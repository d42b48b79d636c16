"""Registry adapters exposing CLUGP (and its Fig-9 ablations) under the
same ``EdgeStream × k → PartitionResult`` interface as the baselines."""
from __future__ import annotations

from repro.core.clugp import clugp_partition
from repro.graphs.generators import EdgeStream
from repro.partitioners.base import PartitionResult, register


def _adapt(stream: EdgeStream, k: int, *, splitting: bool, game: bool, **kw) -> PartitionResult:
    res = clugp_partition(stream, k, splitting=splitting, game=game, **kw)
    return PartitionResult(
        res.edge_partition,
        k,
        seconds=res.total_seconds(),
        space_bytes=res.space_bytes,
        extra={
            "n_clusters": res.n_clusters,
            "clustering_rf": res.clustering_rf,
            "game_rounds": res.game_rounds,
            "phase_seconds": res.phase_seconds,
            "batch_times": res.batch_times,
            # Passes 1 and 3 are O(1) per edge; the game scores m·k per sweep.
            "score_ops": res.score_ops + 2 * stream.n_edges,
        },
    )


@register("clugp")
def clugp(stream: EdgeStream, k: int, **kw) -> PartitionResult:
    """Full CLUGP (splitting + game + transformation)."""
    return _adapt(stream, k, splitting=True, game=True, **kw)


@register("clugp_s")
def clugp_no_split(stream: EdgeStream, k: int, **kw) -> PartitionResult:
    """CLUGP-S ablation: Holl clustering (no splitting operation)."""
    return _adapt(stream, k, splitting=False, game=True, **kw)


@register("clugp_g")
def clugp_no_game(stream: EdgeStream, k: int, **kw) -> PartitionResult:
    """CLUGP-G ablation: greedy size-balancing instead of the Nash game."""
    return _adapt(stream, k, splitting=True, game=False, **kw)

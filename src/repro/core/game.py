"""Pass 2 — game-theoretic cluster partitioning (paper §V, Algorithm 3).

Clusters are players; strategies are the ``k`` partitions; the individual
cost (Eq 11) is

    φ(a_i) = (λ/k)·|c_i|·|a_i|  +  ½(|e(c_i,V∖a_i)| + |e(V∖a_i,c_i)|)

with ``|c_i|`` the intra-cluster edge count and ``|a_i|`` the load of the
chosen partition.  Best-response dynamics converge because the game is an
exact potential game (Theorem 4) with

    Φ(Λ) = (λ/2k)·Σ|p|² + ½·Σ|e(p,V∖p)|.

Loads are tracked as Σ of member clusters' intra-edge counts — the measure
under which the exact-potential identity ΔΦ ≡ Δφ holds (see DESIGN.md §6);
the inter-cluster edges that end up co-located are assigned in pass 3.

Parallelisation (paper §V-D): clusters are grouped into ID-contiguous
batches (locality: BFS clustering makes nearby IDs structurally adjacent);
each batch runs its own best-response game against a snapshot of the other
batches' assignments, bulk-synchronously, optionally on a thread pool. Per
batch wall-times are recorded so Fig 10 can report a *modeled* parallel
time next to the GIL-bound wall-clock (DESIGN.md §4).
"""
from __future__ import annotations

import time
from concurrent.futures import ThreadPoolExecutor
from dataclasses import dataclass, field

import numpy as np


@dataclass
class GameResult:
    """Cluster → partition strategy profile Λ* plus convergence telemetry."""

    assignment: np.ndarray       # cluster id -> partition id
    loads: np.ndarray            # partition id -> Σ|c_i| of members
    lam: float
    rounds: int
    moves: int
    potential_trace: list[float] = field(default_factory=list)
    batch_times: list[float] = field(default_factory=list)
    score_ops: int = 0  # partition-cost evaluations (m·k per sweep)

    def modeled_parallel_seconds(self, threads: int) -> float:
        """LPT-scheduled makespan of the recorded batch times on `threads`."""
        if not self.batch_times:
            return 0.0
        lanes = np.zeros(max(1, threads))
        for t in sorted(self.batch_times, reverse=True):
            lanes[np.argmin(lanes)] += t
        return float(lanes.max())


def lambda_max(sizes: np.ndarray, ext: np.ndarray, k: int) -> float:
    """Theorem 5's upper end of λ's range, the paper's experimental default."""
    tot = float(sizes.sum())
    if tot == 0:
        return 1.0
    return k * k * float(ext.sum()) / (tot * tot)


def lambda_eq(sizes: np.ndarray, ext: np.ndarray, k: int) -> float:
    """Eq 15's equal-importance normalisation (λ_max / k)."""
    return lambda_max(sizes, ext, k) / k


def resolve_lambda(lam, sizes: np.ndarray, ext: np.ndarray, k: int) -> float:
    """``lam`` may be 'max', 'eq', a float, or a relative weight tuple
    ``('weight', w)`` mapping w∈(0,1) to (w/(1−w))·λ_eq (Fig 11(b))."""
    if lam == "max":
        return lambda_max(sizes, ext, k)
    if lam == "eq":
        return lambda_eq(sizes, ext, k)
    if isinstance(lam, tuple) and lam[0] == "weight":
        w = float(lam[1])
        if not 0.0 < w < 1.0:
            raise ValueError(f"relative weight must be in (0,1), got {w}")
        return (w / (1.0 - w)) * lambda_eq(sizes, ext, k)
    return float(lam)


def potential(assignment: np.ndarray, sizes: np.ndarray, adj, lam: float, k: int) -> float:
    """Exact potential Φ(Λ) (Eq 13) under the symmetrised cut weights."""
    loads = np.bincount(assignment, weights=sizes, minlength=k)
    indptr, cols, ws = adj
    # Each unordered inter-cluster pair appears twice in the symmetric CSR.
    rows = np.repeat(np.arange(len(sizes)), np.diff(indptr))
    cut = ws[assignment[rows] != assignment[cols]].sum() / 2.0
    return float(lam / (2.0 * k) * (loads**2).sum() + 0.5 * cut)


def _best_response_pass(
    clusters: np.ndarray,
    assignment: np.ndarray,
    loads: np.ndarray,
    sizes: np.ndarray,
    ext: np.ndarray,
    adj,
    lam: float,
    k: int,
    *,
    commit: bool = True,
) -> int:
    """One round-robin sweep of best responses over ``clusters``.

    Mutates ``assignment``/``loads`` in place when ``commit``; returns the
    number of strategy changes.  Cost per cluster is O(|N(c_i)| + k)
    (Theorem 3's Θ(m) per round amortised).
    """
    indptr, cols, ws = adj
    moves = 0
    for i in clusters.tolist():
        cut_p = np.zeros(k)
        lo, hi = indptr[i], indptr[i + 1]
        if hi > lo:
            np.add.at(cut_p, assignment[cols[lo:hi]], ws[lo:hi])
        size_i = sizes[i]
        cur = assignment[i]
        load_wo = loads.astype(np.float64).copy()
        load_wo[cur] -= size_i
        cost = (lam / k) * size_i * (load_wo + size_i) + 0.5 * (ext[i] - cut_p)
        # Deterministic tie-breaks: lowest cost, then lightest load, then id.
        best = int(np.lexsort((np.arange(k), load_wo, cost))[0])
        if best != cur and cost[best] < cost[cur] - 1e-12:
            moves += 1
            if commit:
                assignment[i] = best
                loads[cur] -= size_i
                loads[best] += size_i
    return moves


def play_game(
    sizes: np.ndarray,
    adj,
    k: int,
    *,
    lam="max",
    batch_size: int = 6400,
    threads: int = 1,
    max_rounds: int = 64,
    seed: int = 0,
    track_potential: bool = False,
) -> GameResult:
    """Find a Nash equilibrium of the cluster-partitioning game.

    Batches of ``batch_size`` ID-contiguous clusters run local best-response
    games bulk-synchronously (each against a snapshot of the others);
    super-rounds repeat until no cluster moves, which the exact-potential
    property guarantees to terminate (Theorem 6 bounds the rounds).
    """
    m = len(sizes)
    indptr, cols, ws = adj
    ext = np.zeros(m)
    np.add.at(ext, np.repeat(np.arange(m), np.diff(indptr)), ws)
    lam_v = resolve_lambda(lam, sizes, ext, k)

    rng = np.random.default_rng(seed)
    assignment = rng.integers(0, k, m, dtype=np.int64)
    loads = np.bincount(assignment, weights=sizes, minlength=k)
    batches = [np.arange(s, min(s + batch_size, m)) for s in range(0, m, batch_size)]

    result = GameResult(assignment, loads, lam_v, rounds=0, moves=0)
    if track_potential:
        result.potential_trace.append(potential(assignment, sizes, adj, lam_v, k))

    def run_batch(batch: np.ndarray) -> tuple[np.ndarray, float]:
        # Thread-local game against a snapshot of the other batches (the
        # paper's independent-thread model); committed bulk-synchronously.
        t0 = time.perf_counter()
        a_local = assignment.copy()
        l_local = loads.copy().astype(np.float64)
        for _ in range(max_rounds):
            result.score_ops += len(batch) * k
            if _best_response_pass(batch, a_local, l_local, sizes, ext, adj, lam_v, k) == 0:
                break
        return a_local[batch], time.perf_counter() - t0

    for sweep in range(max_rounds):
        result.rounds += 1
        moved = 0
        if threads > 1 and len(batches) > 1 and sweep == 0:
            # Parallel phase: one concurrent equilibrium pass per batch.
            with ThreadPoolExecutor(max_workers=threads) as pool:
                outs = list(pool.map(run_batch, batches))
            for batch, (a_new, dt) in zip(batches, outs):
                result.batch_times.append(dt)
                for j, i in enumerate(batch.tolist()):
                    if a_new[j] != assignment[i]:
                        moved += 1
                        loads[assignment[i]] -= sizes[i]
                        loads[a_new[j]] += sizes[i]
                        assignment[i] = a_new[j]
        else:
            # Live sequential sweeps: every committed move strictly lowers
            # the potential Φ, so this phase terminates at an equilibrium
            # (bulk-synchronous snapshot commits could oscillate instead).
            loads_f = loads.astype(np.float64)
            for batch in batches:
                t0 = time.perf_counter()
                moved += _best_response_pass(
                    batch, assignment, loads_f, sizes, ext, adj, lam_v, k
                )
                result.batch_times.append(time.perf_counter() - t0)
                result.score_ops += len(batch) * k
            loads = loads_f
        result.moves += moved
        if track_potential:
            result.potential_trace.append(potential(assignment, sizes, adj, lam_v, k))
        if moved == 0:
            break
    result.loads = loads
    return result


def greedy_assign(sizes: np.ndarray, k: int) -> GameResult:
    """CLUGP-G ablation (Fig 9): big clusters go to small partitions, no game."""
    assignment = np.zeros(len(sizes), dtype=np.int64)
    loads = np.zeros(k)
    for i in np.argsort(-sizes, kind="stable").tolist():
        p = int(np.argmin(loads))
        assignment[i] = p
        loads[p] += sizes[i]
    return GameResult(assignment, loads, lam=0.0, rounds=1, moves=len(sizes))

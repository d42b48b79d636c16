"""PageRank as a GAS vertex program over the DataFrame engine.

The rank values are computed exactly (they do not depend on the
partitioning — PowerGraph's GAS is deterministic up to float order), while
the per-iteration computation/communication *work* is a function of the
layout and is accounted by ``repro.engine.gas`` + ``costmodel``.  Tests
verify the ranks against a dense numpy power iteration via the DuckDB
oracle pattern.

Formulation: standard damped PageRank without dangling-mass
redistribution, ``r' = (1−d)/N + d·Σ_{(u,v)∈E} r(u)/outdeg(u)`` — matching
PowerGraph's example program.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.graphs.generators import EdgeStream


def pagerank(assign: DataFrame, *, iterations: int = 10, damping: float = 0.85) -> DataFrame:
    """Run PageRank over the edge relation; returns (v, rank).

    Each iteration is one Spark shuffle (groupBy dst) — the dataflow
    analogue of a GAS superstep's gather, with the master-side apply as
    the following projection.
    """
    edges = assign.select("src", "dst").cache()
    verts = (
        edges.select(F.col("src").alias("v"))
        .unionAll(edges.select(F.col("dst").alias("v")))
        .distinct()
        .cache()
    )
    n = verts.count()
    outdeg = edges.groupBy("src").agg(F.count("*").alias("outdeg"))
    ranks = verts.withColumn("rank", F.lit(1.0 / n))

    for _ in range(iterations):
        contribs = (
            edges.join(ranks, edges.src == ranks.v)
            .join(outdeg, "src")
            .select(F.col("dst").alias("v"), (F.col("rank") / F.col("outdeg")).alias("c"))
            .groupBy("v")
            .agg(F.sum("c").alias("gathered"))
        )
        ranks = (
            verts.join(contribs, "v", "left")
            .select(
                "v",
                (
                    F.lit((1.0 - damping) / n)
                    + F.lit(damping) * F.coalesce(F.col("gathered"), F.lit(0.0))
                ).alias("rank"),
            )
        )
    out = ranks
    edges.unpersist()
    return out


def pagerank_reference(stream: EdgeStream, *, iterations: int = 10, damping: float = 0.85) -> np.ndarray:
    """Dense numpy power iteration with identical semantics (the oracle)."""
    ids = np.union1d(stream.src, stream.dst)
    remap = {int(v): i for i, v in enumerate(ids)}
    src = np.array([remap[int(x)] for x in stream.src])
    dst = np.array([remap[int(x)] for x in stream.dst])
    n = len(ids)
    outdeg = np.bincount(src, minlength=n).astype(np.float64)
    r = np.full(n, 1.0 / n)
    for _ in range(iterations):
        contrib = np.zeros(n)
        np.add.at(contrib, dst, r[src] / outdeg[src])
        r = (1.0 - damping) / n + damping * contrib
    return np.column_stack([ids, r])

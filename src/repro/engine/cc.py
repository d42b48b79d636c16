"""Connected components as a GAS vertex program (label propagation).

The paper's second representative workload ("pagerank and connected
component", §I/§VI).  Labels propagate the minimum vertex id over
undirected edges until fixpoint; each round is one Spark shuffle, and
returns the number of rounds so the cost model can charge per-iteration
communication.  Tests verify against a driver-side union-find.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.graphs.generators import EdgeStream


def connected_components(assign: DataFrame, *, max_iters: int = 50) -> tuple[DataFrame, int]:
    """Min-label propagation; returns ((v, component), rounds_used)."""
    und = (
        assign.select("src", "dst")
        .unionAll(assign.select(F.col("dst").alias("src"), F.col("src").alias("dst")))
        .distinct()
        .cache()
    )
    labels = (
        und.select(F.col("src").alias("v")).distinct().withColumn("label", F.col("v"))
    )
    rounds = 0
    for _ in range(max_iters):
        rounds += 1
        nbr_min = (
            und.join(labels, und.dst == labels.v)
            .groupBy("src")
            .agg(F.min("label").alias("nbr"))
        )
        new_labels = (
            labels.join(nbr_min, labels.v == nbr_min.src, "left")
            .select("v", F.least(F.col("label"), F.coalesce("nbr", "label")).alias("label"))
            .cache()
        )
        changed = (
            new_labels.alias("n")
            .join(labels.alias("o"), "v")
            .filter(F.col("n.label") != F.col("o.label"))
            .count()
        )
        labels = new_labels
        if changed == 0:
            break
    und.unpersist()
    return labels.select("v", F.col("label").alias("component")), rounds


def cc_reference(stream: EdgeStream) -> np.ndarray:
    """Union-find oracle: (v, component) with component = min id in set."""
    ids = np.union1d(stream.src, stream.dst)
    remap = {int(v): i for i, v in enumerate(ids)}
    parent = np.arange(len(ids))

    def find(x: int) -> int:
        while parent[x] != x:
            parent[x] = parent[parent[x]]
            x = parent[x]
        return x

    for u, v in zip(stream.src.tolist(), stream.dst.tolist()):
        ru, rv = find(remap[u]), find(remap[v])
        if ru != rv:
            parent[max(ru, rv)] = min(ru, rv)
    roots = np.array([find(i) for i in range(len(ids))])
    # Canonical component id = min original vertex id in the set.
    comp = ids[roots]
    return np.column_stack([ids, comp])

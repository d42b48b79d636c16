"""Tests for the distributed (Spark) CLUGP pipeline and the generic
Spark lift of the one-pass partitioners."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.core.clugp import clugp_partition, clugp_partition_spark
from repro.metrics.quality import quality, quality_local
from repro.partitioners import partition_spark


@pytest.fixture(scope="module")
def edges_df(spark, tiny_web):
    return tiny_web.to_spark(spark).cache()


@pytest.mark.parametrize("n_nodes", [1, 2, 4])
def test_spark_pipeline_covers_all_edges(spark, tiny_web, edges_df, n_nodes):
    out = clugp_partition_spark(edges_df, 8, n_nodes=n_nodes)
    assert out.count() == tiny_web.n_edges
    assert set(out.columns) == {"pos", "src", "dst", "partition"}
    mm = out.agg(F.min("partition"), F.max("partition")).collect()[0]
    assert mm[0] >= 0 and mm[1] < 8


def test_spark_single_node_matches_sequential(spark, tiny_web, edges_df):
    """n_nodes=1 must reproduce the driver-side kernel bit-for-bit."""
    seq = clugp_partition(tiny_web, 8)
    dist = (
        clugp_partition_spark(edges_df, 8, n_nodes=1)
        .orderBy("pos")
        .select("partition")
        .toPandas()["partition"]
        .to_numpy()
    )
    assert np.array_equal(dist, seq.edge_partition)


def test_spark_multi_node_quality_reasonable(spark, tiny_web, edges_df):
    """Distributed partitioning stays balanced and within ~2× of the
    sequential pipeline's RF (each node only sees a substream)."""
    seq = clugp_partition(tiny_web, 8)
    q_seq = quality_local(tiny_web, seq.edge_partition, 8)
    out = clugp_partition_spark(edges_df, 8, n_nodes=4)
    q_dist = quality(out, 8)
    assert q_dist["relative_balance"] <= 1.25
    assert q_dist["replication_factor"] <= 2.0 * q_seq["replication_factor"]


def test_spark_preserves_edge_identity(spark, edges_df, tiny_web):
    out = clugp_partition_spark(edges_df, 4, n_nodes=2).orderBy("pos").toPandas()
    assert np.array_equal(out["src"].to_numpy(), tiny_web.src)
    assert np.array_equal(out["dst"].to_numpy(), tiny_web.dst)


@pytest.mark.parametrize("algo", ["hashing", "dbh", "hdrf", "mint"])
def test_partition_spark_lift(spark, tiny_web, edges_df, algo):
    """The generic Spark lift agrees with the sequential kernel."""
    from repro.partitioners import get_partitioner

    out = (
        partition_spark(edges_df, algo, 4)
        .orderBy("pos")
        .select("partition")
        .toPandas()["partition"]
        .to_numpy()
    )
    seq = get_partitioner(algo)(tiny_web, 4).edge_partition
    assert np.array_equal(out, seq)


def test_spark_ablation_flags(spark, edges_df):
    out = clugp_partition_spark(edges_df, 4, n_nodes=2, splitting=False, game=False)
    assert out.count() > 0

"""Metric correctness: Spark aggregations vs the DuckDB oracle, and the
driver-side (numpy) fast path vs the Spark path."""
import numpy as np
import pytest

from repro.metrics.quality import (
    assignment_df,
    quality,
    quality_local,
    replicas,
    replication_factor_df,
)
from repro.oracle import assert_equivalent
from repro.partitioners import get_partitioner


@pytest.fixture(scope="module")
def tiny_assignment(tiny_web):
    res = get_partitioner("hdrf")(tiny_web, 8)
    return tiny_web, res.edge_partition


def test_assignment_df_schema(spark, tiny_assignment):
    stream, parts = tiny_assignment
    df = assignment_df(spark, stream, parts)
    assert set(df.columns) == {"pos", "src", "dst", "partition"}
    assert df.count() == stream.n_edges


def test_replication_factor_oracle(spark, tiny_assignment):
    """RF via Spark == RF via DuckDB SQL over the same relation."""
    stream, parts = tiny_assignment
    assign = assignment_df(spark, stream, parts)
    assert_equivalent(
        replication_factor_df(assign),
        """
        WITH copies AS (
          SELECT DISTINCT v, partition FROM (
            SELECT src AS v, partition FROM assign
            UNION ALL
            SELECT dst AS v, partition FROM assign
          )
        )
        SELECT count(*) / count(DISTINCT v) AS replication_factor FROM copies
        """,
        assign=assign,
    )


def test_replicas_relation_oracle(spark, tiny_assignment):
    stream, parts = tiny_assignment
    assign = assignment_df(spark, stream, parts)
    assert_equivalent(
        replicas(assign).groupBy("partition").count().withColumnRenamed("count", "n"),
        """
        SELECT partition, count(*) AS n FROM (
          SELECT DISTINCT v, partition FROM (
            SELECT src AS v, partition FROM assign
            UNION ALL
            SELECT dst AS v, partition FROM assign
          )
        ) GROUP BY partition
        """,
        assign=assign,
    )


def test_quality_spark_vs_local(spark, tiny_assignment):
    """The numpy fast path must agree exactly with the Spark aggregations."""
    stream, parts = tiny_assignment
    q_spark = quality(assignment_df(spark, stream, parts), 8)
    q_local = quality_local(stream, parts, 8)
    for key in q_spark:
        assert q_spark[key] == pytest.approx(q_local[key]), key


@pytest.mark.parametrize("algo", ["hashing", "clugp"])
def test_quality_local_all_algos(spark, tiny_web, algo):
    parts = get_partitioner(algo)(tiny_web, 4).edge_partition
    q_spark = quality(assignment_df(spark, tiny_web, parts), 4)
    q_local = quality_local(tiny_web, parts, 4)
    assert q_spark["replication_factor"] == pytest.approx(q_local["replication_factor"])
    assert q_spark["relative_balance"] == pytest.approx(q_local["relative_balance"])


def test_rf_lower_bound_one(tiny_web):
    """RF ≥ 1 always (every vertex has at least its master copy)."""
    for algo in ("hashing", "clugp"):
        parts = get_partitioner(algo)(tiny_web, 8).edge_partition
        assert quality_local(tiny_web, parts, 8)["replication_factor"] >= 1.0


def test_rf_upper_bound_k(tiny_web):
    parts = get_partitioner("hashing")(tiny_web, 4).edge_partition
    assert quality_local(tiny_web, parts, 4)["replication_factor"] <= 4.0


def test_single_partition_rf_is_one(tiny_web):
    parts = np.zeros(tiny_web.n_edges, dtype=np.int64)
    q = quality_local(tiny_web, parts, 1)
    assert q["replication_factor"] == 1.0
    assert q["relative_balance"] == 1.0

"""Benchmark — Fig 7: partitioning runtime vs partitions (DESIGN.md section 5: f7)."""
from benchmarks.conftest import run_table


def test_f7_time(benchmark, save_table):
    df = run_table(benchmark, save_table, "f7", **dict(sf=0.03, ks=[4, 16, 64, 256]))
    assert (df.seconds > 0).all()

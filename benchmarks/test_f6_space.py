"""Benchmark — Fig 6: partitioner space vs partitions (DESIGN.md section 5: f6)."""
from benchmarks.conftest import run_table


def test_f6_space(benchmark, save_table):
    df = run_table(benchmark, save_table, "f6", **dict(sf=0.03, ks=[4, 16, 64, 256]))
    assert (df.loc[df.algo == "Hashing", "space_mb"] == 0).all()

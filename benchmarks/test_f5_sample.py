"""Benchmark — Fig 5: RF vs sampled graph size (DESIGN.md section 5: f5)."""
from benchmarks.conftest import run_table


def test_f5_sample(benchmark, save_table):
    df = run_table(benchmark, save_table, "f5", **dict(sf=0.1, k=128, fractions=(0.03, 0.1, 0.3, 1.0), algos=["clugp", "hdrf", "dbh", "hashing"]))
    assert set(df.sample_frac) == {0.03, 0.1, 0.3, 1.0}

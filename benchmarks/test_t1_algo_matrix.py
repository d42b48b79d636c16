"""Benchmark — Table I: algorithm time/quality matrix (DESIGN.md section 5: t1)."""
from benchmarks.conftest import run_table


def test_t1_algo_matrix(benchmark, save_table):
    df = run_table(benchmark, save_table, "t1", **dict(sf=0.05, k=256))
    assert set(df.algo) == {"CLUGP", "HDRF", "Greedy", "Mint", "DBH", "Hashing"}
    assert df.loc[df.algo == "CLUGP", "quality_class"].iloc[0] == "High"

"""Benchmark — Fig 9: splitting/game ablation (DESIGN.md section 5: f9)."""
from benchmarks.conftest import run_table


def test_f9_ablation(benchmark, save_table):
    df = run_table(benchmark, save_table, "f9", **dict(sf=0.03, ks=[4, 16, 64, 256]))
    assert set(df.algo) == {"CLUGP", "CLUGP-S", "CLUGP-G"}

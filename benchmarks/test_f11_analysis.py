"""Benchmark — Fig 11: tau and weight sensitivity (DESIGN.md section 5: f11)."""
from benchmarks.conftest import run_table


def test_f11_analysis(benchmark, save_table):
    df = run_table(benchmark, save_table, "f11", **dict(sf=0.03, k=64))
    assert set(df.sweep) == {"tau", "relative_weight"}

"""Benchmark — Table III: dataset statistics (DESIGN.md section 5: t3)."""
from benchmarks.conftest import run_table


def test_t3_datasets(benchmark, save_table):
    df = run_table(benchmark, save_table, "t3", **dict(sf=0.05))
    assert len(df) == 5

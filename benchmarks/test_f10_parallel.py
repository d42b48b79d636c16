"""Benchmark — Fig 10: game parallelization (DESIGN.md section 5: f10)."""
from benchmarks.conftest import run_table


def test_f10_parallel(benchmark, save_table):
    df = run_table(benchmark, save_table, "f10", **dict(sf=0.1, k=64, threads=(1, 2, 4, 8), batch_sizes=(400, 1600, 6400, 25600)))
    assert set(df.sweep) == {"threads", "batch_size"}

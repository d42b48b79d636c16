"""Benchmark — Fig 4: Twitter RF + total task runtime (DESIGN.md section 5: f4)."""
from benchmarks.conftest import run_table


def test_f4_twitter(benchmark, save_table):
    df = run_table(benchmark, save_table, "f4", **dict(sf=0.03, ks=[4, 16, 64, 256]))
    assert (df.total_task_s > 0).all()

"""Benchmark — Fig 8: simulated PageRank system cost (DESIGN.md section 5: f8)."""
from benchmarks.conftest import run_table


def test_f8_system(benchmark, save_table):
    df = run_table(benchmark, save_table, "f8", **dict(sf=0.03, k=32, rtts_ms=(0.0, 10.0, 50.0, 100.0)))
    assert (df.pagerank_total_s > 0).all()

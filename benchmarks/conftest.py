"""Benchmark plumbing: each benchmark runs one table runner at bench
scale (pedantic, 1 round — these are experiments, not microbenchmarks)
and persists the measured table to ``bench_results/<id>.md`` so
EXPERIMENTS.md can be regenerated from the artifacts."""
from __future__ import annotations

import pathlib

import pandas as pd
import pytest

RESULTS_DIR = pathlib.Path(__file__).resolve().parent.parent / "bench_results"


@pytest.fixture(scope="session")
def save_table():
    RESULTS_DIR.mkdir(exist_ok=True)

    def _save(table_id: str, df: pd.DataFrame) -> pd.DataFrame:
        from repro.experiments.harness import to_markdown

        (RESULTS_DIR / f"{table_id}.md").write_text(to_markdown(df) + "\n")
        return df

    return _save


def run_table(benchmark, save_table, table_id: str, **kwargs):
    """Execute one registered table runner under pytest-benchmark."""
    from repro.experiments.tables import TABLES

    df = benchmark.pedantic(
        lambda: TABLES[table_id](**kwargs), rounds=1, iterations=1
    )
    save_table(table_id, df)
    assert len(df) > 0
    return df

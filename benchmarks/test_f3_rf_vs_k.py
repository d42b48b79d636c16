"""Benchmark — Fig 3(a–d): replication factor vs #partitions on the four
web-graph stand-ins (DESIGN.md §5: f3)."""

import pytest


from repro.experiments.tables import f3_rf_vs_k

KS = [4, 16, 64, 256]


@pytest.mark.parametrize("name", ["uk", "arabic", "webbase", "it"])
def test_f3_rf_vs_k(benchmark, save_table, name):
    df = benchmark.pedantic(
        lambda: f3_rf_vs_k(name, sf=0.03, ks=KS), rounds=1, iterations=1
    )
    df.insert(0, "dataset", name)
    save_table(f"f3_{name}", df)
    # CLUGP is the quality leader at the largest k on every web graph.
    top = df[df.k == KS[-1]].sort_values("replication_factor")
    assert top.algo.iloc[0] == "CLUGP", top[["algo", "replication_factor"]]

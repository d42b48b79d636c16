"""Shared fixtures: small deterministic graphs (session-scoped, cheap)."""
from __future__ import annotations

import pytest

from repro.graphs import generators as G

TINY_SF = 0.002   # ~6k edges / 400 vertices — unit-test scale
SMALL_SF = 0.01   # ~30k edges / 2k vertices — shape-test scale


@pytest.fixture(scope="session")
def tiny_web() -> G.EdgeStream:
    return G.web_graph(sf=TINY_SF, seed=3)


@pytest.fixture(scope="session")
def small_web() -> G.EdgeStream:
    return G.web_graph(sf=SMALL_SF, seed=3)


@pytest.fixture(scope="session")
def tiny_social() -> G.EdgeStream:
    return G.social_graph(sf=TINY_SF, seed=4)

"""Benchmark: Figure 7 — each BKx baseline and its RMCEx counterpart on all
18 analogs (speedup = BKx time / RMCEx time from the stored rows)."""
from __future__ import annotations

import pytest

from repro.graphs.catalog import GRAPH_NAMES
from repro.mce.engine import algorithm_config, enumerate_cliques

from ._cache import graph

ALGOS = [
    "BKdegen", "RMCEdegen",
    "BKrcd", "RMCErcd",
    "BKfacen", "RMCEfacen",
    "BKrevised", "RMCErevised",
]


@pytest.mark.parametrize("algo", ALGOS)
@pytest.mark.parametrize("name", GRAPH_NAMES)
def test_fig7_speedups(benchmark, name, algo):
    g = graph(name)
    cfg = algorithm_config(algo)
    res = benchmark.pedantic(
        lambda: enumerate_cliques(g, **cfg), rounds=1, iterations=1
    )
    assert res.n_cliques > 0

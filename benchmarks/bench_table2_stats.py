"""Benchmark: Table 2 statistics (n, m, d_max, λ) per catalog analog.

The distributed version of the same computation is
``jobs/table2_graph_stats.py``; here the local substrate keeps the
benchmark suite fast while still exercising the full peeling logic.
"""
from __future__ import annotations

import pytest

from repro.graphs.catalog import GRAPH_NAMES
from repro.mce.bitgraph import degeneracy_order

from ._cache import graph


@pytest.mark.parametrize("name", GRAPH_NAMES)
def test_table2_stats(benchmark, name):
    g = graph(name)

    def stats():
        order, core, lam = degeneracy_order(g)
        return {"n": g.n, "m": g.m, "d_max": g.max_degree(), "lam": lam}

    out = benchmark.pedantic(stats, rounds=2, iterations=1)
    assert out["n"] > 0 and out["lam"] >= 1

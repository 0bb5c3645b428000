"""Benchmark: Table 3 ablation — RMCEdegen vs Variant1/2/3 on all 18 analogs.

Regenerates the Table 3 timing grid (`jobs/table3_ablation.py` prints the
paper-vs-ours rows from the same measurements).
"""
from __future__ import annotations

import pytest

from repro.bench.paper import TABLE3_COLUMNS
from repro.graphs.catalog import GRAPH_NAMES
from repro.mce.engine import algorithm_config, enumerate_cliques

from ._cache import graph


@pytest.mark.parametrize("algo", TABLE3_COLUMNS)
@pytest.mark.parametrize("name", GRAPH_NAMES)
def test_table3_ablation(benchmark, name, algo):
    g = graph(name)
    cfg = algorithm_config(algo)
    res = benchmark.pedantic(
        lambda: enumerate_cliques(g, **cfg), rounds=1, iterations=1
    )
    assert res.n_cliques > 0

"""The four inner recursions (no reductions) must equal the brute force."""
from __future__ import annotations

import numpy as np
import pytest

from repro.mce.bitgraph import LocalGraph
from repro.mce.engine import enumerate_cliques
from repro.mce.recursions import RECURSIONS
from repro.mce.reference import maximal_cliques_bruteforce
from tests.conftest import KNOWN_GRAPHS


@pytest.mark.parametrize("rec", RECURSIONS)
@pytest.mark.parametrize("name", list(KNOWN_GRAPHS))
def test_known_graphs(rec, name):
    g = LocalGraph.from_edges(np.array(KNOWN_GRAPHS[name]))
    res = enumerate_cliques(g, rec, False, False, False)
    assert res.cliques == maximal_cliques_bruteforce(g)
    assert len(res.reported) == len(res.cliques), "duplicate reports"


@pytest.mark.parametrize("rec", RECURSIONS)
def test_fuzz_battery(rec, fuzz_graphs):
    for g in fuzz_graphs:
        truth = maximal_cliques_bruteforce(g)
        res = enumerate_cliques(g, rec, False, False, False)
        assert res.cliques == truth
        assert len(res.reported) == len(res.cliques)


def test_unknown_recursion_rejected():
    g = LocalGraph.from_edges([(0, 1)])
    with pytest.raises(ValueError):
        enumerate_cliques(g, "bogus", False, False, False)


@pytest.mark.parametrize("rec", RECURSIONS)
def test_empty_graph(rec):
    g = LocalGraph({})
    res = enumerate_cliques(g, rec, False, False, False)
    assert res.cliques == set()


@pytest.mark.parametrize("rec", RECURSIONS)
def test_single_edge(rec):
    res = enumerate_cliques(LocalGraph.from_edges([(5, 9)]), rec, False, False, False)
    assert res.cliques == {(5, 9)}


@pytest.mark.parametrize("rec", RECURSIONS)
def test_recursive_call_counter_counts_roots(rec):
    g = LocalGraph.from_edges(KNOWN_GRAPHS["k5"])
    res = enumerate_cliques(g, rec, False, False, False)
    # one frame per outer vertex, except the last (P empty, skipped)
    assert res.metrics.recursive_calls >= g.n - 1
    assert res.metrics.subproblems == g.n


def test_pivot_prunes_vs_no_pivot_bound():
    # On K5 the Tomita pivot expands only one branch per level.
    g = LocalGraph.from_edges(KNOWN_GRAPHS["k5"])
    res = enumerate_cliques(g, "pivot", False, False, False)
    assert res.metrics.recursive_calls <= 2 * g.n


def test_rcd_dense_fast_path():
    # rcd terminates the descent as soon as P is a clique — K5 needs no
    # deeper recursion than the root frames.
    g = LocalGraph.from_edges(KNOWN_GRAPHS["k5"])
    res = enumerate_cliques(g, "rcd", False, False, False)
    assert res.metrics.recursive_calls == g.n - 1

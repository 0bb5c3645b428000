"""Brute-force reference enumerator sanity (the oracle must itself be right)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.mce.bitgraph import LocalGraph
from repro.mce.reference import (
    is_clique,
    is_maximal_clique,
    maximal_cliques_bruteforce,
    maximal_cliques_from_edges,
)
from tests.conftest import KNOWN_CLIQUES, KNOWN_GRAPHS


@pytest.mark.parametrize("name", list(KNOWN_CLIQUES))
def test_known_clique_sets(name):
    got = maximal_cliques_from_edges(np.array(KNOWN_GRAPHS[name]))
    assert got == KNOWN_CLIQUES[name]


def test_petersen_count():
    # Petersen graph is triangle-free: maximal cliques = its 15 edges.
    got = maximal_cliques_from_edges(np.array(KNOWN_GRAPHS["petersen"]))
    assert len(got) == 15
    assert all(len(c) == 2 for c in got)


def test_singletons_excluded():
    g = LocalGraph.from_edges([(0, 1)])
    g.adj[7] = set()  # isolated vertex
    assert maximal_cliques_bruteforce(g) == {(0, 1)}


def test_every_report_is_maximal():
    g = LocalGraph.from_edges(KNOWN_GRAPHS["paper_fig2"])
    for c in maximal_cliques_bruteforce(g):
        assert is_maximal_clique(g, c)


def test_is_clique():
    g = LocalGraph.from_edges(KNOWN_GRAPHS["two_triangles_shared_edge"])
    assert is_clique(g, (0, 1, 2))
    assert not is_clique(g, (0, 1, 3))
    assert is_clique(g, (1,))


def test_is_maximal_clique():
    g = LocalGraph.from_edges(KNOWN_GRAPHS["two_triangles_shared_edge"])
    assert is_maximal_clique(g, (0, 1, 2))
    assert not is_maximal_clique(g, (1, 2))  # extendable by 0 or 3
    assert not is_maximal_clique(g, (0, 3))  # not a clique


def test_maximality_cross_check_random():
    rng = np.random.default_rng(3)
    e = [(i, j) for i in range(10) for j in range(i + 1, 10) if rng.random() < 0.4]
    g = LocalGraph.from_edges(np.array(e))
    cliques = maximal_cliques_bruteforce(g)
    # every maximal clique is maximal; every edge is covered by some clique
    for c in cliques:
        assert is_maximal_clique(g, c)
    covered = {frozenset((a, b)) for c in cliques for a in c for b in c if a < b}
    assert covered == {frozenset(x) for x in g.edges()}

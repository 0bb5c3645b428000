"""Dynamic reduction (Algorithm 7 / Lemmas 5, 7, 8) unit + regression tests."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core.dynamic_reduction import dynamic_reduce
from repro.mce.bitgraph import LocalGraph
from repro.mce.engine import enumerate_cliques
from repro.mce.recursions import RECURSIONS
from repro.mce.reference import maximal_cliques_bruteforce
from tests.conftest import KNOWN_GRAPHS, random_edges


def _sub(adj_pairs, n, x_edges=(), nx=0):
    """Build a raw local subproblem: candidates 0..n-1, forbidden n..n+nx-1.

    ``adj_pairs`` are candidate-candidate edges, ``x_edges`` are
    (forbidden_local_index, candidate) pairs.
    """
    adj = [0] * (n + nx)
    for a, b in adj_pairs:
        adj[a] |= 1 << b
        adj[b] |= 1 << a
    for xi, c in x_edges:
        adj[n + xi] |= 1 << c
        adj[c] |= 1 << (n + xi)
    ids = list(range(n + nx))
    p_mask = (1 << n) - 1
    x_mask = ((1 << (n + nx)) - 1) ^ p_mask
    return adj, ids, p_mask, x_mask


def test_degree_zero_unmarked_reports():
    # P = {0} isolated, X empty: R∪{0} reported, P emptied.
    adj, ids, P, X = _sub([], 1)
    got = []
    r, p, x, rem, hoist = dynamic_reduce(adj, ids, ["R"], P, X, got.append)
    # degree-(|P|-1) hoist catches the singleton before the report path?
    # no: pass 1 removes it first with a report.
    assert got == [["R", 0]]
    assert p == 0 and rem == 0b1 and hoist == 0


def test_degree_zero_marked_suppressed():
    # candidate 0 isolated in P but adjacent to forbidden vertex -> no report.
    adj, ids, P, X = _sub([], 1, x_edges=[(0, 0)], nx=1)
    got = []
    r, p, x, rem, hoist = dynamic_reduce(adj, ids, ["R"], P, X, got.append)
    assert got == []
    assert p == 0 and rem == 0b1


def test_degree_one_pair_removed_once():
    # isolated candidate edge (0,1), X empty: one report, both removed.
    adj, ids, P, X = _sub([(0, 1)], 2)
    got = []
    r, p, x, rem, hoist = dynamic_reduce(adj, ids, [], P, X, got.append)
    assert got == [[0, 1]]
    assert p == 0 and rem == 0b11


def test_degree_one_both_marked_kept():
    # both endpoints have forbidden witnesses -> relaxed rule must not fire.
    adj, ids, P, X = _sub([(0, 1)], 2, x_edges=[(0, 0), (0, 1)], nx=1)
    got = []
    r, p, x, rem, hoist = dynamic_reduce(adj, ids, [], P, X, got.append)
    assert got == []
    # pass 2 then hoists nothing reportable; candidates stay for the search
    assert p | hoist != 0


def test_degree_p_minus_1_hoist():
    # K3 candidates: all three are dynamic degree-(|P|-1) -> all hoisted.
    adj, ids, P, X = _sub([(0, 1), (0, 2), (1, 2)], 3)
    got = []
    r, p, x, rem, hoist = dynamic_reduce(adj, ids, ["R"], P, X, got.append)
    assert r == ["R", 0, 1, 2]
    assert p == 0 and hoist == 0b111 and got == []


def test_hoist_updates_forbidden():
    # hoisting intersects X with the hoisted neighborhoods (Alg. 7 line 15).
    adj, ids, P, X = _sub(
        [(0, 1)], 2, x_edges=[(0, 0), (0, 1), (1, 0)], nx=2
    )
    # both candidates marked => pair rule off; both are degree-(|P|-1).
    got = []
    r, p, x, rem, hoist = dynamic_reduce(adj, ids, [], P, X, got.append)
    assert hoist == 0b11
    # x0 adjacent to both -> kept; x1 adjacent only to candidate 0 -> dropped.
    assert x == (1 << 2)


def test_suppression_scenario_degraded_vertex():
    """The frame-level suppression case: star P = {a; b, c} where removing
    b and c as degree-1 partners leaves ``a`` hoisted — reporting R∪{a}
    would be wrong because b extends it. Covered end-to-end: the engine's
    clique set must equal brute force on a graph engineered to hit it."""
    # root r adjacent to a,b,c ; a-b, a-c edges; nothing else.
    g = LocalGraph.from_edges([(9, 1), (9, 2), (9, 3), (1, 2), (1, 3)])
    truth = maximal_cliques_bruteforce(g)
    for rec in RECURSIONS:
        res = enumerate_cliques(g, rec, False, True, False)
        assert res.cliques == truth, rec


@pytest.mark.parametrize("rec", RECURSIONS)
@pytest.mark.parametrize("name", list(KNOWN_GRAPHS))
def test_dynamic_on_known(rec, name):
    g = LocalGraph.from_edges(np.array(KNOWN_GRAPHS[name]))
    truth = maximal_cliques_bruteforce(g)
    res = enumerate_cliques(g, rec, False, True, False)
    assert res.cliques == truth
    assert len(res.reported) == len(res.cliques)


@pytest.mark.parametrize("rec", RECURSIONS)
def test_dynamic_fuzz(rec, fuzz_graphs):
    for g in fuzz_graphs:
        truth = maximal_cliques_bruteforce(g)
        res = enumerate_cliques(g, rec, False, True, False)
        assert res.cliques == truth
        assert len(res.reported) == len(res.cliques)


def test_dynamic_reduces_calls():
    # dense graph: the degree-(|P|-1) rule collapses whole clique descents.
    e = random_edges(16, 0.75, 9)
    g = LocalGraph.from_edges(e)
    base = enumerate_cliques(g, "pivot", False, False, False)
    dyn = enumerate_cliques(g, "pivot", False, True, False)
    assert dyn.cliques == base.cliques
    assert dyn.metrics.recursive_calls <= base.metrics.recursive_calls

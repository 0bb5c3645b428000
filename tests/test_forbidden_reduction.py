"""Maximality-check reduction (Lemma 9 / Algorithm 8): soundness repair,
closed-form equivalence, and engine-level equality."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core.forbidden_reduction import (
    compute_ignore_ids,
    reduce_forbidden,
    update_ignore_ids,
)
from repro.mce.bitgraph import LocalGraph, degeneracy_order
from repro.mce.engine import enumerate_cliques
from repro.mce.recursions import RECURSIONS
from repro.mce.reference import maximal_cliques_bruteforce
from tests.conftest import KNOWN_GRAPHS, random_edges

# The 10-vertex graph on which Algorithm 8's drop rule erases every witness
# of the non-maximal clique {6,8} via the dominance cycle 0 -> 1 -> 3 -> 0
# (discovered by fuzzing; see DESIGN.md §2.3).
CYCLE_COUNTEREXAMPLE = [
    (0, 1), (0, 3), (0, 4), (0, 5), (0, 6), (0, 7), (0, 8), (0, 9),
    (1, 2), (1, 3), (1, 6), (1, 7), (1, 8), (1, 9),
    (2, 4), (2, 6), (2, 7), (2, 9),
    (3, 5), (3, 6), (3, 8), (3, 9),
    (4, 5), (4, 6), (4, 7),
    (5, 6), (5, 7), (5, 9),
    (6, 8), (7, 8),
]


def test_paper_rule_nonchained_unsound():
    """Dropping every u with ignoreId[u] < i — Algorithm 8 lines 2-5 as
    printed — reports the non-maximal clique {6,8} on the counterexample.
    This documents why the chain-sound resolution exists."""
    g = LocalGraph.from_edges(np.array(CYCLE_COUNTEREXAMPLE))
    order, _, _ = degeneracy_order(g)
    rank = {v: i for i, v in enumerate(order)}
    ignore_id, _dom = compute_ignore_ids(g, order, rank)
    i6 = rank[6]
    x6 = [u for u in g.adj[6] if rank[u] < i6]
    naive_kept = [u for u in x6 if ignore_id[u] >= i6]
    # The branch on 8 inside 6's subproblem sees X ∩ N(8): naive dropping
    # erases every witness that {6,8} ⊂ {0,6,8}/{1,6,8}/{3,6,8} — unsound.
    witnesses = [u for u in naive_kept if u in g.adj[8]]
    assert witnesses == [], "counterexample no longer triggers — regenerate"
    assert any(u in g.adj[8] for u in x6), "X must contain a real witness"


def test_chain_resolution_repairs_counterexample():
    g = LocalGraph.from_edges(np.array(CYCLE_COUNTEREXAMPLE))
    truth = maximal_cliques_bruteforce(g)
    for rec in RECURSIONS:
        res = enumerate_cliques(g, rec, False, False, True)
        assert res.cliques == truth, rec
    # and the chain resolver retains at least one dominator for vertex 6
    order, _, _ = degeneracy_order(g)
    rank = {v: i for i, v in enumerate(order)}
    ignore_id, dom = compute_ignore_ids(g, order, rank)
    i6 = rank[6]
    x6 = [u for u in g.adj[6] if rank[u] < i6]
    kept = reduce_forbidden(x6, i6, ignore_id, dom, rank)
    assert kept, "chain resolution must keep a maximality witness"


def test_closed_form_equals_incremental():
    for seed in range(15):
        e = random_edges(14, 0.4, 500 + seed)
        if not len(e):
            continue
        g = LocalGraph.from_edges(e)
        order, _, _ = degeneracy_order(g)
        rank = {v: i for i, v in enumerate(order)}
        closed_id, closed_dom = compute_ignore_ids(g, order, rank)
        # incremental sweep (what the engine does)
        nplus = {v: frozenset(u for u in g.adj[v] if rank[u] > rank[v]) for v in order}
        inc_id = {v: len(order) for v in order}
        inc_dom: dict[int, int] = {}
        for i, v in enumerate(order):
            p_ids = sorted(nplus[v], key=rank.__getitem__)
            update_ignore_ids(inc_id, inc_dom, v, i, p_ids, nplus, rank)
        assert inc_id == closed_id
        assert inc_dom == closed_dom


def test_dominators_always_in_forbidden_set():
    # chain edges must stay inside X of any subproblem that drops a vertex
    for seed in range(10):
        e = random_edges(12, 0.5, 900 + seed)
        if not len(e):
            continue
        g = LocalGraph.from_edges(e)
        order, _, _ = degeneracy_order(g)
        rank = {v: i for i, v in enumerate(order)}
        ignore_id, dom = compute_ignore_ids(g, order, rank)
        for i, v in enumerate(order):
            x = [u for u in g.adj[v] if rank[u] < i]
            xs = set(x)
            for u in x:
                if ignore_id[u] < i:
                    assert dom[u] in xs, (
                        f"dominator {dom[u]} of {u} missing from X of {v}"
                    )


def test_reduce_forbidden_keeps_unignorable():
    ignore_id = {1: 99, 2: 99}
    assert reduce_forbidden([1, 2], 5, ignore_id, {}, {1: 0, 2: 1}) == [1, 2]


def test_reduce_forbidden_simple_chain():
    # 1 dropped (dominator 2 retained); 3 dropped (dominator 1, chain to 2).
    ignore_id = {1: 0, 2: 99, 3: 0}
    dom = {1: 2, 3: 1}
    rank = {1: 0, 2: 1, 3: 2}
    assert reduce_forbidden([1, 2, 3], 5, ignore_id, dom, rank) == [2]


def test_reduce_forbidden_pure_cycle_keeps_one():
    ignore_id = {1: 0, 2: 0, 3: 0}
    dom = {1: 2, 2: 3, 3: 1}
    rank = {1: 5, 2: 7, 3: 6}
    kept = reduce_forbidden([1, 2, 3], 9, ignore_id, dom, rank)
    assert kept == [2], "cycle must retain exactly its max-rank member"


@pytest.mark.parametrize("rec", RECURSIONS)
@pytest.mark.parametrize("name", list(KNOWN_GRAPHS))
def test_maxcheck_on_known(rec, name):
    g = LocalGraph.from_edges(np.array(KNOWN_GRAPHS[name]))
    truth = maximal_cliques_bruteforce(g)
    res = enumerate_cliques(g, rec, False, False, True)
    assert res.cliques == truth
    assert len(res.reported) == len(res.cliques)


@pytest.mark.parametrize("rec", RECURSIONS)
def test_maxcheck_fuzz(rec, fuzz_graphs):
    for g in fuzz_graphs:
        truth = maximal_cliques_bruteforce(g)
        res = enumerate_cliques(g, rec, False, False, True)
        assert res.cliques == truth


def test_maxcheck_actually_prunes():
    # On a clique-dense graph the forbidden set must shrink somewhere.
    e = random_edges(18, 0.6, 77)
    g = LocalGraph.from_edges(e)
    res = enumerate_cliques(g, "pivot", False, False, True)
    m = res.metrics
    assert m.x_after < m.x_before
    assert 0 < m.r_vertex < 1
    assert m.r_subproblem > 0

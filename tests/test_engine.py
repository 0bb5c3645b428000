"""Unified engine: full configuration grid vs brute force, metrics
invariants, paper-name mapping, visit tracking."""
from __future__ import annotations

import itertools

import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.mce.bitgraph import LocalGraph
from repro.mce.engine import algorithm_config, enumerate_cliques
from repro.mce.recursions import RECURSIONS
from repro.mce.reference import maximal_cliques_bruteforce
from tests.conftest import KNOWN_GRAPHS, random_edges

GRID = [
    (rec, gr, dy, mx)
    for rec in RECURSIONS
    for gr, dy, mx in itertools.product([False, True], repeat=3)
]


@pytest.mark.parametrize("rec,gr,dy,mx", GRID)
def test_full_grid_on_paper_fig2(rec, gr, dy, mx):
    g = LocalGraph.from_edges(np.array(KNOWN_GRAPHS["paper_fig2"]))
    truth = maximal_cliques_bruteforce(g)
    res = enumerate_cliques(g, rec, gr, dy, mx)
    assert res.cliques == truth
    assert len(res.reported) == len(res.cliques)


@pytest.mark.parametrize("rec,gr,dy,mx", GRID)
def test_full_grid_on_mixed_graph(rec, gr, dy, mx):
    e = random_edges(15, 0.35, 4242)
    g = LocalGraph.from_edges(e)
    truth = maximal_cliques_bruteforce(g)
    res = enumerate_cliques(g, rec, gr, dy, mx)
    assert res.cliques == truth


def test_rmce_full_fuzz(fuzz_graphs):
    for g in fuzz_graphs:
        truth = maximal_cliques_bruteforce(g)
        for rec in RECURSIONS:
            res = enumerate_cliques(g, rec, True, True, True)
            assert res.cliques == truth
            assert len(res.reported) == len(res.cliques)


@settings(max_examples=50, deadline=None)
@given(
    st.integers(3, 13),
    st.floats(0.05, 0.85),
    st.integers(0, 100_000),
    st.sampled_from(RECURSIONS),
)
def test_rmce_hypothesis(n, p, seed, rec):
    e = random_edges(n, p, seed)
    if not len(e):
        return
    g = LocalGraph.from_edges(e)
    truth = maximal_cliques_bruteforce(g)
    assert enumerate_cliques(g, rec, True, True, True).cliques == truth
    assert enumerate_cliques(g, rec, False, True, True).cliques == truth


def test_accepts_edge_array_directly():
    res = enumerate_cliques(np.array([(0, 1), (1, 2), (0, 2)]))
    assert res.cliques == {(0, 1, 2)}


def test_reductions_cut_recursive_calls():
    e = random_edges(20, 0.45, 13)
    g = LocalGraph.from_edges(e)
    base = enumerate_cliques(g, "pivot", False, False, False)
    rmce = enumerate_cliques(g, "pivot", True, True, True)
    assert rmce.cliques == base.cliques
    assert rmce.metrics.recursive_calls <= base.metrics.recursive_calls


def test_visit_tracking():
    g = LocalGraph.from_edges(np.array(KNOWN_GRAPHS["two_triangles_shared_edge"]))
    base = enumerate_cliques(g, "pivot", False, False, False, track_visits=True)
    assert base.metrics.visits is not None
    assert sum(base.metrics.visits.values()) > 0
    rmce = enumerate_cliques(g, "pivot", True, True, True, track_visits=True)
    assert sum(rmce.metrics.visits.values()) <= sum(base.metrics.visits.values())


def test_metrics_cliques_counter():
    g = LocalGraph.from_edges(np.array(KNOWN_GRAPHS["bowtie"]))
    res = enumerate_cliques(g, "pivot", True, True, True)
    assert res.metrics.cliques == len(res.cliques) == 2


def test_reduction_stats_populated_only_with_global():
    g = LocalGraph.from_edges(np.array(KNOWN_GRAPHS["k4_plus_pendant"]))
    assert enumerate_cliques(g, "pivot", True, False, False).reduction_stats is not None
    assert enumerate_cliques(g, "pivot", False, False, False).reduction_stats is None


@pytest.mark.parametrize(
    "name,expect",
    [
        ("BKdegen", ("pivot", False, False, False)),
        ("BKrcd", ("rcd", False, False, False)),
        ("BKfacen", ("facen", False, False, False)),
        ("BKrevised", ("revised", False, False, False)),
        ("RMCEdegen", ("pivot", True, True, True)),
        ("RMCErcd", ("rcd", True, True, True)),
        ("RMCEfacen", ("facen", True, True, True)),
        ("RMCErevised", ("revised", True, True, True)),
        ("Variant1", ("pivot", False, True, True)),
        ("Variant2", ("pivot", True, False, True)),
        ("Variant3", ("pivot", True, True, False)),
    ],
)
def test_algorithm_config(name, expect):
    cfg = algorithm_config(name)
    assert (
        cfg["recursion"],
        cfg["global_reduction"],
        cfg["dynamic"],
        cfg["maxcheck"],
    ) == expect


def test_algorithm_config_rejects_unknown():
    with pytest.raises(ValueError):
        algorithm_config("BKwhatever")
    with pytest.raises(ValueError):
        algorithm_config("Variant4")


def test_degeneracy_reported():
    g = LocalGraph.from_edges(np.array(KNOWN_GRAPHS["k5"]))
    assert enumerate_cliques(g, "pivot", False, False, False).degeneracy == 4
    # global reduction deletes nothing on K5 (min degree 4)
    assert enumerate_cliques(g, "pivot", True, True, True).degeneracy == 4

"""Brute-force maximal clique enumeration — the test oracle.

Deliberately simple and independent of the engine's data structures: plain
Bron–Kerbosch over frozensets, no pivot, no ordering, no reductions. Every
engine configuration must reproduce exactly this clique set.

Convention (matches the paper's Lemma 1): maximal cliques have ≥ 2 vertices;
isolated vertices are not reported.
"""
from __future__ import annotations

import numpy as np

from .bitgraph import LocalGraph


def maximal_cliques_bruteforce(g: LocalGraph) -> set[tuple[int, ...]]:
    """All maximal cliques (size ≥ 2) as sorted vertex tuples."""
    out: set[tuple[int, ...]] = set()
    adj = g.adj

    def bk(r: set[int], p: set[int], x: set[int]) -> None:
        if not p and not x:
            if len(r) >= 2:
                out.add(tuple(sorted(r)))
            return
        for v in list(p):
            bk(r | {v}, p & adj[v], x & adj[v])
            p.remove(v)
            x.add(v)

    bk(set(), set(adj), set())
    return out


def maximal_cliques_from_edges(edges: np.ndarray) -> set[tuple[int, ...]]:
    """Convenience wrapper for tests operating on raw edge arrays."""
    return maximal_cliques_bruteforce(LocalGraph.from_edges(edges))


def is_clique(g: LocalGraph, vs: tuple[int, ...]) -> bool:
    """True iff ``vs`` induces a complete subgraph of ``g``."""
    return all(
        vs[j] in g.adj.get(vs[i], set())
        for i in range(len(vs))
        for j in range(i + 1, len(vs))
    )


def is_maximal_clique(g: LocalGraph, vs: tuple[int, ...]) -> bool:
    """True iff ``vs`` is a clique no vertex of ``g`` can extend."""
    if not is_clique(g, vs):
        return False
    s = set(vs)
    common: set[int] | None = None
    for v in vs:
        nb = g.adj.get(v, set())
        common = set(nb) if common is None else common & nb
    return common is not None and not (common - s)

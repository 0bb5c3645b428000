"""Shared graph cache for benchmarks (generation excluded from timings)."""
from __future__ import annotations

from functools import cache

from repro.bench.harness import load_graph
from repro.mce.bitgraph import LocalGraph


@cache
def graph(name: str, scale: str = "bench") -> LocalGraph:
    return load_graph(name, scale)

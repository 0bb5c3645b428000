#!/usr/bin/env python
"""Reproduce Figure 10 (as a table): maximality-check reduction ratios —
r_vertex = Σ|X′| / Σ|X| (pruned-forbidden-slot survival) and
r_subproblem = fraction of outer subproblems where X actually shrank.

Usage::

    spark-submit jobs/fig10_forbidden_reduction.py [--scale bench]
        [--out fig10.md] [--graphs name1,name2]
"""
from __future__ import annotations

import argparse

from repro.bench.harness import load_graph, run_algorithm
from repro.bench.jobutil import emit
from repro.graphs.catalog import GRAPH_NAMES


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", default="bench", choices=["unit", "bench"])
    ap.add_argument("--graphs", default=None)
    ap.add_argument("--out", default=None)
    args = ap.parse_args()
    names = args.graphs.split(",") if args.graphs else GRAPH_NAMES

    lines = [
        "## Figure 10 (as table) — forbidden-set reduction ratios (RMCEdegen)",
        "",
        "| Graph | Σ\\|X\\| | Σ\\|X'\\| | pruned (1 - r_vertex) | r_subproblem |",
        "|---|---|---|---|---|",
    ]
    for name in names:
        g = load_graph(name, args.scale)
        row = run_algorithm(g, "RMCEdegen")
        m = row.result.metrics
        lines.append(
            f"| {name} | {m.x_before} | {m.x_after} "
            f"| {1 - m.r_vertex:.1%} | {m.r_subproblem:.1%} |"
        )
        print(f"[fig10] {name}: pruned={1-m.r_vertex:.1%} rsub={m.r_subproblem:.1%}", flush=True)
    emit(args.out, "\n".join(lines))


if __name__ == "__main__":
    main()

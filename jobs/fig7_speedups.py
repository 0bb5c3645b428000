#!/usr/bin/env python
"""Reproduce Figure 7 (as a table): speedup of RMCEx over BKx for the four
recursions (degen, rcd, facen, revised) on all 18 graphs.

Usage::

    spark-submit jobs/fig7_speedups.py [--scale bench] [--repeats 3]
        [--out fig7.md] [--graphs name1,name2]
"""
from __future__ import annotations

import argparse

from repro.bench.harness import sweep
from repro.bench.jobutil import emit
from repro.bench.paper import PAPER_FIG7_HEADLINES
from repro.graphs.catalog import GRAPH_NAMES

PAIRS = [("BKdegen", "RMCEdegen"), ("BKrcd", "RMCErcd"),
         ("BKfacen", "RMCEfacen"), ("BKrevised", "RMCErevised")]


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", default="bench", choices=["unit", "bench"])
    ap.add_argument("--repeats", type=int, default=3)
    ap.add_argument("--graphs", default=None)
    ap.add_argument("--out", default=None)
    args = ap.parse_args()
    names = args.graphs.split(",") if args.graphs else GRAPH_NAMES

    algos = [a for pair in PAIRS for a in pair]
    rows = sweep(algos, names, scale=args.scale, repeats=args.repeats)
    by = {(r.graph, r.algorithm): r for r in rows}
    lines = [
        "## Figure 7 (as table) — speedup of RMCEx over BKx (time_BKx / time_RMCEx)",
        "",
        "| Graph | " + " | ".join(r for _, r in PAIRS) + " |",
        "|---" * (len(PAIRS) + 1) + "|",
    ]
    best = {r: (0.0, "") for _, r in PAIRS}
    for name in names:
        cells = []
        for b, r in PAIRS:
            sp = by[(name, b)].seconds / max(by[(name, r)].seconds, 1e-9)
            cells.append(f"{sp:.2f}x")
            if sp > best[r][0]:
                best[r] = (sp, name)
        lines.append(f"| {name} | " + " | ".join(cells) + " |")
        print(f"[fig7] {name}: " + " ".join(cells), flush=True)
    lines.append("")
    lines.append("| Algorithm | paper max speedup (graph) | ours max speedup (graph) |")
    lines.append("|---|---|---|")
    for _, r in PAIRS:
        p, pg = PAPER_FIG7_HEADLINES[r]
        o, og = best[r]
        lines.append(f"| {r} | {p}x ({pg}) | {o:.2f}x ({og}) |")
    emit(args.out, "\n".join(lines))


if __name__ == "__main__":
    main()

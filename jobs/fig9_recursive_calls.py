#!/usr/bin/env python
"""Reproduce Figure 9 (as a table): ratio of recursive calls of each RMCE
variant to the BKdegen baseline (lower = stronger pruning).

Usage::

    spark-submit jobs/fig9_recursive_calls.py [--scale bench]
        [--out fig9.md] [--graphs name1,name2]
"""
from __future__ import annotations

import argparse

from repro.bench.harness import sweep
from repro.bench.jobutil import emit
from repro.bench.paper import PAPER_FIG9_MAX_RATIO
from repro.graphs.catalog import GRAPH_NAMES

RMCE = ["RMCEdegen", "RMCErcd", "RMCEfacen", "RMCErevised"]


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", default="bench", choices=["unit", "bench"])
    ap.add_argument("--graphs", default=None)
    ap.add_argument("--out", default=None)
    args = ap.parse_args()
    names = args.graphs.split(",") if args.graphs else GRAPH_NAMES

    rows = sweep(["BKdegen"] + RMCE, names, scale=args.scale, repeats=1)
    by = {(r.graph, r.algorithm): r for r in rows}
    lines = [
        "## Figure 9 (as table) — #recursive calls of RMCEx / #recursive calls of BKdegen",
        "",
        "| Graph | BKdegen calls | " + " | ".join(RMCE) + " |",
        "|---" * (len(RMCE) + 2) + "|",
    ]
    worst = {a: 0.0 for a in RMCE}
    for name in names:
        base = by[(name, "BKdegen")].recursive_calls
        cells = []
        for a in RMCE:
            ratio = by[(name, a)].recursive_calls / base if base else 0.0
            worst[a] = max(worst[a], ratio)
            cells.append(f"{ratio:.1%}")
        lines.append(f"| {name} | {base} | " + " | ".join(cells) + " |")
        print(f"[fig9] {name}: base={base} " + " ".join(cells), flush=True)
    lines.append("")
    lines.append("| Algorithm | paper max ratio | ours max ratio |")
    lines.append("|---|---|---|")
    for a in RMCE:
        lines.append(f"| {a} | {PAPER_FIG9_MAX_RATIO[a]:.1%} | {worst[a]:.1%} |")
    emit(args.out, "\n".join(lines))


if __name__ == "__main__":
    main()

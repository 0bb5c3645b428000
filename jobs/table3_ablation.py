#!/usr/bin/env python
"""Reproduce Table 3 (ablation study): RMCEdegen vs Variant1/2/3 runtimes.

Variant1 disables global reduction, Variant2 dynamic reduction, Variant3
maximality-check reduction. Timings use the local kernel (the paper's
single-machine setting — DESIGN.md §3); all four configurations are
cross-verified to report the identical clique set per graph.

Usage::

    spark-submit jobs/table3_ablation.py [--scale bench] [--repeats 3]
        [--out table3.md] [--graphs name1,name2]
"""
from __future__ import annotations

import argparse

from repro.bench.harness import format_table, sweep
from repro.bench.jobutil import emit
from repro.bench.paper import PAPER_TABLE3, TABLE3_COLUMNS
from repro.graphs.catalog import GRAPH_NAMES

ALGOS = list(TABLE3_COLUMNS)  # RMCEdegen, Variant1, Variant2, Variant3


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", default="bench", choices=["unit", "bench"])
    ap.add_argument("--repeats", type=int, default=3)
    ap.add_argument("--graphs", default=None)
    ap.add_argument("--out", default=None)
    args = ap.parse_args()
    names = args.graphs.split(",") if args.graphs else GRAPH_NAMES

    rows = sweep(ALGOS, names, scale=args.scale, repeats=args.repeats)
    by = {(r.graph, r.algorithm): r for r in rows}
    lines = [
        "## Table 3 — ablation study (seconds; paper → C++ on real graphs, "
        "ours → Python kernel on synthetic analogs)",
        "",
        "| Graph | " + " | ".join(f"paper {a}" for a in ALGOS) + " | "
        + " | ".join(f"ours {a}" for a in ALGOS) + " | paper best | ours best |",
        "|---" * (2 * len(ALGOS) + 3) + "|",
    ]
    for name in names:
        paper = PAPER_TABLE3[name]
        ours = [by[(name, a)].seconds for a in ALGOS]
        pbest = ALGOS[min(range(len(ALGOS)), key=lambda i: paper[i])]
        obest = ALGOS[min(range(len(ALGOS)), key=lambda i: ours[i])]
        lines.append(
            f"| {name} | " + " | ".join(f"{p:.2f}" for p in paper) + " | "
            + " | ".join(f"{o:.3f}" for o in ours) + f" | {pbest} | {obest} |"
        )
        print(f"[table3] {name}: " + " ".join(f"{a}={by[(name,a)].seconds:.3f}" for a in ALGOS), flush=True)
    emit(args.out, "\n".join(lines))
    print("\n(raw seconds)\n" + format_table(rows, ALGOS))


if __name__ == "__main__":
    main()

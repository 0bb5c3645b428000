#!/usr/bin/env python
"""Reproduce Table 2 (graph statistics): n, m, d_max, degeneracy λ.

Statistics of the 18 synthetic analogs are computed with the Spark
substrate — degrees via ``groupBy``, λ via distributed batch peeling
(``repro.gx.kcore``) — and printed next to the paper's published numbers.

Usage::

    spark-submit jobs/table2_graph_stats.py [--scale bench] [--engine spark]
        [--out table2.md] [--graphs name1,name2]
"""
from __future__ import annotations

import argparse

from pyspark.sql import functions as F

from repro.bench.harness import graph_stats_local
from repro.bench.jobutil import emit, job_session
from repro.graphs.catalog import GRAPH_NAMES, PAPER_TABLE2, edges_for
from repro.gx.graph import degrees, edges_df, vertices
from repro.gx.kcore import peel


def stats_spark(spark, name: str, scale: str) -> dict:
    """Table 2 statistics via the distributed substrate."""
    df = edges_df(spark, edges_for(name, scale)).localCheckpoint(eager=True)
    n = vertices(df).count()
    m = df.count()
    d_max = degrees(df).agg(F.max("degree")).collect()[0][0] or 0
    _, lam = peel(spark, df)
    return {"graph": name, "n": n, "m": m, "d_max": int(d_max), "degeneracy": lam}


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", default="bench", choices=["unit", "bench"])
    ap.add_argument("--engine", default="spark", choices=["spark", "local"])
    ap.add_argument("--graphs", default=None, help="comma-separated subset")
    ap.add_argument("--out", default=None)
    args = ap.parse_args()
    names = args.graphs.split(",") if args.graphs else GRAPH_NAMES

    spark = job_session("table2") if args.engine == "spark" else None
    lines = [
        "## Table 2 — graph statistics (paper vs synthetic analog)",
        "",
        "| Graph | paper n | paper m | paper d_max | paper λ | ours n | ours m | ours d_max | ours λ |",
        "|---|---|---|---|---|---|---|---|---|",
    ]
    for name in names:
        s = (
            stats_spark(spark, name, args.scale)
            if spark is not None
            else graph_stats_local(name, args.scale)
        )
        _, pn, pm, pdmax, plam = PAPER_TABLE2[name]
        lines.append(
            f"| {name} | {pn} | {pm} | {pdmax} | {plam} "
            f"| {s['n']} | {s['m']} | {s['d_max']} | {s['degeneracy']} |"
        )
        print(f"[table2] {name}: {s}", flush=True)
    emit(args.out, "\n".join(lines))
    if spark is not None:
        spark.stop()


if __name__ == "__main__":
    main()

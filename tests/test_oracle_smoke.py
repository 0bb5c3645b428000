"""Scaffold smoke tests: TPC-H-lite generators + the DuckDB oracle, plus
oracle checks over the clique output (query-shaped result verification)."""
from __future__ import annotations

import pandas as pd
from pyspark.sql import functions as F

from repro import synth_data
from repro.graphs.catalog import edges_for
from repro.mce.bitgraph import LocalGraph
from repro.mce.engine import enumerate_cliques
from repro.oracle import assert_equivalent


def test_tpch_lite_aggregate(spark):
    li = synth_data.lineitem(spark, sf=0.001, seed=0)
    assert_equivalent(
        li.groupBy("l_returnflag").agg(
            F.count("*").alias("cnt"),
            F.round(F.sum("l_quantity"), 2).alias("sum_qty"),
        ),
        """
        SELECT l_returnflag, COUNT(*) AS cnt, ROUND(SUM(l_quantity), 2) AS sum_qty
        FROM lineitem GROUP BY l_returnflag
        """,
        lineitem=li,
    )


def test_tpch_lite_join(spark):
    o = synth_data.orders(spark, sf=0.001)
    c = synth_data.customer(spark, sf=0.001)
    got = (
        o.join(c, o.o_custkey == c.c_custkey)
        .groupBy("c_mktsegment")
        .agg(F.count("*").alias("n_orders"))
    )
    assert_equivalent(
        got,
        """
        SELECT c_mktsegment, COUNT(*) AS n_orders
        FROM orders JOIN customer ON o_custkey = c_custkey
        GROUP BY c_mktsegment
        """,
        orders=o,
        customer=c,
    )


def test_clique_size_histogram_vs_oracle(spark):
    """Clique-size distribution of the engine output, aggregated by Spark,
    diffed against DuckDB over the same clique table."""
    e = edges_for("ca-CondMat", "unit")
    res = enumerate_cliques(LocalGraph.from_edges(e), "pivot", True, True, True)
    cl = pd.DataFrame({"clique": [",".join(map(str, c)) for c in sorted(res.cliques)]})
    df = spark.createDataFrame(cl)
    got = (
        df.withColumn("size", F.size(F.split("clique", ",")))
        .groupBy("size")
        .agg(F.count("*").alias("n"))
    )
    assert_equivalent(
        got,
        """
        SELECT LEN(STRING_SPLIT(clique, ',')) AS size, COUNT(*) AS n
        FROM cliques GROUP BY 1
        """,
        cliques=cl,
    )


def test_degree_histogram_vs_oracle(spark):
    e = edges_for("web-Google", "unit")
    pdf = pd.DataFrame({"src": e[:, 0], "dst": e[:, 1]})
    from repro.gx.graph import degrees, edges_df

    got = degrees(edges_df(spark, e)).groupBy("degree").agg(F.count("*").alias("n"))
    assert_equivalent(
        got,
        """
        SELECT degree, COUNT(*) AS n FROM (
            SELECT v, COUNT(*) AS degree FROM (
                SELECT src AS v FROM edges UNION ALL SELECT dst AS v FROM edges
            ) GROUP BY v
        ) GROUP BY degree
        """,
        edges=pdf,
    )

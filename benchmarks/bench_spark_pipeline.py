"""Benchmark: the distributed RMCE pipeline end-to-end (unit scale).

One RMCE and one baseline configuration — wall time here is dominated by
Spark scheduling, so this tracks pipeline overhead rather than algorithmic
differences (those are measured by the local-kernel benchmarks)."""
from __future__ import annotations

import pytest

from repro.core.spark_rmce import enumerate_cliques_spark
from repro.graphs.catalog import edges_for
from repro.gx.graph import edges_df


@pytest.fixture(scope="module")
def small_partitions(spark):
    old = spark.conf.get("spark.sql.shuffle.partitions")
    spark.conf.set("spark.sql.shuffle.partitions", "8")
    yield spark
    spark.conf.set("spark.sql.shuffle.partitions", old)


@pytest.mark.parametrize("reductions", [True, False], ids=["rmce", "baseline"])
def test_spark_pipeline(benchmark, small_partitions, reductions):
    spark = small_partitions
    df = edges_df(spark, edges_for("ca-CondMat", "unit")).localCheckpoint(eager=True)

    def run():
        res = enumerate_cliques_spark(
            spark, df, "pivot", reductions, reductions, reductions
        )
        return res.cliques.count()

    n = benchmark.pedantic(run, rounds=1, iterations=1)
    assert n > 0

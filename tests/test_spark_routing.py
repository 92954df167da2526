"""Spark-side routing tests: shard/executor histograms computed by
Catalyst over the trace DataFrames must agree with the NumPy routing
the engine uses — checked directly and through the DuckDB oracle."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core import shards
from repro.oracle import assert_equivalent
from repro.streams.microbench import (
    executor_load_matrix,
    micro_trace,
    shard_histogram,
    trace_counts_df,
    trace_tuples_df,
)


@pytest.fixture(scope="module")
def trace():
    return micro_trace(n_epochs=4, rate=3000, n_keys=500, omega=4, seed=2)


@pytest.fixture(scope="module")
def counts_df(spark, trace):
    return trace_counts_df(spark, trace).cache()


class TestTraceViews:
    def test_counts_df_conserves_tuples(self, counts_df, trace):
        total = counts_df.agg(F.sum("cnt")).collect()[0][0]
        assert total == trace.total_tuples()

    def test_tuples_df_matches_counts(self, spark, trace, counts_df):
        tuples = trace_tuples_df(spark, trace)
        a = (
            tuples.groupBy("epoch", "k").count()
            .withColumnRenamed("count", "cnt")
            .toPandas().sort_values(["epoch", "k"]).reset_index(drop=True)
        )
        b = counts_df.toPandas().sort_values(["epoch", "k"]).reset_index(drop=True)
        pd.testing.assert_frame_equal(a, b[a.columns], check_dtype=False)


class TestShardHistogram:
    def test_matches_numpy_executor_loads(self, counts_df, trace):
        hist = shard_histogram(counts_df, n_executors=8, shards_per_executor=16)
        got = (
            hist.groupBy("epoch", "executor").agg(F.sum("n").alias("n"))
            .toPandas().pivot(index="epoch", columns="executor", values="n")
            .fillna(0).to_numpy()
        )
        expected = executor_load_matrix(trace, 8)
        assert np.array_equal(got, expected)

    def test_oracle_checked_histogram(self, counts_df):
        """The Catalyst plan (hash expressions + groupBy) vs DuckDB
        computing over the identical XXH64 routing."""
        hist = shard_histogram(counts_df, n_executors=4, shards_per_executor=8)
        pdf = counts_df.toPandas()
        pdf["executor"] = shards.key_to_executor(pdf["k"].to_numpy(), 4)
        pdf["shard"] = shards.key_to_shard(pdf["k"].to_numpy(), 8)
        assert_equivalent(
            hist,
            """
            SELECT epoch, executor, shard, sum(cnt) AS n
            FROM routed GROUP BY epoch, executor, shard
            """,
            routed=pdf,
        )

    def test_tuple_level_histogram(self, spark, trace):
        tuples = trace_tuples_df(spark, trace)
        hist = shard_histogram(
            tuples, n_executors=4, shards_per_executor=8, count_col=None
        )
        total = hist.agg(F.sum("n")).collect()[0][0]
        assert total == trace.total_tuples()

    def test_engine_shard_loads_match_spark(self, spark, counts_df, trace):
        """End-to-end: the engine's per-shard arrival bincount equals
        the Spark histogram for the same epoch."""
        from repro.substrate.topology import OperatorSpec

        y, z = 4, 8
        hist = (
            shard_histogram(counts_df, n_executors=y, shards_per_executor=z)
            .filter(F.col("epoch") == 1)
            .toPandas()
        )
        key_to_global = shards.global_shard(np.arange(trace.n_keys), y, z)
        engine_loads = np.bincount(
            key_to_global, weights=trace.counts[1], minlength=y * z
        )
        spark_loads = np.zeros(y * z)
        for row in hist.itertuples(index=False):
            spark_loads[row.executor * z + row.shard] = row.n
        assert np.array_equal(engine_loads, spark_loads)

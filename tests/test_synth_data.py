"""Tests for the provided TPC-H-lite generators and the DuckDB oracle
plumbing itself (used here to sanity-check the harness over Spark)."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001, seed=0).cache()


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=0.001, seed=1).cache()


class TestGenerators:
    def test_lineitem_size(self, li):
        assert li.count() == 6000

    def test_orders_keys_unique(self, orders):
        assert orders.select("o_orderkey").distinct().count() == orders.count()

    def test_deterministic(self, spark):
        a = synth_data.lineitem(spark, sf=0.0005, seed=3).toPandas()
        b = synth_data.lineitem(spark, sf=0.0005, seed=3).toPandas()
        assert a.equals(b)

    def test_zipf_keys_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=20_000, n_keys=100, alpha=1.2).toPandas()
        counts = df["k"].value_counts()
        assert counts.iloc[0] > 5 * counts.iloc[-1]

    def test_uniform_keys_range(self, spark):
        df = synth_data.uniform_keys(spark, n=1000, n_keys=50).toPandas()
        assert df["k"].between(1, 50).all()


class TestOracleHarness:
    def test_aggregation_query(self, li):
        got = li.groupBy("l_returnflag").agg(
            F.sum("l_quantity").alias("sum_qty"),
            F.count(F.lit(1)).alias("n"),
        )
        assert_equivalent(
            got,
            """
            SELECT l_returnflag, sum(l_quantity) AS sum_qty, count(*) AS n
            FROM lineitem GROUP BY l_returnflag
            """,
            lineitem=li,
        )

    def test_join_query(self, li, orders):
        got = (
            li.join(orders, li.l_orderkey == orders.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.count(F.lit(1)).alias("n"))
        )
        assert_equivalent(
            got,
            """
            SELECT o_orderpriority, count(*) AS n
            FROM lineitem JOIN orders ON l_orderkey = o_orderkey
            GROUP BY o_orderpriority
            """,
            lineitem=li,
            orders=orders,
        )

    def test_oracle_catches_wrong_result(self, li):
        wrong = li.groupBy("l_returnflag").agg(
            (F.sum("l_quantity") + 1).alias("sum_qty")
        )
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong,
                "SELECT l_returnflag, sum(l_quantity) AS sum_qty FROM lineitem GROUP BY l_returnflag",
                lineitem=li,
            )

    def test_oracle_catches_column_mismatch(self, li):
        got = li.groupBy("l_returnflag").agg(F.count(F.lit(1)).alias("wrong_name"))
        with pytest.raises(AssertionError):
            assert_equivalent(
                got,
                "SELECT l_returnflag, count(*) AS n FROM lineitem GROUP BY l_returnflag",
                lineitem=li,
            )

"""SSE statistics operators (the 6 analytics operators of Fig. 14).

Each is a pure ``DataFrame -> DataFrame`` transformation over the
transaction stream, expressed in the Spark SQL / DataFrame API so
Catalyst plans it, and each has an exact DuckDB twin the tests diff
against via :func:`repro.oracle.assert_equivalent`.

Operators (all keyed by stock, matching the engine topology):

1. ``stock_stats``        — per-stock trade count / volume / turnover
2. ``vwap_per_epoch``     — per-stock per-epoch volume-weighted price
3. ``moving_average``     — trailing w-epoch moving average price
4. ``composite_index``    — per-epoch market-wide VWAP (the "composite
                            index" of §5.4)
5. ``trader_positions``   — per-trader net share position
6. ``price_range``        — per-stock high/low/last price
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F


def stock_stats(tx: DataFrame) -> DataFrame:
    """Per-stock trade count, total volume and turnover (cash traded)."""
    return tx.groupBy("stock").agg(
        F.count(F.lit(1)).alias("n_trades"),
        F.sum("volume").alias("total_volume"),
        F.round(F.sum(F.col("price") * F.col("volume")), 4).alias("turnover"),
    )


def vwap_per_epoch(tx: DataFrame) -> DataFrame:
    """Volume-weighted average price per stock per epoch."""
    return tx.groupBy("stock", "epoch").agg(
        F.round(
            F.sum(F.col("price") * F.col("volume")) / F.sum("volume"), 6
        ).alias("vwap"),
        F.sum("volume").alias("volume"),
    )


def moving_average(tx: DataFrame, window_epochs: int = 5) -> DataFrame:
    """Trailing moving average of the per-epoch VWAP, per stock.

    Window: the ``window_epochs`` preceding epochs including the
    current one, ordered by epoch.
    """
    v = vwap_per_epoch(tx)
    w = (
        Window.partitionBy("stock")
        .orderBy("epoch")
        .rowsBetween(-(window_epochs - 1), 0)
    )
    return v.select(
        "stock",
        "epoch",
        F.round(F.avg("vwap").over(w), 6).alias("ma"),
    )


def composite_index(tx: DataFrame) -> DataFrame:
    """Market-wide volume-weighted average price per epoch."""
    return tx.groupBy("epoch").agg(
        F.round(
            F.sum(F.col("price") * F.col("volume")) / F.sum("volume"), 6
        ).alias("index")
    )


def trader_positions(tx: DataFrame) -> DataFrame:
    """Net share position per trader (bought minus sold)."""
    bought = tx.groupBy(F.col("buyer").alias("trader")).agg(
        F.sum("volume").alias("b")
    )
    sold = tx.groupBy(F.col("seller").alias("trader")).agg(
        F.sum("volume").alias("s")
    )
    return (
        bought.join(sold, "trader", "outer")
        .na.fill(0, ["b", "s"])
        .select("trader", (F.col("b") - F.col("s")).alias("position"))
    )


def price_range(tx: DataFrame) -> DataFrame:
    """High / low / last traded price per stock (last by fill order)."""
    w = Window.partitionBy("stock").orderBy(F.desc("seq"), F.desc("price"))
    last = (
        tx.withColumn("rn", F.row_number().over(w))
        .filter(F.col("rn") == 1)
        .select("stock", F.col("price").alias("last_price"))
    )
    hilo = tx.groupBy("stock").agg(
        F.max("price").alias("high"), F.min("price").alias("low")
    )
    return hilo.join(last, "stock")

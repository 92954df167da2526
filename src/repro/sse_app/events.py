"""SSE event-processing operators (the 5 event operators of Fig. 14).

User-defined events triggered from the transaction stream — alarms on
threshold crossings and notable trades.  Pure DataFrame transforms with
DuckDB twins in the tests.

1. ``price_alarms``    — fills above a per-stock price threshold
2. ``large_trades``    — fills with volume above a fixed threshold
3. ``price_jumps``     — fill-to-fill price change above a ratio
4. ``volume_surges``   — per-stock-epoch volume above a multiple of the
                         stock's mean epoch volume
5. ``self_trades``     — buyer == seller (compliance surveillance)
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F


def price_alarms(tx: DataFrame, thresholds: DataFrame) -> DataFrame:
    """Fills whose price exceeds the stock's alarm threshold.

    ``thresholds``: (stock, threshold) DataFrame.
    """
    return (
        tx.join(thresholds, "stock")
        .filter(F.col("price") > F.col("threshold"))
        .select("stock", "seq", "price", "volume")
    )


def large_trades(tx: DataFrame, min_volume: int = 1500) -> DataFrame:
    """Fills at or above ``min_volume`` shares."""
    return tx.filter(F.col("volume") >= min_volume).select(
        "stock", "seq", "price", "volume", "buyer", "seller"
    )


def price_jumps(tx: DataFrame, ratio: float = 1.01) -> DataFrame:
    """Consecutive-fill price moves exceeding ``ratio`` (up or down),
    per stock in fill order (seq, then price as a deterministic
    tie-break for fills of one aggressor order)."""
    w = Window.partitionBy("stock").orderBy("seq", "price")
    prev = F.lag("price").over(w)
    return (
        tx.withColumn("prev_price", prev)
        .filter(
            F.col("prev_price").isNotNull()
            & (
                (F.col("price") > F.col("prev_price") * ratio)
                | (F.col("price") * ratio < F.col("prev_price"))
            )
        )
        .select("stock", "seq", "price", "prev_price")
    )


def volume_surges(tx: DataFrame, factor: float = 3.0) -> DataFrame:
    """(stock, epoch) cells whose traded volume exceeds ``factor`` times
    that stock's mean per-epoch volume."""
    per_epoch = tx.groupBy("stock", "epoch").agg(F.sum("volume").alias("v"))
    mean = per_epoch.groupBy("stock").agg(F.avg("v").alias("mean_v"))
    return (
        per_epoch.join(mean, "stock")
        .filter(F.col("v") > factor * F.col("mean_v"))
        .select("stock", "epoch", F.col("v").alias("volume"))
    )


def self_trades(tx: DataFrame) -> DataFrame:
    """Fills where one trader is on both sides (surveillance event)."""
    return tx.filter(F.col("buyer") == F.col("seller")).select(
        "stock", "seq", "price", "volume", F.col("buyer").alias("trader")
    )

"""The transactor operator on the Spark data plane.

Orders are grouped by stock (the operator's key space) and each group
is matched through the :class:`~repro.sse_app.order_book.OrderBook` in
arrival (``seq``) order — exactly the per-key ordered, stateful
processing contract of §2.1.  Runs as ``applyInPandas`` so Spark
parallelises across stocks while the book state stays per-key.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql.types import (
    DoubleType,
    LongType,
    StructField,
    StructType,
)

from repro.sse_app.order_book import OrderBook

TRANSACTION_SCHEMA = StructType(
    [
        StructField("stock", LongType()),
        StructField("price", DoubleType()),
        StructField("volume", LongType()),
        StructField("buyer", LongType()),
        StructField("seller", LongType()),
        StructField("seq", LongType()),
        StructField("epoch", LongType()),
    ]
)


def match_orders_pdf(orders: pd.DataFrame) -> pd.DataFrame:
    """Match one stock's orders (pandas path, also used by the oracle
    tests as the single source of truth for matching semantics)."""
    out = {c.name: [] for c in TRANSACTION_SCHEMA.fields}
    books: dict[int, OrderBook] = {}
    for row in orders.sort_values("seq").itertuples(index=False):
        book = books.setdefault(int(row.stock), OrderBook(int(row.stock)))
        for f in book.submit(
            row.side, float(row.price), int(row.volume), int(row.trader), int(row.seq)
        ):
            out["stock"].append(f.stock)
            out["price"].append(f.price)
            out["volume"].append(f.volume)
            out["buyer"].append(f.buyer)
            out["seller"].append(f.seller)
            out["seq"].append(f.seq)
            out["epoch"].append(int(row.epoch))
    return pd.DataFrame(out)


def transactions(orders: DataFrame) -> DataFrame:
    """Spark transactor: orders → transaction records, keyed by stock."""
    return orders.groupBy("stock").applyInPandas(
        match_orders_pdf, schema=TRANSACTION_SCHEMA
    )

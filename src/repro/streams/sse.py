"""Synthetic Shanghai Stock Exchange (SSE) order stream (§5.4).

The paper replays three months of anonymised SSE limit orders
(~8 M records per trading hour, 96 B orders, 160 B transaction
records).  That trace is proprietary, so we synthesise a stream with
the two properties the evaluation exploits (Fig. 15):

* **temporal dynamics** — per-stock arrival rates burst: stocks enter a
  "hot" regime (rate multiplied ~8x) for geometrically-distributed
  durations, and the aggregate rate is modulated by a slow sinusoid
  (open/close activity waves);
* **spatial dynamics** — the stock-popularity ranking drifts: every
  ``drift_every_s`` a random subset of stocks swaps popularity ranks,
  shifting the key distribution like the paper's ω-shuffles but
  gentler.

Two products share one seed and agree by construction:

* :func:`sse_trace` — the dense per-epoch per-stock order-count matrix
  driving the cluster engine;
* :func:`sse_orders` — an order-level Spark DataFrame (stock, side,
  price, volume, …) sampled from the same count matrix, feeding the
  real matching engine in :mod:`repro.sse_app`.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.streams.microbench import Trace, zipf_weights

ORDER_BYTES = 96
TRANSACTION_BYTES = 160


def sse_trace(
    *,
    n_epochs: int,
    rate: float,
    n_stocks: int = 2000,
    skew: float = 0.3,
    hot_prob: float = 0.03,
    hot_exit_prob: float = 0.25,
    hot_boost: float = 6.0,
    boost_min_rank: int = 50,
    drift_every_s: float = 20.0,
    drift_frac: float = 0.1,
    epoch_s: float = 1.0,
    cpu_cost_ms: float = 0.5,
    seed: int = 17,
) -> Trace:
    """Per-epoch per-stock order counts with bursty, drifting popularity.

    ``rate`` is the *mean* aggregate orders/s; the instantaneous rate is
    modulated by a ±30 % sinusoid.  ``cpu_cost_ms`` is the transactor's
    per-order matching cost in the engine's cost model.

    Calibration notes: the base skew is mild (no single stock above
    ~0.4 % of the stream) and bursts only hit stocks ranked below
    ``boost_min_rank``, so even a boosted stock stays below one core's
    matching capacity — a single key cannot be parallelised under
    ordered stateful processing (§2.1), and the real SSE trace respects
    the same bound (Fig. 15 tops out around a few hundred orders/s per
    stock).  The burst Markov chain (≈10 % of stocks hot at any time,
    mean burst ~4 s) is what drives per-executor demand fluctuation and
    hence scheduler activity.
    """
    rng = np.random.default_rng(seed)
    base = zipf_weights(n_stocks, skew)
    perm = rng.permutation(n_stocks)
    hot = np.zeros(n_stocks, dtype=bool)
    counts = np.zeros((n_epochs, n_stocks), dtype=np.int64)
    drift_period = max(1, int(round(drift_every_s / epoch_s)))
    for t in range(n_epochs):
        if t > 0 and t % drift_period == 0:
            k = max(2, int(drift_frac * n_stocks))
            idx = rng.choice(n_stocks, size=k, replace=False)
            perm[idx] = perm[rng.permutation(idx)]
        # hot-regime Markov chain per stock (only mid/low-rank eligible)
        eligible = perm >= boost_min_rank
        hot = np.where(
            hot, rng.random(n_stocks) >= hot_exit_prob, rng.random(n_stocks) < hot_prob
        ) & eligible
        w = base[perm] * np.where(hot, hot_boost, 1.0)
        w = w / w.sum()
        inst_rate = rate * (1.0 + 0.2 * np.sin(2 * np.pi * t / max(n_epochs, 60)))
        counts[t] = rng.multinomial(int(round(inst_rate * epoch_s)), w)
    return Trace(counts=counts, epoch_s=epoch_s, tuple_bytes=ORDER_BYTES, cpu_cost_ms=cpu_cost_ms)


def sse_orders_pdf(
    *,
    n_epochs: int,
    rate: float,
    n_stocks: int = 100,
    seed: int = 17,
    **trace_kwargs,
) -> pd.DataFrame:
    """Order-level pandas frame sampled from :func:`sse_trace`.

    Columns: ``epoch, seq, stock, side ('B'/'S'), price, volume,
    trader``.  Prices random-walk per stock around a per-stock base so
    bids and asks actually cross and the matching engine trades.
    Deterministic in ``seed``.
    """
    trace = sse_trace(n_epochs=n_epochs, rate=rate, n_stocks=n_stocks, seed=seed, **trace_kwargs)
    rng = np.random.default_rng(seed + 1)
    base_price = 10.0 + 90.0 * rng.random(n_stocks)
    frames = []
    seq0 = 0
    for t in range(n_epochs):
        stocks = np.repeat(np.arange(n_stocks), trace.counts[t])
        n = len(stocks)
        if n == 0:
            continue
        order = rng.permutation(n)
        stocks = stocks[order]
        side = rng.random(n) < 0.5
        # ±1% noise around the base price; buys bid slightly above,
        # sells ask slightly below, so the book crosses ~half the time.
        noise = 1.0 + 0.01 * rng.standard_normal(n)
        px = base_price[stocks] * noise * np.where(side, 1.002, 0.998)
        frames.append(
            pd.DataFrame(
                {
                    "epoch": np.full(n, t, dtype=np.int64),
                    "seq": np.arange(seq0, seq0 + n, dtype=np.int64),
                    "stock": stocks.astype(np.int64),
                    "side": np.where(side, "B", "S"),
                    "price": np.round(px, 2),
                    "volume": rng.integers(1, 20, n) * 100,
                    "trader": rng.integers(0, 10_000, n),
                }
            )
        )
        seq0 += n
    if not frames:
        return pd.DataFrame(
            columns=["epoch", "seq", "stock", "side", "price", "volume", "trader"]
        )
    return pd.concat(frames, ignore_index=True)


def sse_orders(spark: SparkSession, **kwargs) -> DataFrame:
    """Spark view of :func:`sse_orders_pdf`."""
    return spark.createDataFrame(sse_orders_pdf(**kwargs))

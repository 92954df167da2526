"""Limit-order-book matching engine — the *transactor* operator of the
SSE application (§5.4).

Implements continuous double-auction matching with price-time priority,
the market-clearing mechanism of a stock exchange:

* an incoming **buy** matches resting asks with ``ask price <= bid``,
  lowest price first, FIFO within a price level;
* an incoming **sell** matches resting bids with ``bid price >= ask``,
  highest price first, FIFO within a price level;
* fills execute at the *resting* order's price; partial remainders rest
  in the book.

The book is the per-stock state held by the stream operator: in the
tuple-level elastic executor it lives in the shared
:class:`~repro.core.state.StateStore`, and on the Spark data plane it
is rebuilt per stock group inside ``applyInPandas``
(:mod:`repro.sse_app.transactor`).
"""
from __future__ import annotations

import heapq
from dataclasses import dataclass, field


@dataclass(frozen=True)
class Transaction:
    """One fill: the 160-byte transaction record of §5.4."""

    stock: int
    price: float
    volume: int
    buyer: int
    seller: int
    seq: int  # arrival sequence of the incoming (aggressor) order


@dataclass
class OrderBook:
    """Price-time-priority book for one stock.

    Heaps hold ``[sort_key, seq, price, volume, trader]`` entries;
    bids use negated price so heapq's min-heap pops the best bid first.
    Volume is mutated in place on partial fills.
    """

    stock: int
    bids: list = field(default_factory=list)
    asks: list = field(default_factory=list)

    def submit(
        self, side: str, price: float, volume: int, trader: int, seq: int
    ) -> list[Transaction]:
        """Execute an incoming limit order; returns the fills it caused."""
        if side not in ("B", "S"):
            raise ValueError(f"side must be 'B' or 'S', got {side!r}")
        if volume <= 0 or price <= 0:
            raise ValueError("price and volume must be positive")
        fills: list[Transaction] = []
        if side == "B":
            book, crosses = self.asks, lambda best: best <= price
            mine, opp_sign = self.bids, 1.0
        else:
            book, crosses = self.bids, lambda best: -best >= price
            mine, opp_sign = self.asks, -1.0
        remaining = volume
        while remaining > 0 and book and crosses(book[0][0]):
            entry = book[0]
            take = min(remaining, entry[3])
            rest_price = entry[2]
            buyer, seller = (trader, entry[4]) if side == "B" else (entry[4], trader)
            fills.append(
                Transaction(self.stock, rest_price, take, buyer, seller, seq)
            )
            remaining -= take
            entry[3] -= take
            if entry[3] == 0:
                heapq.heappop(book)
        if remaining > 0:
            heapq.heappush(mine, [-opp_sign * price, seq, price, remaining, trader])
        return fills

    def best_bid(self) -> float | None:
        return self.bids[0][2] if self.bids else None

    def best_ask(self) -> float | None:
        return self.asks[0][2] if self.asks else None

    def depth(self) -> tuple[int, int]:
        """(resting bid volume, resting ask volume)."""
        return (
            sum(e[3] for e in self.bids),
            sum(e[3] for e in self.asks),
        )

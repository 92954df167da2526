"""Tests for the limit-order-book matching engine (SSE transactor)."""
import numpy as np
import pytest

from repro.sse_app.order_book import OrderBook, Transaction


class TestMatching:
    def test_no_cross_no_fill(self):
        b = OrderBook(1)
        assert b.submit("B", 9.0, 100, 1, 0) == []
        assert b.submit("S", 10.0, 100, 2, 1) == []
        assert b.best_bid() == 9.0
        assert b.best_ask() == 10.0

    def test_crossing_order_fills(self):
        b = OrderBook(1)
        b.submit("S", 10.0, 100, 1, 0)
        fills = b.submit("B", 10.5, 100, 2, 1)
        assert len(fills) == 1
        f = fills[0]
        assert f.price == 10.0  # resting order's price
        assert f.volume == 100
        assert f.buyer == 2 and f.seller == 1

    def test_partial_fill_remainder_rests(self):
        b = OrderBook(1)
        b.submit("S", 10.0, 50, 1, 0)
        fills = b.submit("B", 10.0, 120, 2, 1)
        assert fills[0].volume == 50
        assert b.best_bid() == 10.0
        assert b.depth() == (70, 0)

    def test_sweeps_multiple_levels(self):
        b = OrderBook(1)
        b.submit("S", 10.0, 30, 1, 0)
        b.submit("S", 11.0, 30, 2, 1)
        fills = b.submit("B", 11.0, 60, 3, 2)
        assert [f.price for f in fills] == [10.0, 11.0]  # best price first

    def test_price_priority(self):
        b = OrderBook(1)
        b.submit("S", 11.0, 10, 1, 0)
        b.submit("S", 10.0, 10, 2, 1)
        fills = b.submit("B", 12.0, 10, 3, 2)
        assert fills[0].seller == 2  # cheaper ask wins

    def test_time_priority_within_price(self):
        b = OrderBook(1)
        b.submit("S", 10.0, 10, 1, 0)
        b.submit("S", 10.0, 10, 2, 1)
        fills = b.submit("B", 10.0, 10, 3, 2)
        assert fills[0].seller == 1  # earlier order first

    def test_sell_side_symmetry(self):
        b = OrderBook(1)
        b.submit("B", 10.0, 10, 1, 0)
        b.submit("B", 11.0, 10, 2, 1)
        fills = b.submit("S", 9.0, 20, 3, 2)
        # highest bid first, both fill at resting prices
        assert [f.price for f in fills] == [11.0, 10.0]
        assert all(f.seller == 3 for f in fills)

    def test_stop_at_limit(self):
        b = OrderBook(1)
        b.submit("S", 10.0, 10, 1, 0)
        b.submit("S", 12.0, 10, 2, 1)
        fills = b.submit("B", 11.0, 20, 3, 2)
        assert len(fills) == 1  # 12.0 ask is beyond the 11.0 limit
        assert b.depth() == (10, 10)  # 10 bid rests, 10 ask rests

    def test_invalid_inputs(self):
        b = OrderBook(1)
        with pytest.raises(ValueError):
            b.submit("X", 10.0, 1, 1, 0)
        with pytest.raises(ValueError):
            b.submit("B", -1.0, 1, 1, 0)
        with pytest.raises(ValueError):
            b.submit("B", 10.0, 0, 1, 0)


class TestConservation:
    def test_volume_conserved_random_stream(self):
        """Shares bought == shares sold, fills never exceed order sizes,
        and the book depth accounts for every unfilled share."""
        rng = np.random.default_rng(0)
        b = OrderBook(7)
        submitted = 0
        filled = 0
        for seq in range(2000):
            side = "B" if rng.random() < 0.5 else "S"
            price = float(np.round(10 + rng.standard_normal() * 0.2, 2))
            vol = int(rng.integers(1, 10)) * 100
            submitted += vol
            fills = b.submit(side, price, vol, int(rng.integers(0, 50)), seq)
            filled += sum(f.volume for f in fills)
        bid_depth, ask_depth = b.depth()
        # every share is either matched (twice: one buy + one sell
        # side of the same fill) or resting
        assert 2 * filled + bid_depth + ask_depth == submitted

    def test_book_never_crossed_after_submit(self):
        rng = np.random.default_rng(1)
        b = OrderBook(7)
        for seq in range(500):
            side = "B" if rng.random() < 0.5 else "S"
            price = float(np.round(10 + rng.standard_normal() * 0.3, 2))
            b.submit(side, price, 100, 1, seq)
            bb, ba = b.best_bid(), b.best_ask()
            if bb is not None and ba is not None:
                assert bb < ba  # a crossed book means matching failed

    def test_fill_prices_within_limits(self):
        rng = np.random.default_rng(2)
        b = OrderBook(7)
        for seq in range(500):
            side = "B" if rng.random() < 0.5 else "S"
            price = float(np.round(10 + rng.standard_normal() * 0.3, 2))
            fills = b.submit(side, price, 100, 1, seq)
            for f in fills:
                if side == "B":
                    assert f.price <= price + 1e-9
                else:
                    assert f.price >= price - 1e-9

    def test_transaction_fields(self):
        b = OrderBook(42)
        b.submit("S", 10.0, 5, 8, 0)
        f = b.submit("B", 10.0, 5, 9, 1)[0]
        assert isinstance(f, Transaction)
        assert f.stock == 42
        assert f.seq == 1  # aggressor's sequence

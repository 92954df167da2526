"""Unit tests for the M/M/k / Erlang-C / Jackson-network substrate."""
import math

import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.substrate.queueing import (
    UNSTABLE_LATENCY_MS,
    erlang_c,
    jackson_latency_ms,
    min_stable_cores,
    mmk_sojourn_ms,
)


class TestErlangC:
    def test_zero_load(self):
        assert erlang_c(4, 0.0) == 0.0

    def test_overload_is_certain_wait(self):
        assert erlang_c(2, 2.5) == 1.0

    def test_single_server_equals_rho(self):
        # For M/M/1, P(wait) = rho.
        for rho in (0.1, 0.5, 0.9):
            assert erlang_c(1, rho) == pytest.approx(rho)

    def test_direct_summation_small_k(self):
        # Compare against the textbook formula computed directly.
        k, a = 3, 1.7
        num = a**k / math.factorial(k) * (k / (k - a))
        den = sum(a**j / math.factorial(j) for j in range(k)) + num
        assert erlang_c(k, a) == pytest.approx(num / den)

    def test_monotone_decreasing_in_k(self):
        a = 3.0
        vals = [erlang_c(k, a) for k in range(4, 12)]
        assert all(x > y for x, y in zip(vals, vals[1:]))

    def test_probability_bounds(self):
        for k in (1, 2, 8, 64):
            for a in (0.01, k * 0.5, k * 0.99):
                assert 0.0 <= erlang_c(k, a) <= 1.0

    def test_invalid_k_raises(self):
        with pytest.raises(ValueError):
            erlang_c(0, 1.0)

    def test_negative_load_raises(self):
        with pytest.raises(ValueError):
            erlang_c(2, -0.1)

    @given(
        k=st.integers(min_value=1, max_value=100),
        frac=st.floats(min_value=0.01, max_value=0.99),
    )
    @settings(max_examples=60, deadline=None)
    def test_property_bounds(self, k, frac):
        c = erlang_c(k, k * frac)
        assert 0.0 <= c <= 1.0


class TestMMkSojourn:
    def test_mm1_closed_form(self):
        # M/M/1 sojourn = 1/(mu - lambda).
        lam, mu = 600.0, 1000.0
        assert mmk_sojourn_ms(lam, mu, 1) == pytest.approx(
            1000.0 / (mu - lam), rel=1e-9
        )

    def test_idle_server_is_pure_service(self):
        assert mmk_sojourn_ms(0.0, 500.0, 3) == pytest.approx(2.0)

    def test_unstable_returns_sentinel(self):
        assert mmk_sojourn_ms(2000.0, 1000.0, 2) == UNSTABLE_LATENCY_MS
        assert mmk_sojourn_ms(100.0, 1000.0, 0) == UNSTABLE_LATENCY_MS

    def test_adding_servers_helps(self):
        lam, mu = 1800.0, 1000.0
        t2 = mmk_sojourn_ms(lam, mu, 2)
        t3 = mmk_sojourn_ms(lam, mu, 3)
        t8 = mmk_sojourn_ms(lam, mu, 8)
        assert t2 > t3 > t8
        assert t8 == pytest.approx(1.0, rel=0.01)  # nearly pure service

    def test_sojourn_at_least_service_time(self):
        for k in (1, 2, 5):
            assert mmk_sojourn_ms(400.0, 1000.0, k) >= 1.0 - 1e-9

    def test_bad_mu_raises(self):
        with pytest.raises(ValueError):
            mmk_sojourn_ms(1.0, 0.0, 1)

    @given(
        lam=st.floats(min_value=1.0, max_value=5000.0),
        k=st.integers(min_value=1, max_value=32),
    )
    @settings(max_examples=60, deadline=None)
    def test_property_monotone_in_load(self, lam, k):
        mu = 1000.0
        if lam >= k * mu:
            assert mmk_sojourn_ms(lam, mu, k) == UNSTABLE_LATENCY_MS
        else:
            lighter = mmk_sojourn_ms(lam * 0.5, mu, k)
            heavier = mmk_sojourn_ms(lam, mu, k)
            assert heavier >= lighter - 1e-9


class TestJackson:
    def test_single_station_matches_mmk(self):
        lam, mu, k = 800.0, 1000.0, 2
        assert jackson_latency_ms(lam, [lam], [mu], [k]) == pytest.approx(
            mmk_sojourn_ms(lam, mu, k)
        )

    def test_eq1_weighting(self):
        # E[T] = (1/lam0) * sum lam_j E[T_j].
        lam0 = 1000.0
        lams, mus, ks = [1000.0, 500.0], [2000.0, 2000.0], [1, 1]
        expected = (
            1000.0 * mmk_sojourn_ms(1000.0, 2000.0, 1)
            + 500.0 * mmk_sojourn_ms(500.0, 2000.0, 1)
        ) / lam0
        assert jackson_latency_ms(lam0, lams, mus, ks) == pytest.approx(expected)

    def test_empty_topology(self):
        assert jackson_latency_ms(1.0, [], [], []) == 0.0

    def test_mismatched_lengths_raise(self):
        with pytest.raises(ValueError):
            jackson_latency_ms(1.0, [1.0], [1.0, 2.0], [1])

    def test_nonpositive_lam0_raises(self):
        with pytest.raises(ValueError):
            jackson_latency_ms(0.0, [1.0], [1.0], [1])


class TestMinStableCores:
    def test_paper_initialisation(self):
        # k_j = floor(lambda_j / mu_j) + 1  (§4.1)
        assert min_stable_cores(2500.0, 1000.0) == 3
        assert min_stable_cores(999.0, 1000.0) == 1

    def test_exact_multiple_still_stable(self):
        # lam == k*mu is NOT stable; need one more.
        assert min_stable_cores(2000.0, 1000.0) == 3

    def test_zero_arrivals_need_one_core(self):
        assert min_stable_cores(0.0, 1000.0) == 1

    def test_result_is_stable(self):
        for lam in (1.0, 999.9, 1000.0, 12345.6):
            k = min_stable_cores(lam, 1000.0)
            assert lam < k * 1000.0

    def test_bad_mu_raises(self):
        with pytest.raises(ValueError):
            min_stable_cores(1.0, 0.0)

    @given(lam=st.floats(min_value=0.0, max_value=1e6))
    @settings(max_examples=60, deadline=None)
    def test_property_minimal(self, lam):
        mu = 997.0
        k = min_stable_cores(lam, mu)
        assert lam < k * mu
        if k > 1:
            assert lam >= (k - 1) * mu

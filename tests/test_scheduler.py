"""Unit tests for model-based resource allocation (§4.1)."""
import itertools

import pytest

from repro.core.scheduler import Allocation, allocate_cores
from repro.substrate.queueing import jackson_latency_ms, min_stable_cores


class TestAllocateCores:
    def test_initialisation_is_stability_minimum(self):
        # With a huge latency target the greedy never adds cores.
        a = allocate_cores(1000.0, [2500.0, 100.0], [1000.0, 1000.0], 64, 1e9)
        assert a.cores == (3, 1)
        assert a.feasible

    def test_greedy_meets_target(self):
        a = allocate_cores(3000.0, [3000.0, 1500.0], [1000.0, 1000.0], 64, 5.0)
        assert a.feasible
        assert a.expected_latency_ms <= 5.0
        assert jackson_latency_ms(
            3000.0, [3000.0, 1500.0], [1000.0, 1000.0], list(a.cores)
        ) == pytest.approx(a.expected_latency_ms)

    def test_tighter_target_needs_more_cores(self):
        lams, mus = [5000.0, 2000.0], [1000.0, 1000.0]
        loose = allocate_cores(5000.0, lams, mus, 64, 50.0)
        tight = allocate_cores(5000.0, lams, mus, 64, 2.0)
        assert sum(tight.cores) >= sum(loose.cores)

    def test_budget_exhaustion_reported(self):
        # Stability minimum exceeds the budget → infeasible, caller
        # handles degradation (engine caps proportionally).
        a = allocate_cores(9000.0, [9000.0] * 3, [1000.0] * 3, 12, 1.0)
        assert not a.feasible
        assert a.cores == (10, 10, 10)

    def test_budget_limits_greedy(self):
        a = allocate_cores(4000.0, [4000.0], [1000.0], 6, 0.0001)
        assert sum(a.cores) <= 6

    def test_every_executor_gets_a_core(self):
        a = allocate_cores(10.0, [10.0, 0.0, 0.0], [1000.0] * 3, 8, 10.0)
        assert all(k >= 1 for k in a.cores)

    def test_empty_topology(self):
        a = allocate_cores(1.0, [], [], 4, 1.0)
        assert a.cores == ()
        assert a.feasible

    def test_mismatched_lengths_raise(self):
        with pytest.raises(ValueError):
            allocate_cores(1.0, [1.0], [1.0, 2.0], 4, 1.0)

    def test_fewer_cores_than_executors_raises(self):
        with pytest.raises(ValueError):
            allocate_cores(1.0, [1.0, 1.0], [10.0, 10.0], 1, 1.0)

    def test_greedy_matches_bruteforce_small(self):
        """The greedy is optimal for this separable convex objective
        ([15]): it must find the fewest total cores achieving
        E[T] <= T_max on exhaustive small instances."""
        lams, mus = [1800.0, 900.0], [1000.0, 1000.0]
        lam0, tmax, budget = 1800.0, 3.0, 10
        greedy = allocate_cores(lam0, lams, mus, budget, tmax)
        assert greedy.feasible
        best = None
        for k1, k2 in itertools.product(range(1, budget), repeat=2):
            if k1 + k2 > budget:
                continue
            if jackson_latency_ms(lam0, lams, mus, [k1, k2]) <= tmax:
                if best is None or k1 + k2 < best:
                    best = k1 + k2
        assert sum(greedy.cores) == best

    def test_allocation_is_frozen_dataclass(self):
        a = Allocation(cores=(1,), expected_latency_ms=1.0, feasible=True)
        with pytest.raises(AttributeError):
            a.feasible = False

    def test_min_stable_consistency(self):
        lams, mus = [3333.0, 10.0, 777.0], [1000.0, 100.0, 500.0]
        a = allocate_cores(3333.0, lams, mus, 256, 1e9)
        assert a.cores == tuple(min_stable_cores(l, m) for l, m in zip(lams, mus))

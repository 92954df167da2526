"""Queueing-theory substrate: M/M/k waiting times and the Jackson-network
latency model of §4.1 (Eq. 1).

The dynamic scheduler treats each elastic executor ``j`` as an M/M/k_j
station inside a Jackson network.  The mean sojourn time of an M/M/k
queue is ``1/mu + Wq`` where ``Wq`` is the Erlang-C waiting time::

    Wq = C(k, a) / (k*mu - lambda),   a = lambda/mu

with ``C(k, a)`` the Erlang-C probability of waiting.  Everything here
is closed-form and unit-tested against independent formulations
(M/M/1 special case, direct summation, simulation-free identities).
"""
from __future__ import annotations

import math
from collections.abc import Sequence

#: sojourn time reported for an unstable station (lambda >= k*mu).  Kept
#: finite so the greedy allocator can still rank allocations.
UNSTABLE_LATENCY_MS = 1e9


def erlang_c(k: int, a: float) -> float:
    """Erlang-C probability that an arriving job waits, offered load ``a``.

    ``a = lambda/mu`` in Erlangs; requires ``a < k`` for stability.
    Computed with the standard recurrence on the Erlang-B blocking
    probability for numerical robustness at large ``k``.
    """
    if k <= 0:
        raise ValueError("k must be positive")
    if a < 0:
        raise ValueError("offered load must be non-negative")
    if a == 0:
        return 0.0
    if a >= k:
        return 1.0
    # Erlang-B via recurrence: B(0)=1, B(j) = a*B(j-1)/(j + a*B(j-1))
    b = 1.0
    for j in range(1, k + 1):
        b = a * b / (j + a * b)
    rho = a / k
    return b / (1.0 - rho + rho * b)


def mmk_sojourn_ms(lam: float, mu: float, k: int) -> float:
    """Mean sojourn time (ms) of an M/M/k queue.

    ``lam``: arrival rate (tuples/s); ``mu``: per-server service rate
    (tuples/s); ``k``: number of servers.  Returns service + waiting
    time in milliseconds; :data:`UNSTABLE_LATENCY_MS` if unstable.
    """
    if lam < 0 or mu <= 0:
        raise ValueError("need lam >= 0 and mu > 0")
    if k <= 0 or lam >= k * mu:
        return UNSTABLE_LATENCY_MS
    if lam == 0:
        return 1000.0 / mu
    a = lam / mu
    wq = erlang_c(k, a) / (k * mu - lam)  # seconds
    return 1000.0 * (wq + 1.0 / mu)


def jackson_latency_ms(
    lam0: float, lams: Sequence[float], mus: Sequence[float], ks: Sequence[int]
) -> float:
    """Eq. 1: E[T](k) = (1/lambda_0) * sum_j lambda_j * E[T_j](k_j), in ms.

    ``lam0`` is the topology input rate; ``lams``/``mus``/``ks`` are the
    per-executor arrival rates, per-core service rates, and core counts.
    """
    if lam0 <= 0:
        raise ValueError("lam0 must be positive")
    if not (len(lams) == len(mus) == len(ks)):
        raise ValueError("lams, mus, ks must have equal length")
    total = 0.0
    for lam, mu, k in zip(lams, mus, ks):
        total += lam * mmk_sojourn_ms(lam, mu, k)
    return total / lam0


def min_stable_cores(lam: float, mu: float) -> int:
    """floor(lambda/mu) + 1 — the paper's initialisation of k_j (§4.1)."""
    if mu <= 0:
        raise ValueError("mu must be positive")
    if lam <= 0:
        return 1
    k = math.floor(lam / mu) + 1
    # Guard the boundary lam == k*mu exactly (floor of an integer ratio).
    while lam >= k * mu:
        k += 1
    return k

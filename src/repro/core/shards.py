"""Two-tier key routing (§3.1/§3.2, first tier).

Tier 1 is a *static* hash of the key space: operator-level key → executor
(the executor-centric paradigm never changes this), and within an
executor key → shard.  Tier 2 — the dynamic shard → task map — lives in
the routing table of :mod:`repro.core.elastic_executor` and in the
engine's per-executor state.

Hashes must be deterministic across processes (Spark workers and the
driver compute them independently) and identical between the NumPy
routing the engine uses and the Catalyst expressions the Spark views
use.  We use **XXH64 of the key as one little-endian long** — exactly
what Spark's built-in ``xxhash64(BIGINT)`` computes — re-implemented
here in vectorised NumPy (verified bit-for-bit in
``tests/test_shards.py``).  Using the builtin on the SQL side sidesteps
ANSI-mode overflow checking, which forbids wraparound ``*``/``+`` in
BIGINT expressions.

The 64-bit hash is truncated to 63 bits (``>> 1``) before the modulo so
the SQL side can use ``pmod`` on a non-negative BIGINT and agree with
the unsigned NumPy modulo for any modulus.
"""
from __future__ import annotations

import numpy as np

_P1 = np.uint64(0x9E3779B185EBCA87)
_P2 = np.uint64(0xC2B2AE3D27D4EB4F)
_P3 = np.uint64(0x165667B19E3779F9)
_P4 = np.uint64(0x85EBCA77C2B2AE63)
_P5 = np.uint64(0x27D4EB2F165667C5)
_SEED = np.uint64(42)  # Spark's xxhash64 default seed
_U64 = np.uint64


def _rotl(x: np.ndarray, r: int) -> np.ndarray:
    r64 = _U64(r)
    return (x << r64) | (x >> (_U64(64) - r64))


def _xxh64(x: np.ndarray) -> np.ndarray:
    """XXH64 of one 8-byte little-endian long, seed 42 — bit-identical
    to Spark's ``xxhash64(CAST(x AS BIGINT))``.  Truncated to 63 bits."""
    with np.errstate(over="ignore"):  # wraparound is the hash semantics
        x = np.asarray(x, dtype=np.uint64)
        acc = _SEED + _P5 + _U64(8)
        k1 = _rotl(x * _P2, 31) * _P1
        acc = acc ^ k1
        acc = _rotl(acc, 27) * _P1 + _P4
        acc = acc ^ (acc >> _U64(33))
        acc = acc * _P2
        acc = acc ^ (acc >> _U64(29))
        acc = acc * _P3
        acc = acc ^ (acc >> _U64(32))
        return acc >> _U64(1)


def key_to_executor(keys: np.ndarray | int, n_executors: int) -> np.ndarray | int:
    """Tier-1 static operator-level partitioning: key → executor id."""
    if n_executors <= 0:
        raise ValueError("n_executors must be positive")
    arr = np.asarray(keys, dtype=np.uint64)
    out = _xxh64(arr) % np.uint64(n_executors)
    return int(out) if np.isscalar(keys) or arr.shape == () else out.astype(np.int64)


def key_to_shard(keys: np.ndarray | int, n_shards: int, salt: int = 0x51ED) -> np.ndarray | int:
    """Static key → shard hash within an executor (or operator for RC).

    XORing a salt before hashing decorrelates this tier from
    :func:`key_to_executor` (XXH64 is non-linear), so the keys of one
    executor spread over all shards.
    """
    if n_shards <= 0:
        raise ValueError("n_shards must be positive")
    arr = np.asarray(keys, dtype=np.uint64)
    out = _xxh64(arr ^ np.uint64(salt)) % np.uint64(n_shards)
    return int(out) if np.isscalar(keys) or arr.shape == () else out.astype(np.int64)


def global_shard(keys: np.ndarray | int, n_executors: int, shards_per_executor: int) -> np.ndarray | int:
    """Operator-global shard id = executor * z + local shard."""
    e = key_to_executor(keys, n_executors)
    s = key_to_shard(keys, shards_per_executor)
    return e * shards_per_executor + s


def executor_expr(col: str, n_executors: int) -> str:
    """Spark SQL expression computing :func:`key_to_executor` of ``col``."""
    h = f"shiftrightunsigned(xxhash64(CAST({col} AS BIGINT)), 1)"
    return f"pmod({h}, {n_executors})"


def shard_expr(col: str, n_shards: int, salt: int = 0x51ED) -> str:
    """Spark SQL expression computing :func:`key_to_shard` of ``col``."""
    h = f"shiftrightunsigned(xxhash64(CAST(({col} ^ {salt}) AS BIGINT)), 1)"
    return f"pmod({h}, {n_shards})"

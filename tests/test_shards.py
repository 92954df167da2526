"""Unit tests for key → executor/shard hashing, including the
NumPy-vs-Spark-SQL equivalence of the splitmix hash."""
import numpy as np
import pytest

from repro.core import shards


class TestHashing:
    def test_deterministic(self):
        keys = np.arange(1000)
        a = shards.key_to_shard(keys, 64)
        b = shards.key_to_shard(keys, 64)
        assert np.array_equal(a, b)

    def test_range(self):
        keys = np.arange(10_000)
        s = shards.key_to_shard(keys, 37)
        assert s.min() >= 0 and s.max() < 37
        e = shards.key_to_executor(keys, 13)
        assert e.min() >= 0 and e.max() < 13

    def test_scalar_input(self):
        assert isinstance(shards.key_to_shard(42, 8), int)
        assert 0 <= shards.key_to_executor(42, 8) < 8

    def test_covers_all_shards(self):
        s = shards.key_to_shard(np.arange(10_000), 64)
        assert len(np.unique(s)) == 64

    def test_roughly_uniform(self):
        s = shards.key_to_shard(np.arange(100_000), 16)
        counts = np.bincount(s, minlength=16)
        assert counts.min() > 0.9 * counts.mean()
        assert counts.max() < 1.1 * counts.mean()

    def test_tiers_are_decorrelated(self):
        # Keys of one executor must spread over all shards, not a subset.
        keys = np.arange(100_000)
        e = shards.key_to_executor(keys, 8)
        mine = keys[e == 3]
        local = shards.key_to_shard(mine, 32)
        assert len(np.unique(local)) == 32

    def test_global_shard_composition(self):
        keys = np.arange(5000)
        g = shards.global_shard(keys, 4, 16)
        e = shards.key_to_executor(keys, 4)
        s = shards.key_to_shard(keys, 16)
        assert np.array_equal(g, e * 16 + s)
        assert g.max() < 64

    def test_invalid_counts_raise(self):
        with pytest.raises(ValueError):
            shards.key_to_shard(np.array([1]), 0)
        with pytest.raises(ValueError):
            shards.key_to_executor(np.array([1]), -1)


class TestSqlTwin:
    """The Spark SQL expressions must match NumPy bit-for-bit — shard
    histograms computed by Catalyst feed the same engine arithmetic."""

    @pytest.mark.parametrize("n", [2, 7, 32, 255, 8192])
    def test_shard_expr_matches_numpy(self, spark, n):
        keys = np.concatenate([np.arange(2000), [10**9, 10**12, 2**40 + 7]])
        import pandas as pd

        df = spark.createDataFrame(pd.DataFrame({"k": keys}))
        got = (
            df.selectExpr("k", f"{shards.shard_expr('k', n)} AS s")
            .toPandas()
            .sort_values("k")
        )
        expected = shards.key_to_shard(np.sort(keys), n)
        assert np.array_equal(got["s"].to_numpy(), expected)

    @pytest.mark.parametrize("n", [3, 8, 100])
    def test_executor_expr_matches_numpy(self, spark, n):
        import pandas as pd

        keys = np.arange(3000)
        df = spark.createDataFrame(pd.DataFrame({"k": keys}))
        got = (
            df.selectExpr("k", f"{shards.executor_expr('k', n)} AS e")
            .toPandas()
            .sort_values("k")
        )
        expected = shards.key_to_executor(keys, n)
        assert np.array_equal(got["e"].to_numpy(), expected)

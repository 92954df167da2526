"""Benchmark regenerating Table 1 (§2.2) from measured behaviour.

Run: ``pytest benchmarks/bench_table1.py --benchmark-only``
"""
import pytest

from repro.experiments.table1 import run_table1


@pytest.mark.benchmark(group="table1")
def test_table1_paradigm_comparison(benchmark, capsys):
    df = benchmark.pedantic(
        lambda: run_table1(n_nodes=8, n_epochs=30), rounds=1, iterations=1
    )
    with capsys.disabled():  # the regenerated table belongs in the log
        print("\n== Table 1: three execution paradigms (measured) ==")
        print(df.to_string(index=False))
    rows = {r["paradigm"]: r for _, r in df.iterrows()}
    assert rows["elasticutor"]["elasticity"] == "rapid"
    assert rows["resource-centric"]["elasticity"] == "slow"
    assert rows["static"]["elasticity"] == "N/A"

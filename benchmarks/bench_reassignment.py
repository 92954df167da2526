"""Benchmark for the shard-reassignment cost experiments (Fig. 8/9).

Run: ``pytest benchmarks/bench_reassignment.py --benchmark-only``
"""
import pytest

from repro.experiments.reassignment import (
    migration_vs_state,
    reassignment_breakdown,
    sync_vs_upstream,
)


@pytest.mark.benchmark(group="reassignment")
def test_reassignment_costs(benchmark, capsys):
    def run():
        return (
            reassignment_breakdown(),
            sync_vs_upstream((1, 4, 16, 64, 256)),
            migration_vs_state(),
        )

    breakdown, sync, mig = benchmark.pedantic(run, rounds=1, iterations=1)
    with capsys.disabled():  # the cost tables belong in the log
        print("\n== Fig. 8 shape: per-shard reassignment breakdown (ms) ==")
        print(breakdown.to_string(index=False))
        print("\n== Fig. 9a shape: sync time vs #upstream executors (ms) ==")
        print(sync.to_string(index=False))
        print("\n== Fig. 9b shape: migration time vs state size (ms) ==")
        print(mig.to_string(index=False, float_format=lambda v: f"{v:.2f}"))
    # EC sync flat at ~2 ms; RC 2-3 orders higher and growing
    assert sync["elasticutor_ms"].nunique() == 1
    assert sync["resource_centric_ms"].iloc[-1] > 100 * sync["elasticutor_ms"].iloc[0]
    # intra-node migration free under intra-process state sharing
    assert (mig["ec_intra_ms"] == 0).all()

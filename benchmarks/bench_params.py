"""Benchmark for the §5.3 parameter sweep (Fig. 13 shape): Elasticutor
throughput across (y, z) for the three workload flavours.

Run: ``pytest benchmarks/bench_params.py --benchmark-only``
"""
import pandas as pd
import pytest

from repro.experiments.params import params_sweep


@pytest.mark.benchmark(group="params")
@pytest.mark.parametrize("workload", ["default", "data-intensive", "highly-dynamic"])
def test_params_sweep_fig13(benchmark, capsys, workload):
    df = benchmark.pedantic(
        lambda: params_sweep(ys=(1, 8, 32, 256), zs=(1, 8, 64, 256),
                             workload=workload, n_epochs=40),
        rounds=1,
        iterations=1,
    )
    pivot = df.pivot(index="y", columns="z", values="throughput_tps")
    with capsys.disabled():  # the sweep grid belongs in the log
        print(f"\n== Fig. 13 shape ({workload}): throughput (tuples/s) by y × z ==")
        print(pivot.to_string(float_format=lambda v: f"{v:,.0f}"))
    best = df["throughput_tps"].max()
    # default config (y=32, z=256) is near-optimal in every workload
    default_cell = float(pivot.loc[32, 256])
    assert default_cell > 0.8 * best
    # z=1 starves intra-executor balancing
    assert float(pivot.loc[32, 1]) < 0.7 * default_cell
    if workload == "data-intensive":
        # a single executor over remote cores is NIC-bound (§5.2)
        assert float(pivot.loc[1, 256]) < 0.6 * default_cell

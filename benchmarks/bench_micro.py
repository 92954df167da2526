"""Benchmark for the §5.1 micro-benchmark sweep (Fig. 6 shape):
throughput/latency vs ω at the paper's full scale (32 nodes × 8 cores,
y=32, z=256, 10 K zipf(0.5) keys, 1 ms/tuple, 128 B).

Run: ``pytest benchmarks/bench_micro.py --benchmark-only``
"""
import pytest

from repro.experiments.micro import micro_sweep


@pytest.mark.benchmark(group="micro")
def test_micro_sweep_fig6(benchmark, capsys):
    df = benchmark.pedantic(
        lambda: micro_sweep(omegas=(0, 2, 16), n_epochs=60),
        rounds=1,
        iterations=1,
    )
    cols = ["omega", "paradigm", "throughput_tps", "avg_latency_ms"]
    with capsys.disabled():  # the sweep table belongs in the log
        print("\n== Fig. 6 shape: micro-benchmark sweep (256 cores) ==")
        print(df[cols].to_string(index=False, float_format=lambda v: f"{v:,.1f}"))

    def cell(p, w):
        return df[(df.paradigm == p) & (df.omega == w)].iloc[0]

    # Elasticutor ≈ 2x static throughput, orders lower latency
    assert cell("elasticutor", 2).throughput_tps > 1.5 * cell("static", 2).throughput_tps
    assert cell("elasticutor", 2).avg_latency_ms < 0.1 * cell("static", 2).avg_latency_ms
    # RC collapses as ω reaches 16; Elasticutor degrades only marginally
    assert (
        cell("resource-centric", 16).throughput_tps
        < 0.5 * cell("elasticutor", 16).throughput_tps
    )
    assert cell("elasticutor", 16).throughput_tps > 0.9 * cell("elasticutor", 0).throughput_tps

"""Benchmark reproducing Table 3 (§5.4): Elasticutor throughput and
scheduling time vs cluster size (8/16/32 nodes), SSE workload.

Run: ``pytest benchmarks/bench_table3.py --benchmark-only``
"""
import pytest

from repro.experiments.table3 import format_table3, run_table3


@pytest.mark.benchmark(group="table3")
def test_table3_sse_scalability(benchmark, capsys):
    result = benchmark.pedantic(
        lambda: run_table3((8, 16, 32), n_epochs=60), rounds=1, iterations=1
    )
    with capsys.disabled():  # the paper-vs-ours table belongs in the log
        print("\n== Table 3: Elasticutor scalability under SSE workload ==")
        print(format_table3(result))
    t = result.set_index("n_nodes")["throughput_ktps"]
    # near-linear scaling, as in the paper (x1.82 and x1.80 steps)
    assert t[16] > 1.6 * t[8]
    assert t[32] > 1.6 * t[16]
    # scheduling stays in the milliseconds and grows only mildly
    s = result.set_index("n_nodes")["scheduling_ms"]
    assert (s < 50).all()
    assert s[32] >= s[8]

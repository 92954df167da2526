"""Table 2 (§5.4): naive-EC vs Elasticutor under the SSE workload.

Paper numbers (32 nodes, SSE stream):

    ============================  ========  ===========
    Metric                        naive-EC  Elasticutor
    ============================  ========  ===========
    State migration rate (MB/s)       13.9          2.4
    Remote data transfer (MB/s)      235.3         21.6
    ============================  ========  ===========

We run both executor-centric schedulers on the same synthetic SSE trace
and aggregate the engine's migration-byte and remote-traffic counters
into the same two rates.  The claim being reproduced: disabling the
migration-cost and locality optimisations multiplies state migration
(~5x) and remote data transfer (~10x).
"""
from __future__ import annotations

import pandas as pd

from repro.engine.simulator import EngineConfig
from repro.paradigms.elasticutor import ElasticutorSim
from repro.paradigms.naive_ec import NaiveECSim
from repro.sse_app.topology import scaled_sse_topology, sse_cost_per_order_ms
from repro.streams.microbench import Trace
from repro.streams.sse import sse_trace
from repro.substrate.cluster import ClusterSpec

PAPER_TABLE2 = pd.DataFrame(
    {
        "metric": ["state_migration_mbps", "remote_transfer_mbps"],
        "naive-ec": [13.9, 235.3],
        "elasticutor": [2.4, 21.6],
    }
)

#: SSE offered load relative to topology capacity — the sustainable
#: operating point: the model-based allocator needs ~one spare core per
#: executor (its floor(λ/μ)+1 stability floor) plus the θ intra-executor
#: imbalance headroom, and the ±20 % rate modulation peaks must stay
#: within that envelope.
SSE_LOAD_FACTOR = 0.55


def sse_engine_inputs(
    *, n_nodes: int = 32, n_epochs: int = 60, seed: int = 17, load: float = SSE_LOAD_FACTOR
):
    """(spec, topology, trace) for an SSE engine run at a cluster size."""
    spec = ClusterSpec(n_nodes=n_nodes)
    topo = scaled_sse_topology(n_nodes, spec.cores_per_node)
    cost = sse_cost_per_order_ms(topo)
    rate = load * spec.total_cores * spec.core_capacity_ms_per_s / cost
    trace = sse_trace(
        n_epochs=n_epochs,
        rate=rate,
        cpu_cost_ms=topo.operator("transactor").cpu_cost_ms,
        seed=seed,
    )
    return spec, topo, trace


def run_table2(*, n_nodes: int = 32, n_epochs: int = 60, seed: int = 17) -> pd.DataFrame:
    """Measured Table 2: one row per metric, one column per scheduler."""
    spec, topo, trace = sse_engine_inputs(n_nodes=n_nodes, n_epochs=n_epochs, seed=seed)
    cfg = EngineConfig(spec=spec, warmup_epochs=8)
    results = {}
    for name, cls in (("naive-ec", NaiveECSim), ("elasticutor", ElasticutorSim)):
        r = cls(topo, cfg).run(trace)
        results[name] = r
    return pd.DataFrame(
        {
            "metric": ["state_migration_mbps", "remote_transfer_mbps"],
            "naive-ec": [
                results["naive-ec"].migration_rate_mbps(),
                results["naive-ec"].remote_rate_mbps(),
            ],
            "elasticutor": [
                results["elasticutor"].migration_rate_mbps(),
                results["elasticutor"].remote_rate_mbps(),
            ],
        }
    )


def format_table2(measured: pd.DataFrame) -> str:
    """Paper-vs-measured table for EXPERIMENTS.md / job output."""
    merged = PAPER_TABLE2.merge(measured, on="metric", suffixes=(" (paper)", " (ours)"))
    return merged.to_string(index=False, float_format=lambda v: f"{v:.1f}")

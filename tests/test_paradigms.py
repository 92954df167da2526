"""Behavioural tests for the four paradigms — the §2.2/§5 contracts:
static does nothing, RC pays global synchronisation, Elasticutor's
elasticity is executor-local, naive-EC churns state and locality."""
import numpy as np
import pytest

from repro.engine.simulator import EngineConfig
from repro.paradigms.elasticutor import ElasticutorSim, _cap_allocation
from repro.paradigms.naive_ec import NaiveECSim
from repro.paradigms.resource_centric import ResourceCentricSim
from repro.paradigms.static_paradigm import StaticSim
from repro.streams.microbench import micro_trace
from repro.substrate.cluster import ClusterSpec
from repro.substrate.topology import OperatorSpec, Topology


def topo(y=4, z=16, cost=1.0):
    return Topology(
        [
            OperatorSpec(
                name="calculator",
                cpu_cost_ms=cost,
                tuple_bytes=128,
                n_executors=y,
                shards_per_executor=z,
            )
        ],
        [],
    )


def spec(n=4, c=4):
    return ClusterSpec(n_nodes=n, cores_per_node=c)


def dynamic_trace(rate=12_000, n_epochs=25, omega=8, seed=0, n_keys=500):
    return micro_trace(n_epochs=n_epochs, rate=rate, n_keys=n_keys, omega=omega, seed=seed)


class TestStatic:
    def test_no_elasticity_operations(self):
        r = StaticSim(topo(), EngineConfig(spec=spec(), warmup_epochs=0)).run(dynamic_trace())
        assert all(e.n_shard_moves == 0 for e in r.epochs)
        assert all(e.sync_ms == 0 for e in r.epochs)
        assert all(e.migrated_bytes == 0 for e in r.epochs)

    def test_one_core_per_executor(self):
        sim = StaticSim(topo(), EngineConfig(spec=spec()))
        sim.setup(100)
        rt = sim.ops["calculator"]
        assert rt.n_tasks == sim._core_split["calculator"]
        assert np.array_equal(rt.tasks_exec, np.arange(rt.n_tasks))

    def test_no_remote_tasks_ever(self):
        sim = StaticSim(topo(), EngineConfig(spec=spec(), warmup_epochs=0))
        r = sim.run(dynamic_trace())
        assert all(e.remote_bytes == 0 for e in r.epochs)


class TestResourceCentric:
    def test_repartition_stalls_operator(self):
        sim = ResourceCentricSim(topo(), EngineConfig(spec=spec(), warmup_epochs=2))
        r = sim.run(dynamic_trace(omega=8))
        stall_epochs = [e for e in r.epochs if e.sync_ms > 0]
        assert stall_epochs, "dynamic workload must trigger repartitioning"
        rt = sim.ops["calculator"]

    def test_sync_cost_scales_with_spout_parallelism(self):
        t = dynamic_trace(omega=8)
        costs = {}
        for spout in (4, 64):
            cfg = EngineConfig(spec=spec(), warmup_epochs=2, spout_executors=spout)
            sim = ResourceCentricSim(topo(), cfg)
            r = sim.run(t)
            ops = [e.sync_ms for e in r.epochs if e.sync_ms > 0]
            costs[spout] = np.mean(ops) if ops else 0.0
        assert costs[64] > 5 * costs[4]

    def test_moves_applied_after_stall(self):
        sim = ResourceCentricSim(topo(), EngineConfig(spec=spec(), warmup_epochs=2))
        r = sim.run(dynamic_trace(omega=8))
        # at least one repartitioning completed and applied its moves
        # (one may still be in flight when the run ends)
        assert sum(e.n_shard_moves for e in r.epochs) > 0

    def test_warmup_balancing_is_free(self):
        sim = ResourceCentricSim(topo(), EngineConfig(spec=spec(), warmup_epochs=5))
        r = sim.run(dynamic_trace(omega=0, n_epochs=8))
        assert all(e.sync_ms == 0 for e in r.epochs[:5])

    def test_futile_repartition_suppressed(self):
        """Irreducible single-shard skew must not trigger repeated
        repartitioning (each one stalls the operator)."""
        from repro.streams.microbench import Trace

        counts = np.zeros((20, 50), dtype=np.int64)
        counts[:, 7] = 5000  # one irreducibly hot key
        trace = Trace(counts=counts, epoch_s=1.0, tuple_bytes=128, cpu_cost_ms=1.0)
        sim = ResourceCentricSim(topo(), EngineConfig(spec=spec(), warmup_epochs=2))
        r = sim.run(trace)
        assert sum(1 for e in r.epochs if e.sync_ms > 0) <= 2


class TestElasticutor:
    def test_executors_scale_beyond_one_core(self):
        sim = ElasticutorSim(topo(), EngineConfig(spec=spec(), warmup_epochs=0))
        sim.run(dynamic_trace())
        rt = sim.ops["calculator"]
        assert np.bincount(rt.tasks_exec).max() > 1

    def test_key_to_executor_immutable(self):
        """The executor-centric invariant: operator-level partitioning
        is static — key→shard→executor never changes."""
        sim = ElasticutorSim(topo(), EngineConfig(spec=spec(), warmup_epochs=0))
        sim.setup(500)
        before = sim.ops["calculator"].key_to_shard.copy()
        sim.run(dynamic_trace())
        after = sim.ops["calculator"].key_to_shard
        assert np.array_equal(before, after)

    def test_shard_stays_inside_its_executor(self):
        sim = ElasticutorSim(topo(), EngineConfig(spec=spec(), warmup_epochs=0))
        sim.run(dynamic_trace())
        rt = sim.ops["calculator"]
        z = rt.op.shards_per_executor
        owner_exec = rt.tasks_exec[rt.shard_assign]
        assert np.array_equal(owner_exec, np.arange(rt.op.total_shards) // z)

    def test_no_operator_stalls(self):
        sim = ElasticutorSim(topo(), EngineConfig(spec=spec(), warmup_epochs=0))
        sim.run(dynamic_trace(omega=16))
        assert sim.ops["calculator"].stall_until_s == 0.0

    def test_sync_is_2ms_per_move(self):
        cfg = EngineConfig(spec=spec(), warmup_epochs=0)
        sim = ElasticutorSim(topo(), cfg)
        r = sim.run(dynamic_trace(omega=16))
        moves = sum(e.n_shard_moves for e in r.epochs)
        sync = sum(e.sync_ms for e in r.epochs)
        assert moves > 0
        assert sync == pytest.approx(moves * cfg.spec.ec_sync_ms)

    def test_assignment_respects_capacity_every_epoch(self):
        sim = ElasticutorSim(topo(), EngineConfig(spec=spec(), warmup_epochs=0))
        sim.run(dynamic_trace())
        X = sim._Xg
        assert (X.sum(axis=1) <= sim.spec.cores_per_node).all()
        assert (X.sum(axis=0) >= 1).all()

    def test_scheduling_time_measured(self):
        sim = ElasticutorSim(topo(), EngineConfig(spec=spec(), warmup_epochs=0))
        r = sim.run(dynamic_trace(n_epochs=5))
        assert all(e.sched_ms > 0 for e in r.epochs)

    def test_too_many_executors_rejected(self):
        t = topo(y=64)  # 64 executors > 16 cores
        with pytest.raises(ValueError):
            ElasticutorSim(t, EngineConfig(spec=spec())).setup(100)


class TestCapAllocation:
    def test_sums_to_total(self):
        k = _cap_allocation(np.array([3.0, 1.0, 0.0]), 10)
        assert k.sum() == 10
        assert (k >= 1).all()

    def test_proportional(self):
        k = _cap_allocation(np.array([9.0, 1.0]), 12)
        assert k[0] == 10 and k[1] == 2

    def test_zero_weights_uniform(self):
        k = _cap_allocation(np.zeros(4), 8)
        assert k.tolist() == [2, 2, 2, 2]

    def test_too_few_cores_raises(self):
        with pytest.raises(ValueError):
            _cap_allocation(np.ones(5), 4)


class TestNaiveEC:
    def test_same_throughput_class_as_elasticutor(self):
        t = dynamic_trace(omega=8)
        cfg = EngineConfig(spec=spec(), warmup_epochs=3)
        r_ec = ElasticutorSim(topo(), cfg).run(t)
        r_nv = NaiveECSim(topo(), cfg).run(t)
        assert r_nv.throughput_tps() > 0.85 * r_ec.throughput_tps()

    def test_more_migration_and_remote_traffic(self):
        """Table 2's direction: naive scatters and churns more than the
        optimising scheduler.  Needs a cluster large enough that the
        naive packing cannot accidentally coincide with the round-robin
        executor homes (at 4 nodes with uniform k they align)."""
        big_spec = ClusterSpec(n_nodes=8, cores_per_node=8)
        t = micro_trace(n_epochs=25, rate=45_000, n_keys=2000, omega=8, skew=1.0, seed=0)
        cfg = EngineConfig(spec=big_spec, warmup_epochs=3)
        big_topo = topo(y=8, z=64)
        r_ec = ElasticutorSim(big_topo, cfg).run(t)
        r_nv = NaiveECSim(big_topo, cfg).run(t)
        assert r_nv.remote_rate_mbps() > r_ec.remote_rate_mbps()
        assert (
            r_nv.migration_rate_mbps() + r_nv.remote_rate_mbps()
            > r_ec.migration_rate_mbps() + r_ec.remote_rate_mbps()
        )

"""Unit tests for the cluster substrate and protocol cost model."""
import pytest

from repro.substrate.cluster import ClusterSpec, CoreMap


class TestClusterSpec:
    def test_paper_defaults(self):
        spec = ClusterSpec()
        assert spec.n_nodes == 32
        assert spec.cores_per_node == 8
        assert spec.total_cores == 256
        assert spec.nic_bytes_per_s == pytest.approx(125e6)

    def test_core_capacity_scales_with_epoch(self):
        spec = ClusterSpec()
        assert spec.core_capacity_per_epoch(1.0) == pytest.approx(1000.0)
        assert spec.core_capacity_per_epoch(0.5) == pytest.approx(500.0)

    def test_transfer_time_includes_rtt(self):
        spec = ClusterSpec()
        assert spec.transfer_ms(0) == pytest.approx(spec.rtt_ms)
        # 125 MB at 125 MB/s = 1 s + rtt
        assert spec.transfer_ms(125e6) == pytest.approx(1000.0 + spec.rtt_ms)

    def test_ec_intra_node_migration_free(self):
        # Intra-process state sharing (§3.2): same-node moves migrate nothing.
        spec = ClusterSpec()
        sync, mig = spec.ec_shard_reassign_ms(32 * 1024, inter_node=False)
        assert sync == pytest.approx(spec.ec_sync_ms)
        assert mig == 0.0

    def test_ec_inter_node_pays_transfer(self):
        spec = ClusterSpec()
        _, mig = spec.ec_shard_reassign_ms(32 * 1024, inter_node=True)
        assert mig > spec.migration_proto_ms

    def test_ec_sync_independent_of_state(self):
        spec = ClusterSpec()
        s1, _ = spec.ec_shard_reassign_ms(1024, True)
        s2, _ = spec.ec_shard_reassign_ms(1 << 25, True)
        assert s1 == s2 == spec.ec_sync_ms

    def test_rc_sync_scales_with_upstream(self):
        # Fig. 9(a): RC sync grows with upstream parallelism.
        spec = ClusterSpec()
        assert spec.rc_sync_ms(64) == pytest.approx(4 * spec.rc_sync_ms(16))
        assert spec.rc_sync_ms(1) > 0

    def test_rc_sync_orders_of_magnitude_above_ec(self):
        spec = ClusterSpec()
        assert spec.rc_sync_ms(64) / spec.ec_sync_ms > 100

    def test_rc_migration_intra_node_free(self):
        # The §5 fair-comparison setup gives RC the same state sharing.
        spec = ClusterSpec()
        assert spec.rc_shard_migration_ms(1 << 20, inter_node=False) == 0.0

    def test_migration_grows_with_state_size(self):
        # Fig. 9(b): wire transfer dominates at 32 MB.
        spec = ClusterSpec()
        small = spec.rc_shard_migration_ms(32 * 1024, True)
        big = spec.rc_shard_migration_ms(1 << 25, True)
        assert big > 10 * small


class TestCoreMap:
    def test_initial_state(self):
        cm = CoreMap(ClusterSpec(n_nodes=4, cores_per_node=8))
        assert cm.total_free() == 32
        assert cm.free_on(0) == 8

    def test_allocate_release_roundtrip(self):
        cm = CoreMap(ClusterSpec(n_nodes=2, cores_per_node=4))
        cm.allocate(0, 3)
        assert cm.free_on(0) == 1
        assert cm.total_free() == 5
        cm.release(0, 2)
        assert cm.free_on(0) == 3

    def test_over_allocate_raises(self):
        cm = CoreMap(ClusterSpec(n_nodes=2, cores_per_node=2))
        with pytest.raises(ValueError):
            cm.allocate(0, 3)

    def test_over_release_raises(self):
        cm = CoreMap(ClusterSpec(n_nodes=2, cores_per_node=2))
        cm.allocate(1, 1)
        with pytest.raises(ValueError):
            cm.release(1, 2)

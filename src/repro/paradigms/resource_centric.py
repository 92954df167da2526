"""The *resource-centric* (RC) paradigm (§2.2) — dynamic operator-level
key repartitioning, as in Flux / Fernandez et al.

Executors are single-threaded and bound to one core (the static
layout), but the operator-level shard→executor map is dynamic.  When an
operator's imbalance factor exceeds θ, the system repartitions using
the *same* load-balancing algorithm and intra-process state sharing as
Elasticutor (the §5 fair-comparison setup), but the protocol requires
global synchronisation:

1. pause all upstream executors (barrier ∝ #upstream executors),
2. wait for in-flight tuples to drain,
3. migrate the states of the moved shards (serially),
4. update every upstream routing table (second barrier).

During the whole transition the operator processes nothing.  This is
what produces the 10–20 s transients of Fig. 7 and the collapse at
ω = 16 in Fig. 6.
"""
from __future__ import annotations

import numpy as np

from repro.core.load_balancer import imbalance, rebalance, task_loads
from repro.engine.metrics import EpochMetrics
from repro.paradigms.static_paradigm import StaticSim


class ResourceCentricSim(StaticSim):
    """RC: static layout + globally-synchronised repartitioning."""

    name = "resource-centric"

    def _elasticity(
        self, epoch: int, now_s: float, arrivals: dict[str, np.ndarray], m: EpochMetrics
    ) -> None:
        for name in self._order:
            rt = self.ops[name]
            if rt.stall_until_s > now_s or rt.pending_moves:
                continue  # one repartitioning at a time
            loads = self.shard_loads_ms(rt, arrivals[name])
            tl = task_loads(loads, rt.shard_assign, rt.n_tasks)
            delta_before = imbalance(tl)
            if tl.sum() <= 0 or delta_before < self.cfg.theta:
                continue
            new_assign, moves = rebalance(
                loads, rt.shard_assign, rt.n_tasks, self.cfg.theta
            )
            delta_after = imbalance(task_loads(loads, new_assign, rt.n_tasks))
            # A repartitioning stalls the whole operator; only pay that
            # price when it actually helps.  Irreducible skew (a single
            # shard above θ·mean) would otherwise trigger a futile
            # repartition every epoch.
            if not moves or delta_after > 0.95 * delta_before:
                continue
            if epoch < self.cfg.warmup_epochs:
                # measurements start from a stabilised system (§5): the
                # initial balancing pass is not charged to the run.
                rt.shard_assign = new_assign
                continue
            # --- protocol cost (all serial, operator stalled throughout) ---
            sync_ms = self.spec.rc_sync_ms(self.n_upstream_executors(name))
            # drain: the slowest executor must finish its pending queue
            drain_ms = float(tl.max())  # CPU-ms on a single core ≈ wall-ms
            mig_ms = 0.0
            mig_bytes = 0.0
            for mv in moves:
                inter = rt.tasks_node[mv.src] != rt.tasks_node[mv.dst]
                mig_ms += self.spec.rc_shard_migration_ms(
                    rt.op.shard_state_bytes, bool(inter)
                )
                if inter:
                    mig_bytes += rt.op.shard_state_bytes
            total_ms = sync_ms + drain_ms + mig_ms
            rt.stall_until_s = now_s + total_ms / 1000.0
            rt.pending_moves = moves
            rt.pending_migration_bytes = mig_bytes
            m.sync_ms += sync_ms

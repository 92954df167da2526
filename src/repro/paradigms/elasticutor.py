"""The Elasticutor paradigm (§2.3–§4): elastic executors + dynamic
scheduler.

Every epoch the control plane:

1. measures per-executor demand λ_j (arrivals + backlog) and service
   rate μ_j, and runs the §4.1 model-based allocator for the target
   core counts ``k`` (capped proportionally when the cluster is
   saturated — backpressure territory);
2. maps physical cores to executors with Algorithm 1 (§4.2), minimising
   state-migration cost under the computation-locality constraint —
   the wall-clock of steps 1–2 is the *scheduling time* of Table 3;
3. applies the new assignment: tasks are created/removed per executor
   and node, orphaned shards are re-homed, and the intra-executor load
   balancer (§3.1) restores δ < θ.  Every shard move is charged the
   §3.3 protocol cost: a 2 ms sync pause, plus state migration only
   when the shard crosses nodes (intra-process state sharing makes
   same-node moves free).

:class:`NaiveECSim` (in :mod:`repro.paradigms.naive_ec`) swaps step 2
for the cost-and-locality-blind assignment.
"""
from __future__ import annotations

import time

import numpy as np

from repro.core import shards as shard_hash
from repro.core.assignment import AssignmentResult, assign_cores
from repro.core.load_balancer import rebalance
from repro.core.scheduler import allocate_cores
from repro.engine.metrics import EpochMetrics
from repro.engine.simulator import BaseSim, OpRuntime
from repro.substrate.topology import OperatorSpec

_EPS = 1e-12


class ElasticutorSim(BaseSim):
    """Full Elasticutor: elastic executors + model-based scheduler."""

    name = "elasticutor"

    def __init__(self, *args, **kwargs) -> None:
        super().__init__(*args, **kwargs)
        self._gslice: dict[str, slice] = {}
        self._Xg: np.ndarray | None = None

    # ------------------------------------------------------------------
    # layout
    # ------------------------------------------------------------------
    def _init_layout(self, op: OperatorSpec, n_keys: int) -> OpRuntime:
        y, z = op.n_executors, op.shards_per_executor
        homes = self._take_cores(y)  # one initial (local) core per executor
        keys = np.arange(n_keys)
        return OpRuntime(
            op=op,
            key_to_shard=np.asarray(shard_hash.global_shard(keys, y, z), dtype=np.int64),
            tasks_node=homes.copy(),
            tasks_exec=np.arange(y, dtype=np.int64),
            shard_assign=np.repeat(np.arange(y, dtype=np.int64), z),
            exec_home=homes,
        )

    def setup(self, n_keys: int) -> None:
        wanted = sum(op.n_executors for op in self.topology.operators)
        if wanted > self.spec.total_cores:
            raise ValueError(
                f"{wanted} executors need at least one core each but the "
                f"cluster has {self.spec.total_cores}"
            )
        super().setup(n_keys)
        total = 0
        for name in self._order:
            y = self.ops[name].op.n_executors
            self._gslice[name] = slice(total, total + y)
            total += y
        X = np.zeros((self.spec.n_nodes, total), dtype=np.int64)
        for name in self._order:
            rt = self.ops[name]
            for j, home in enumerate(rt.exec_home):
                X[home, self._gslice[name].start + j] += 1
        self._Xg = X

    # ------------------------------------------------------------------
    # control plane
    # ------------------------------------------------------------------
    def _assign(
        self,
        epoch: int,
        k: np.ndarray,
        state_bytes: np.ndarray,
        local_node: np.ndarray,
        data_intensity: np.ndarray,
    ) -> AssignmentResult:
        cores = np.full(self.spec.n_nodes, self.spec.cores_per_node, dtype=np.int64)
        return assign_cores(
            k,
            self._Xg,
            cores,
            state_bytes,
            local_node,
            data_intensity,
            phi=self.cfg.phi_bytes_per_s,
        )

    def _elasticity(
        self, epoch: int, now_s: float, arrivals: dict[str, np.ndarray], m: EpochMetrics
    ) -> None:
        cfg, spec = self.cfg, self.spec
        M = self._Xg.shape[1]
        lams = np.zeros(M)
        mus = np.zeros(M)
        sbytes = np.zeros(M)
        local = np.zeros(M, dtype=np.int64)
        dint = np.zeros(M)
        kcur = self._Xg.sum(axis=0)
        lam0 = 0.0
        for name in self._order:
            rt = self.ops[name]
            op = rt.op
            y, z = op.n_executors, op.shards_per_executor
            gsl = self._gslice[name]
            a = np.bincount(rt.key_to_shard, weights=arrivals[name], minlength=op.total_shards)
            demand = (a + rt.queue_n + rt.resid_n).reshape(y, z).sum(axis=1)
            lams[gsl] = demand / cfg.epoch_s
            mus[gsl] = 1000.0 / op.cpu_cost_ms
            sbytes[gsl] = z * op.shard_state_bytes
            local[gsl] = rt.exec_home
            fanout = max(1, len(self.topology.downstreams(name)))
            per_tuple_bytes = op.tuple_bytes + op.selectivity * op.output_bytes * fanout
            arr_rate = a.reshape(y, z).sum(axis=1) / cfg.epoch_s
            dint[gsl] = arr_rate * per_tuple_bytes / np.maximum(kcur[gsl], 1)
            if not self.topology.upstreams(name):
                lam0 += float(arrivals[name].sum()) / cfg.epoch_s

        # EWMA-smooth the measured arrival rates (the system's metrics
        # are windowed measurements, not raw per-second noise) so the
        # allocation does not chase multinomial sampling noise.
        if not hasattr(self, "_lam_ewma"):
            self._lam_ewma = lams
        else:
            self._lam_ewma = 0.5 * self._lam_ewma + 0.5 * lams
        lams = self._lam_ewma

        t0 = time.perf_counter()
        # The M/M/k model assumes ideal work sharing inside an executor;
        # the intra-executor balancer only guarantees max task load
        # ≤ θ·avg, so an executor with k cores sustains k·μ/θ.  Feed the
        # allocator θ-scaled demand to keep every task stable.
        lam_eff = (lams * cfg.theta).tolist()
        alloc = allocate_cores(
            max(lam0, _EPS), lam_eff, mus.tolist(), spec.total_cores, cfg.t_max_ms
        )
        k = np.asarray(alloc.cores, dtype=np.int64)
        if k.sum() > spec.total_cores:
            k = _cap_allocation(lams / mus, spec.total_cores)
        res = self._assign(epoch, k, sbytes, local, dint)
        m.sched_ms += (time.perf_counter() - t0) * 1000.0
        m.n_core_changes += int(np.abs(res.X - self._Xg).sum() // 2)
        self._apply_assignment(res.X, arrivals, m)
        self._Xg = res.X

    # ------------------------------------------------------------------
    # applying a new core-to-executor assignment
    # ------------------------------------------------------------------
    def _charge_move(
        self, rt: OpRuntime, m: EpochMetrics, shard: int, src_node: int, dst_node: int
    ) -> None:
        sync, mig = self.spec.ec_shard_reassign_ms(
            rt.op.shard_state_bytes, bool(src_node != dst_node)
        )
        rt.pause_ms[shard] += sync + mig
        m.sync_ms += sync
        if src_node != dst_node:
            m.migrated_bytes += rt.op.shard_state_bytes
        m.n_shard_moves += 1

    def _apply_assignment(
        self, X_new: np.ndarray, arrivals: dict[str, np.ndarray], m: EpochMetrics
    ) -> None:
        for name in self._order:
            rt = self.ops[name]
            op = rt.op
            y, z = op.n_executors, op.shards_per_executor
            Xop = X_new[:, self._gslice[name]]
            if not np.array_equal(
                np.bincount(
                    rt.tasks_node * y + rt.tasks_exec,
                    minlength=self.spec.n_nodes * y,
                ).reshape(self.spec.n_nodes, y),
                Xop,
            ):
                self._rebuild_operator(rt, Xop, arrivals[name], m)
            else:
                self._rebalance_only(rt, arrivals[name], m)

    def _rebalance_only(self, rt: OpRuntime, in_counts: np.ndarray, m: EpochMetrics) -> None:
        """No core changes for this operator: just restore δ < θ inside
        each executor (handles key-distribution shuffles)."""
        y, z = rt.op.n_executors, rt.op.shards_per_executor
        loads = self.shard_loads_ms(rt, in_counts)
        for j in range(y):
            tj = rt.exec_tasks(j)
            if len(tj) <= 1:
                continue
            shards_j = rt.exec_shards(j)
            pos = np.full(rt.n_tasks, -1, dtype=np.int64)
            pos[tj] = np.arange(len(tj))
            loc = pos[rt.shard_assign[shards_j]]
            loc2, moves = rebalance(loads[shards_j], loc, len(tj), self.cfg.theta)
            for mv in moves:
                self._charge_move(
                    rt,
                    m,
                    int(shards_j[mv.shard]),
                    int(rt.tasks_node[tj[mv.src]]),
                    int(rt.tasks_node[tj[mv.dst]]),
                )
            rt.shard_assign[shards_j] = tj[loc2]

    def _rebuild_operator(
        self, rt: OpRuntime, Xop: np.ndarray, in_counts: np.ndarray, m: EpochMetrics
    ) -> None:
        """Recreate the operator's task list to match ``Xop`` (cores per
        node per executor), preserving surviving tasks' shards, re-homing
        orphans (FFD), then rebalancing each executor."""
        op = rt.op
        y, z = op.n_executors, op.shards_per_executor
        loads = self.shard_loads_ms(rt, in_counts)
        new_nodes: list[int] = []
        new_exec: list[int] = []
        old_to_new = np.full(rt.n_tasks, -1, dtype=np.int64)
        for j in range(y):
            old_ts = np.flatnonzero(rt.tasks_exec == j)
            by_node: dict[int, list[int]] = {}
            for t in old_ts:
                by_node.setdefault(int(rt.tasks_node[t]), []).append(int(t))
            for i in range(self.spec.n_nodes):
                want = int(Xop[i, j])
                olds = by_node.get(i, [])
                for t in olds[:want]:
                    old_to_new[t] = len(new_nodes)
                    new_nodes.append(i)
                    new_exec.append(j)
                for _ in range(max(0, want - len(olds))):
                    new_nodes.append(i)
                    new_exec.append(j)
        nodes_arr = np.asarray(new_nodes, dtype=np.int64)
        exec_arr = np.asarray(new_exec, dtype=np.int64)
        new_assign = old_to_new[rt.shard_assign]  # -1 where the task died
        for j in range(y):
            tj = np.flatnonzero(exec_arr == j)
            if len(tj) == 0:
                raise RuntimeError(f"executor {j} of {op.name} left with no core")
            shards_j = rt.exec_shards(j)
            pos = np.full(len(nodes_arr), -1, dtype=np.int64)
            pos[tj] = np.arange(len(tj))
            glob = new_assign[shards_j]
            loc = np.where(glob >= 0, pos[np.maximum(glob, 0)], -1)
            lj = loads[shards_j]
            tl = np.bincount(loc[loc >= 0], weights=lj[loc >= 0], minlength=len(tj))
            orphans = np.flatnonzero(loc < 0)
            for s in orphans[np.argsort(-lj[orphans])]:
                d = int(np.argmin(tl))
                loc[s] = d
                tl[d] += lj[s]
                old_node = int(rt.tasks_node[rt.shard_assign[shards_j[s]]])
                self._charge_move(
                    rt, m, int(shards_j[s]), old_node, int(nodes_arr[tj[d]])
                )
            if len(tj) > 1:
                loc2, moves = rebalance(lj, loc, len(tj), self.cfg.theta)
                for mv in moves:
                    self._charge_move(
                        rt,
                        m,
                        int(shards_j[mv.shard]),
                        int(nodes_arr[tj[mv.src]]),
                        int(nodes_arr[tj[mv.dst]]),
                    )
                loc = loc2
            new_assign[shards_j] = tj[loc]
        rt.tasks_node = nodes_arr
        rt.tasks_exec = exec_arr
        rt.shard_assign = new_assign


def _cap_allocation(weights: np.ndarray, total: int) -> np.ndarray:
    """Saturated cluster: one core per executor, the rest split
    proportionally to demand (largest-remainder rounding)."""
    m = len(weights)
    if total < m:
        raise ValueError("fewer cores than executors")
    w = np.maximum(np.asarray(weights, dtype=float), 0.0)
    w = w / w.sum() if w.sum() > 0 else np.full(m, 1.0 / m)
    extra_f = w * (total - m)
    extra = np.floor(extra_f).astype(np.int64)
    rem = int(total - m - extra.sum())
    if rem > 0:
        order = np.argsort(-(extra_f - extra), kind="stable")
        extra[order[:rem]] += 1
    return 1 + extra

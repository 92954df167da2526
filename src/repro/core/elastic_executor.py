"""Tuple-level elastic executor (§3.2–§3.3).

A faithful, single-host implementation of the paper's elastic executor
used to *verify* its consistency and efficiency claims on real tuple
streams:

* **Receiver / emitter daemons** — the single entrance and exit of the
  executor.  Upstream operators only ever talk to the receiver, so shard
  reassignments never require inter-operator synchronisation.
* **Two-tier routing table** — tier 1 statically hashes keys to shards
  (:func:`repro.core.shards.key_to_shard`); tier 2 is the dynamic
  shard→task map updated by reassignments.
* **Tasks** — one data-processing "thread" per assigned CPU core, each
  with a FIFO pending queue, hosted by a per-node process that owns a
  shared :class:`~repro.core.state.StateStore`.
* **Labeling-tuple protocol** — consistent shard reassignment: routing
  for the shard is paused, a labeling tuple is enqueued on the source
  task; tuples queued ahead of it are processed first (FIFO), then the
  state migrates (only if the destination is in a different process),
  the routing table is updated and buffered tuples are re-routed.

Execution is cooperatively scheduled: tests call :meth:`step` /
:meth:`run_until_idle` to advance tasks, which lets them interleave
reassignments with in-flight tuples and check the §3.3 guarantees
(per-key FIFO order, no lost state updates).  Protocol costs (sync ms,
migrated bytes) are accounted with the same :class:`ClusterSpec` cost
model the cluster engine uses.
"""
from __future__ import annotations

from collections import deque
from dataclasses import dataclass, field
from typing import Any, Callable

from repro.core import shards as shard_hash
from repro.core.state import StateStore
from repro.substrate.cluster import ClusterSpec

#: sentinel payload marking a labeling tuple in a pending queue.
_LABEL = object()


@dataclass
class Tuple:
    """One data tuple: key, payload, and a monotone arrival sequence
    number assigned by the receiver (used to verify FIFO order)."""

    key: int
    value: Any
    seq: int = -1


@dataclass
class _Reassignment:
    shard: int
    src_task: int
    dst_task: int
    buffered: deque = field(default_factory=deque)


class StateAccessor:
    """Per-key state interface handed to user processing functions —
    the ``ElasticBolt`` state API of §5."""

    def __init__(self, store: StateStore, shard_id: int) -> None:
        self._store = store
        self._shard = shard_id

    def get(self, key: Any, default: Any = None) -> Any:
        return self._store.get(self._shard, key, default)

    def put(self, key: Any, value: Any) -> None:
        self._store.put(self._shard, key, value)


@dataclass
class Task:
    """A data-processing thread bound to one CPU core."""

    task_id: int
    node: int
    pending: deque = field(default_factory=deque)

    def queue_len(self) -> int:
        return sum(1 for item in self.pending if item[1] is not _LABEL)


class ElasticExecutor:
    """One elastic executor over a fixed key subspace, hashed into
    ``n_shards`` shards, processing with ``fn(key, value, state) -> out``.
    """

    def __init__(
        self,
        executor_id: int,
        *,
        n_shards: int,
        local_node: int,
        fn: Callable[[int, Any, StateAccessor], Any],
        spec: ClusterSpec | None = None,
        shard_state_bytes: int = 32 * 1024,
    ) -> None:
        if n_shards <= 0:
            raise ValueError("n_shards must be positive")
        self.executor_id = executor_id
        self.n_shards = n_shards
        self.local_node = local_node
        self.fn = fn
        self.spec = spec or ClusterSpec()
        self.shard_state_bytes = shard_state_bytes
        # one process (and shared state store) per node hosting tasks;
        # the local node's process is the main process.
        self._stores: dict[int, StateStore] = {
            local_node: StateStore(f"exec{executor_id}@n{local_node}", shard_state_bytes)
        }
        self.tasks: list[Task] = []
        self._next_task_id = 0
        self.shard_to_task: list[int] = []
        self._pending_reassign: dict[int, _Reassignment] = {}
        self._seq = 0
        self.emitted: list[Tuple] = []
        # protocol cost metrics (ms / bytes), mirroring Fig. 8 breakdown
        self.sync_ms = 0.0
        self.migration_ms = 0.0
        self.migrated_bytes = 0
        self.n_reassignments = 0
        self.add_core(local_node)
        self.shard_to_task = [0] * n_shards

    # ------------------------------------------------------------------
    # core (task) lifecycle
    # ------------------------------------------------------------------
    def add_core(self, node: int) -> int:
        """Allocate a CPU core on ``node``: creates a task (and a remote
        process with its own state store if this is the node's first)."""
        if node not in self._stores:
            self._stores[node] = StateStore(
                f"exec{self.executor_id}@n{node}", self.shard_state_bytes
            )
        t = Task(task_id=self._next_task_id, node=node)
        self._next_task_id += 1
        self.tasks.append(t)
        return t.task_id

    def remove_core(self, task_id: int) -> None:
        """Deallocate a core: reassign its shards away, then delete the
        task.  Pending tuples are drained through the reassignment
        protocol (labeling tuples), so call :meth:`run_until_idle`
        afterwards to complete in-flight work."""
        idx = self._task_index(task_id)
        if len(self.tasks) == 1:
            raise ValueError("cannot remove the last core of an executor")
        survivors = [t.task_id for t in self.tasks if t.task_id != task_id]
        for shard, owner in enumerate(self.shard_to_task):
            if owner == task_id and shard not in self._pending_reassign:
                dst = min(survivors, key=lambda tid: self._task(tid).queue_len())
                self.reassign_shard(shard, dst)
        # The task object stays until its queue (incl. labels) drains;
        # mark it draining by removing it from routing targets only.
        self._draining = getattr(self, "_draining", set())
        self._draining.add(task_id)
        del idx  # index recomputed lazily; tasks list unchanged until drained

    def _gc_drained_tasks(self) -> None:
        draining = getattr(self, "_draining", set())
        done = {tid for tid in draining if not self._task(tid).pending}
        if done:
            self.tasks = [t for t in self.tasks if t.task_id not in done]
            draining -= done

    def _task(self, task_id: int) -> Task:
        for t in self.tasks:
            if t.task_id == task_id:
                return t
        raise KeyError(f"task {task_id}")

    def _task_index(self, task_id: int) -> int:
        for i, t in enumerate(self.tasks):
            if t.task_id == task_id:
                return i
        raise KeyError(f"task {task_id}")

    # ------------------------------------------------------------------
    # receiver / routing (single entrance, §3.3)
    # ------------------------------------------------------------------
    def receive(self, key: int, value: Any) -> None:
        """Receiver daemon: assign an arrival sequence number and route
        by the two-tier table.  Tuples of a shard under reassignment are
        buffered until the protocol completes."""
        tup = Tuple(key=key, value=value, seq=self._seq)
        self._seq += 1
        shard = shard_hash.key_to_shard(key, self.n_shards)
        pending = self._pending_reassign.get(shard)
        if pending is not None:
            pending.buffered.append(tup)
            return
        self._task(self.shard_to_task[shard]).pending.append((shard, tup))

    # ------------------------------------------------------------------
    # consistent shard reassignment (§3.3)
    # ------------------------------------------------------------------
    def reassign_shard(self, shard: int, dst_task: int) -> None:
        """Start the labeling-tuple protocol moving ``shard`` to
        ``dst_task``.  Completes asynchronously when the source task
        processes the labeling tuple (see :meth:`step`)."""
        if not (0 <= shard < self.n_shards):
            raise ValueError("shard out of range")
        if shard in self._pending_reassign:
            raise ValueError(f"shard {shard} already being reassigned")
        src_task = self.shard_to_task[shard]
        self._task(dst_task)  # validate destination exists
        if dst_task == src_task:
            return
        # pause routing for the shard, then label the source queue
        self._pending_reassign[shard] = _Reassignment(shard, src_task, dst_task)
        self._task(src_task).pending.append((shard, _LABEL))
        self.sync_ms += self.spec.ec_sync_ms
        self.n_reassignments += 1

    def _complete_reassignment(self, shard: int) -> None:
        r = self._pending_reassign.pop(shard)
        src_node = self._task(r.src_task).node
        dst_node = self._task(r.dst_task).node
        src_store = self._stores[src_node]
        if src_node != dst_node:
            if src_store.has_shard(shard):
                state = src_store.export_shard(shard)
                nbytes = state.size_bytes()
                self._stores[dst_node].import_shard(state)
                self.migrated_bytes += nbytes
                self.migration_ms += (
                    self.spec.migration_proto_ms + self.spec.transfer_ms(nbytes)
                )
        # routing-table update, then resume: flush buffered tuples in
        # arrival order to the destination task.
        self.shard_to_task[shard] = r.dst_task
        dst = self._task(r.dst_task)
        while r.buffered:
            dst.pending.append((shard, r.buffered.popleft()))

    # ------------------------------------------------------------------
    # task execution
    # ------------------------------------------------------------------
    def step(self, task_id: int | None = None, max_tuples: int = 1) -> int:
        """Advance one task (or round-robin all tasks) by up to
        ``max_tuples`` queue entries each, FIFO.  Returns the number of
        data tuples processed."""
        targets = [self._task(task_id)] if task_id is not None else list(self.tasks)
        processed = 0
        for t in targets:
            for _ in range(max_tuples):
                if not t.pending:
                    break
                shard, item = t.pending.popleft()
                if item is _LABEL:
                    self._complete_reassignment(shard)
                    continue
                store = self._stores[t.node]
                out = self.fn(item.key, item.value, StateAccessor(store, shard))
                if out is not None:
                    self.emitted.append(Tuple(key=item.key, value=out, seq=item.seq))
                processed += 1
        self._gc_drained_tasks()
        return processed

    def run_until_idle(self, max_steps: int = 1_000_000) -> int:
        """Process until every pending queue is empty and no
        reassignment is outstanding."""
        total = 0
        for _ in range(max_steps):
            n = self.step(max_tuples=16)
            total += n
            if n == 0 and not any(t.pending for t in self.tasks):
                if not self._pending_reassign:
                    break
                # outstanding reassignments whose labels were consumed
                # would have completed; any left have queued labels only
                # on tasks — keep stepping (handled above), else break.
        return total

    # ------------------------------------------------------------------
    # introspection for tests
    # ------------------------------------------------------------------
    def store_on(self, node: int) -> StateStore:
        return self._stores[node]

    def queue_sizes(self) -> dict[int, int]:
        return {t.task_id: t.queue_len() for t in self.tasks}

    def shards_of_task(self, task_id: int) -> list[int]:
        return [s for s, t in enumerate(self.shard_to_task) if t == task_id]

"""Intra-process shared state store (§3.2).

Each *process* of an elastic executor keeps the states of all its tasks
in one lightweight in-memory key-value store and exposes per-key
read/update access to the tasks.  Because the store is process-wide,
reassigning a shard between two tasks of the same process migrates
nothing; only cross-process (cross-node) moves serialize and ship the
shard's state.

:class:`StateStore` models one process's store; :class:`ShardState`
is the unit of migration.  Sizes are tracked in bytes so the engine and
scheduler (whose cost model is byte-proportional, §4.2) can account
migration costs exactly.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Any, Iterator


@dataclass
class ShardState:
    """State of one shard: a per-key dict plus a nominal byte size.

    ``nominal_bytes`` models the paper's fixed shard-state sizes (32 KB
    default, swept to 32 MB in Fig. 9b/12); the per-key dict holds the
    actual application state (e.g. SSE order books) for correctness
    tests.
    """

    shard_id: int
    nominal_bytes: int = 32 * 1024
    data: dict[Any, Any] = field(default_factory=dict)

    def size_bytes(self) -> int:
        return self.nominal_bytes


class StateStore:
    """One process's shared KV store, keyed (shard_id, key).

    Tasks never hold private state; they read/update through this
    interface, which is what makes intra-process shard reassignment
    migration-free.
    """

    def __init__(self, process_id: str, default_shard_bytes: int = 32 * 1024) -> None:
        self.process_id = process_id
        self.default_shard_bytes = default_shard_bytes
        self._shards: dict[int, ShardState] = {}

    # -- shard lifecycle ------------------------------------------------
    def ensure_shard(self, shard_id: int) -> ShardState:
        if shard_id not in self._shards:
            self._shards[shard_id] = ShardState(shard_id, self.default_shard_bytes)
        return self._shards[shard_id]

    def has_shard(self, shard_id: int) -> bool:
        return shard_id in self._shards

    def shard_ids(self) -> Iterator[int]:
        return iter(self._shards)

    # -- per-key access (the user-facing state interface) ---------------
    def get(self, shard_id: int, key: Any, default: Any = None) -> Any:
        return self.ensure_shard(shard_id).data.get(key, default)

    def put(self, shard_id: int, key: Any, value: Any) -> None:
        self.ensure_shard(shard_id).data[key] = value

    def update(self, shard_id: int, key: Any, fn, default: Any = None) -> Any:
        """Atomically apply ``fn`` to the current value; returns the new one."""
        shard = self.ensure_shard(shard_id)
        new = fn(shard.data.get(key, default))
        shard.data[key] = new
        return new

    # -- migration ------------------------------------------------------
    def export_shard(self, shard_id: int) -> ShardState:
        """Remove and return a shard's state for migration to another
        process.  Raises ``KeyError`` if the shard is not resident —
        migrating state you do not own is a protocol bug."""
        return self._shards.pop(shard_id)

    def import_shard(self, state: ShardState) -> None:
        if state.shard_id in self._shards:
            raise ValueError(
                f"shard {state.shard_id} already resident in {self.process_id}"
            )
        self._shards[state.shard_id] = state

    def shard_bytes(self, shard_id: int) -> int:
        return self.ensure_shard(shard_id).size_bytes()

    def total_bytes(self) -> int:
        return sum(s.size_bytes() for s in self._shards.values())

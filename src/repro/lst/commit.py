"""Optimistic-concurrency commit protocol for Iceberg-lite tables.

A table mutation runs in two phases, mirroring Iceberg's commit path:

1. **prepare** — the expensive Spark work (writing new Parquet files into the
   table's data directory) happens without holding any lock, producing a
   :class:`PendingCommit` that records the *base version* the plan was built
   against, the files it adds, and the files it removes.
2. **commit** — the pending commit is applied by writing ``v<base+1>.json``
   with ``open(..., 'x')``. If another writer got there first, the commit
   raises :class:`CommitConflictError`; callers may *rebase-retry*, which
   revalidates the plan against the new current snapshot and re-attempts.

Rebase validation rules (matching Iceberg v1.2.0 semantics the paper relies
on in §4.4 and Table 1):

- ``append`` always rebases cleanly (new files conflict with nothing).
- ``overwrite`` / ``delete`` / ``rewrite`` rebase only if every file they
  planned to remove is still live in the new current snapshot; otherwise the
  operation no longer applies and a :class:`ValidationError` is raised.

The two-phase split is also what lets the workload simulator create
*deterministic* concurrency: it prepares several operations against the same
base version and commits them in a seeded order — later committers observe a
stale base exactly like racing writers on a real cluster, without relying on
thread timing (NFR2: explainability/determinism).
"""
from __future__ import annotations

import os
from dataclasses import dataclass, field

from repro.lst.errors import CommitConflictError, ValidationError
from repro.lst.snapshot import (
    DataFile,
    Snapshot,
    current_version,
    read_snapshot,
    write_snapshot_exclusive,
)


@dataclass
class PendingCommit:
    """A prepared (but not yet committed) table mutation."""

    table_name: str
    metadata_dir: str
    base_version: int
    operation: str  # append | overwrite | delete | rewrite
    added: list[DataFile]
    removed_paths: set[str] = field(default_factory=set)
    summary: dict = field(default_factory=dict)

    @property
    def committed(self) -> bool:
        return getattr(self, "_committed", False)


def _snapshot_path(metadata_dir: str, version: int) -> str:
    return os.path.join(metadata_dir, f"v{version}.json")


def _apply(base: Snapshot | None, pending: PendingCommit, timestamp: float) -> Snapshot:
    """Compute the successor snapshot's file list from base + pending."""
    live = list(base.files) if base is not None else []
    if pending.removed_paths:
        live = [f for f in live if f.path not in pending.removed_paths]
    live.extend(pending.added)
    version = (base.version if base is not None else -1) + 1
    summary = dict(pending.summary)
    summary.update(
        {
            "added-files": len(pending.added),
            "removed-files": len(pending.removed_paths),
            "added-bytes": sum(f.file_size_bytes for f in pending.added),
        }
    )
    return Snapshot(
        version=version,
        timestamp=timestamp,
        operation=pending.operation,
        files=tuple(live),
        summary=summary,
    )


def _validate_rebase(pending: PendingCommit, current: Snapshot) -> None:
    """Check the pending op still applies on top of ``current``."""
    if pending.operation == "append":
        return
    live_paths = {f.path for f in current.files}
    missing = pending.removed_paths - live_paths
    if missing:
        raise ValidationError(
            f"{pending.operation} on {pending.table_name!r} no longer applies: "
            f"{len(missing)} planned-removed file(s) were removed concurrently"
        )


def try_commit(pending: PendingCommit, timestamp: float) -> Snapshot:
    """Single commit attempt; raises ``CommitConflictError`` on a stale base."""
    cur = current_version(pending.metadata_dir)
    if cur != pending.base_version:
        raise CommitConflictError(pending.table_name, pending.base_version, cur)
    base = (
        read_snapshot(_snapshot_path(pending.metadata_dir, cur)) if cur >= 0 else None
    )
    snap = _apply(base, pending, timestamp)
    try:
        write_snapshot_exclusive(_snapshot_path(pending.metadata_dir, snap.version), snap)
    except FileExistsError:
        # Lost the race between the version check and the write.
        raise CommitConflictError(
            pending.table_name,
            pending.base_version,
            current_version(pending.metadata_dir),
        ) from None
    pending._committed = True
    return snap


def rebase(pending: PendingCommit) -> None:
    """Re-point ``pending`` at the current version after a conflict.

    Raises :class:`ValidationError` if the operation no longer applies
    (for rewrites/deletes whose planned-removed files are gone). Used by
    callers that retry *later* rather than immediately — e.g. the workload
    simulator's compaction tasks, whose retry occupies a subsequent slot
    and may conflict again with newer writes.
    """
    cur = current_version(pending.metadata_dir)
    if cur >= 0:
        current = read_snapshot(_snapshot_path(pending.metadata_dir, cur))
        _validate_rebase(pending, current)
    pending.base_version = cur


def commit_with_retries(
    pending: PendingCommit,
    timestamp: float,
    retries: int = 3,
    on_conflict=None,
) -> Snapshot:
    """Commit, rebasing up to ``retries`` times on conflict.

    ``on_conflict(pending, exc)`` is invoked once per conflict observed —
    the workload simulator uses it to count client-side (writes) and
    cluster-side (compaction) conflicts for Table 1.
    """
    attempt = 0
    while True:
        try:
            return try_commit(pending, timestamp)
        except CommitConflictError as exc:
            if on_conflict is not None:
                on_conflict(pending, exc)
            if attempt >= retries:
                raise
            attempt += 1
            cur = current_version(pending.metadata_dir)
            if cur >= 0:
                current = read_snapshot(_snapshot_path(pending.metadata_dir, cur))
                _validate_rebase(pending, current)
            pending.base_version = cur

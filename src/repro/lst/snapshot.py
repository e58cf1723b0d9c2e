"""Snapshot and data-file metadata model with JSON (de)serialization.

Each table version ``v<N>.json`` holds a full :class:`Snapshot`: the
operation that produced it, a summary, and the complete list of live
:class:`DataFile` entries (an inlined manifest). Inlining the manifest —
rather than Iceberg's manifest-list → manifest → files indirection — keeps
the substrate simple while preserving what AutoComp consumes: exact file
paths, sizes, row counts, and partition values per snapshot.
"""
from __future__ import annotations

import json
import os
from dataclasses import dataclass, field


@dataclass(frozen=True)
class DataFile:
    """One immutable Parquet data file registered in a snapshot."""

    path: str  # relative to the table's data/ directory
    file_size_bytes: int
    record_count: int
    partition: tuple[tuple[str, str], ...] = field(default=())  # ((name, value), ...)

    def __post_init__(self) -> None:
        if not isinstance(self.partition, tuple):
            object.__setattr__(
                self, "partition", tuple((k, v) for k, v in self.partition)
            )

    @property
    def partition_dict(self) -> dict[str, str]:
        return dict(self.partition)

    def to_dict(self) -> dict:
        return {
            "path": self.path,
            "file_size_bytes": self.file_size_bytes,
            "record_count": self.record_count,
            "partition": [list(kv) for kv in self.partition],
        }

    @staticmethod
    def from_dict(raw: dict) -> "DataFile":
        return DataFile(
            path=raw["path"],
            file_size_bytes=int(raw["file_size_bytes"]),
            record_count=int(raw["record_count"]),
            partition=tuple((k, v) for k, v in raw["partition"]),
        )


@dataclass(frozen=True)
class Snapshot:
    """A committed table version: full live-file manifest plus provenance."""

    version: int
    timestamp: float  # logical clock supplied by the caller (simulated hours ok)
    operation: str  # create | append | overwrite | delete | rewrite
    files: tuple[DataFile, ...] = field(default=())
    summary: dict = field(default_factory=dict)

    def __post_init__(self) -> None:
        if not isinstance(self.files, tuple):
            object.__setattr__(self, "files", tuple(self.files))

    @property
    def file_count(self) -> int:
        return len(self.files)

    @property
    def total_bytes(self) -> int:
        return sum(f.file_size_bytes for f in self.files)

    @property
    def total_records(self) -> int:
        return sum(f.record_count for f in self.files)

    def files_in_partition(self, partition: dict[str, str]) -> list[DataFile]:
        want = tuple(sorted(partition.items()))
        return [f for f in self.files if tuple(sorted(f.partition)) == want]

    def partitions(self) -> list[dict[str, str]]:
        """Distinct partition tuples present in this snapshot, sorted."""
        seen = sorted({f.partition for f in self.files})
        return [dict(p) for p in seen]

    def to_dict(self) -> dict:
        return {
            "version": self.version,
            "timestamp": self.timestamp,
            "operation": self.operation,
            "summary": self.summary,
            "files": [f.to_dict() for f in self.files],
        }

    @staticmethod
    def from_dict(raw: dict) -> "Snapshot":
        return Snapshot(
            version=int(raw["version"]),
            timestamp=float(raw["timestamp"]),
            operation=raw["operation"],
            files=tuple(DataFile.from_dict(f) for f in raw["files"]),
            summary=dict(raw.get("summary", {})),
        )


def write_snapshot_exclusive(path: str, snapshot: Snapshot) -> None:
    """Serialize ``snapshot`` to ``path``, failing if the file exists.

    ``open(..., 'x')`` is the atomicity primitive of the whole commit
    protocol: the filesystem guarantees a single winner per version file.
    Raises ``FileExistsError`` for the loser (translated to
    ``CommitConflictError`` by the commit layer).
    """
    with open(path, "x", encoding="utf-8") as fh:
        json.dump(snapshot.to_dict(), fh)


def read_snapshot(path: str) -> Snapshot:
    with open(path, encoding="utf-8") as fh:
        return Snapshot.from_dict(json.load(fh))


def current_version(metadata_dir: str) -> int:
    """Highest committed version in ``metadata_dir`` (-1 if none).

    Derived by listing rather than a hint file so that a reader never
    observes a stale pointer — the version log itself is the source of truth.
    """
    best = -1
    for name in os.listdir(metadata_dir):
        if name.startswith("v") and name.endswith(".json"):
            try:
                best = max(best, int(name[1:-5]))
            except ValueError:
                continue
    return best

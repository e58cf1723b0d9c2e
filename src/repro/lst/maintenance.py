"""Compaction: the Spark batch job that rewrites small files into large ones.

This is the mechanism AutoComp's *act* phase executes (and the heart of the
reproduction): per partition, read the files smaller than the small-file
threshold, bin-pack their total bytes to the target file size, and rewrite
them as ``ceil(total / target)`` consolidated files through the DataFrame
writer. The rewrite is committed as a single ``rewrite`` snapshot replacing
the input files — optimistic concurrency applies, so a concurrent write to
the table makes the commit raise/retry (the §4.4 / Table 1 cluster-side
conflicts).

File-size heuristics (Iceberg ``binpack``-style):

- only files with ``size < small_file_threshold`` (default: the target) are
  rewrite candidates — already-well-sized files are never rewritten;
- a partition group is skipped unless compaction actually reduces its file
  count (``n_out < n_in``), so repeated compaction of a healthy table is a
  no-op (the §2 "diminishing returns" behavior);
- output file count per group is ``max(1, ceil(group_bytes / target))`` and
  ``repartition(n_out)`` splits rows evenly so outputs land near
  ``group_bytes / n_out ≈ target``.
"""
from __future__ import annotations

import math
import time
from dataclasses import dataclass, field

from pyspark.sql import SparkSession

from repro.lst.commit import PendingCommit
from repro.lst.errors import CommitConflictError, ValidationError
from repro.lst.reader import scan_files
from repro.lst.snapshot import DataFile
from repro.lst.table import LstTable
from repro.lst.writer import write_data_files


@dataclass(frozen=True)
class FileGroup:
    """Small files of one partition selected for a single bin-packed rewrite."""

    partition: tuple[tuple[str, str], ...]
    files: tuple[DataFile, ...]
    n_out: int

    @property
    def total_bytes(self) -> int:
        return sum(f.file_size_bytes for f in self.files)


@dataclass
class CompactionResult:
    """What one ``compact()`` call did (feeds metrics + the feedback loop)."""

    table_name: str
    files_removed: int = 0
    files_added: int = 0
    bytes_rewritten: int = 0  # input bytes read (what the GBHr model charges)
    bytes_added: int = 0  # output bytes written (real jobs also pay this)
    records_rewritten: int = 0
    groups_compacted: int = 0
    snapshot_version: int | None = None
    conflicts: int = 0
    skipped: bool = False
    partitions: list[dict] = field(default_factory=list)

    @property
    def file_count_reduction(self) -> int:
        return self.files_removed - self.files_added


def plan_groups(
    files: list[DataFile],
    *,
    target_file_size: int,
    small_file_threshold: int | None = None,
) -> list[FileGroup]:
    """Partition the small files into per-partition rewrite groups.

    Pure planning (no Spark): deterministic given the manifest, per NFR2.
    """
    threshold = small_file_threshold if small_file_threshold is not None else target_file_size
    by_partition: dict[tuple, list[DataFile]] = {}
    for f in files:
        if f.file_size_bytes < threshold:
            by_partition.setdefault(f.partition, []).append(f)
    groups: list[FileGroup] = []
    for partition in sorted(by_partition):
        members = sorted(by_partition[partition], key=lambda f: f.path)
        total = sum(f.file_size_bytes for f in members)
        n_out = max(1, math.ceil(total / target_file_size))
        if n_out >= len(members):
            continue  # no reduction possible — skip (diminishing returns)
        groups.append(FileGroup(partition, tuple(members), n_out))
    return groups


def rewrite_group(
    spark: SparkSession, table: LstTable, group: FileGroup
) -> list[DataFile]:
    """Execute one group's rewrite: read its files, repartition, write."""
    df = scan_files(
        spark, table.table_dir, list(group.files), table.spec.is_partitioned
    )
    # Partition columns were re-derived from the file paths by the reader;
    # drop them so spec.apply() re-computes them for the writer (they must
    # not appear twice), then write exactly n_out consolidated files.
    for name in table.spec.names:
        df = df.drop(name)
    return write_data_files(df, table.table_dir, table.spec, n_files=group.n_out)


def plan_compaction(
    spark: SparkSession,
    table: LstTable,
    *,
    target_file_size: int,
    partition_filter: dict[str, str] | None = None,
    small_file_threshold: int | None = None,
) -> tuple[PendingCommit | None, CompactionResult]:
    """Prepare (but do not commit) a compaction of the table / one partition.

    Returns ``(None, result-with-skipped=True)`` when there is nothing to
    compact. The two-phase form lets the simulator interleave compaction
    commits with client writes deterministically.
    """
    result = CompactionResult(table_name=table.name)
    files = table.files(partition_filter)
    groups = plan_groups(
        files,
        target_file_size=target_file_size,
        small_file_threshold=small_file_threshold,
    )
    if not groups:
        result.skipped = True
        return None, result
    removed: list[DataFile] = []
    added: list[DataFile] = []
    for group in groups:
        new_files = rewrite_group(spark, table, group)
        removed.extend(group.files)
        added.extend(new_files)
        result.groups_compacted += 1
        result.partitions.append(dict(group.partition))
        result.records_rewritten += sum(f.record_count for f in group.files)
    result.files_removed = len(removed)
    result.files_added = len(added)
    result.bytes_rewritten = sum(f.file_size_bytes for f in removed)
    result.bytes_added = sum(f.file_size_bytes for f in added)
    return table.plan_rewrite(removed, added), result


def compact(
    spark: SparkSession,
    table: LstTable,
    *,
    target_file_size: int,
    partition_filter: dict[str, str] | None = None,
    small_file_threshold: int | None = None,
    now: float | None = None,
    retries: int = 3,
    on_conflict=None,
) -> CompactionResult:
    """Plan + commit a compaction, rebase-retrying on conflicts.

    A concurrent commit that removed any planned input file aborts the
    rewrite (``ValidationError`` → result marked skipped with the conflict
    count preserved), matching Iceberg's rewrite-validation behavior.
    """
    pending, result = plan_compaction(
        spark,
        table,
        target_file_size=target_file_size,
        partition_filter=partition_filter,
        small_file_threshold=small_file_threshold,
    )
    if pending is None:
        return result

    def _count(pending_commit, exc):
        result.conflicts += 1
        if on_conflict is not None:
            on_conflict(pending_commit, exc)

    try:
        snap = table.commit(pending, now=now, retries=retries, on_conflict=_count)
    except (CommitConflictError, ValidationError):
        result.skipped = True
        result.files_removed = result.files_added = 0
        result.bytes_rewritten = result.bytes_added = 0
        result.records_rewritten = 0
        result.groups_compacted = 0
        return result
    result.snapshot_version = snap.version
    return result

"""Spark Parquet writer that stages files and registers them as DataFiles.

Two jobs in one module:

- :func:`write_data_files` — the *mechanism* every table mutation uses:
  write a DataFrame through the stock Spark Parquet writer into a staging
  directory, then move each produced file into the table's ``data/``
  directory under its Hive-style partition path and return the
  :class:`DataFile` entries (size from ``os.stat``, row count from the
  Parquet footer via pyarrow — no extra Spark job).

- ``n_files`` control — the small-file phenomenon the paper studies comes
  from writers that are "neither designed nor tuned for generating optimal
  file sizes" (§2). ``n_files`` repartitions before the write, so a
  mis-tuned end-user job is simulated by passing a large value, and the
  compaction job gets precise output-file-count control by passing the
  bin-packed target count.
"""
from __future__ import annotations

import os
import shutil
import uuid

import pyarrow.parquet as pq
from pyspark.sql import DataFrame

from repro.lst.snapshot import DataFile
from repro.lst.spec import PartitionSpec


def _record_count(path: str) -> int:
    return pq.ParquetFile(path).metadata.num_rows


def _partition_of(rel_dir: str) -> tuple[tuple[str, str], ...]:
    """Parse ``a=1/b=2`` directory components into a partition tuple."""
    parts = []
    for comp in rel_dir.split(os.sep):
        if "=" in comp:
            k, v = comp.split("=", 1)
            parts.append((k, v))
    return tuple(parts)


def write_data_files(
    df: DataFrame,
    table_dir: str,
    spec: PartitionSpec,
    *,
    n_files: int | None = None,
) -> list[DataFile]:
    """Write ``df`` as Parquet under ``<table_dir>/data`` and describe the files.

    Returns the new :class:`DataFile` entries *without* committing them —
    the caller wraps them in a :class:`~repro.lst.commit.PendingCommit`.
    Uncommitted files are orphans, exactly as in Iceberg, and are invisible
    to readers because scans resolve file lists from snapshots only.
    """
    data_dir = os.path.join(table_dir, "data")
    staging = os.path.join(table_dir, "_staging", uuid.uuid4().hex)
    os.makedirs(data_dir, exist_ok=True)
    out = spec.apply(df)
    if n_files is not None and n_files > 0:
        out = out.repartition(n_files)
    writer = out.write.mode("overwrite")
    if spec.is_partitioned:
        writer = writer.partitionBy(*spec.names)
    writer.parquet(staging)

    added: list[DataFile] = []
    commit_id = uuid.uuid4().hex[:12]
    seq = 0
    for root, _dirs, files in os.walk(staging):
        for name in sorted(files):
            if not name.endswith(".parquet"):
                continue
            src = os.path.join(root, name)
            rel_dir = os.path.relpath(root, staging)
            partition = _partition_of(rel_dir) if rel_dir != "." else ()
            dest_dir = (
                os.path.join(data_dir, rel_dir) if rel_dir != "." else data_dir
            )
            os.makedirs(dest_dir, exist_ok=True)
            dest_name = f"{commit_id}-{seq:05d}.parquet"
            seq += 1
            dest = os.path.join(dest_dir, dest_name)
            shutil.move(src, dest)
            added.append(
                DataFile(
                    path=os.path.relpath(dest, data_dir),
                    file_size_bytes=os.stat(dest).st_size,
                    record_count=_record_count(dest),
                    partition=partition,
                )
            )
    shutil.rmtree(staging, ignore_errors=True)
    return added


def delete_files(table_dir: str, rel_paths: list[str]) -> None:
    """Physically remove data files (used by tests/GC; commits never do this
    eagerly so that readers of older snapshots keep working — time travel)."""
    data_dir = os.path.join(table_dir, "data")
    for rel in rel_paths:
        try:
            os.remove(os.path.join(data_dir, rel))
        except FileNotFoundError:
            pass

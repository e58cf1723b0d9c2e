"""LstTable: the user-facing log-structured table.

A table is a directory:

```
<table_dir>/
  table.json          # name, partition spec, properties, created_at
  metadata/v<N>.json  # snapshot log (optimistic-concurrency version files)
  data/...            # immutable Parquet files (Hive-style partition dirs)
  _staging/...        # transient Spark write output (moved, then removed)
```

All mutations go through prepare → commit (:mod:`repro.lst.commit`): the
``plan_*`` methods do the Spark work and return a ``PendingCommit``; the
convenience wrappers (``append``/``overwrite_partitions``/``delete_where``)
prepare and commit in one call with rebase-retries. The workload simulator
uses the split form to create deterministic write-write conflicts (Table 1).
"""
from __future__ import annotations

import json
import os
import time

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.lst.commit import PendingCommit, commit_with_retries
from repro.lst.errors import TableExistsError, TableNotFoundError
from repro.lst.reader import prune_files, scan_snapshot
from repro.lst.snapshot import (
    DataFile,
    Snapshot,
    current_version,
    read_snapshot,
)
from repro.lst.spec import PartitionSpec
from repro.lst.writer import write_data_files


class LstTable:
    """Handle on one Iceberg-lite table rooted at ``table_dir``."""

    def __init__(self, table_dir: str):
        self.table_dir = table_dir
        meta_path = os.path.join(table_dir, "table.json")
        if not os.path.exists(meta_path):
            raise TableNotFoundError(table_dir)
        with open(meta_path, encoding="utf-8") as fh:
            raw = json.load(fh)
        self.name: str = raw["name"]
        self.spec = PartitionSpec.from_dict(raw["spec"])
        self.properties: dict = raw.get("properties", {})
        self.created_at: float = raw.get("created_at", 0.0)

    # ---------------------------------------------------------------- setup
    @staticmethod
    def create(
        table_dir: str,
        name: str,
        spec: PartitionSpec | None = None,
        properties: dict | None = None,
        created_at: float | None = None,
    ) -> "LstTable":
        if os.path.exists(os.path.join(table_dir, "table.json")):
            raise TableExistsError(table_dir)
        os.makedirs(os.path.join(table_dir, "metadata"), exist_ok=True)
        os.makedirs(os.path.join(table_dir, "data"), exist_ok=True)
        meta = {
            "name": name,
            "spec": (spec or PartitionSpec.unpartitioned()).to_dict(),
            "properties": properties or {},
            "created_at": created_at if created_at is not None else time.time(),
        }
        with open(os.path.join(table_dir, "table.json"), "x", encoding="utf-8") as fh:
            json.dump(meta, fh)
        return LstTable(table_dir)

    @staticmethod
    def load(table_dir: str) -> "LstTable":
        return LstTable(table_dir)

    # ------------------------------------------------------------ snapshots
    @property
    def metadata_dir(self) -> str:
        return os.path.join(self.table_dir, "metadata")

    @property
    def data_dir(self) -> str:
        return os.path.join(self.table_dir, "data")

    def current_version(self) -> int:
        return current_version(self.metadata_dir)

    def snapshot(self, version: int) -> Snapshot:
        return read_snapshot(os.path.join(self.metadata_dir, f"v{version}.json"))

    def current_snapshot(self) -> Snapshot | None:
        v = self.current_version()
        return self.snapshot(v) if v >= 0 else None

    def snapshots(self) -> list[Snapshot]:
        return [self.snapshot(v) for v in range(self.current_version() + 1)]

    # ----------------------------------------------------------- statistics
    def files(self, partition_filter: dict[str, str] | None = None) -> list[DataFile]:
        snap = self.current_snapshot()
        if snap is None:
            return []
        return prune_files(snap, partition_filter)

    def file_count(self) -> int:
        return len(self.files())

    def total_bytes(self) -> int:
        return sum(f.file_size_bytes for f in self.files())

    def metadata_object_count(self) -> int:
        """Filesystem objects this table contributes to a namespace quota:
        data files plus metadata version files (the paper's HDFS NameNode
        pressure is proportional to exactly this count)."""
        return self.file_count() + self.current_version() + 2  # +table.json

    # ----------------------------------------------------------------- scan
    def scan(
        self,
        spark: SparkSession,
        snapshot_version: int | None = None,
        partition_filter: dict[str, str] | None = None,
    ) -> DataFrame | None:
        """Read the table (or one partition / an older snapshot) as a
        DataFrame; ``None`` when the selection contains no files."""
        snap = (
            self.snapshot(snapshot_version)
            if snapshot_version is not None
            else self.current_snapshot()
        )
        if snap is None:
            return None
        return scan_snapshot(spark, self.table_dir, snap, partition_filter)

    # ---------------------------------------------------------------- plans
    def plan_append(self, df: DataFrame, *, n_files: int | None = None) -> PendingCommit:
        added = write_data_files(df, self.table_dir, self.spec, n_files=n_files)
        return PendingCommit(
            table_name=self.name,
            metadata_dir=self.metadata_dir,
            base_version=self.current_version(),
            operation="append",
            added=added,
        )

    def plan_overwrite_partitions(
        self, df: DataFrame, *, n_files: int | None = None
    ) -> PendingCommit:
        """Dynamic partition overwrite: replace exactly the partitions ``df``
        touches (whole-table overwrite when unpartitioned)."""
        added = write_data_files(df, self.table_dir, self.spec, n_files=n_files)
        snap = self.current_snapshot()
        removed: set[str] = set()
        if snap is not None:
            if self.spec.is_partitioned:
                touched = {f.partition for f in added}
                removed = {f.path for f in snap.files if f.partition in touched}
            else:
                removed = {f.path for f in snap.files}
        return PendingCommit(
            table_name=self.name,
            metadata_dir=self.metadata_dir,
            base_version=self.current_version(),
            operation="overwrite",
            added=added,
            removed_paths=removed,
        )

    def plan_delete_where(self, spark: SparkSession, predicate: str) -> PendingCommit:
        """Copy-on-Write delete: rewrite every file containing a matching row.

        This is the §2 cause (ii) of small files: CoW deletes redistribute
        rows across files and produce new (often small, uneven) files. The
        rewrite keeps the per-file structure (one new file per affected old
        file) to mirror that behavior.
        """
        snap = self.current_snapshot()
        base_version = self.current_version()
        if snap is None or not snap.files:
            return PendingCommit(
                self.name, self.metadata_dir, base_version, "delete", added=[]
            )
        df = self.scan(spark)
        # Which physical files hold matching rows? Tag rows with their source
        # file, filter, and collect the distinct basenames (globally unique).
        tagged = df.withColumn("__file", F.input_file_name())
        hit_names = {
            os.path.basename(r["__file"])
            for r in tagged.filter(F.expr(predicate)).select("__file").distinct().collect()
        }
        affected = [f for f in snap.files if os.path.basename(f.path) in hit_names]
        if not affected:
            return PendingCommit(
                self.name, self.metadata_dir, base_version, "delete", added=[]
            )
        from repro.lst.reader import scan_files  # local import avoids cycle

        keep = (
            scan_files(
                spark, self.table_dir, affected, self.spec.is_partitioned
            )
            .filter(~F.expr(predicate))
        )
        for name in self.spec.names:
            keep = keep.drop(name)  # re-derived by the writer's spec.apply
        # CoW keeps the per-file structure *within each partition*: the
        # repartition width is the mean affected-file count per partition
        # (a global width would multiply across partitions).
        if self.spec.is_partitioned:
            n_parts = max(1, len({f.partition for f in affected}))
            width = max(1, round(len(affected) / n_parts))
        else:
            width = len(affected)
        added = write_data_files(keep, self.table_dir, self.spec, n_files=width)
        return PendingCommit(
            table_name=self.name,
            metadata_dir=self.metadata_dir,
            base_version=base_version,
            operation="delete",
            added=added,
            removed_paths={f.path for f in affected},
        )

    def plan_rewrite(
        self, removed: list[DataFile], added: list[DataFile]
    ) -> PendingCommit:
        """Register a compaction rewrite prepared by :mod:`maintenance`."""
        return PendingCommit(
            table_name=self.name,
            metadata_dir=self.metadata_dir,
            base_version=self.current_version(),
            operation="rewrite",
            added=list(added),
            removed_paths={f.path for f in removed},
        )

    # ------------------------------------------------------------- wrappers
    def commit(
        self,
        pending: PendingCommit,
        *,
        now: float | None = None,
        retries: int = 3,
        on_conflict=None,
    ) -> Snapshot:
        return commit_with_retries(
            pending,
            timestamp=now if now is not None else time.time(),
            retries=retries,
            on_conflict=on_conflict,
        )

    def append(
        self,
        df: DataFrame,
        *,
        n_files: int | None = None,
        now: float | None = None,
        retries: int = 3,
        on_conflict=None,
    ) -> Snapshot:
        return self.commit(
            self.plan_append(df, n_files=n_files),
            now=now,
            retries=retries,
            on_conflict=on_conflict,
        )

    def overwrite_partitions(
        self,
        df: DataFrame,
        *,
        n_files: int | None = None,
        now: float | None = None,
        retries: int = 3,
        on_conflict=None,
    ) -> Snapshot:
        return self.commit(
            self.plan_overwrite_partitions(df, n_files=n_files),
            now=now,
            retries=retries,
            on_conflict=on_conflict,
        )

    def delete_where(
        self,
        spark: SparkSession,
        predicate: str,
        *,
        now: float | None = None,
        retries: int = 3,
        on_conflict=None,
    ) -> Snapshot:
        return self.commit(
            self.plan_delete_where(spark, predicate),
            now=now,
            retries=retries,
            on_conflict=on_conflict,
        )

"""Iceberg-lite: a log-structured table (LST) substrate over the local filesystem.

The paper (AutoComp, SIGMOD 2025) runs on Apache Iceberg v1.2.0 / Delta Lake
v2.4.0 over HDFS/ADLS. Neither is available offline, so this package
implements the minimal LST semantics AutoComp depends on:

- immutable Parquet data files written by Spark,
- a JSON snapshot log (``metadata/v<N>.json``) with inlined manifests,
- optimistic-concurrency commits: version files are created with
  ``open(..., 'x')`` so exactly one writer wins a version; losers raise
  :class:`~repro.lst.errors.CommitConflictError` and may rebase-retry,
- identity/month partition transforms with Hive-style directory layout,
- table operations: append, dynamic-partition overwrite, copy-on-write
  delete, and file rewrite (compaction),
- a reader that hands Spark the exact file list for a snapshot
  (``spark.read.option("basePath", ...).parquet(*files)``).

See DESIGN.md §4 for why this substitution preserves the behavior the
paper's evaluation exercises.
"""
from repro.lst.catalog import Catalog, Database
from repro.lst.errors import (
    CommitConflictError,
    LstError,
    TableExistsError,
    TableNotFoundError,
    ValidationError,
)
from repro.lst.maintenance import CompactionResult, compact
from repro.lst.snapshot import DataFile, Snapshot
from repro.lst.spec import PartitionField, PartitionSpec
from repro.lst.table import LstTable

__all__ = [
    "Catalog",
    "Database",
    "CommitConflictError",
    "CompactionResult",
    "DataFile",
    "LstError",
    "LstTable",
    "PartitionField",
    "PartitionSpec",
    "Snapshot",
    "TableExistsError",
    "TableNotFoundError",
    "ValidationError",
    "compact",
]

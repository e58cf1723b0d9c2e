"""Snapshot scans: resolve a snapshot's file list into a Spark DataFrame.

The substrate has no JVM DataSourceV2 (DESIGN.md §2 layering note); instead
the reader hands Spark the *exact* Parquet file list registered in the
snapshot manifest, with ``basePath`` set to the table's data directory so
Spark re-derives the Hive-style partition columns from the file paths. This
drives the same Catalyst scan path (vectorized Parquet readers, partition
columns as metadata) while file pruning — the part Iceberg does from
manifests — happens here in Python, from the same manifest data.
"""
from __future__ import annotations

import os

from pyspark.sql import DataFrame, SparkSession

from repro.lst.snapshot import DataFile, Snapshot


def prune_files(
    snapshot: Snapshot, partition_filter: dict[str, str] | None = None
) -> list[DataFile]:
    """Manifest-level partition pruning: keep files matching all filter keys."""
    if not partition_filter:
        return list(snapshot.files)
    want = partition_filter.items()
    return [
        f for f in snapshot.files if all(f.partition_dict.get(k) == v for k, v in want)
    ]


def scan_files(
    spark: SparkSession,
    table_dir: str,
    files: list[DataFile],
    partitioned: bool,
) -> DataFrame:
    """Read exactly ``files`` as one DataFrame (partition columns restored)."""
    data_dir = os.path.join(table_dir, "data")
    if not files:
        # An empty table still needs a well-formed (empty) DataFrame; the
        # caller knows its own schema better than we can infer here, so an
        # empty RDD-free frame via an empty file list is not possible with
        # parquet — raise to force callers to handle the empty case.
        raise ValueError("scan_files called with an empty file list")
    paths = [os.path.join(data_dir, f.path) for f in files]
    reader = spark.read
    if partitioned:
        reader = reader.option("basePath", data_dir)
    return reader.parquet(*paths)


def scan_snapshot(
    spark: SparkSession,
    table_dir: str,
    snapshot: Snapshot,
    partition_filter: dict[str, str] | None = None,
) -> DataFrame | None:
    """Scan a snapshot with optional partition pruning; None if no files."""
    files = prune_files(snapshot, partition_filter)
    if not files:
        return None
    partitioned = any(f.partition for f in files)
    return scan_files(spark, table_dir, files, partitioned)

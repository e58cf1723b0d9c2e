"""Observe phase: fleet-wide statistics collection as one Spark aggregation.

Instead of looping over candidates in the driver, the file metadata of every
candidate (path, partition, size) is unioned into a single DataFrame and
aggregated in one distributed dataflow:

1. group by ``(candidate, partition)`` — per-partition small-file counts and
   the bin-packed output count ``ceil(small_bytes / target)``, which yields
   the *partition-aware* file-count reduction (compaction never crosses
   partition boundaries);
2. group by ``candidate`` — totals, the paper's table-level ΔF_c
   (``small_file_count``), and ``Σ sᵢ·ln sᵢ`` from which the orient phase
   derives file entropy without revisiting file lists.

At LinkedIn's fleet scale (21K→100K tables) this is the step that must be a
distributed job; here the same Catalyst plan runs over local metadata.
"""
from __future__ import annotations

from pyspark.sql import SparkSession
from pyspark.sql import functions as F
from pyspark.sql.types import LongType, StringType, StructField, StructType

from repro.core.model import Candidate, CandidateStats
from repro.lst.catalog import Catalog
from repro.lst.snapshot import DataFile

_FILE_SCHEMA = StructType(
    [
        StructField("cid", LongType(), False),
        StructField("part", StringType(), False),
        StructField("size", LongType(), False),
    ]
)


def candidate_files(catalog: Catalog, candidate: Candidate) -> list[DataFile]:
    """Resolve the file set a candidate covers from the current snapshot."""
    table = catalog.load_table(candidate.db, candidate.table)
    snap = table.current_snapshot()
    if snap is None:
        return []
    if candidate.scope == "partition":
        return [f for f in snap.files if f.partition == candidate.partition]
    if candidate.scope == "snapshot":
        floor = candidate.snapshot_floor or 0
        if floor >= 0 and table.current_version() > floor:
            old = {f.path for f in table.snapshot(floor).files}
            return [f for f in snap.files if f.path not in old]
    return list(snap.files)


def collect_stats(
    spark: SparkSession,
    catalog: Catalog,
    candidates: list[Candidate],
    *,
    target_file_size: int,
    small_file_threshold: int | None = None,
) -> list[CandidateStats]:
    """One Spark job computing :class:`CandidateStats` for every candidate.

    Candidates with no files get zeroed stats (they are filtered later);
    table-level metadata (creation time, last write time) is joined in from
    the catalog on the driver — it is per-table, not per-file.
    """
    threshold = small_file_threshold if small_file_threshold is not None else target_file_size
    rows: list[tuple[int, str, int]] = []
    meta: list[tuple[float, float]] = []
    for cid, cand in enumerate(candidates):
        table = catalog.load_table(cand.db, cand.table)
        snap = table.current_snapshot()
        meta.append(
            (table.created_at, snap.timestamp if snap is not None else 0.0)
        )
        for f in candidate_files(catalog, cand):
            part = "/".join(f"{k}={v}" for k, v in f.partition)
            rows.append((cid, part, f.file_size_bytes))

    by_cid: dict[int, dict] = {}
    if rows:
        files_df = spark.createDataFrame(rows, schema=_FILE_SCHEMA)
        small = F.col("size") < F.lit(threshold)
        per_partition = files_df.groupBy("cid", "part").agg(
            F.count("*").alias("n"),
            F.sum("size").alias("bytes"),
            F.sum(F.when(small, 1).otherwise(0)).alias("small_n"),
            F.sum(F.when(small, F.col("size")).otherwise(0)).alias("small_bytes"),
            F.sum(F.col("size") * F.log(F.col("size").cast("double"))).alias("slogs"),
        )
        n_out = F.ceil(F.col("small_bytes") / F.lit(float(target_file_size)))
        per_partition = per_partition.withColumn(
            "reduction",
            F.when(n_out < F.col("small_n"), F.col("small_n") - n_out).otherwise(0),
        )
        per_candidate = per_partition.groupBy("cid").agg(
            F.sum("n").alias("file_count"),
            F.sum("bytes").alias("total_bytes"),
            F.sum("small_n").alias("small_file_count"),
            F.sum("small_bytes").alias("small_bytes"),
            F.sum("reduction").alias("partition_aware_reduction"),
            F.sum("slogs").alias("sum_bytes_log_bytes"),
        )
        by_cid = {r["cid"]: r.asDict() for r in per_candidate.collect()}

    out: list[CandidateStats] = []
    for cid, cand in enumerate(candidates):
        agg = by_cid.get(cid)
        created_at, last_write_at = meta[cid]
        if agg is None:
            out.append(
                CandidateStats(
                    candidate=cand, created_at=created_at, last_write_at=last_write_at
                )
            )
            continue
        out.append(
            CandidateStats(
                candidate=cand,
                file_count=int(agg["file_count"]),
                total_bytes=int(agg["total_bytes"]),
                small_file_count=int(agg["small_file_count"]),
                small_bytes=int(agg["small_bytes"]),
                partition_aware_reduction=int(agg["partition_aware_reduction"]),
                sum_bytes_log_bytes=float(agg["sum_bytes_log_bytes"]),
                created_at=created_at,
                last_write_at=last_write_at,
            )
        )
    return out

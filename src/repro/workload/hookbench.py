"""Optimize-after-write workloads for the §6.3 auto-tuning experiments (Fig 9).

Three scaled-down LST-Bench workload phases, each a rounds-loop of data
modification + reads over one table, with AutoComp's optimize-after-write
hook evaluated after every write (unconstrained resources, as in §6.3):

- ``tpch`` — a *non-partitioned* table with a heavy data-modification
  phase: compaction must rewrite the whole table, so triggering it is
  costly and its long modification phase dominates — the no-compaction
  default wins (Fig 9b).
- ``wp1`` (TPC-DS WP1) — a *partitioned* table with frequent small
  modifications and a read-heavy phase on the same cluster: compaction
  pays off when fragmentation crosses a threshold (Fig 9a/9c).
- ``wp3`` (TPC-DS WP3) — like WP1 but reads and writes run on decoupled
  clusters, so compaction time does not queue behind reads: consistent
  benefit (Fig 9d).

The objective returned is the end-to-end duration proxy in seconds:
client query time, plus compaction time only when it shares the cluster.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

from pyspark.sql import SparkSession

from repro import synth_data
from repro.core.autocomp import AutoComp, AutoCompConfig
from repro.core.ranking import ThresholdTrigger
from repro.lst.spec import PartitionSpec
from repro.lst.table import LstTable

KB = 1024


@dataclass(frozen=True)
class HookWorkloadConfig:
    kind: str  # tpch | wp1 | wp3
    rounds: int = 4
    rows_per_round: int = 400
    files_per_commit: int = 8
    reads_per_round: int = 2
    target_file_size: int = 256 * KB
    seed: int = 0


@dataclass
class HookRunResult:
    duration_s: float
    compactions: int
    final_file_count: int
    query_time_s: float
    compaction_time_s: float


def run_hook_workload(
    spark: SparkSession,
    root: str,
    cfg: HookWorkloadConfig,
    *,
    trait: str = "file_count_reduction",
    threshold: float = 1e18,  # effectively "never" (the no-compaction default)
) -> HookRunResult:
    """Run one workload under a single-trait trigger; lower duration = better."""
    autocomp = AutoComp(AutoCompConfig(target_file_size=cfg.target_file_size))
    trigger = ThresholdTrigger(trait, threshold)
    partitioned = cfg.kind in ("wp1", "wp3")
    decoupled = cfg.kind == "wp3"
    if partitioned:
        table = LstTable.create(
            f"{root}/t",
            name="bench.t",
            spec=PartitionSpec.monthly("ss_sold_date", "sold_month"),
        )
    else:
        table = LstTable.create(f"{root}/t", name="bench.t")

    query_time = 0.0
    compaction_time = 0.0
    compactions = 0
    for rnd in range(cfg.rounds):
        # ------------------------- data-modification phase (small files)
        t0 = time.monotonic()
        if partitioned:
            batch = synth_data.store_sales_batch(
                spark,
                n_rows=cfg.rows_per_round,
                seed=cfg.seed * 100 + rnd,
                start_day=rnd * 25,
                n_days=40,
            )
        else:
            # TPC-H-style: heavier modification phase on one table.
            batch = synth_data.orders_batch(
                spark,
                n_rows=cfg.rows_per_round * 2,
                seed=cfg.seed * 100 + rnd,
                key_offset=rnd * cfg.rows_per_round * 2,
            )
        table.append(batch, n_files=cfg.files_per_commit)
        query_time += time.monotonic() - t0

        # --------------------------- optimize-after-write hook evaluation
        t0 = time.monotonic()
        res = autocomp.optimize_after_write(spark, table, trigger)
        dt = time.monotonic() - t0
        if res is not None and not res.skipped:
            compactions += 1
        if not decoupled:
            compaction_time += dt
        # -------------------------------------------------- read phase
        t0 = time.monotonic()
        df = table.scan(spark)
        for _ in range(cfg.reads_per_round):
            df.groupBy().count().collect()
            if partitioned:
                df.groupBy("sold_month").count().collect()
            else:
                df.groupBy("o_orderstatus").count().collect()
        query_time += time.monotonic() - t0

    duration = query_time + compaction_time
    return HookRunResult(
        duration_s=duration,
        compactions=compactions,
        final_file_count=table.file_count(),
        query_time_s=query_time,
        compaction_time_s=compaction_time,
    )

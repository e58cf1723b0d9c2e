"""Hour-by-hour experiment driver (the §6 evaluation harness).

Replaces the paper's LST-Bench-driven 5-hour cluster runs with a
deterministic discrete-event simulation in which every write, read, and
compaction is *real Spark work* against Iceberg-lite tables; only the
interleaving is simulated:

- Each hour's ops get integer *slots*. A write prepares (runs its Spark
  job, staging files) at its start slot and commits ``duration`` slots
  later; any commit landing on its table in between makes its base stale —
  the optimistic-concurrency protocol then raises, the retry is counted as
  a **client-side conflict** (Table 1).
- Compaction decisions are made by AutoComp at the start of each hour from
  the previous hour's state (periodic pull mode, 1-hour interval as in
  §6.1) and their commits race with the same hour's writes:
  - ``table`` strategy: all selected tables are prepared in parallel at
    slot 0 and commit after ``table_compaction_slots`` — a long window in
    which client writes land first, producing **cluster-side conflicts**;
  - ``hybrid`` strategy: partition-scope tasks run sequentially, each
    preparing *and* committing in its own slot — the §4.4 serialization
    that yields zero cluster-side conflicts in Table 1.
- Reads execute at their slot against the current snapshot (snapshot
  isolation — they never conflict) with wall-clock latency recorded.

Determinism (NFR2): all interleaving choices derive from the config seed;
identical configs reproduce identical conflict tables and decisions.
"""
from __future__ import annotations

import random
import time
from dataclasses import dataclass, field

from pyspark.sql import SparkSession

from repro import synth_data
from repro.core.autocomp import AutoComp, AutoCompConfig
from repro.core.ranking import select_top_k
from repro.core.traits import CostModelConfig
from repro.lst.catalog import Catalog
from repro.lst.commit import PendingCommit, commit_with_retries, rebase, try_commit
from repro.lst.errors import CommitConflictError, ValidationError
from repro.lst.maintenance import CompactionResult, plan_compaction
from repro.lst.spec import PartitionSpec
from repro.workload.cab import Op, WorkloadConfig, generate_workload
from repro.workload.conflicts import CLIENT, CLUSTER, ConflictLog
from repro.workload.metrics import (
    Candlestick,
    FileCountSeries,
    LatencyRecorder,
    gbhr_app,
)
from repro.workload.queries import prepare_write, run_read


@dataclass
class SimConfig:
    strategy: str = "none"  # none | table | hybrid
    k: int = 10
    n_databases: int = 4
    n_hours: int = 5
    seed: int = 0
    target_file_size: int = 256 * 1024
    initial_rows_lineitem: int = 1500
    initial_rows_orders: int = 600
    initial_files_per_commit: int = 12  # mis-tuned bulk load → many small files
    files_per_commit: int = 3  # mis-tuned incremental writers
    base_rows: int = 150
    retries: int = 3
    table_compaction_slots: int = 4  # base table-scope rewrite duration
    compaction_slots_per_file: float = 0.5  # + duration per file rewritten
    write_slots: tuple[int, int] = (1, 4)  # write duration range
    cost_model: CostModelConfig = field(default_factory=CostModelConfig)
    workload: WorkloadConfig | None = None

    def workload_config(self) -> WorkloadConfig:
        return self.workload or WorkloadConfig(
            n_databases=self.n_databases, n_hours=self.n_hours, seed=self.seed
        )


@dataclass
class HourReport:
    hour: int
    n_reads: int = 0
    n_writes: int = 0
    client_conflicts: int = 0
    cluster_conflicts: int = 0
    file_count_end: int = 0
    compactions_committed: int = 0
    compactions_abandoned: int = 0
    compaction_gbhr: float = 0.0
    files_removed: int = 0
    files_added: int = 0
    read_latency: Candlestick | None = None
    write_latency: Candlestick | None = None
    errors: int = 0


@dataclass
class SimReport:
    config: SimConfig
    hours: list[HourReport] = field(default_factory=list)
    conflicts: ConflictLog = field(default_factory=ConflictLog)
    latency: LatencyRecorder = field(default_factory=LatencyRecorder)
    file_counts: FileCountSeries = field(default_factory=FileCountSeries)
    compaction_results: list[tuple[int, CompactionResult]] = field(default_factory=list)
    write_counts: dict[int, int] = field(default_factory=dict)

    @property
    def duration_proxy_s(self) -> float:
        """End-to-end runtime proxy: total client query time (the quantity
        the §6.3 auto-tuner minimizes)."""
        return self.latency.total()

    def mean_compaction_gbhr(self) -> float:
        gb = [
            gbhr_app(r.bytes_rewritten, self.config.cost_model)
            for _h, r in self.compaction_results
            if not r.skipped
        ]
        return sum(gb) / len(gb) if gb else 0.0


def setup_fleet(spark: SparkSession, root: str, cfg: SimConfig) -> Catalog:
    """Create the CAB database fleet with a fragmented initial load."""
    catalog = Catalog(root)
    wcfg = cfg.workload_config()
    for d in range(wcfg.n_databases):
        db = f"db{d}"
        catalog.create_database(db, total_quota=50_000)
        catalog.create_table(
            db,
            "lineitem",
            spec=PartitionSpec.monthly("l_shipdate", "ship_month"),
            created_at=0.0,
        )
        catalog.create_table(db, "orders", created_at=0.0)
        li = catalog.load_table(db, "lineitem")
        li.append(
            synth_data.lineitem_batch(
                spark,
                n_rows=cfg.initial_rows_lineitem,
                seed=cfg.seed * 1000 + d,
                start_day=0,
                n_days=170,
            ),
            n_files=cfg.initial_files_per_commit,
            now=0.0,
        )
        orders = catalog.load_table(db, "orders")
        orders.append(
            synth_data.orders_batch(
                spark, n_rows=cfg.initial_rows_orders, seed=cfg.seed * 1000 + d + 500
            ),
            n_files=cfg.initial_files_per_commit,
            now=0.0,
        )
    return catalog


@dataclass
class _PendingWrite:
    op: Op
    table_key: str
    pending: PendingCommit
    commit_slot: int
    started: float  # monotonic start, for latency


@dataclass
class _PendingCompaction:
    table_key: str
    pending: PendingCommit
    planned: CompactionResult
    commit_slot: int
    attempts: int = 0


def _autocomp_for(cfg: SimConfig) -> AutoComp:
    scope = "hybrid" if cfg.strategy == "hybrid" else "table"
    return AutoComp(
        AutoCompConfig(
            scope=scope,
            target_file_size=cfg.target_file_size,
            k=cfg.k,
            cost_model=cfg.cost_model,
            retries=cfg.retries,
        )
    )


def run_simulation(spark: SparkSession, root: str, cfg: SimConfig) -> SimReport:
    """Run the full experiment and return all metrics."""
    report = SimReport(config=cfg)
    catalog = setup_fleet(spark, root, cfg)
    workload = generate_workload(cfg.workload_config())
    report.write_counts = {
        h: sum(1 for op in ops if op.is_write) for h, ops in workload.items()
    }
    report.file_counts.record(0, catalog.total_file_count())
    autocomp = _autocomp_for(cfg) if cfg.strategy != "none" else None

    for hour in range(1, cfg.n_hours + 1):
        hr = HourReport(hour=hour)
        ops = workload[hour]
        hr.n_writes = report.write_counts[hour]
        hr.n_reads = len(ops) - hr.n_writes
        rng = random.Random(f"{cfg.seed}|interleave|{hour}")

        # -------- compaction decisions from last hour's state (pull mode)
        comp_queue: list[tuple[int, Op | None, str]] = []  # (slot, marker)
        compaction_tasks: list[_PendingCompaction] = []
        if autocomp is not None:
            _n, ranked = autocomp.rank_candidates(spark, catalog)
            selected = select_top_k(ranked, cfg.k)
            if cfg.strategy == "table":
                # Parallel preparation at slot 0; staggered long commits.
                for i, r in enumerate(selected):
                    cand = r.candidate
                    table = catalog.load_table(cand.db, cand.table)
                    pending, planned = plan_compaction(
                        spark,
                        table,
                        target_file_size=cfg.target_file_size,
                        partition_filter=cand.partition_filter,
                    )
                    if pending is None:
                        continue
                    # A rewrite's wall time scales with the data it moves:
                    # early-hour compactions of heavily fragmented tables
                    # stay open the longest and accrue the most conflicts —
                    # which then decline as the fleet heals (Table 1).
                    duration = cfg.table_compaction_slots + int(
                        planned.files_removed * cfg.compaction_slots_per_file
                    )
                    compaction_tasks.append(
                        _PendingCompaction(
                            table_key=cand.table_key,
                            pending=pending,
                            planned=planned,
                            commit_slot=duration + i,
                        )
                    )
            else:
                # Hybrid: sequential short tasks — prepare+commit same slot.
                n_slots = max(1, len(ops))
                spacing = max(1, n_slots // max(1, len(selected)))
                for i, r in enumerate(selected):
                    comp_queue.append((1 + i * spacing, None, r.candidate.id))
                hybrid_selected = {r.candidate.id: r for r in selected}

        # ---------------- assign slots to client ops and run the timeline
        pending_writes: list[_PendingWrite] = []
        max_slot = len(ops) + cfg.table_compaction_slots + cfg.k + 2
        # Streams run in parallel: each round-robin wave of ops (one op per
        # stream lane) shares a start slot, so concurrent writes genuinely
        # overlap — the source of the paper's no-compaction client-side
        # conflicts and of write-vs-compaction races.
        wcfg = cfg.workload_config()
        n_lanes = max(1, wcfg.n_databases * wcfg.streams_per_db)
        by_start: dict[int, list[Op]] = {}
        for op in ops:
            by_start.setdefault(op.seq // n_lanes, []).append(op)

        def _commit_writes_due(slot: int) -> None:
            for pw in [w for w in pending_writes if w.commit_slot == slot]:
                pending_writes.remove(pw)
                conflicted = {"n": 0}

                def on_conflict(_p, _e, pw=pw, conflicted=conflicted):
                    conflicted["n"] += 1
                    report.conflicts.record(
                        hour=hour,
                        side=CLIENT,
                        table_key=pw.table_key,
                        op_kind=pw.op.kind,
                    )

                try:
                    commit_with_retries(
                        pw.pending,
                        timestamp=float(hour),
                        retries=cfg.retries,
                        on_conflict=on_conflict,
                    )
                except ValidationError:
                    # A CoW delete whose input files were compacted away:
                    # a real client re-runs the statement against the new
                    # snapshot (one more client-side retry), which then
                    # applies cleanly.
                    report.conflicts.record(
                        hour=hour,
                        side=CLIENT,
                        table_key=pw.table_key,
                        op_kind=pw.op.kind,
                    )
                    try:
                        _table, pending2 = prepare_write(
                            spark,
                            catalog,
                            pw.op,
                            seed=cfg.seed,
                            base_rows=cfg.base_rows,
                            files_per_commit=cfg.files_per_commit,
                        )
                        commit_with_retries(
                            pending2, timestamp=float(hour), retries=cfg.retries
                        )
                    except (CommitConflictError, ValidationError):
                        hr.errors += 1
                        report.conflicts.record(
                            hour=hour,
                            side=CLIENT,
                            table_key=pw.table_key,
                            op_kind=pw.op.kind,
                            fatal=True,
                        )
                except CommitConflictError:
                    hr.errors += 1
                    report.conflicts.record(
                        hour=hour,
                        side=CLIENT,
                        table_key=pw.table_key,
                        op_kind=pw.op.kind,
                        fatal=True,
                    )
                report.latency.add(hour, "write", time.monotonic() - pw.started)

        def _commit_compactions_due(slot: int) -> None:
            for task in [t for t in compaction_tasks if t.commit_slot == slot]:
                compaction_tasks.remove(task)
                try:
                    snap = try_commit(task.pending, timestamp=float(hour))
                except CommitConflictError:
                    # Unlike client writes (which rebase immediately), a
                    # compaction retry re-occupies a later slot — newer
                    # writes may conflict it again, so one task can accrue
                    # several cluster-side conflicts (the Table 1 counts).
                    report.conflicts.record(
                        hour=hour,
                        side=CLUSTER,
                        table_key=task.table_key,
                        op_kind="compact",
                    )
                    task.attempts += 1
                    if task.attempts > cfg.retries:
                        hr.compactions_abandoned += 1
                        continue
                    try:
                        rebase(task.pending)
                    except ValidationError:
                        # Planned input files were removed concurrently —
                        # the rewrite no longer applies (dropped, §4.4).
                        hr.compactions_abandoned += 1
                        report.conflicts.record(
                            hour=hour,
                            side=CLUSTER,
                            table_key=task.table_key,
                            op_kind="compact",
                            fatal=True,
                        )
                        continue
                    task.commit_slot = slot + 1
                    compaction_tasks.append(task)
                    continue
                res = task.planned
                res.snapshot_version = snap.version
                hr.compactions_committed += 1
                hr.files_removed += res.files_removed
                hr.files_added += res.files_added
                hr.compaction_gbhr += gbhr_app(res.bytes_rewritten, cfg.cost_model)
                report.compaction_results.append((hour, res))

        slot = -1
        while slot < max_slot or pending_writes or compaction_tasks or comp_queue:
            slot += 1
            _commit_writes_due(slot)
            _commit_compactions_due(slot)
            # Hybrid sequential compactions: plan + commit atomically now.
            for entry in [e for e in comp_queue if e[0] == slot]:
                comp_queue.remove(entry)
                _slot, _op, cand_id = entry
                r = hybrid_selected[cand_id]
                cand = r.candidate
                table = catalog.load_table(cand.db, cand.table)
                pending, planned = plan_compaction(
                    spark,
                    table,
                    target_file_size=cfg.target_file_size,
                    partition_filter=cand.partition_filter,
                )
                if pending is None:
                    continue
                compaction_tasks.append(
                    _PendingCompaction(
                        table_key=cand.table_key,
                        pending=pending,
                        planned=planned,
                        commit_slot=slot,
                    )
                )
                _commit_compactions_due(slot)
            for op in by_start.get(slot, []):
                if op.is_write:
                    t0 = time.monotonic()
                    table, pending = prepare_write(
                        spark,
                        catalog,
                        op,
                        seed=cfg.seed,
                        base_rows=cfg.base_rows,
                        files_per_commit=cfg.files_per_commit,
                    )
                    duration = rng.randint(*cfg.write_slots)
                    pending_writes.append(
                        _PendingWrite(
                            op=op,
                            table_key=table.name,
                            pending=pending,
                            commit_slot=slot + duration,
                            started=t0,
                        )
                    )
                else:
                    res = run_read(spark, catalog, op)
                    if res.error:
                        hr.errors += 1
                    report.latency.add(hour, "read", res.latency_s)

        hr.client_conflicts = report.conflicts.count(side=CLIENT, hour=hour)
        hr.cluster_conflicts = report.conflicts.count(side=CLUSTER, hour=hour)
        hr.file_count_end = catalog.total_file_count()
        hr.read_latency = report.latency.candlestick(hour, "read")
        hr.write_latency = report.latency.candlestick(hour, "write")
        report.file_counts.record(hour, hr.file_count_end)
        report.hours.append(hr)
    return report

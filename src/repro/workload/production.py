"""Production-deployment simulation (§7, Figures 2 and 10).

Models the LinkedIn OpenHouse fleet at laptop scale: many tenant databases
whose tables fragment at different rates (Zipf-skewed write traffic, as in
real multi-tenant fleets), compacted weekly under one of three policies:

- ``manual`` — the §7 "ad-hoc manual compaction": a *fixed* set of k tables
  chosen once, up front, by their fragmentation at rollout time; the set
  never adapts, so its returns diminish as those tables become healthy.
- ``auto`` — AutoComp with MOOP ranking and a fixed top-k re-decided every
  week from fresh statistics (the week-3 transition in Fig 10a).
- ``budget`` — AutoComp with dynamic k: greedy budget fill under a GBHr
  cap (the week-22 transition in Fig 10b).

Each "week" applies a seeded write round (small-file appends skewed toward
hot tables) and then runs the policy; per-week metrics mirror Fig 10:
files reduced, compaction cost, fleet file count, small-file percentage.
"""
from __future__ import annotations

import random
from dataclasses import dataclass, field

from pyspark.sql import SparkSession

from repro import synth_data
from repro.core.autocomp import AutoComp, AutoCompConfig
from repro.core.ranking import select_within_budget
from repro.core.traits import CostModelConfig
from repro.lst.catalog import Catalog
from repro.lst.maintenance import compact
from repro.workload.metrics import gbhr_app


@dataclass(frozen=True)
class FleetConfig:
    n_databases: int = 3
    tables_per_db: int = 6
    seed: int = 0
    target_file_size: int = 256 * 1024
    initial_appends_hot: int = 4  # hot tables start heavily fragmented
    files_per_append: int = 4
    rows_per_append: int = 80
    writes_per_week: int = 10
    zipf_alpha: float = 1.2
    drift_per_week: int = 2  # hot-spot rotation: users change their workflows


@dataclass
class WeekMetrics:
    week: int
    files_reduced: int = 0
    gbhr: float = 0.0
    fleet_file_count: int = 0
    small_file_pct: float = 0.0
    k_effective: int = 0


@dataclass
class ProductionRun:
    policy: str
    weeks: list[WeekMetrics] = field(default_factory=list)

    @property
    def total_files_reduced(self) -> int:
        return sum(w.files_reduced for w in self.weeks)

    @property
    def total_gbhr(self) -> float:
        return sum(w.gbhr for w in self.weeks)


def _zipf_pick(rng: random.Random, n: int, alpha: float) -> int:
    """Zipf-distributed index in [0, n) — hot tables get most writes."""
    weights = [1.0 / (i + 1) ** alpha for i in range(n)]
    total = sum(weights)
    x = rng.random() * total
    acc = 0.0
    for i, w in enumerate(weights):
        acc += w
        if x <= acc:
            return i
    return n - 1


def build_production_fleet(
    spark: SparkSession, root: str, cfg: FleetConfig
) -> Catalog:
    """Create the fleet; hot (low-index) tables start more fragmented."""
    catalog = Catalog(root)
    rng = random.Random(f"{cfg.seed}|fleet")
    idx = 0
    for d in range(cfg.n_databases):
        db = f"tenant{d}"
        catalog.create_database(db, total_quota=2_000)
        for t in range(cfg.tables_per_db):
            name = f"t{t}"
            catalog.create_table(db, name, created_at=0.0)
            table = catalog.load_table(db, name)
            # Fragmentation decays with global table index (Zipf-ish fleet).
            n_appends = max(1, round(cfg.initial_appends_hot / (1 + idx * 0.5)))
            for a in range(n_appends):
                table.append(
                    synth_data.orders_batch(
                        spark,
                        n_rows=cfg.rows_per_append,
                        seed=rng.randrange(2**31),
                        key_offset=a * cfg.rows_per_append,
                    ),
                    n_files=cfg.files_per_append,
                    now=0.0,
                )
            idx += 1
    return catalog


def fleet_write_round(
    spark: SparkSession, catalog: Catalog, cfg: FleetConfig, week: int
) -> int:
    """One week of tenant writes: Zipf-skewed small-file appends. Returns
    the number of files added."""
    rng = random.Random(f"{cfg.seed}|writes|{week}")
    pairs = catalog.list_tables()
    added = 0
    for w in range(cfg.writes_per_week):
        # The Zipf rank order rotates week over week: the hot tables drift
        # as users "modify their data, create new tables, and adjust
        # workflows" (§7) — this is what makes a fixed manual set go stale.
        rank = _zipf_pick(rng, len(pairs), cfg.zipf_alpha)
        db, name = pairs[(rank + week * cfg.drift_per_week) % len(pairs)]
        table = catalog.load_table(db, name)
        table.append(
            synth_data.orders_batch(
                spark,
                n_rows=cfg.rows_per_append,
                seed=rng.randrange(2**31),
                key_offset=rng.randrange(10**6),
            ),
            n_files=cfg.files_per_append,
            now=float(week),
        )
        added += cfg.files_per_append
    return added


def small_file_pct(catalog: Catalog, threshold: int) -> float:
    """Share of fleet data files below ``threshold`` (the Fig 2 y-axis)."""
    small = total = 0
    for db, name in catalog.list_tables():
        for f in catalog.load_table(db, name).files():
            total += 1
            if f.file_size_bytes < threshold:
                small += 1
    return small / total if total else 0.0


def run_production(
    spark: SparkSession,
    catalog: Catalog,
    cfg: FleetConfig,
    *,
    policy: str,
    n_weeks: int,
    k: int = 10,
    budget_gbhr: float | None = None,
    cost_model: CostModelConfig | None = None,
) -> ProductionRun:
    """Drive ``n_weeks`` of writes + weekly compaction under ``policy``."""
    cm = cost_model or CostModelConfig()
    run = ProductionRun(policy=policy)
    autocomp = AutoComp(
        AutoCompConfig(
            scope="table",
            target_file_size=cfg.target_file_size,
            k=k,
            budget_gbhr=budget_gbhr,
            cost_model=cm,
            quota_aware=(policy != "manual"),
        )
    )
    manual_set: list[tuple[str, str]] | None = None
    if policy == "manual":
        # Chosen once, by fragmentation at rollout: never adapts (§7).
        ranked = sorted(
            catalog.list_tables(),
            key=lambda p: -catalog.load_table(*p).file_count(),
        )
        manual_set = ranked[:k]

    for week in range(1, n_weeks + 1):
        fleet_write_round(spark, catalog, cfg, week)
        wm = WeekMetrics(week=week)
        if policy == "manual":
            for db, name in manual_set:
                res = compact(
                    spark,
                    catalog.load_table(db, name),
                    target_file_size=cfg.target_file_size,
                    now=float(week),
                )
                wm.files_reduced += res.file_count_reduction
                wm.gbhr += gbhr_app(res.bytes_rewritten, cm)
                if not res.skipped:
                    wm.k_effective += 1
        else:
            _n, ranked = autocomp.rank_candidates(spark, catalog)
            if policy == "budget" and budget_gbhr is not None:
                selected = select_within_budget(ranked, budget_gbhr).selected
            else:
                selected = ranked[:k]
            for r in selected:
                cand = r.candidate
                res = compact(
                    spark,
                    catalog.load_table(cand.db, cand.table),
                    target_file_size=cfg.target_file_size,
                    now=float(week),
                )
                wm.files_reduced += res.file_count_reduction
                wm.gbhr += gbhr_app(res.bytes_rewritten, cm)
                if not res.skipped:
                    wm.k_effective += 1
        wm.fleet_file_count = catalog.total_file_count()
        wm.small_file_pct = small_file_pct(catalog, cfg.target_file_size // 4)
        run.weeks.append(wm)
    return run

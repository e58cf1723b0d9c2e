"""The AutoComp driver: the full OODA cycle and the optimize-after-write hook.

``AutoComp.run_cycle`` is the periodic ("pull") mode of §5: generate
candidates → observe (one Spark aggregation) → filter → orient (traits) →
decide (MOOP rank + top-k/budget select) → act (schedule + execute) →
feedback (re-observe what was compacted, reported in the cycle summary).

``AutoComp.optimize_after_write`` is the push mode: evaluate a single
table's traits right after a write and compact immediately when the
configured threshold trigger fires (unconstrained scenario, §4.3/§6.3).
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.sql import SparkSession

from repro.core.candidates import (
    StatsFilter,
    apply_filters,
    generate_candidates,
    min_small_file_count,
)
from repro.core.model import Candidate, CandidateStats, RankedCandidate
from repro.core.observe import collect_stats
from repro.core.ranking import (
    DEFAULT_OBJECTIVES,
    MoopObjective,
    ThresholdTrigger,
    moop_rank,
    quota_weight,
    select_top_k,
    select_within_budget,
)
from repro.core.scheduler import build_plan, run_plan
from repro.core.traits import CostModelConfig, compute_traits
from repro.lst.catalog import Catalog
from repro.lst.maintenance import CompactionResult
from repro.lst.table import LstTable


@dataclass
class AutoCompConfig:
    """Everything that shapes one AutoComp instance (NFR1: all swappable)."""

    scope: str = "table"  # table | partition | hybrid | snapshot
    target_file_size: int = 256 * 1024
    small_file_threshold: int | None = None
    objectives: tuple[MoopObjective, ...] = DEFAULT_OBJECTIVES
    k: int | None = 10  # fixed top-k; None → use budget
    budget_gbhr: float | None = None  # dynamic k under a GBHr budget
    cost_model: CostModelConfig = field(default_factory=CostModelConfig)
    quota_aware: bool = False  # §7: w1 scaled by tenant quota utilization
    retries: int = 3
    extra_filters: tuple[StatsFilter, ...] = ()


@dataclass
class CycleReport:
    """Feedback-loop output of one periodic cycle."""

    candidates_generated: int = 0
    candidates_after_filters: int = 0
    selected: list[RankedCandidate] = field(default_factory=list)
    results: list[CompactionResult] = field(default_factory=list)
    total_gbhr_estimated: float = 0.0
    total_gbhr_actual: float = 0.0
    files_removed: int = 0
    files_added: int = 0
    bytes_rewritten: int = 0
    conflicts: int = 0

    @property
    def file_count_reduction(self) -> int:
        return self.files_removed - self.files_added


class AutoComp:
    """One configured AutoComp service instance."""

    def __init__(self, config: AutoCompConfig):
        self.config = config

    # ------------------------------------------------------- observe/orient
    def rank_candidates(
        self,
        spark: SparkSession,
        catalog: Catalog,
        *,
        now: float = 0.0,
        filters: tuple[StatsFilter, ...] = (),
    ) -> tuple[int, list[RankedCandidate]]:
        """Run observe + orient + decide, returning the full ranking."""
        cfg = self.config
        cands = generate_candidates(catalog, scope=cfg.scope)
        stats = collect_stats(
            spark,
            catalog,
            cands,
            target_file_size=cfg.target_file_size,
            small_file_threshold=cfg.small_file_threshold,
        )
        # Always drop candidates with nothing to gain, then user filters.
        all_filters = (min_small_file_count(2),) + cfg.extra_filters + filters
        kept = apply_filters(stats, all_filters)
        scored = [
            (
                s,
                compute_traits(
                    s,
                    target_file_size=cfg.target_file_size,
                    cost_model=cfg.cost_model,
                ),
            )
            for s in kept
        ]
        weights = self._quota_weights(catalog, kept) if cfg.quota_aware else None
        ranked = moop_rank(scored, cfg.objectives, per_candidate_weights=weights)
        return len(cands), ranked

    def _quota_weights(
        self, catalog: Catalog, stats: list[CandidateStats]
    ) -> dict[str, dict[str, float]]:
        """§7: per-database w₁ = 0.5·(1 + used/total quota)."""
        by_db: dict[str, float] = {}
        for s in stats:
            db = s.candidate.db
            if db not in by_db:
                d = catalog.database(db)
                by_db[db] = quota_weight(d.used_quota(catalog), d.total_quota)
        return {
            s.candidate.id: {"file_count_reduction": by_db[s.candidate.db]}
            for s in stats
        }

    # ----------------------------------------------------------- decide/act
    def run_cycle(
        self,
        spark: SparkSession,
        catalog: Catalog,
        *,
        now: float = 0.0,
        filters: tuple[StatsFilter, ...] = (),
        on_conflict=None,
    ) -> CycleReport:
        cfg = self.config
        report = CycleReport()
        n_generated, ranked = self.rank_candidates(
            spark, catalog, now=now, filters=filters
        )
        report.candidates_generated = n_generated
        report.candidates_after_filters = len(ranked)
        if cfg.budget_gbhr is not None:
            selection = select_within_budget(ranked, cfg.budget_gbhr)
            report.selected = selection.selected
        else:
            report.selected = select_top_k(ranked, cfg.k if cfg.k is not None else 10)
        report.total_gbhr_estimated = sum(
            r.traits.get("compute_cost_gbhr", 0.0) for r in report.selected
        )

        def _count_conflict(pending, exc):
            report.conflicts += 1
            if on_conflict is not None:
                on_conflict(pending, exc)

        plan = build_plan(report.selected)
        report.results = run_plan(
            spark,
            catalog,
            plan,
            target_file_size=cfg.target_file_size,
            small_file_threshold=cfg.small_file_threshold,
            now=now,
            retries=cfg.retries,
            on_conflict=_count_conflict,
        )
        for res in report.results:
            report.files_removed += res.files_removed
            report.files_added += res.files_added
            report.bytes_rewritten += res.bytes_rewritten
        # Actual cost through the same GBHr model, over bytes really rewritten.
        report.total_gbhr_actual = cfg.cost_model.executor_memory_gb * (
            report.bytes_rewritten / cfg.cost_model.rewrite_bytes_per_hour
        )
        return report

    # ------------------------------------------------ optimize-after-write
    def optimize_after_write(
        self,
        spark: SparkSession,
        table: LstTable,
        trigger: ThresholdTrigger,
        *,
        now: float = 0.0,
        on_conflict=None,
    ) -> CompactionResult | None:
        """Push-mode hook (§5): called after a write commit; compacts the
        table immediately when ``trigger`` fires on its current traits.
        Returns None when the trigger does not fire."""
        from repro.lst.maintenance import compact  # local to avoid cycles

        cfg = self.config
        db, _, name = table.name.partition(".")
        cand = Candidate(db=db, table=name, scope="table")
        snap = table.current_snapshot()
        if snap is None:
            return None
        stats = CandidateStats(candidate=cand)
        stats.file_count = snap.file_count
        stats.total_bytes = snap.total_bytes
        threshold = (
            cfg.small_file_threshold
            if cfg.small_file_threshold is not None
            else cfg.target_file_size
        )
        import math

        for f in snap.files:
            if f.file_size_bytes < threshold:
                stats.small_file_count += 1
                stats.small_bytes += f.file_size_bytes
            if f.file_size_bytes > 0:
                stats.sum_bytes_log_bytes += f.file_size_bytes * math.log(
                    f.file_size_bytes
                )
        traits = compute_traits(
            stats, target_file_size=cfg.target_file_size, cost_model=cfg.cost_model
        )
        if not trigger.fires(traits):
            return None
        return compact(
            spark,
            table,
            target_file_size=cfg.target_file_size,
            small_file_threshold=cfg.small_file_threshold,
            now=now,
            retries=cfg.retries,
            on_conflict=on_conflict,
        )

"""Act phase: turn selected candidates into an execution plan and run it (§4.4).

Scheduling rules learned from the paper's Iceberg v1.2.0 deployment:

- **Across tables**: compaction tasks are independent (they race on
  different metadata logs), so they form parallel groups. The local runner
  executes groups in deterministic order, but the plan records the
  parallelism structure a cluster scheduler would exploit.
- **Within a table**: partition-scope tasks run *sequentially* — the paper
  observed concurrent compactions conflicting even on disjoint partitions
  (§4.4), so the plan serializes them; this is why the hybrid strategy shows
  zero cluster-side conflicts in Table 1.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.sql import SparkSession

from repro.core.model import RankedCandidate
from repro.lst.catalog import Catalog
from repro.lst.errors import CommitConflictError, ValidationError
from repro.lst.maintenance import CompactionResult, compact


@dataclass
class ExecutionGroup:
    """All selected tasks for one table, in rank order (run sequentially)."""

    table_key: str
    tasks: list[RankedCandidate] = field(default_factory=list)


@dataclass
class ExecutionPlan:
    """Groups may run in parallel with each other; tasks inside a group may
    not. ``groups`` is sorted by the best rank within each group so the most
    impactful tables start first."""

    groups: list[ExecutionGroup] = field(default_factory=list)

    @property
    def task_count(self) -> int:
        return sum(len(g.tasks) for g in self.groups)


def build_plan(selected: list[RankedCandidate]) -> ExecutionPlan:
    """Group ranked tasks by table, preserving rank order within and across."""
    groups: dict[str, ExecutionGroup] = {}
    order: list[str] = []
    for r in selected:
        key = r.candidate.table_key
        if key not in groups:
            groups[key] = ExecutionGroup(table_key=key)
            order.append(key)
        groups[key].tasks.append(r)
    return ExecutionPlan(groups=[groups[k] for k in order])


def run_plan(
    spark: SparkSession,
    catalog: Catalog,
    plan: ExecutionPlan,
    *,
    target_file_size: int,
    small_file_threshold: int | None = None,
    now: float | None = None,
    retries: int = 3,
    on_conflict=None,
) -> list[CompactionResult]:
    """Execute every task; a conflicted/aborted task yields a skipped result
    rather than failing the cycle (fault tolerance via fine-grained units,
    FR1)."""
    results: list[CompactionResult] = []
    for group in plan.groups:
        for task in group.tasks:
            cand = task.candidate
            table = catalog.load_table(cand.db, cand.table)
            try:
                res = compact(
                    spark,
                    table,
                    target_file_size=target_file_size,
                    partition_filter=cand.partition_filter,
                    small_file_threshold=small_file_threshold,
                    now=now,
                    retries=retries,
                    on_conflict=on_conflict,
                )
            except (CommitConflictError, ValidationError):
                res = CompactionResult(table_name=cand.table_key, skipped=True)
            results.append(res)
    return results

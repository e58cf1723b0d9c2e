"""Tests for the act phase: plan construction + execution."""
import pytest

from repro import synth_data
from repro.core.model import Candidate, CandidateStats, RankedCandidate
from repro.core.scheduler import build_plan, run_plan
from repro.lst import Catalog, PartitionSpec


def ranked(db, table, scope="table", partition=None, score=0.0):
    c = (
        Candidate(db=db, table=table, scope=scope, partition=partition)
        if partition
        else Candidate(db=db, table=table)
    )
    return RankedCandidate(stats=CandidateStats(candidate=c), score=score)


class TestBuildPlan:
    def test_groups_by_table(self):
        sel = [
            ranked("d", "a", "partition", (("m", "1"),), 0.9),
            ranked("d", "b", score=0.8),
            ranked("d", "a", "partition", (("m", "2"),), 0.7),
        ]
        plan = build_plan(sel)
        assert [g.table_key for g in plan.groups] == ["d.a", "d.b"]
        assert len(plan.groups[0].tasks) == 2
        assert plan.task_count == 3

    def test_within_table_rank_order_preserved(self):
        sel = [
            ranked("d", "a", "partition", (("m", "2"),), 0.9),
            ranked("d", "a", "partition", (("m", "1"),), 0.1),
        ]
        plan = build_plan(sel)
        parts = [t.candidate.partition for t in plan.groups[0].tasks]
        assert parts == [(("m", "2"),), (("m", "1"),)]

    def test_empty_selection(self):
        plan = build_plan([])
        assert plan.groups == []
        assert plan.task_count == 0

    def test_group_order_follows_best_rank(self):
        sel = [ranked("d", "z", score=0.9), ranked("d", "a", score=0.5)]
        plan = build_plan(sel)
        assert [g.table_key for g in plan.groups] == ["d.z", "d.a"]


class TestRunPlan:
    @pytest.fixture()
    def fleet(self, spark, tmp_path):
        cat = Catalog(str(tmp_path / "wh"))
        cat.create_database("d")
        cat.create_table("d", "o1")
        cat.create_table(
            "d", "li", spec=PartitionSpec.monthly("l_shipdate", "m")
        )
        o1 = cat.load_table("d", "o1")
        for i in range(3):
            o1.append(synth_data.orders_batch(spark, n_rows=80, seed=i), n_files=2)
        li = cat.load_table("d", "li")
        li.append(
            synth_data.lineitem_batch(spark, n_rows=300, seed=0, n_days=55), n_files=3
        )
        return cat

    def test_executes_all_tasks(self, spark, fleet):
        li = fleet.load_table("d", "li")
        parts = sorted({f.partition for f in li.current_snapshot().files})
        sel = [ranked("d", "o1")] + [
            ranked("d", "li", "partition", p) for p in parts
        ]
        results = run_plan(
            spark, fleet, build_plan(sel), target_file_size=256 * 1024
        )
        assert len(results) == 1 + len(parts)
        assert fleet.load_table("d", "o1").file_count() < 6

    def test_sequential_partition_tasks_do_not_conflict(self, spark, fleet):
        """The §4.4 rule: serializing a table's partition compactions means
        each sees the version the previous one committed — zero conflicts."""
        li = fleet.load_table("d", "li")
        parts = sorted({f.partition for f in li.current_snapshot().files})
        assert len(parts) >= 2
        conflicts = []
        run_plan(
            spark,
            fleet,
            build_plan([ranked("d", "li", "partition", p) for p in parts]),
            target_file_size=256 * 1024,
            on_conflict=lambda p, e: conflicts.append(e),
        )
        assert conflicts == []

    def test_skipped_tables_yield_skipped_results(self, spark, fleet):
        # Compact twice: second run has nothing to do but must not fail.
        sel = [ranked("d", "o1")]
        run_plan(spark, fleet, build_plan(sel), target_file_size=256 * 1024)
        results = run_plan(
            spark, fleet, build_plan(sel), target_file_size=256 * 1024
        )
        assert results[0].skipped

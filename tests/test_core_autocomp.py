"""Integration tests for the end-to-end AutoComp OODA driver."""
import pytest

from repro import synth_data
from repro.core import AutoComp, AutoCompConfig
from repro.core.ranking import ThresholdTrigger
from repro.lst import Catalog, PartitionSpec

KB = 1024
TARGET = 256 * KB


def build_fleet(spark, root, n_fragmented=3):
    """Catalog with fragmented unpartitioned tables + one healthy table +
    one partitioned table."""
    cat = Catalog(str(root / "wh"))
    cat.create_database("db1", total_quota=10_000)
    for i in range(n_fragmented):
        cat.create_table("db1", f"frag{i}", created_at=0.0)
        t = cat.load_table("db1", f"frag{i}")
        for j in range(2 + i):
            t.append(
                synth_data.orders_batch(spark, n_rows=100, seed=10 * i + j),
                n_files=3,
                now=1.0,
            )
    cat.create_table("db1", "healthy", created_at=0.0)
    h = cat.load_table("db1", "healthy")
    h.append(synth_data.orders_batch(spark, n_rows=400, seed=99), n_files=1, now=1.0)
    cat.create_table(
        "db1", "li", spec=PartitionSpec.monthly("l_shipdate", "m"), created_at=0.0
    )
    cat.load_table("db1", "li").append(
        synth_data.lineitem_batch(spark, n_rows=300, seed=5, n_days=55),
        n_files=3,
        now=1.0,
    )
    return cat


@pytest.fixture()
def fleet(spark, tmp_path):
    return build_fleet(spark, tmp_path)


class TestRunCycle:
    def test_cycle_reduces_fleet_file_count(self, spark, fleet):
        before = fleet.total_file_count()
        ac = AutoComp(AutoCompConfig(scope="table", target_file_size=TARGET, k=10))
        report = ac.run_cycle(spark, fleet)
        assert report.file_count_reduction > 0
        assert fleet.total_file_count() == before - report.file_count_reduction

    def test_most_fragmented_ranked_first(self, spark, fleet):
        ac = AutoComp(AutoCompConfig(scope="table", target_file_size=TARGET, k=10))
        _, ranked = ac.rank_candidates(spark, fleet)
        # frag2 has the most small files (4 appends x 3 files).
        assert ranked[0].candidate.table == "frag2"

    def test_healthy_table_not_selected(self, spark, fleet):
        ac = AutoComp(AutoCompConfig(scope="table", target_file_size=TARGET, k=10))
        report = ac.run_cycle(spark, fleet)
        assert all(r.candidate.table != "healthy" for r in report.selected)

    def test_top_k_limits_selection(self, spark, fleet):
        ac = AutoComp(AutoCompConfig(scope="table", target_file_size=TARGET, k=1))
        report = ac.run_cycle(spark, fleet)
        assert len(report.selected) == 1
        assert report.selected[0].candidate.table == "frag2"

    def test_budget_mode_dynamic_k(self, spark, fleet):
        ac_all = AutoComp(AutoCompConfig(scope="table", target_file_size=TARGET, k=10))
        _, ranked = ac_all.rank_candidates(spark, fleet)
        top_cost = ranked[0].traits["compute_cost_gbhr"]
        ac = AutoComp(
            AutoCompConfig(
                scope="table",
                target_file_size=TARGET,
                k=None,
                budget_gbhr=top_cost * 1.5,
            )
        )
        report = ac.run_cycle(spark, fleet)
        assert report.total_gbhr_estimated <= top_cost * 1.5
        assert len(report.selected) >= 1

    def test_hybrid_scope_compacts_partitions(self, spark, fleet):
        ac = AutoComp(AutoCompConfig(scope="hybrid", target_file_size=TARGET, k=50))
        report = ac.run_cycle(spark, fleet)
        scopes = {r.candidate.scope for r in report.selected}
        assert "partition" in scopes  # li partitions
        assert "table" in scopes  # unpartitioned frag tables

    def test_second_cycle_is_noop(self, spark, fleet):
        ac = AutoComp(AutoCompConfig(scope="table", target_file_size=TARGET, k=10))
        ac.run_cycle(spark, fleet)
        report2 = ac.run_cycle(spark, fleet)
        # Diminishing returns (§2): once healthy, nothing worth selecting.
        assert report2.file_count_reduction == 0

    def test_gbhr_estimates_close_to_actual(self, spark, fleet):
        ac = AutoComp(AutoCompConfig(scope="table", target_file_size=TARGET, k=10))
        report = ac.run_cycle(spark, fleet)
        assert report.total_gbhr_actual > 0
        # Estimated cost covers planned small-file bytes; actual covers the
        # bytes rewritten. They agree within 2x on the healthy path.
        ratio = report.total_gbhr_estimated / report.total_gbhr_actual
        assert 0.5 < ratio < 2.0

    def test_quota_aware_weights_applied(self, spark, tmp_path):
        cat = build_fleet(spark, tmp_path)
        ac = AutoComp(
            AutoCompConfig(scope="table", target_file_size=TARGET, k=10, quota_aware=True)
        )
        _, ranked = ac.rank_candidates(spark, cat)
        assert ranked  # runs end-to-end with per-db weight overrides
        assert ranked[0].score > 0


class TestOptimizeAfterWrite:
    def test_trigger_fires_and_compacts(self, spark, tmp_path, fleet):
        t = fleet.load_table("db1", "frag0")
        ac = AutoComp(AutoCompConfig(target_file_size=TARGET))
        trig = ThresholdTrigger("file_count_reduction", 4)
        res = ac.optimize_after_write(spark, t, trig)
        assert res is not None
        assert res.file_count_reduction > 0

    def test_trigger_holds_fire_below_threshold(self, spark, fleet):
        t = fleet.load_table("db1", "healthy")
        ac = AutoComp(AutoCompConfig(target_file_size=TARGET))
        trig = ThresholdTrigger("file_count_reduction", 4)
        assert ac.optimize_after_write(spark, t, trig) is None

    def test_entropy_trigger(self, spark, fleet):
        t = fleet.load_table("db1", "frag1")
        ac = AutoComp(AutoCompConfig(target_file_size=TARGET))
        trig = ThresholdTrigger("file_entropy", 0.05)
        res = ac.optimize_after_write(spark, t, trig)
        assert res is not None

    def test_empty_table_no_op(self, spark, fleet):
        fleet.create_table("db1", "fresh")
        t = fleet.load_table("db1", "fresh")
        ac = AutoComp(AutoCompConfig(target_file_size=TARGET))
        assert (
            ac.optimize_after_write(
                spark, t, ThresholdTrigger("file_count_reduction", 0)
            )
            is None
        )

"""Integration tests for the discrete-event experiment simulator.

Small configurations (2 databases, 2–3 hours) keep Spark time bounded; the
full-scale runs live in benchmarks/.
"""
import pytest

from repro.workload.simulator import SimConfig, run_simulation, setup_fleet


def small_cfg(**kw):
    defaults = dict(
        strategy="none",
        n_databases=2,
        n_hours=2,
        seed=0,
        initial_rows_lineitem=400,
        initial_rows_orders=200,
        initial_files_per_commit=6,
        files_per_commit=2,
        base_rows=60,
        target_file_size=256 * 1024,
        k=10,
    )
    defaults.update(kw)
    return SimConfig(**defaults)


class TestSetup:
    def test_fleet_created_fragmented(self, spark, tmp_path):
        cfg = small_cfg()
        cat = setup_fleet(spark, str(tmp_path / "wh"), cfg)
        assert len(cat.list_tables()) == 4  # 2 dbs x (lineitem, orders)
        # Mis-tuned load: many more files than tables.
        assert cat.total_file_count() > 20
        li = cat.load_table("db0", "lineitem")
        assert li.spec.is_partitioned


class TestNoCompaction:
    def test_file_count_grows(self, spark, tmp_path):
        report = run_simulation(spark, str(tmp_path / "wh"), small_cfg())
        assert report.file_counts.final() > report.file_counts.initial()
        assert len(report.hours) == 2
        assert all(h.compactions_committed == 0 for h in report.hours)

    def test_latencies_recorded(self, spark, tmp_path):
        report = run_simulation(spark, str(tmp_path / "wh"), small_cfg())
        for h in report.hours:
            assert h.n_reads > 0
            assert h.read_latency is not None
            assert h.read_latency.min > 0

    def test_write_counts_match_workload(self, spark, tmp_path):
        report = run_simulation(spark, str(tmp_path / "wh"), small_cfg())
        for h in report.hours:
            assert h.n_writes == report.write_counts[h.hour]
            assert h.n_writes > 0


class TestTableStrategy:
    def test_compaction_reduces_files(self, spark, tmp_path):
        base = run_simulation(spark, str(tmp_path / "a"), small_cfg(n_hours=3))
        comp = run_simulation(
            spark, str(tmp_path / "b"), small_cfg(n_hours=3, strategy="table")
        )
        assert comp.file_counts.final() < base.file_counts.final()
        assert any(h.compactions_committed > 0 for h in comp.hours)

    def test_gbhr_accounted(self, spark, tmp_path):
        comp = run_simulation(
            spark, str(tmp_path / "wh"), small_cfg(n_hours=3, strategy="table")
        )
        assert comp.mean_compaction_gbhr() > 0
        assert sum(h.compaction_gbhr for h in comp.hours) > 0

    def test_deterministic_conflict_table(self, spark, tmp_path):
        cfg = small_cfg(n_hours=3, strategy="table")
        r1 = run_simulation(spark, str(tmp_path / "a"), cfg)
        r2 = run_simulation(spark, str(tmp_path / "b"), cfg)
        hours = [h.hour for h in r1.hours]
        assert r1.conflicts.table_rows(hours) == r2.conflicts.table_rows(hours)
        assert [h.file_count_end for h in r1.hours] == [
            h.file_count_end for h in r2.hours
        ]


class TestHybridStrategy:
    def test_no_cluster_side_conflicts(self, spark, tmp_path):
        """§4.4/§6.2: sequential partition-scope compaction never races —
        the Table 1 hybrid column is all zeros on the cluster side."""
        comp = run_simulation(
            spark,
            str(tmp_path / "wh"),
            small_cfg(n_hours=3, strategy="hybrid", k=50),
        )
        assert comp.conflicts.count(side="cluster") == 0
        assert any(h.compactions_committed > 0 for h in comp.hours)

    def test_hybrid_reduces_files_more_gradually(self, spark, tmp_path):
        tbl = run_simulation(
            spark, str(tmp_path / "a"), small_cfg(n_hours=3, strategy="table", k=10)
        )
        hyb = run_simulation(
            spark, str(tmp_path / "b"), small_cfg(n_hours=3, strategy="hybrid", k=4)
        )
        # Both reduce vs initial, hybrid (few partitions per hour) less steeply.
        assert hyb.file_counts.final() < hyb.file_counts.initial() * 2
        assert tbl.file_counts.at(1) <= hyb.file_counts.at(1)

    def test_duration_proxy_positive(self, spark, tmp_path):
        r = run_simulation(
            spark, str(tmp_path / "wh"), small_cfg(strategy="hybrid", k=5)
        )
        assert r.duration_proxy_s > 0

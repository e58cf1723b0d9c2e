"""Tests for the optimize-after-write tuning workloads (Fig 9 substrate)."""
import pytest

from repro.workload.hookbench import HookWorkloadConfig, run_hook_workload

KB = 1024


def cfg(kind, **kw):
    defaults = dict(
        rounds=2, rows_per_round=150, files_per_commit=4, reads_per_round=1, seed=0
    )
    defaults.update(kw)
    return HookWorkloadConfig(kind=kind, **defaults)


class TestHookWorkloads:
    def test_never_trigger_never_compacts(self, spark, tmp_path):
        res = run_hook_workload(spark, str(tmp_path / "w"), cfg("wp1"))
        assert res.compactions == 0
        assert res.final_file_count >= 8  # fragmentation accumulates

    def test_low_threshold_compacts(self, spark, tmp_path):
        res = run_hook_workload(
            spark,
            str(tmp_path / "w"),
            cfg("wp1"),
            trait="file_count_reduction",
            threshold=2,
        )
        assert res.compactions >= 1
        nores = run_hook_workload(spark, str(tmp_path / "w2"), cfg("wp1"))
        assert res.final_file_count < nores.final_file_count

    def test_tpch_unpartitioned(self, spark, tmp_path):
        res = run_hook_workload(
            spark,
            str(tmp_path / "w"),
            cfg("tpch"),
            trait="file_count_reduction",
            threshold=2,
        )
        assert res.compactions >= 1
        assert res.compaction_time_s > 0

    def test_wp3_decoupled_cluster_excludes_compaction_time(self, spark, tmp_path):
        res = run_hook_workload(
            spark,
            str(tmp_path / "w"),
            cfg("wp3"),
            trait="file_count_reduction",
            threshold=2,
        )
        assert res.compactions >= 1
        assert res.compaction_time_s == 0.0  # runs on the sidecar cluster
        assert res.duration_s == pytest.approx(res.query_time_s)

    def test_entropy_trigger_works(self, spark, tmp_path):
        res = run_hook_workload(
            spark,
            str(tmp_path / "w"),
            cfg("wp1"),
            trait="file_entropy",
            threshold=0.05,
        )
        assert res.compactions >= 1

    def test_duration_components_sum(self, spark, tmp_path):
        res = run_hook_workload(
            spark,
            str(tmp_path / "w"),
            cfg("wp1"),
            trait="file_count_reduction",
            threshold=2,
        )
        assert res.duration_s == pytest.approx(
            res.query_time_s + res.compaction_time_s
        )

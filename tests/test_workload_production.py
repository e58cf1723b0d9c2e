"""Tests for the §7 production-fleet simulation."""
import pytest

from repro.core.traits import CostModelConfig
from repro.workload.production import (
    FleetConfig,
    build_production_fleet,
    fleet_write_round,
    run_production,
    small_file_pct,
)

KB = 1024


def tiny_cfg(**kw):
    defaults = dict(
        n_databases=2,
        tables_per_db=3,
        seed=0,
        target_file_size=32 * KB,
        initial_appends_hot=3,
        files_per_append=3,
        rows_per_append=120,
        writes_per_week=4,
    )
    defaults.update(kw)
    return FleetConfig(**defaults)


class TestFleet:
    def test_build_creates_tables(self, spark, tmp_path):
        cfg = tiny_cfg()
        cat = build_production_fleet(spark, str(tmp_path / "wh"), cfg)
        assert len(cat.list_tables()) == 6
        assert cat.total_file_count() > 6

    def test_hot_tables_more_fragmented(self, spark, tmp_path):
        cfg = tiny_cfg()
        cat = build_production_fleet(spark, str(tmp_path / "wh"), cfg)
        hot = cat.load_table("tenant0", "t0").file_count()
        cold = cat.load_table("tenant1", "t2").file_count()
        assert hot > cold

    def test_write_round_adds_files(self, spark, tmp_path):
        cfg = tiny_cfg()
        cat = build_production_fleet(spark, str(tmp_path / "wh"), cfg)
        before = cat.total_file_count()
        added = fleet_write_round(spark, cat, cfg, week=1)
        assert added == 4 * 3
        assert cat.total_file_count() == before + added

    def test_small_file_pct_bounds(self, spark, tmp_path):
        cfg = tiny_cfg()
        cat = build_production_fleet(spark, str(tmp_path / "wh"), cfg)
        assert small_file_pct(cat, 10**9) == 1.0
        assert small_file_pct(cat, 1) == 0.0


class TestPolicies:
    @pytest.mark.parametrize("policy", ["manual", "auto"])
    def test_policy_reduces_files(self, spark, tmp_path, policy):
        cfg = tiny_cfg()
        cat = build_production_fleet(spark, str(tmp_path / "wh"), cfg)
        run = run_production(
            spark, cat, cfg, policy=policy, n_weeks=2, k=3
        )
        assert run.total_files_reduced > 0
        assert len(run.weeks) == 2
        assert all(w.fleet_file_count > 0 for w in run.weeks)

    def test_budget_policy_dynamic_k(self, spark, tmp_path):
        cfg = tiny_cfg()
        cat = build_production_fleet(spark, str(tmp_path / "wh"), cfg)
        cm = CostModelConfig(executor_memory_gb=8.0, rewrite_bytes_per_hour=1024**3)
        run = run_production(
            spark,
            cat,
            cfg,
            policy="budget",
            n_weeks=2,
            budget_gbhr=8.0 * 100 * KB / 1024**3,  # caps bytes per week
            cost_model=cm,
        )
        assert run.policy == "budget"
        # Budget caps the per-week GBHr spend.
        for w in run.weeks:
            assert w.gbhr <= 8.0 * 120 * KB / 1024**3 + 1e-9

    def test_deterministic(self, spark, tmp_path):
        cfg = tiny_cfg()
        cat1 = build_production_fleet(spark, str(tmp_path / "a"), cfg)
        cat2 = build_production_fleet(spark, str(tmp_path / "b"), cfg)
        r1 = run_production(spark, cat1, cfg, policy="auto", n_weeks=2, k=2)
        r2 = run_production(spark, cat2, cfg, policy="auto", n_weeks=2, k=2)
        assert [w.files_reduced for w in r1.weeks] == [
            w.files_reduced for w in r2.weeks
        ]
        assert [w.fleet_file_count for w in r1.weeks] == [
            w.fleet_file_count for w in r2.weeks
        ]

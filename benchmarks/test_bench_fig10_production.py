"""Figure 10 / §7: AutoComp behavior and impact in (simulated) production.

Paper results reproduced in shape:

- Fig 10a / §7: switching from manual top-100 to AutoComp top-10 *increased*
  file-count reduction (6.59M → 7.44M files, +12%) despite compacting 10×
  fewer tables — the fixed manual set goes stale as write hot-spots drift.
- Fig 10b: week-22 transition from fixed k to dynamic k under a GBHr
  budget (226 TBHr → k≈2500 tables per iteration).
- Fig 10c: fleet file count declines despite deployment growth.
- §7 estimator accuracy: compute cost underestimated (−19% in the paper:
  real jobs also write output bytes), file-count reduction overestimated
  (+28%: table-level ΔF_c ignores partition boundaries).
"""
import pytest

from repro.benchutil import print_table
from repro import synth_data
from repro.core.model import Candidate
from repro.core.observe import collect_stats
from repro.core.traits import CostModelConfig, compute_traits
from repro.lst import Catalog, PartitionSpec, compact
from repro.workload.metrics import gbhr_app
from repro.workload.production import (
    FleetConfig,
    build_production_fleet,
    run_production,
)

KB = 1024

CFG = FleetConfig(
    n_databases=3,
    tables_per_db=8,
    seed=5,
    target_file_size=32 * KB,
    initial_appends_hot=5,
    files_per_append=4,
    rows_per_append=150,
    writes_per_week=10,
    drift_per_week=3,
)
CM = CostModelConfig(executor_memory_gb=8.0, rewrite_bytes_per_hour=1024**3)
N_WEEKS = 4
MANUAL_K = 8  # "top-100" at fleet scale (1/3 of 24 tables)
AUTO_K = 3  # "top-10" — ~3x fewer than manual, as 10 is 10x fewer than 100


@pytest.fixture(scope="module")
def production_runs(spark, tmp_path_factory):
    root = tmp_path_factory.mktemp("fig10")
    runs = {}
    for policy, kw in (
        ("manual", dict(k=MANUAL_K)),
        ("auto", dict(k=AUTO_K)),
        ("budget", dict(k=AUTO_K, budget_gbhr=8.0 * 600 * KB / 1024**3)),
    ):
        cat = build_production_fleet(spark, str(root / policy), CFG)
        runs[policy] = run_production(
            spark, cat, CFG, policy=policy, n_weeks=N_WEEKS, cost_model=CM, **kw
        )
    return runs


def test_fig10a_auto_beats_manual_with_fewer_tables(benchmark, production_runs):
    runs = benchmark.pedantic(lambda: production_runs, rounds=1, iterations=1)
    manual, auto = runs["manual"], runs["auto"]
    rows = [
        [
            w.week,
            manual.weeks[i].files_reduced,
            manual.weeks[i].k_effective,
            auto.weeks[i].files_reduced,
            auto.weeks[i].k_effective,
        ]
        for i, w in enumerate(manual.weeks)
    ]
    print_table(
        "Figure 10a — weekly file-count reduction: manual vs AutoComp",
        ["week", "manual_reduced", "manual_k", "auto_reduced", "auto_k"],
        rows,
    )
    improvement = (
        (auto.total_files_reduced - manual.total_files_reduced)
        / max(1, manual.total_files_reduced)
    )
    print(
        f"\ntotal reduced: manual(k={MANUAL_K})={manual.total_files_reduced} "
        f"auto(k={AUTO_K})={auto.total_files_reduced} "
        f"({improvement:+.0%}; paper: +12% with 10x fewer tables)"
    )
    # Auto *selects* far fewer tables per week (k=3 vs k=8 — the paper's
    # top-10 vs top-100), yet reduces at least as many files, because the
    # fixed manual set goes stale under hot-spot drift (its effective k
    # collapses: healthy tables make its compactions no-ops).
    assert AUTO_K < MANUAL_K
    assert all(a.k_effective <= AUTO_K for a in auto.weeks)
    assert manual.weeks[-1].k_effective < manual.weeks[0].k_effective
    assert auto.total_files_reduced >= manual.total_files_reduced
    # Auto's reduction stays steady week over week; manual's collapses.
    assert auto.weeks[-1].files_reduced > manual.weeks[-1].files_reduced


def test_fig10b_dynamic_k_under_budget(benchmark, production_runs):
    runs = benchmark.pedantic(lambda: production_runs, rounds=1, iterations=1)
    budget_run = runs["budget"]
    budget = 8.0 * 600 * KB / 1024**3
    rows = [
        [w.week, w.k_effective, f"{w.gbhr:.3e}", f"{budget:.3e}"]
        for w in budget_run.weeks
    ]
    print_table(
        "Figure 10b — dynamic k under a GBHr budget",
        ["week", "k_selected", "gbhr_spent", "budget"],
        rows,
    )
    # Selection adapts week to week and never blows the budget (estimates
    # gate selection; actuals stay within 2x of the cap at this scale).
    assert any(w.k_effective > 0 for w in budget_run.weeks)
    for w in budget_run.weeks:
        assert w.gbhr <= budget * 2.0


def test_fig10c_fleet_file_count_declines(benchmark, production_runs):
    runs = benchmark.pedantic(lambda: production_runs, rounds=1, iterations=1)
    auto = runs["auto"]
    series = [w.fleet_file_count for w in auto.weeks]
    print_table(
        "Figure 10c — fleet file count by week (AutoComp enabled)",
        ["week", "fleet_files", "small_file_pct"],
        [[w.week, w.fleet_file_count, f"{w.small_file_pct:.0%}"] for w in auto.weeks],
    )
    # Despite continuous writes, auto-compaction keeps the fleet from
    # growing: the final count is no higher than the first sampled week.
    assert series[-1] <= series[0]


def test_s7_estimator_accuracy(benchmark, spark, tmp_path_factory):
    """§7 model accuracy: ΔF_c overestimates reduction (partition
    boundaries); the GBHr model underestimates cost (output bytes)."""
    root = tmp_path_factory.mktemp("estimator")
    cat = Catalog(str(root))
    cat.create_database("db")
    cat.create_table("db", "li", spec=PartitionSpec.monthly("l_shipdate", "m"))
    t = cat.load_table("db", "li")
    for i in range(4):
        t.append(
            synth_data.lineitem_batch(spark, n_rows=400, seed=i, n_days=110),
            n_files=3,
        )

    def run():
        [stats] = collect_stats(
            spark,
            cat,
            [Candidate(db="db", table="li")],
            target_file_size=256 * KB,
        )
        traits = compute_traits(stats, target_file_size=256 * KB, cost_model=CM)
        res = compact(spark, t, target_file_size=256 * KB)
        return stats, traits, res

    stats, traits, res = benchmark.pedantic(run, rounds=1, iterations=1)
    predicted_reduction = traits["file_count_reduction"]
    actual_reduction = res.file_count_reduction
    predicted_cost = traits["compute_cost_gbhr"]
    actual_cost = gbhr_app(res.bytes_rewritten + res.bytes_added, CM)
    red_err = (predicted_reduction - actual_reduction) / max(1, actual_reduction)
    cost_err = (predicted_cost - actual_cost) / actual_cost
    print_table(
        "§7 — estimator accuracy (measured vs model)",
        ["quantity", "predicted", "actual", "error", "paper"],
        [
            [
                "file-count reduction",
                int(predicted_reduction),
                actual_reduction,
                f"{red_err:+.0%}",
                "+28% (overestimate)",
            ],
            [
                "compute cost (GBHr)",
                f"{predicted_cost:.3e}",
                f"{actual_cost:.3e}",
                f"{cost_err:+.0%}",
                "-19% (underestimate)",
            ],
        ],
    )
    # Table-level ΔF_c can only overestimate: compaction keeps one file per
    # partition, so the true reduction is strictly smaller.
    assert predicted_reduction > actual_reduction
    assert stats.partition_aware_reduction == actual_reduction
    # The bytes-read cost model omits output writes: it underestimates.
    assert predicted_cost < actual_cost

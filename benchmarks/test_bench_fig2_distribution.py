"""Figure 2: file-size distribution before/after compaction.

Paper (§2/§7): before any compaction, 83% of OpenHouse files were smaller
than 128 MB (a quarter of the 512 MB target); manual compaction moved that
to 62%; AutoComp then kept shifting the distribution toward the target.

Here the fleet is a scaled production fleet (32 KB target, 8 KB small-file
threshold — the same 1:4 ratio); one "month" of manual compaction over a
fixed table set, then an AutoComp cycle, must shift the small-file share
down monotonically.
"""
import pytest

from repro.benchutil import print_table
from repro.workload.production import (
    FleetConfig,
    build_production_fleet,
    run_production,
    small_file_pct,
)

KB = 1024

CFG = FleetConfig(
    n_databases=3,
    tables_per_db=5,
    seed=11,
    target_file_size=32 * KB,
    initial_appends_hot=5,
    files_per_append=4,
    rows_per_append=150,
    writes_per_week=6,
)


@pytest.fixture(scope="module")
def distribution(spark, tmp_path_factory):
    root = tmp_path_factory.mktemp("fig2")
    threshold = CFG.target_file_size // 4
    cat = build_production_fleet(spark, str(root / "wh"), CFG)
    before = small_file_pct(cat, threshold)
    # One "month" of manual compaction over a fixed k-table set.
    run_production(spark, cat, CFG, policy="manual", n_weeks=2, k=6)
    after_manual = small_file_pct(cat, threshold)
    # AutoComp rollout continues the shift.
    run_production(spark, cat, CFG, policy="auto", n_weeks=2, k=6)
    after_auto = small_file_pct(cat, threshold)
    return before, after_manual, after_auto


def test_fig2_distribution_shift(benchmark, distribution):
    before, after_manual, after_auto = benchmark.pedantic(
        lambda: distribution, rounds=1, iterations=1
    )
    print_table(
        "Figure 2 — share of files below the small-file threshold",
        ["stage", "paper", "measured"],
        [
            ["no compaction", "83%", f"{before:.0%}"],
            ["after manual compaction", "62%", f"{after_manual:.0%}"],
            ["after AutoComp", "lower", f"{after_auto:.0%}"],
        ],
    )
    # Most files start small (mis-tuned writers dominate the fleet).
    assert before > 0.6
    # Each stage shifts the distribution toward the target.
    assert after_manual < before
    assert after_auto <= after_manual

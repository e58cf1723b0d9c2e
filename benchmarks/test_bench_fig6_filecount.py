"""Figure 6: compaction-strategy impact on fleet file count over time.

Paper (§6.1): the no-compaction baseline starts high (mis-tuned bulk load)
and grows ~2,640 files/hour; every compaction strategy produces a sharp
initial decline then flattens; hybrid strategies reduce more gradually than
table-scope because fewer entities are compacted per round.
"""
from repro.benchutil import print_table


def _series(cab_runs):
    hours = [0, 1, 2, 3, 4, 5]
    return {
        name: [run.file_counts.at(h) for h in hours]
        for name, run in cab_runs.items()
    }


def test_fig6_file_count_over_time(benchmark, cab_runs):
    series = benchmark.pedantic(_series, args=(cab_runs,), rounds=1, iterations=1)
    rows = [[name] + counts for name, counts in series.items()]
    print_table(
        "Figure 6 — fleet file count per hour (measured)",
        ["strategy", "h0", "h1", "h2", "h3", "h4", "h5"],
        rows,
    )
    none, table = series["none"], series["table-10"]
    hyb6, hyb50 = series["hybrid-6"], series["hybrid-50"]
    # (1) Baseline grows steadily: every hour adds files.
    assert all(b > a for a, b in zip(none, none[1:]))
    # (2) Every compaction strategy ends far below the baseline.
    for s in (table, hyb6, hyb50):
        assert s[-1] < none[-1]
    # (3) Table-scope: sharp initial decline (hour 1 is already below h0).
    assert table[1] < table[0]
    # (4) Hybrid reduces more gradually than table-scope: after the first
    # compaction hour, table-scope is at or below the throttled hybrid.
    assert table[1] <= hyb6[1]
    # (5) Compacted fleets flatten rather than regrow: the write spike at
    # hour 4 can bump the curve within the hour, but the end state is no
    # worse than the post-first-compaction level, and every compacted hour
    # stays far below the baseline.
    assert table[-1] <= table[2] * 1.10
    for h in range(1, 6):
        assert table[h] < none[h] / 2
    # (6) Growth rate context (the paper's ~2,640 files/hour at 20 dbs):
    per_hour = (none[-1] - none[0]) / 5
    print(f"\nbaseline growth: {per_hour:.1f} files/hour (4-db scale)")
    assert per_hour > 0

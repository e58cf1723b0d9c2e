"""Figure 7: mean GBHr_App per compaction strategy.

Paper (§6.1): table-scope compaction is effective when layouts are highly
fragmented but spends more compute per application; the hybrid
(partition-level) approach yields smaller, more stable GBHr_App per
compaction operation, balancing resource usage over time.
"""
import statistics

from repro.benchutil import print_table
from repro.workload.metrics import gbhr_app


def _per_strategy(cab_runs):
    out = {}
    for name, run in cab_runs.items():
        if name == "none":
            continue
        vals = [
            gbhr_app(r.bytes_rewritten, run.config.cost_model)
            for _h, r in run.compaction_results
            if not r.skipped
        ]
        out[name] = vals
    return out


def test_fig7_mean_gbhr_per_strategy(benchmark, cab_runs):
    per = benchmark.pedantic(_per_strategy, args=(cab_runs,), rounds=1, iterations=1)
    rows = []
    for name, vals in per.items():
        mean = statistics.mean(vals) if vals else 0.0
        stdev = statistics.pstdev(vals) if len(vals) > 1 else 0.0
        rows.append([name, len(vals), f"{mean:.3e}", f"{stdev:.3e}"])
    print_table(
        "Figure 7 — GBHr_App per compaction application (measured)",
        ["strategy", "n_apps", "mean_gbhr", "stdev_gbhr"],
        rows,
    )
    table = per["table-10"]
    hyb = per["hybrid-50"]
    assert table and hyb
    # (1) Table-scope applications are heavier on average than
    # partition-scope ones (each rewrites a whole table).
    assert statistics.mean(table) > statistics.mean(hyb)
    # (2) Hybrid applications are more numerous but individually smaller —
    # finer-grained work units (FR1).
    assert len(hyb) >= len(table)
    assert max(hyb) <= max(table)

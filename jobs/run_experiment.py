"""Figure 6/7/8 + Table 1 harness: the §6 CAB experiment for one strategy.

Usage:
    spark-submit jobs/run_experiment.py --strategy table --k 10 \
        --databases 4 --hours 5 --workdir /tmp/autocomp_exp

Prints the per-hour file counts, conflict counts, latency candlesticks and
compaction GBHr for the chosen strategy (run once per strategy and diff).
"""
from __future__ import annotations

import argparse
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _session import get_spark  # noqa: E402

from repro.benchutil import print_table  # noqa: E402
from repro.workload.simulator import SimConfig, run_simulation  # noqa: E402


def main(argv: list[str] | None = None) -> int:
    ap = argparse.ArgumentParser()
    ap.add_argument("--strategy", choices=["none", "table", "hybrid"], default="table")
    ap.add_argument("--k", type=int, default=10)
    ap.add_argument("--databases", type=int, default=4)
    ap.add_argument("--hours", type=int, default=5)
    ap.add_argument("--seed", type=int, default=7)
    ap.add_argument("--target-kb", type=int, default=256)
    ap.add_argument("--workdir", default="/tmp/autocomp_experiment")
    args = ap.parse_args(argv)

    spark = get_spark(f"autocomp-exp-{args.strategy}")
    cfg = SimConfig(
        strategy=args.strategy,
        k=args.k,
        n_databases=args.databases,
        n_hours=args.hours,
        seed=args.seed,
        target_file_size=args.target_kb * 1024,
        initial_rows_lineitem=2000,
        initial_rows_orders=800,
        initial_files_per_commit=10,
    )
    root = os.path.join(args.workdir, f"{args.strategy}-{args.k}-{args.seed}")
    report = run_simulation(spark, root, cfg)

    rows = []
    for h in report.hours:
        rl = h.read_latency
        rows.append(
            [
                h.hour,
                h.n_writes,
                h.n_reads,
                h.file_count_end,
                h.client_conflicts,
                h.cluster_conflicts,
                h.compactions_committed,
                f"{h.compaction_gbhr:.3e}",
                f"{rl.median:.3f}" if rl else "-",
            ]
        )
    print_table(
        f"CAB experiment — strategy={args.strategy} k={args.k}",
        [
            "hour",
            "writes",
            "reads",
            "files",
            "client_conf",
            "cluster_conf",
            "compactions",
            "gbhr",
            "read_p50_s",
        ],
        rows,
    )
    print(
        f"\ninitial files: {report.file_counts.initial()}  "
        f"final: {report.file_counts.final()}  "
        f"mean GBHr/app: {report.mean_compaction_gbhr():.3e}  "
        f"total client time: {report.duration_proxy_s:.1f}s"
    )
    return 0


if __name__ == "__main__":
    raise SystemExit(main())

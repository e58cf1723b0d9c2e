"""Figure 9 harness: auto-tune compaction-trigger thresholds per workload.

Usage:
    spark-submit jobs/run_tuning.py --workload wp1 --trait file_count_reduction \
        --iterations 6 --workdir /tmp/fig9
"""
from __future__ import annotations

import argparse
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _session import get_spark  # noqa: E402

from repro.benchutil import print_table  # noqa: E402
from repro.core.tuning import Param, tune  # noqa: E402
from repro.workload.hookbench import HookWorkloadConfig, run_hook_workload  # noqa: E402


def main(argv: list[str] | None = None) -> int:
    ap = argparse.ArgumentParser()
    ap.add_argument("--workload", choices=["tpch", "wp1", "wp3"], default="wp1")
    ap.add_argument(
        "--trait",
        choices=["file_count_reduction", "file_entropy"],
        default="file_count_reduction",
    )
    ap.add_argument("--iterations", type=int, default=6)
    ap.add_argument("--seed", type=int, default=1)
    ap.add_argument("--workdir", default="/tmp/autocomp_fig9")
    args = ap.parse_args(argv)
    spark = get_spark("autocomp-fig9")

    reads = {"tpch": 1, "wp1": 4, "wp3": 4}[args.workload]
    cfg = HookWorkloadConfig(
        kind=args.workload,
        rounds=4,
        rows_per_round=500,
        files_per_commit=10,
        reads_per_round=reads,
        seed=3,
    )
    counter = [0]

    def objective(params):
        counter[0] += 1
        return run_hook_workload(
            spark,
            os.path.join(args.workdir, f"run{counter[0]}"),
            cfg,
            trait=args.trait,
            threshold=params["threshold"],
        ).duration_s

    default = run_hook_workload(
        spark, os.path.join(args.workdir, "default"), cfg
    ).duration_s
    lo, hi = (0.1, 3.0) if args.trait == "file_entropy" else (2.0, 60.0)
    result = tune(
        objective,
        [Param("threshold", lo, hi)],
        n_iterations=args.iterations,
        seed=args.seed,
    )
    print_table(
        f"Figure 9 — {args.workload} / {args.trait} tuning trace",
        ["iteration", "threshold", "duration_s"],
        [
            [t.iteration, f"{t.params['threshold']:.2f}", f"{t.value:.2f}"]
            for t in result.history
        ],
    )
    print(
        f"\ndefault (no compaction): {default:.2f}s   "
        f"best tuned: {result.best.value:.2f}s "
        f"@ threshold {result.best.params['threshold']:.2f}"
    )
    return 0


if __name__ == "__main__":
    raise SystemExit(main())

"""Figure 2 / Figure 10 / §7 harness: production-fleet policy comparison.

Usage:
    spark-submit jobs/run_production.py --weeks 4 --workdir /tmp/fig10
"""
from __future__ import annotations

import argparse
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _session import get_spark  # noqa: E402

from repro.benchutil import print_table  # noqa: E402
from repro.core.traits import CostModelConfig  # noqa: E402
from repro.workload.production import (  # noqa: E402
    FleetConfig,
    build_production_fleet,
    run_production,
    small_file_pct,
)

KB = 1024


def main(argv: list[str] | None = None) -> int:
    ap = argparse.ArgumentParser()
    ap.add_argument("--weeks", type=int, default=4)
    ap.add_argument("--manual-k", type=int, default=8)
    ap.add_argument("--auto-k", type=int, default=3)
    ap.add_argument("--seed", type=int, default=5)
    ap.add_argument("--workdir", default="/tmp/autocomp_fig10")
    args = ap.parse_args(argv)
    spark = get_spark("autocomp-fig10")

    cfg = FleetConfig(
        n_databases=3,
        tables_per_db=8,
        seed=args.seed,
        target_file_size=32 * KB,
        initial_appends_hot=5,
        files_per_append=4,
        rows_per_append=150,
        writes_per_week=10,
        drift_per_week=3,
    )
    cm = CostModelConfig(executor_memory_gb=8.0, rewrite_bytes_per_hour=1024**3)
    runs = {}
    for policy, kw in (
        ("manual", dict(k=args.manual_k)),
        ("auto", dict(k=args.auto_k)),
        ("budget", dict(k=args.auto_k, budget_gbhr=8.0 * 600 * KB / 1024**3)),
    ):
        cat = build_production_fleet(
            spark, os.path.join(args.workdir, policy), cfg
        )
        runs[policy] = run_production(
            spark, cat, cfg, policy=policy, n_weeks=args.weeks, cost_model=cm, **kw
        )
        runs[policy + "_pct"] = small_file_pct(cat, cfg.target_file_size // 4)

    for policy in ("manual", "auto", "budget"):
        run = runs[policy]
        print_table(
            f"policy={policy} (k_effective, files reduced, fleet files, small%)",
            ["week", "k_eff", "files_reduced", "gbhr", "fleet_files", "small_pct"],
            [
                [
                    w.week,
                    w.k_effective,
                    w.files_reduced,
                    f"{w.gbhr:.3e}",
                    w.fleet_file_count,
                    f"{w.small_file_pct:.0%}",
                ]
                for w in run.weeks
            ],
        )
    manual, auto = runs["manual"], runs["auto"]
    gain = (auto.total_files_reduced - manual.total_files_reduced) / max(
        1, manual.total_files_reduced
    )
    print(
        f"\nauto(k={args.auto_k}) vs manual(k={args.manual_k}): "
        f"{auto.total_files_reduced} vs {manual.total_files_reduced} files reduced "
        f"({gain:+.0%}; paper: +12% with 10x fewer tables)"
    )
    return 0


if __name__ == "__main__":
    raise SystemExit(main())

"""Figure 3 harness: TPC-DS-lite fresh / post-maintenance / post-compaction.

Usage:
    spark-submit jobs/run_tpcds_maintenance.py --sf 0.02 --workdir /tmp/fig3
"""
from __future__ import annotations

import argparse
import os
import sys
import time

sys.path.insert(0, os.path.dirname(__file__))
from _session import get_spark  # noqa: E402

from repro import synth_data  # noqa: E402
from repro.benchutil import print_table  # noqa: E402
from repro.lst import LstTable, PartitionSpec, compact  # noqa: E402


def query_suite(spark, table) -> float:
    df = table.scan(spark)
    t0 = time.monotonic()
    for _ in range(2):
        df.groupBy("ss_store_sk").sum("ss_ext_sales_price").collect()
        df.groupBy("sold_month").count().collect()
        df.filter("ss_quantity > 50").groupBy("ss_item_sk").count().orderBy(
            "count", ascending=False
        ).limit(10).collect()
    return time.monotonic() - t0


def main(argv: list[str] | None = None) -> int:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.02)
    ap.add_argument("--target-kb", type=int, default=512)
    ap.add_argument("--workdir", default="/tmp/autocomp_fig3")
    args = ap.parse_args(argv)
    spark = get_spark("autocomp-fig3")

    table = LstTable.create(
        os.path.join(args.workdir, f"store_sales_{args.sf}"),
        name="tpcds.store_sales",
        spec=PartitionSpec.monthly("ss_sold_date", "sold_month"),
    )
    table.append(synth_data.store_sales(spark, sf=args.sf, seed=0), n_files=1)
    query_suite(spark, table)  # warm-up run, untimed
    f0, t0 = table.file_count(), query_suite(spark, table)

    table.delete_where(spark, "ss_quantity > 97")
    for i in range(6):
        table.append(
            synth_data.store_sales_batch(
                spark, n_rows=600, seed=i + 1, start_day=i * 300, n_days=250
            ),
            n_files=6,
        )
    f1, t1 = table.file_count(), query_suite(spark, table)

    compact(spark, table, target_file_size=args.target_kb * 1024)
    f2, t2 = table.file_count(), query_suite(spark, table)

    print_table(
        "Figure 3 — TPC-DS-lite single-user runtime",
        ["phase", "files", "runtime_s", "vs_fresh"],
        [
            ["fresh load", f0, f"{t0:.2f}", "1.00x"],
            ["after maintenance", f1, f"{t1:.2f}", f"{t1 / t0:.2f}x"],
            ["after compaction", f2, f"{t2:.2f}", f"{t2 / t0:.2f}x"],
        ],
    )
    print("\npaper: 1.53x degradation, restored after compaction")
    return 0


if __name__ == "__main__":
    raise SystemExit(main())

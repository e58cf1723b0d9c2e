"""TPC-H-lite query and write-batch implementations over Iceberg-lite tables.

Reads are real Spark DataFrame queries (Catalyst plans over the snapshot's
Parquet file list); their wall-clock time is the client-side latency metric
of Figure 8. Writes use the two-phase plan/commit API so the simulator can
interleave their commits with compaction commits deterministically.

Each database holds the §6 table pair: ``lineitem`` partitioned by ship
month and ``orders`` non-partitioned — the mixed partitioned/non-partitioned
update pattern the paper built with CAB + dbgen.
"""
from __future__ import annotations

import random
from dataclasses import dataclass

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro import synth_data
from repro.lst.catalog import Catalog
from repro.lst.commit import PendingCommit
from repro.lst.table import LstTable
from repro.workload.cab import Op


@dataclass
class QueryResult:
    op: Op
    latency_s: float = 0.0
    rows: int = 0
    error: str | None = None


# ------------------------------------------------------------------- reads
def q1_pricing(spark: SparkSession, li: LstTable) -> DataFrame | None:
    """TPC-H Q1-lite: pricing summary over lineitem."""
    df = li.scan(spark)
    if df is None:
        return None
    return (
        df.groupBy("l_returnflag", "l_linestatus")
        .agg(
            F.sum("l_quantity").alias("sum_qty"),
            F.sum("l_extendedprice").alias("sum_base_price"),
            F.avg("l_discount").alias("avg_disc"),
            F.count("*").alias("count_order"),
        )
        .orderBy("l_returnflag", "l_linestatus")
    )


def q3_join(spark: SparkSession, li: LstTable, orders: LstTable) -> DataFrame | None:
    """TPC-H Q3-lite: revenue by order priority via a shuffle join."""
    ldf, odf = li.scan(spark), orders.scan(spark)
    if ldf is None or odf is None:
        return None
    return (
        ldf.join(odf, ldf.l_orderkey == odf.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(
            F.sum(
                F.col("l_extendedprice") * (1 - F.col("l_discount"))
            ).alias("revenue")
        )
        .orderBy("o_orderpriority")
    )


def q_orders(spark: SparkSession, orders: LstTable) -> DataFrame | None:
    """Order-status rollup on the non-partitioned table."""
    df = orders.scan(spark)
    if df is None:
        return None
    return (
        df.groupBy("o_orderstatus")
        .agg(F.count("*").alias("n"), F.sum("o_totalprice").alias("total"))
        .orderBy("o_orderstatus")
    )


def run_read(spark: SparkSession, catalog: Catalog, op: Op) -> QueryResult:
    """Execute a read op, measuring wall-clock latency of the full query."""
    import time

    res = QueryResult(op=op)
    t0 = time.monotonic()
    try:
        li = catalog.load_table(op.db, "lineitem")
        orders = catalog.load_table(op.db, "orders")
        if op.kind == "q1_pricing":
            df = q1_pricing(spark, li)
        elif op.kind == "q3_join":
            df = q3_join(spark, li, orders)
        else:
            df = q_orders(spark, orders)
        res.rows = 0 if df is None else len(df.collect())
    except Exception as exc:  # noqa: BLE001 — client error counting
        res.error = f"{type(exc).__name__}: {exc}"
    res.latency_s = time.monotonic() - t0
    return res


# ------------------------------------------------------------------ writes
def prepare_write(
    spark: SparkSession,
    catalog: Catalog,
    op: Op,
    *,
    seed: int,
    base_rows: int = 150,
    files_per_commit: int = 3,
) -> tuple[LstTable, PendingCommit | None]:
    """Build the pending commit for a write op (the expensive Spark part).

    ``files_per_commit`` models the §2 mis-tuned writers: every incremental
    insert lands as several small files. Deletes are CoW rewrites over a
    narrow seeded predicate (~a few percent of rows).
    """
    rng = random.Random(f"{seed}|{op.db}|{op.hour}|{op.stream}|{op.seq}")
    params = dict(op.params)
    rows = int(base_rows * params.get("rows", 1.0))
    op_seed = rng.randrange(2**31)
    if op.kind == "insert_lineitem":
        table = catalog.load_table(op.db, "lineitem")
        start_day = rng.randrange(0, 300)
        df = synth_data.lineitem_batch(
            spark, n_rows=rows, seed=op_seed, start_day=start_day, n_days=45
        )
        return table, table.plan_append(df, n_files=files_per_commit)
    if op.kind == "insert_orders":
        table = catalog.load_table(op.db, "orders")
        df = synth_data.orders_batch(
            spark, n_rows=rows, seed=op_seed, key_offset=rng.randrange(10**6)
        )
        return table, table.plan_append(df, n_files=files_per_commit)
    if op.kind == "delete_orders":
        table = catalog.load_table(op.db, "orders")
        lo = rng.randrange(0, 480_000)
        predicate = f"o_totalprice >= {lo} AND o_totalprice < {lo + 15_000}"
        return table, table.plan_delete_where(spark, predicate)
    raise ValueError(f"not a write op: {op.kind}")

"""Tests for TPC-H-lite queries over LST tables, oracle-checked."""
import pytest

from repro import synth_data
from repro.lst import Catalog, PartitionSpec
from repro.oracle import assert_equivalent
from repro.workload.cab import Op
from repro.workload.queries import (
    prepare_write,
    q1_pricing,
    q3_join,
    q_orders,
    run_read,
)


@pytest.fixture(scope="module")
def db(spark, tmp_path_factory):
    cat = Catalog(str(tmp_path_factory.mktemp("q") / "wh"))
    cat.create_database("db0")
    cat.create_table(
        "db0", "lineitem", spec=PartitionSpec.monthly("l_shipdate", "ship_month")
    )
    cat.create_table("db0", "orders")
    li_df = synth_data.lineitem_batch(spark, n_rows=500, seed=0, n_days=60)
    o_df = synth_data.orders_batch(spark, n_rows=200, seed=1)
    cat.load_table("db0", "lineitem").append(li_df, n_files=3)
    cat.load_table("db0", "orders").append(o_df, n_files=3)
    return cat, li_df.toPandas(), o_df.toPandas()


class TestReadQueries:
    def test_q1_matches_oracle(self, spark, db):
        cat, li_pdf, _ = db
        got = q1_pricing(spark, cat.load_table("db0", "lineitem"))
        assert_equivalent(
            got,
            """
            SELECT l_returnflag, l_linestatus,
                   sum(l_quantity) AS sum_qty,
                   sum(l_extendedprice) AS sum_base_price,
                   avg(l_discount) AS avg_disc,
                   count(*) AS count_order
            FROM li GROUP BY l_returnflag, l_linestatus
            """,
            li=li_pdf,
        )

    def test_q3_matches_oracle(self, spark, db):
        cat, li_pdf, o_pdf = db
        got = q3_join(
            spark,
            cat.load_table("db0", "lineitem"),
            cat.load_table("db0", "orders"),
        ).drop("o_orderpriority")
        got = q3_join(
            spark,
            cat.load_table("db0", "lineitem"),
            cat.load_table("db0", "orders"),
        )
        assert_equivalent(
            got,
            """
            SELECT o_orderpriority,
                   sum(l_extendedprice * (1 - l_discount)) AS revenue
            FROM li JOIN o ON l_orderkey = o_orderkey
            GROUP BY o_orderpriority
            """,
            li=li_pdf,
            o=o_pdf,
        )

    def test_q_orders_matches_oracle(self, spark, db):
        cat, _, o_pdf = db
        got = q_orders(spark, cat.load_table("db0", "orders"))
        assert_equivalent(
            got,
            """
            SELECT o_orderstatus, count(*) AS n, sum(o_totalprice) AS total
            FROM o GROUP BY o_orderstatus
            """,
            o=o_pdf,
        )

    def test_run_read_records_latency(self, spark, db):
        cat, _, _ = db
        op = Op("q1_pricing", "db0", 1, 0, 0)
        res = run_read(spark, cat, op)
        assert res.error is None
        assert res.rows > 0
        assert res.latency_s > 0

    def test_run_read_on_empty_table(self, spark, tmp_path):
        cat = Catalog(str(tmp_path / "wh"))
        cat.create_database("db0")
        cat.create_table("db0", "lineitem")
        cat.create_table("db0", "orders")
        res = run_read(spark, cat, Op("q_orders", "db0", 1, 0, 0))
        assert res.error is None
        assert res.rows == 0


class TestPrepareWrite:
    def test_insert_lineitem(self, spark, db):
        cat, _, _ = db
        op = Op("insert_lineitem", "db0", 1, 0, 0, params=(("rows", 2.0),))
        table, pending = prepare_write(
            spark, cat, op, seed=0, base_rows=50, files_per_commit=2
        )
        assert pending.operation == "append"
        assert len(pending.added) >= 2
        assert sum(f.record_count for f in pending.added) == 100
        assert not pending.committed  # two-phase: caller commits

    def test_insert_orders(self, spark, db):
        cat, _, _ = db
        op = Op("insert_orders", "db0", 1, 0, 1)
        table, pending = prepare_write(spark, cat, op, seed=0, files_per_commit=3)
        assert table.name == "db0.orders"
        assert len(pending.added) == 3

    def test_delete_orders_predicate_narrow(self, spark, db):
        cat, _, _ = db
        op = Op("delete_orders", "db0", 1, 0, 2)
        table, pending = prepare_write(spark, cat, op, seed=0)
        assert pending.operation == "delete"
        # CoW: may add rewritten files or be a no-op, never an append.
        assert pending.removed_paths or not pending.added

    def test_deterministic_given_seed(self, spark, db):
        cat, _, _ = db
        op = Op("insert_orders", "db0", 2, 1, 3)
        _, p1 = prepare_write(spark, cat, op, seed=5, files_per_commit=2)
        _, p2 = prepare_write(spark, cat, op, seed=5, files_per_commit=2)
        assert sum(f.record_count for f in p1.added) == sum(
            f.record_count for f in p2.added
        )

    def test_read_op_rejected(self, spark, db):
        cat, _, _ = db
        with pytest.raises(ValueError, match="not a write op"):
            prepare_write(spark, cat, Op("q1_pricing", "db0", 1, 0, 0), seed=0)

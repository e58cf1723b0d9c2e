"""Integration tests for LstTable operations against a live SparkSession."""
import pytest

from repro import synth_data
from repro.lst import (
    LstTable,
    PartitionSpec,
    TableExistsError,
    TableNotFoundError,
)
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def orders_df(spark):
    return synth_data.orders_batch(spark, n_rows=400, seed=3)


def make_unpartitioned(tmp_path, name="db.orders"):
    return LstTable.create(str(tmp_path / "orders"), name=name)


def make_partitioned(tmp_path):
    return LstTable.create(
        str(tmp_path / "li"),
        name="db.li",
        spec=PartitionSpec.monthly("l_shipdate", "ship_month"),
    )


class TestLifecycle:
    def test_create_and_load(self, tmp_path):
        t = make_unpartitioned(tmp_path)
        t2 = LstTable.load(t.table_dir)
        assert t2.name == "db.orders"
        assert not t2.spec.is_partitioned

    def test_create_twice_fails(self, tmp_path):
        make_unpartitioned(tmp_path)
        with pytest.raises(TableExistsError):
            LstTable.create(str(tmp_path / "orders"), name="x")

    def test_load_missing_fails(self, tmp_path):
        with pytest.raises(TableNotFoundError):
            LstTable.load(str(tmp_path / "nope"))

    def test_created_at_recorded(self, tmp_path):
        t = LstTable.create(str(tmp_path / "t"), name="t", created_at=123.0)
        assert LstTable.load(t.table_dir).created_at == 123.0

    def test_properties_roundtrip(self, tmp_path):
        t = LstTable.create(
            str(tmp_path / "t"), name="t", properties={"target_file_size": 1024}
        )
        assert LstTable.load(t.table_dir).properties["target_file_size"] == 1024

    def test_empty_table_stats(self, spark, tmp_path):
        t = make_unpartitioned(tmp_path)
        assert t.current_snapshot() is None
        assert t.file_count() == 0
        assert t.total_bytes() == 0
        assert t.files() == []
        assert t.scan(spark) is None


class TestAppend:
    def test_append_unpartitioned_n_files(self, spark, tmp_path, orders_df):
        t = make_unpartitioned(tmp_path)
        t.append(orders_df, n_files=3)
        assert t.file_count() == 3
        assert t.current_snapshot().total_records == 400

    def test_append_accumulates_files(self, spark, tmp_path, orders_df):
        t = make_unpartitioned(tmp_path)
        t.append(orders_df, n_files=2)
        t.append(orders_df, n_files=2)
        assert t.file_count() == 4
        assert t.current_version() == 1
        assert t.current_snapshot().total_records == 800

    def test_append_partitioned_routes_rows(self, spark, tmp_path):
        t = make_partitioned(tmp_path)
        df = synth_data.lineitem_batch(spark, n_rows=300, seed=1, n_days=45)
        t.append(df, n_files=2)
        snap = t.current_snapshot()
        assert len(snap.partitions()) >= 2
        for f in snap.files:
            assert f.partition_dict.keys() == {"ship_month"}
            assert f.path.startswith("ship_month=")

    def test_scan_matches_oracle(self, spark, tmp_path, orders_df):
        t = make_unpartitioned(tmp_path)
        t.append(orders_df, n_files=3)
        got = (
            t.scan(spark)
            .groupBy("o_orderpriority")
            .count()
            .withColumnRenamed("count", "n")
        )
        assert_equivalent(
            got,
            "SELECT o_orderpriority, count(*) AS n FROM o GROUP BY o_orderpriority",
            o=orders_df,
        )

    def test_file_sizes_positive(self, spark, tmp_path, orders_df):
        t = make_unpartitioned(tmp_path)
        t.append(orders_df, n_files=2)
        for f in t.files():
            assert f.file_size_bytes > 0
            assert f.record_count > 0


class TestOverwrite:
    def test_unpartitioned_overwrite_replaces_all(self, spark, tmp_path, orders_df):
        t = make_unpartitioned(tmp_path)
        t.append(orders_df, n_files=4)
        small = synth_data.orders_batch(spark, n_rows=50, seed=4)
        t.overwrite_partitions(small, n_files=1)
        assert t.file_count() == 1
        assert t.current_snapshot().total_records == 50
        assert t.current_snapshot().operation == "overwrite"

    def test_partitioned_overwrite_is_dynamic(self, spark, tmp_path):
        t = make_partitioned(tmp_path)
        base = synth_data.lineitem_batch(spark, n_rows=300, seed=1, n_days=80)
        t.append(base, n_files=2)
        before = t.current_snapshot()
        months = sorted(p["ship_month"] for p in before.partitions())
        # Overwrite only the first month window.
        patch = synth_data.lineitem_batch(spark, n_rows=40, seed=2, n_days=20)
        t.overwrite_partitions(patch, n_files=1)
        after = t.current_snapshot()
        touched = {f.partition_dict["ship_month"] for f in after.files} - {
            f.partition_dict["ship_month"] for f in before.files
        }
        # Untouched later months keep their original files.
        untouched_before = before.files_in_partition({"ship_month": months[-1]})
        untouched_after = after.files_in_partition({"ship_month": months[-1]})
        assert untouched_before == untouched_after

    def test_overwrite_bumps_version(self, spark, tmp_path, orders_df):
        t = make_unpartitioned(tmp_path)
        t.append(orders_df, n_files=1)
        t.overwrite_partitions(orders_df, n_files=1)
        assert t.current_version() == 1


class TestDelete:
    def test_delete_removes_rows(self, spark, tmp_path, orders_df):
        t = make_unpartitioned(tmp_path)
        t.append(orders_df, n_files=3)
        n_match = orders_df.filter("o_orderstatus = 'P'").count()
        assert n_match > 0
        t.delete_where(spark, "o_orderstatus = 'P'")
        snap = t.current_snapshot()
        assert snap.operation == "delete"
        assert snap.total_records == 400 - n_match
        assert t.scan(spark).filter("o_orderstatus = 'P'").count() == 0

    def test_delete_result_matches_oracle(self, spark, tmp_path, orders_df):
        t = make_unpartitioned(tmp_path)
        t.append(orders_df, n_files=3)
        t.delete_where(spark, "o_totalprice > 250000")
        got = (
            t.scan(spark)
            .groupBy()
            .count()
            .withColumnRenamed("count", "n")
        )
        assert_equivalent(
            got,
            "SELECT count(*) AS n FROM o WHERE o_totalprice <= 250000",
            o=orders_df,
        )

    def test_delete_rewrites_cow_files(self, spark, tmp_path, orders_df):
        t = make_unpartitioned(tmp_path)
        t.append(orders_df, n_files=3)
        before_paths = {f.path for f in t.files()}
        t.delete_where(spark, "o_orderstatus = 'P'")
        after_paths = {f.path for f in t.files()}
        # CoW: matching files replaced by new ones (every file matched here).
        assert before_paths.isdisjoint(after_paths)

    def test_delete_no_match_is_noop_commit(self, spark, tmp_path, orders_df):
        t = make_unpartitioned(tmp_path)
        t.append(orders_df, n_files=2)
        before = {f.path for f in t.files()}
        t.delete_where(spark, "o_totalprice < 0")
        assert {f.path for f in t.files()} == before

    def test_delete_only_touches_matching_files(self, spark, tmp_path):
        t = make_partitioned(tmp_path)
        df = synth_data.lineitem_batch(spark, n_rows=300, seed=1, n_days=80)
        t.append(df, n_files=1)
        months = sorted(p["ship_month"] for p in t.current_snapshot().partitions())
        first, last = months[0], months[-1]
        keep = {
            f.path for f in t.files({"ship_month": last})
        }
        t.delete_where(spark, f"ship_month = '{first}'")
        after = {f.path for f in t.files({"ship_month": last})}
        assert keep == after


class TestTimeTravel:
    def test_scan_old_snapshot(self, spark, tmp_path, orders_df):
        t = make_unpartitioned(tmp_path)
        t.append(orders_df, n_files=2)
        v0 = t.current_version()
        t.append(synth_data.orders_batch(spark, n_rows=100, seed=9), n_files=1)
        assert t.scan(spark, snapshot_version=v0).count() == 400
        assert t.scan(spark).count() == 500

    def test_snapshots_history(self, spark, tmp_path, orders_df):
        t = make_unpartitioned(tmp_path)
        t.append(orders_df, n_files=1, now=1.0)
        t.append(orders_df, n_files=1, now=2.0)
        snaps = t.snapshots()
        assert [s.version for s in snaps] == [0, 1]
        assert [s.timestamp for s in snaps] == [1.0, 2.0]

    def test_metadata_object_count(self, spark, tmp_path, orders_df):
        t = make_unpartitioned(tmp_path)
        t.append(orders_df, n_files=3)
        # 3 data files + 1 version file (v0) + table.json + 1
        assert t.metadata_object_count() == 3 + 0 + 2

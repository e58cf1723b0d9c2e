"""End-to-end smoke of the Iceberg-lite substrate: write → scan → compact."""
import pytest

from repro import synth_data
from repro.lst import CommitConflictError, LstTable, PartitionSpec, compact
from repro.oracle import assert_equivalent

TARGET = 64 * 1024  # 64 KB unit-test target file size (DESIGN.md §6)


def _make_table(spark, path):
    t = LstTable.create(
        str(path),
        name="db.lineitem",
        spec=PartitionSpec.monthly("l_shipdate", "ship_month"),
    )
    # ~3 monthly partitions x 4 tasks => ~12 small files, 1200 rows.
    df = synth_data.lineitem_batch(spark, n_rows=1200, seed=0, n_days=80)
    t.append(df, n_files=4)
    return t


@pytest.fixture(scope="module")
def li_table(spark, tmp_path_factory):
    """Read-only shared table; mutation tests build their own."""
    return _make_table(spark, tmp_path_factory.mktemp("smoke") / "lineitem")


def test_append_creates_files_and_snapshot(li_table):
    snap = li_table.current_snapshot()
    assert snap is not None
    assert snap.operation == "append"
    assert snap.file_count >= 4
    assert snap.total_records == 1200


def test_scan_roundtrip_matches_oracle(spark, li_table):
    df = li_table.scan(spark)
    got = df.groupBy().sum("l_quantity").withColumnRenamed("sum(l_quantity)", "s")
    src = synth_data.lineitem_batch(spark, n_rows=1200, seed=0, n_days=80)
    assert_equivalent(got, "SELECT sum(l_quantity) AS s FROM li", li=src)


def test_partition_pruned_scan(spark, li_table):
    parts = li_table.current_snapshot().partitions()
    assert len(parts) >= 2
    one = parts[0]
    df = li_table.scan(spark, partition_filter=one)
    vals = {r["ship_month"] for r in df.select("ship_month").distinct().collect()}
    assert vals == {one["ship_month"]}


def test_compaction_reduces_files_preserves_rows(spark, tmp_path):
    t = _make_table(spark, tmp_path / "t")
    before = t.current_snapshot()
    res = compact(spark, t, target_file_size=TARGET)
    after = t.current_snapshot()
    assert res.files_removed > res.files_added
    assert after.file_count < before.file_count
    assert after.total_records == before.total_records
    got = t.scan(spark).groupBy("l_returnflag").count().withColumnRenamed("count", "n")
    pre = t.scan(spark, snapshot_version=before.version).drop("ship_month")
    assert_equivalent(
        got,
        "SELECT l_returnflag, count(*) AS n FROM pre GROUP BY l_returnflag",
        pre=pre,
    )


def test_compaction_is_idempotent(spark, tmp_path):
    t = _make_table(spark, tmp_path / "t")
    compact(spark, t, target_file_size=TARGET)
    res2 = compact(spark, t, target_file_size=TARGET)
    assert res2.skipped or res2.file_count_reduction == 0


def test_concurrent_commits_conflict(spark, tmp_path):
    t = _make_table(spark, tmp_path / "t")
    batch = synth_data.lineitem_batch(spark, n_rows=50, seed=9, n_days=10)
    p1 = t.plan_append(batch, n_files=1)
    p2 = t.plan_append(batch, n_files=1)
    t.commit(p1, retries=0)
    with pytest.raises(CommitConflictError):
        t.commit(p2, retries=0)
    # With retries, the same pending commit rebases and lands.
    conflicts = []
    t.commit(p2, retries=3, on_conflict=lambda p, e: conflicts.append(e))
    assert len(conflicts) == 1
    assert t.current_snapshot().total_records == 1300

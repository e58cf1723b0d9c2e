"""Tests for the compaction job: pure bin-packing planner + Spark rewrites."""
import pytest

from repro import synth_data
from repro.lst import LstTable, PartitionSpec
from repro.lst.maintenance import compact, plan_compaction, plan_groups
from repro.lst.snapshot import DataFile
from repro.oracle import assert_equivalent

KB = 1024


def df_(path, size, partition=()):
    return DataFile(
        path=path, file_size_bytes=size, record_count=1, partition=partition
    )


class TestPlanGroups:
    """Pure planning logic — deterministic bin-packing (NFR2)."""

    def test_empty_input(self):
        assert plan_groups([], target_file_size=100 * KB) == []

    def test_single_small_file_not_compacted(self):
        # One small file cannot be reduced further.
        assert plan_groups([df_("a", KB)], target_file_size=100 * KB) == []

    def test_many_small_files_one_output(self):
        files = [df_(f"f{i}", 10 * KB) for i in range(10)]
        groups = plan_groups(files, target_file_size=200 * KB)
        assert len(groups) == 1
        assert groups[0].n_out == 1
        assert len(groups[0].files) == 10

    def test_bin_pack_ceil(self):
        # 10 files x 30KB = 300KB at 100KB target => 3 outputs.
        files = [df_(f"f{i}", 30 * KB) for i in range(10)]
        [g] = plan_groups(files, target_file_size=100 * KB)
        assert g.n_out == 3

    def test_large_files_excluded(self):
        files = [df_("big", 500 * KB)] + [df_(f"s{i}", KB) for i in range(4)]
        [g] = plan_groups(files, target_file_size=100 * KB)
        assert all(f.path != "big" for f in g.files)

    def test_custom_small_threshold(self):
        files = [df_(f"f{i}", 50 * KB) for i in range(4)]
        # With threshold 40KB nothing qualifies.
        assert (
            plan_groups(files, target_file_size=100 * KB, small_file_threshold=40 * KB)
            == []
        )

    def test_groups_per_partition(self):
        p1, p2 = (("m", "1"),), (("m", "2"),)
        files = [df_(f"a{i}", KB, p1) for i in range(3)] + [
            df_(f"b{i}", KB, p2) for i in range(3)
        ]
        groups = plan_groups(files, target_file_size=100 * KB)
        assert len(groups) == 2
        assert [g.partition for g in groups] == [p1, p2]

    def test_no_gain_group_skipped(self):
        # 2 files of 90KB at 100KB target -> n_out=2 == n_in -> skip.
        files = [df_("a", 90 * KB), df_("b", 90 * KB)]
        assert plan_groups(files, target_file_size=100 * KB) == []

    def test_deterministic_ordering(self):
        files = [df_(f"f{i}", KB) for i in range(5)]
        g1 = plan_groups(list(reversed(files)), target_file_size=100 * KB)
        g2 = plan_groups(files, target_file_size=100 * KB)
        assert g1 == g2

    def test_group_total_bytes(self):
        files = [df_("a", 10), df_("b", 20)]
        [g] = plan_groups(files, target_file_size=100 * KB)
        assert g.total_bytes == 30


@pytest.fixture()
def fragmented_orders(spark, tmp_path):
    """Unpartitioned table with 12 small files from 4 trickle appends."""
    t = LstTable.create(str(tmp_path / "orders"), name="db.orders")
    for i in range(4):
        df = synth_data.orders_batch(spark, n_rows=120, seed=i, key_offset=i * 120)
        t.append(df, n_files=3)
    return t


class TestCompactSpark:
    def test_unpartitioned_compaction(self, spark, fragmented_orders):
        t = fragmented_orders
        assert t.file_count() == 12
        res = compact(spark, t, target_file_size=256 * KB)
        assert not res.skipped
        assert res.files_removed == 12
        assert res.files_added < 12
        assert t.current_snapshot().total_records == 480
        assert t.current_snapshot().operation == "rewrite"

    def test_compaction_preserves_data_oracle(self, spark, fragmented_orders):
        t = fragmented_orders
        pre = t.scan(spark)
        pre_pdf = pre.toPandas()
        compact(spark, t, target_file_size=256 * KB)
        got = (
            t.scan(spark)
            .groupBy("o_orderstatus")
            .sum("o_totalprice")
            .withColumnRenamed("sum(o_totalprice)", "s")
        )
        assert_equivalent(
            got,
            "SELECT o_orderstatus, sum(o_totalprice) AS s FROM o GROUP BY o_orderstatus",
            o=pre_pdf,
        )

    def test_output_file_sizes_near_target(self, spark, tmp_path):
        t = LstTable.create(str(tmp_path / "t"), name="t")
        for i in range(6):
            t.append(
                synth_data.orders_batch(spark, n_rows=200, seed=i), n_files=4
            )
        total = t.total_bytes()
        target = total // 3
        res = compact(spark, t, target_file_size=target)
        sizes = [f.file_size_bytes for f in t.files()]
        # Consolidated files should be within ~2.5x of target and far larger
        # than the inputs (parquet size is not perfectly linear in rows).
        assert res.files_added <= 4
        assert min(sizes) > target / 4

    def test_partition_scoped_compaction(self, spark, tmp_path):
        t = LstTable.create(
            str(tmp_path / "li"),
            name="li",
            spec=PartitionSpec.monthly("l_shipdate", "m"),
        )
        for i in range(3):
            t.append(
                synth_data.lineitem_batch(spark, n_rows=200, seed=i, n_days=55),
                n_files=2,
            )
        months = sorted(p["m"] for p in t.current_snapshot().partitions())
        first = months[0]
        other_before = [
            f.path for f in t.files() if f.partition_dict["m"] != first
        ]
        res = compact(
            spark, t, target_file_size=256 * KB, partition_filter={"m": first}
        )
        assert not res.skipped
        assert res.partitions == [{"m": first}]
        other_after = [
            f.path for f in t.files() if f.partition_dict["m"] != first
        ]
        assert other_before == other_after  # untouched partitions unchanged
        assert len(t.files({"m": first})) < 6

    def test_compaction_does_not_cross_partitions(self, spark, tmp_path):
        t = LstTable.create(
            str(tmp_path / "li"),
            name="li",
            spec=PartitionSpec.monthly("l_shipdate", "m"),
        )
        t.append(
            synth_data.lineitem_batch(spark, n_rows=400, seed=0, n_days=80),
            n_files=3,
        )
        n_parts = len(t.current_snapshot().partitions())
        compact(spark, t, target_file_size=10_000 * KB)
        # Even with a huge target, one file per partition minimum: the §7
        # estimator-accuracy point — table-level estimates overestimate
        # because compaction does not cross partition boundaries.
        assert t.file_count() == n_parts

    def test_plan_compaction_two_phase(self, spark, fragmented_orders):
        t = fragmented_orders
        pending, planned = plan_compaction(spark, t, target_file_size=256 * KB)
        assert pending is not None
        assert planned.files_removed == 12
        # Not yet committed: table still sees the fragmented layout.
        assert t.file_count() == 12
        t.commit(pending)
        assert t.file_count() == planned.files_added

    def test_nothing_to_compact_skips(self, spark, tmp_path):
        t = LstTable.create(str(tmp_path / "t"), name="t")
        t.append(synth_data.orders_batch(spark, n_rows=50, seed=0), n_files=1)
        res = compact(spark, t, target_file_size=1)  # everything is "large"
        assert res.skipped
        assert res.snapshot_version is None
        assert t.current_version() == 0

    def test_conflict_then_retry_succeeds(self, spark, fragmented_orders):
        t = fragmented_orders
        pending, _ = plan_compaction(spark, t, target_file_size=256 * KB)
        # A concurrent append lands first; rewrite inputs remain live.
        t.append(synth_data.orders_batch(spark, n_rows=30, seed=99), n_files=1)
        conflicts = []
        t.commit(pending, retries=2, on_conflict=lambda p, e: conflicts.append(e))
        assert len(conflicts) == 1
        assert t.current_snapshot().total_records == 510

    def test_conflicting_rewrite_abandoned(self, spark, fragmented_orders):
        """Two compactions race: the loser must abandon, not clobber."""
        t = fragmented_orders
        res1 = compact(spark, t, target_file_size=256 * KB)
        assert not res1.skipped
        # Losing compaction was planned against the old layout.
        # Rebuild a stale plan by hand:
        pending, _ = plan_compaction(spark, t, target_file_size=256 * KB)
        if pending is None:
            # Already optimal — that's the expected healthy end state.
            return
        res2 = compact(spark, t, target_file_size=256 * KB)
        assert res2.skipped or res2.file_count_reduction >= 0

    def test_gbhr_inputs_reported(self, spark, fragmented_orders):
        t = fragmented_orders
        res = compact(spark, t, target_file_size=256 * KB)
        assert res.bytes_rewritten > 0
        assert res.records_rewritten == 480
        assert res.groups_compacted == 1

"""Edge-case tests for the low-level reader/writer pair."""
import os

import pytest

from repro import synth_data
from repro.lst.reader import prune_files, scan_files, scan_snapshot
from repro.lst.snapshot import DataFile, Snapshot
from repro.lst.spec import PartitionSpec
from repro.lst.writer import delete_files, write_data_files


def df_(path, partition=()):
    return DataFile(path=path, file_size_bytes=1, record_count=1, partition=partition)


class TestPruneFiles:
    def _snap(self):
        return Snapshot(
            0,
            0.0,
            "append",
            files=(
                df_("m=a/1.parquet", (("m", "a"),)),
                df_("m=b/2.parquet", (("m", "b"),)),
            ),
        )

    def test_no_filter_returns_all(self):
        assert len(prune_files(self._snap(), None)) == 2
        assert len(prune_files(self._snap(), {})) == 2

    def test_filter_matches_subset(self):
        out = prune_files(self._snap(), {"m": "a"})
        assert [f.path for f in out] == ["m=a/1.parquet"]

    def test_filter_no_match(self):
        assert prune_files(self._snap(), {"m": "zzz"}) == []

    def test_filter_unknown_key_excludes_all(self):
        assert prune_files(self._snap(), {"other": "a"}) == []


class TestScan:
    def test_scan_files_empty_list_raises(self, spark, tmp_path):
        with pytest.raises(ValueError, match="empty file list"):
            scan_files(spark, str(tmp_path), [], partitioned=False)

    def test_scan_snapshot_empty_returns_none(self, spark, tmp_path):
        snap = Snapshot(0, 0.0, "create")
        assert scan_snapshot(spark, str(tmp_path), snap) is None

    def test_partition_columns_restored(self, spark, tmp_path):
        spec = PartitionSpec.monthly("l_shipdate", "m")
        df = synth_data.lineitem_batch(spark, n_rows=120, seed=0, n_days=50)
        files = write_data_files(df, str(tmp_path), spec, n_files=2)
        snap = Snapshot(0, 0.0, "append", files=tuple(files))
        out = scan_snapshot(spark, str(tmp_path), snap)
        assert "m" in out.columns
        assert out.count() == 120


class TestWriter:
    def test_unpartitioned_exact_file_count(self, spark, tmp_path):
        df = synth_data.orders_batch(spark, n_rows=100, seed=0)
        files = write_data_files(
            df, str(tmp_path), PartitionSpec.unpartitioned(), n_files=5
        )
        assert len(files) == 5
        assert sum(f.record_count for f in files) == 100
        assert all(f.partition == () for f in files)

    def test_staging_dir_cleaned(self, spark, tmp_path):
        df = synth_data.orders_batch(spark, n_rows=20, seed=0)
        write_data_files(df, str(tmp_path), PartitionSpec.unpartitioned(), n_files=1)
        staging = os.path.join(str(tmp_path), "_staging")
        assert not os.path.exists(staging) or os.listdir(staging) == []

    def test_unique_file_names_across_commits(self, spark, tmp_path):
        df = synth_data.orders_batch(spark, n_rows=20, seed=0)
        spec = PartitionSpec.unpartitioned()
        a = write_data_files(df, str(tmp_path), spec, n_files=2)
        b = write_data_files(df, str(tmp_path), spec, n_files=2)
        names = [os.path.basename(f.path) for f in a + b]
        assert len(set(names)) == 4

    def test_delete_files_removes_and_tolerates_missing(self, spark, tmp_path):
        df = synth_data.orders_batch(spark, n_rows=20, seed=0)
        files = write_data_files(
            df, str(tmp_path), PartitionSpec.unpartitioned(), n_files=1
        )
        delete_files(str(tmp_path), [files[0].path])
        assert not os.path.exists(
            os.path.join(str(tmp_path), "data", files[0].path)
        )
        delete_files(str(tmp_path), ["does/not/exist.parquet"])  # no raise

    def test_sizes_match_disk(self, spark, tmp_path):
        df = synth_data.orders_batch(spark, n_rows=50, seed=0)
        files = write_data_files(
            df, str(tmp_path), PartitionSpec.unpartitioned(), n_files=1
        )
        on_disk = os.stat(
            os.path.join(str(tmp_path), "data", files[0].path)
        ).st_size
        assert files[0].file_size_bytes == on_disk

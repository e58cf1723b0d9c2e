"""Unit tests for the snapshot/manifest model (pure Python, no Spark)."""
import pytest

from repro.lst.snapshot import (
    DataFile,
    Snapshot,
    current_version,
    read_snapshot,
    write_snapshot_exclusive,
)


def df_(path, size=100, records=10, partition=()):
    return DataFile(
        path=path, file_size_bytes=size, record_count=records, partition=partition
    )


class TestDataFile:
    def test_roundtrip(self):
        f = df_("a.parquet", 123, 7, (("m", "1992-01"),))
        assert DataFile.from_dict(f.to_dict()) == f

    def test_partition_dict(self):
        f = df_("a.parquet", partition=(("a", "1"), ("b", "2")))
        assert f.partition_dict == {"a": "1", "b": "2"}

    def test_unpartitioned_default(self):
        assert df_("a.parquet").partition == ()

    def test_accepts_list_partition(self):
        f = DataFile("a", 1, 1, [("m", "x")])
        assert f.partition == (("m", "x"),)

    def test_hashable(self):
        assert hash(df_("a.parquet")) == hash(df_("a.parquet"))


class TestSnapshot:
    def _snap(self):
        return Snapshot(
            version=3,
            timestamp=42.0,
            operation="append",
            files=(
                df_("p1/a.parquet", 100, 5, (("m", "1992-01"),)),
                df_("p1/b.parquet", 200, 6, (("m", "1992-01"),)),
                df_("p2/c.parquet", 300, 7, (("m", "1992-02"),)),
            ),
            summary={"added-files": 3},
        )

    def test_aggregates(self):
        s = self._snap()
        assert s.file_count == 3
        assert s.total_bytes == 600
        assert s.total_records == 18

    def test_partitions_sorted_distinct(self):
        s = self._snap()
        assert s.partitions() == [{"m": "1992-01"}, {"m": "1992-02"}]

    def test_files_in_partition(self):
        s = self._snap()
        assert len(s.files_in_partition({"m": "1992-01"})) == 2
        assert len(s.files_in_partition({"m": "1992-03"})) == 0

    def test_roundtrip(self):
        s = self._snap()
        assert Snapshot.from_dict(s.to_dict()) == s

    def test_empty_snapshot(self):
        s = Snapshot(0, 0.0, "create")
        assert s.file_count == 0 and s.total_bytes == 0
        assert s.partitions() == []

    def test_accepts_list_files(self):
        s = Snapshot(0, 0.0, "append", [df_("a")])
        assert isinstance(s.files, tuple)


class TestVersionFiles:
    def test_write_read_roundtrip(self, tmp_path):
        s = Snapshot(0, 1.0, "create")
        p = str(tmp_path / "v0.json")
        write_snapshot_exclusive(p, s)
        assert read_snapshot(p) == s

    def test_exclusive_write_fails_on_existing(self, tmp_path):
        s = Snapshot(0, 1.0, "create")
        p = str(tmp_path / "v0.json")
        write_snapshot_exclusive(p, s)
        with pytest.raises(FileExistsError):
            write_snapshot_exclusive(p, s)

    def test_current_version_empty_dir(self, tmp_path):
        assert current_version(str(tmp_path)) == -1

    def test_current_version_picks_max(self, tmp_path):
        for v in (0, 1, 2, 10):
            write_snapshot_exclusive(
                str(tmp_path / f"v{v}.json"), Snapshot(v, 0.0, "append")
            )
        assert current_version(str(tmp_path)) == 10

    def test_current_version_ignores_junk(self, tmp_path):
        (tmp_path / "vNaN.json").write_text("{}")
        (tmp_path / "other.txt").write_text("x")
        write_snapshot_exclusive(str(tmp_path / "v1.json"), Snapshot(1, 0.0, "append"))
        assert current_version(str(tmp_path)) == 1

"""Tests for the observe phase: the fleet-wide Spark stats aggregation."""
import math

import pytest

from repro import synth_data
from repro.core.candidates import generate_candidates
from repro.core.observe import candidate_files, collect_stats
from repro.core.model import Candidate
from repro.lst import Catalog, PartitionSpec

TARGET = 10**12  # everything counts as small at this target


@pytest.fixture(scope="module")
def fleet(spark, tmp_path_factory):
    cat = Catalog(str(tmp_path_factory.mktemp("obs") / "wh"))
    cat.create_database("db1")
    cat.create_table(
        "db1", "li", spec=PartitionSpec.monthly("l_shipdate", "m"), created_at=1.0
    )
    cat.create_table("db1", "orders", created_at=2.0)
    li = cat.load_table("db1", "li")
    li.append(
        synth_data.lineitem_batch(spark, n_rows=400, seed=0, n_days=80),
        n_files=2,
        now=10.0,
    )
    o = cat.load_table("db1", "orders")
    o.append(synth_data.orders_batch(spark, n_rows=100, seed=0), n_files=4, now=20.0)
    o.append(synth_data.orders_batch(spark, n_rows=100, seed=1), n_files=4, now=21.0)
    return cat


class TestCandidateFiles:
    def test_table_scope_all_files(self, fleet):
        c = Candidate(db="db1", table="orders")
        assert len(candidate_files(fleet, c)) == 8

    def test_partition_scope_subset(self, fleet):
        li = fleet.load_table("db1", "li")
        part = li.current_snapshot().files[0].partition
        c = Candidate(db="db1", table="li", scope="partition", partition=part)
        files = candidate_files(fleet, c)
        assert files
        assert all(f.partition == part for f in files)

    def test_snapshot_scope_delta_only(self, fleet):
        c = Candidate(db="db1", table="orders", scope="snapshot", snapshot_floor=0)
        files = candidate_files(fleet, c)
        assert len(files) == 4  # only the second append's files

    def test_empty_table(self, fleet):
        fleet.create_table("db1", "nofiles")
        c = Candidate(db="db1", table="nofiles")
        assert candidate_files(fleet, c) == []


class TestCollectStats:
    def test_matches_manifest_totals(self, spark, fleet):
        cands = generate_candidates(fleet, scope="table")
        stats = collect_stats(spark, fleet, cands, target_file_size=TARGET)
        by_id = {s.candidate.id: s for s in stats}
        o = fleet.load_table("db1", "orders")
        assert by_id["db1.orders"].file_count == o.file_count() == 8
        assert by_id["db1.orders"].total_bytes == o.total_bytes()
        assert by_id["db1.orders"].small_file_count == 8  # all below huge target

    def test_small_threshold_respected(self, spark, fleet):
        cands = [Candidate(db="db1", table="orders")]
        [s] = collect_stats(
            spark, fleet, cands, target_file_size=TARGET, small_file_threshold=1
        )
        assert s.small_file_count == 0
        assert s.small_bytes == 0

    def test_partition_aware_reduction_bounded(self, spark, fleet):
        cands = generate_candidates(fleet, scope="table")
        stats = collect_stats(spark, fleet, cands, target_file_size=TARGET)
        for s in stats:
            assert 0 <= s.partition_aware_reduction <= s.small_file_count

    def test_partition_aware_less_than_table_level(self, spark, fleet):
        # li has ~3 partitions × 2 files: table-level ΔF=6 says "6 files can
        # merge to 1" but per-partition the floor is one file per partition.
        [s] = collect_stats(
            spark,
            fleet,
            [Candidate(db="db1", table="li")],
            target_file_size=TARGET,
        )
        n_parts = len(fleet.load_table("db1", "li").current_snapshot().partitions())
        assert s.partition_aware_reduction == s.small_file_count - n_parts

    def test_entropy_aggregate_correct(self, spark, fleet):
        [s] = collect_stats(
            spark,
            fleet,
            [Candidate(db="db1", table="orders")],
            target_file_size=TARGET,
        )
        expected = sum(
            f.file_size_bytes * math.log(f.file_size_bytes)
            for f in fleet.load_table("db1", "orders").files()
        )
        assert s.sum_bytes_log_bytes == pytest.approx(expected, rel=1e-9)

    def test_metadata_joined(self, spark, fleet):
        cands = generate_candidates(fleet, scope="table")
        stats = collect_stats(spark, fleet, cands, target_file_size=TARGET)
        by_id = {s.candidate.id: s for s in stats}
        assert by_id["db1.li"].created_at == 1.0
        assert by_id["db1.li"].last_write_at == 10.0
        assert by_id["db1.orders"].last_write_at == 21.0

    def test_empty_candidate_zeroed(self, spark, fleet):
        fleet.create_table("db1", "void", created_at=7.0)
        [s] = collect_stats(
            spark, fleet, [Candidate(db="db1", table="void")], target_file_size=TARGET
        )
        assert s.file_count == 0
        assert s.created_at == 7.0

    def test_no_candidates(self, spark, fleet):
        assert collect_stats(spark, fleet, [], target_file_size=TARGET) == []

    def test_partition_candidates_sum_to_table(self, spark, fleet):
        li_parts = [
            c
            for c in generate_candidates(fleet, scope="hybrid")
            if c.table == "li"
        ]
        part_stats = collect_stats(spark, fleet, li_parts, target_file_size=TARGET)
        [tbl_stats] = collect_stats(
            spark, fleet, [Candidate(db="db1", table="li")], target_file_size=TARGET
        )
        assert sum(s.file_count for s in part_stats) == tbl_stats.file_count
        assert sum(s.total_bytes for s in part_stats) == tbl_stats.total_bytes

"""Unit tests for trait computation (pure math, no Spark)."""
import math

import pytest

from repro.core.model import Candidate, CandidateStats
from repro.core.traits import (
    CostModelConfig,
    compute_cost_gbhr,
    compute_traits,
    file_count_reduction,
    file_count_reduction_pct,
    file_entropy,
    partition_aware_reduction,
)

KB = 1024
TARGET = 100 * KB


def stats(files: list[tuple[int, bool]], partition_aware=0) -> CandidateStats:
    """files: list of (size, is_small)."""
    s = CandidateStats(candidate=Candidate(db="d", table="t"))
    for size, small in files:
        s.file_count += 1
        s.total_bytes += size
        if small:
            s.small_file_count += 1
            s.small_bytes += size
        s.sum_bytes_log_bytes += size * math.log(size)
    s.partition_aware_reduction = partition_aware
    return s


class TestFileCountReduction:
    def test_counts_small_files(self):
        s = stats([(KB, True), (KB, True), (500 * KB, False)])
        assert file_count_reduction(s) == 2.0

    def test_pct(self):
        s = stats([(KB, True), (KB, True), (500 * KB, False), (500 * KB, False)])
        assert file_count_reduction_pct(s) == 0.5

    def test_pct_empty_table(self):
        s = CandidateStats(candidate=Candidate(db="d", table="t"))
        assert file_count_reduction_pct(s) == 0.0

    def test_partition_aware_passthrough(self):
        s = stats([(KB, True)] * 4, partition_aware=3)
        assert partition_aware_reduction(s) == 3.0

    def test_table_level_overestimates_partition_aware(self):
        # The §7 estimator gap: ΔF_c ≥ partition-aware reduction always.
        s = stats([(KB, True)] * 10, partition_aware=6)
        assert file_count_reduction(s) >= partition_aware_reduction(s)


class TestFileEntropy:
    def test_perfectly_packed_is_zero(self):
        # 4 files exactly at target: H = ln 4, ideal n* = 4 → excess 0.
        s = stats([(TARGET, False)] * 4)
        assert file_entropy(s, target_file_size=TARGET) == pytest.approx(0.0, abs=1e-9)

    def test_fragmented_is_positive(self):
        # Same bytes in 100 tiny files: excess ≈ ln(100/4).
        n = 100
        size = 4 * TARGET // n
        s = stats([(size, True)] * n)
        e = file_entropy(s, target_file_size=TARGET)
        assert e == pytest.approx(math.log(n / 4), rel=1e-6)

    def test_more_fragmentation_more_entropy(self):
        s10 = stats([(TARGET // 10, True)] * 10)
        s100 = stats([(TARGET // 100, True)] * 100)
        assert file_entropy(s100, target_file_size=TARGET) > file_entropy(
            s10, target_file_size=TARGET
        )

    def test_empty_table_zero(self):
        s = CandidateStats(candidate=Candidate(db="d", table="t"))
        assert file_entropy(s, target_file_size=TARGET) == 0.0

    def test_single_large_file_zero(self):
        s = stats([(3 * TARGET, False)])
        # One file holding 3×target: ideal is 3 files, actual entropy 0 →
        # excess clamps at 0 (compaction cannot help a single file).
        assert file_entropy(s, target_file_size=TARGET) == 0.0

    def test_never_negative(self):
        for files in ([(TARGET * 2, False)], [(KB, True)], [(TARGET, False)] * 3):
            assert file_entropy(stats(files), target_file_size=TARGET) >= 0.0


class TestComputeCost:
    def test_formula(self):
        s = stats([(KB, True)] * 10)
        cm = CostModelConfig(executor_memory_gb=8.0, rewrite_bytes_per_hour=1024**3)
        expected = 8.0 * (10 * KB / 1024**3)
        assert compute_cost_gbhr(s, cost_model=cm) == pytest.approx(expected)

    def test_large_files_not_charged(self):
        # Cost covers only the bytes actually rewritten (small files).
        s = stats([(KB, True), (10**9, False)])
        cm = CostModelConfig()
        assert compute_cost_gbhr(s, cost_model=cm) == pytest.approx(
            cm.executor_memory_gb * KB / cm.rewrite_bytes_per_hour
        )

    def test_scales_linearly_with_bytes(self):
        cm = CostModelConfig()
        c1 = compute_cost_gbhr(stats([(KB, True)]), cost_model=cm)
        c2 = compute_cost_gbhr(stats([(2 * KB, True)]), cost_model=cm)
        assert c2 == pytest.approx(2 * c1)

    def test_empty_is_free(self):
        s = CandidateStats(candidate=Candidate(db="d", table="t"))
        assert compute_cost_gbhr(s, cost_model=CostModelConfig()) == 0.0


class TestComputeTraits:
    def test_standard_set_present(self):
        s = stats([(KB, True)] * 3)
        t = compute_traits(s, target_file_size=TARGET, cost_model=CostModelConfig())
        assert set(t) == {
            "file_count_reduction",
            "file_count_reduction_pct",
            "partition_aware_reduction",
            "file_entropy",
            "compute_cost_gbhr",
        }

    def test_deterministic(self):
        s = stats([(KB, True), (TARGET, False)])
        kw = dict(target_file_size=TARGET, cost_model=CostModelConfig())
        assert compute_traits(s, **kw) == compute_traits(s, **kw)

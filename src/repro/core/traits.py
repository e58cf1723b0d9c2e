"""Orient phase: traits derived from observe-phase statistics (§4.2).

Benefit traits:

- ``file_count_reduction`` — the paper's ΔF_c: the number of files below
  the target size (each can in principle be merged away).
- ``file_count_reduction_pct`` — ΔF_c / file count, the relative form used
  by the unconstrained 10%-threshold example in §4.3.
- ``file_entropy`` — fragmentation measure after Netflix's auto-optimize
  [65], adapted: the Shannon entropy of the file-size distribution in
  excess of the entropy of an ideally packed layout. A table of
  equal target-sized files scores 0; many tiny files score high.

Cost traits:

- ``compute_cost_gbhr`` — the paper's GBHr_c model:
  ``ExecutorMemoryGB × (DataSize_c / RewriteBytesPerHour)``, where
  DataSize_c is the bytes the rewrite must process (the candidate's small
  files).

Each trait is an independent pure function of (stats, config) — traits
compose freely in the ranking phase (FR2) and are deterministic (NFR2).
"""
from __future__ import annotations

import math
from dataclasses import dataclass

from repro.core.model import CandidateStats


@dataclass(frozen=True)
class CostModelConfig:
    """Knobs of the GBHr cost model (§4.2) with production-ish defaults
    scaled to the local substrate."""

    executor_memory_gb: float = 8.0
    rewrite_bytes_per_hour: float = 256 * 1024**3  # 256 GB/h


def file_count_reduction(stats: CandidateStats) -> float:
    """ΔF_c: Σ 1(FileSize_i < TargetFileSize) — table-level estimate."""
    return float(stats.small_file_count)


def file_count_reduction_pct(stats: CandidateStats) -> float:
    """ΔF_c as a fraction of the candidate's file count (0 when empty)."""
    if stats.file_count == 0:
        return 0.0
    return stats.small_file_count / stats.file_count


def partition_aware_reduction(stats: CandidateStats) -> float:
    """Exact reduction the bin-packing planner achieves (never crosses
    partitions) — the corrected estimator §7 calls for."""
    return float(stats.partition_aware_reduction)


def file_entropy(stats: CandidateStats, *, target_file_size: int) -> float:
    """Excess Shannon entropy of the file-size distribution.

    H = ln(B) − (Σ sᵢ·ln sᵢ)/B with B = total bytes, computed from the
    aggregates the observe phase already carries. The ideal layout packs B
    bytes into n* = ceil(B / target) equal files with entropy ln(n*), so the
    trait is max(0, H − ln n*): zero for a perfectly packed table,
    ~ln(file_count/n*) for uniform small files.
    """
    if stats.file_count == 0 or stats.total_bytes <= 0:
        return 0.0
    b = float(stats.total_bytes)
    h = math.log(b) - stats.sum_bytes_log_bytes / b
    n_ideal = max(1, math.ceil(b / target_file_size))
    return max(0.0, h - math.log(n_ideal))


def compute_cost_gbhr(stats: CandidateStats, *, cost_model: CostModelConfig) -> float:
    """GBHr_c = ExecutorMemoryGB × DataSize_c / RewriteBytesPerHour."""
    return cost_model.executor_memory_gb * (
        stats.small_bytes / cost_model.rewrite_bytes_per_hour
    )


def compute_traits(
    stats: CandidateStats,
    *,
    target_file_size: int,
    cost_model: CostModelConfig,
) -> dict[str, float]:
    """Evaluate the standard trait set for one candidate."""
    return {
        "file_count_reduction": file_count_reduction(stats),
        "file_count_reduction_pct": file_count_reduction_pct(stats),
        "partition_aware_reduction": partition_aware_reduction(stats),
        "file_entropy": file_entropy(stats, target_file_size=target_file_size),
        "compute_cost_gbhr": compute_cost_gbhr(stats, cost_model=cost_model),
    }

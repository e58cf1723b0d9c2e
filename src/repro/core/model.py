"""Data model shared by the OODA phases.

A consistent structure between phases is what makes the phases swappable
(NFR1): candidate generation emits :class:`Candidate`, observe emits
:class:`CandidateStats`, orient attaches trait values, decide emits
:class:`RankedCandidate` — each phase only depends on the previous type.
"""
from __future__ import annotations

from dataclasses import dataclass, field


@dataclass(frozen=True)
class Candidate:
    """A collection of files eligible for one compaction task (§4.1).

    ``scope`` is ``table`` (all files), ``partition`` (one partition's
    files), or ``snapshot`` (files added since a snapshot floor).
    """

    db: str
    table: str
    scope: str = "table"
    partition: tuple[tuple[str, str], ...] | None = None
    snapshot_floor: int | None = None

    def __post_init__(self) -> None:
        if self.scope not in ("table", "partition", "snapshot"):
            raise ValueError(f"unknown scope {self.scope!r}")
        if self.scope == "partition" and self.partition is None:
            raise ValueError("partition scope requires a partition tuple")
        if self.partition is not None and not isinstance(self.partition, tuple):
            object.__setattr__(
                self, "partition", tuple((k, v) for k, v in self.partition)
            )

    @property
    def table_key(self) -> str:
        return f"{self.db}.{self.table}"

    @property
    def id(self) -> str:
        """Stable, human-readable identity — also the deterministic ranking
        tie-breaker (NFR2)."""
        if self.scope == "partition":
            part = "/".join(f"{k}={v}" for k, v in self.partition)
            return f"{self.table_key}/{part}"
        if self.scope == "snapshot":
            return f"{self.table_key}@>{self.snapshot_floor}"
        return self.table_key

    @property
    def partition_filter(self) -> dict[str, str] | None:
        return dict(self.partition) if self.partition is not None else None


@dataclass
class CandidateStats:
    """Observe-phase output: generic statistics for one candidate (§4.1).

    ``small_file_count`` implements the paper's ΔF_c estimator — the count
    of files below the target size, *ignoring* partition boundaries.
    ``partition_aware_reduction`` is the exact file-count reduction the
    bin-packing planner would achieve; §7 reports the gap between the two
    (table-level ΔF_c overestimated reduction by 28% in production).
    ``sum_bytes_log_bytes`` carries Σ sᵢ·ln sᵢ so the orient phase can
    derive file entropy without re-reading file lists.
    """

    candidate: Candidate
    file_count: int = 0
    total_bytes: int = 0
    small_file_count: int = 0
    small_bytes: int = 0
    partition_aware_reduction: int = 0
    sum_bytes_log_bytes: float = 0.0
    created_at: float = 0.0
    last_write_at: float = 0.0
    custom: dict = field(default_factory=dict)


@dataclass
class RankedCandidate:
    """Decide-phase output: traits, normalized traits, and the MOOP score."""

    stats: CandidateStats
    traits: dict[str, float] = field(default_factory=dict)
    normalized: dict[str, float] = field(default_factory=dict)
    score: float = 0.0

    @property
    def candidate(self) -> Candidate:
        return self.stats.candidate

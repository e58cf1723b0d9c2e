"""Decide phase: candidate ranking and selection (§4.3).

Two modes, matching the paper:

- **Unconstrained** — a threshold decision function: a candidate triggers
  compaction when a trait exceeds its threshold (e.g. ΔF_c ≥ 10%). Used by
  the optimize-after-write hook and the §6.3 auto-tuning experiments.
- **Resource-constrained** — the MOOP weighted sum: each trait is min-max
  normalized across the candidate pool, benefit traits add
  ``+wᵢ·T'ᵢ`` and cost traits subtract ``−wⱼ·T'ⱼ``; candidates sort by the
  scalarized score and the top-k (or greedy budget fill) are selected.

Everything is deterministic: ties break on the candidate id (NFR2), and
normalization over an identical pool yields identical scores.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from repro.core.model import CandidateStats, RankedCandidate


@dataclass(frozen=True)
class MoopObjective:
    """One scalarization term: a trait with a weight and a direction."""

    trait: str
    weight: float
    kind: str = "benefit"  # benefit (+) or cost (−)

    def __post_init__(self) -> None:
        if self.kind not in ("benefit", "cost"):
            raise ValueError(f"kind must be benefit|cost, got {self.kind!r}")
        if self.weight < 0:
            raise ValueError("weights must be non-negative")


#: The paper's deployed objective: 0.7·ΔF' − 0.3·GBHr' (§6.1, §7).
DEFAULT_OBJECTIVES = (
    MoopObjective("file_count_reduction", 0.7, "benefit"),
    MoopObjective("compute_cost_gbhr", 0.3, "cost"),
)


def min_max_normalize(values: list[float]) -> list[float]:
    """Scale to [0, 1]; a constant column maps to all-zeros (no signal)."""
    if not values:
        return []
    lo, hi = min(values), max(values)
    if hi == lo:
        return [0.0 for _ in values]
    return [(v - lo) / (hi - lo) for v in values]


def quota_weight(used_quota: float, total_quota: float) -> float:
    """§7 production policy: w₁ = 0.5 × (1 + used/total).

    A tenant near its HDFS namespace quota gets its file-count-reduction
    weight boosted toward 1.0; an idle tenant sits at 0.5.
    """
    if total_quota <= 0:
        return 0.5
    return 0.5 * (1.0 + min(1.0, used_quota / total_quota))


def moop_rank(
    scored: list[tuple[CandidateStats, dict[str, float]]],
    objectives: tuple[MoopObjective, ...] = DEFAULT_OBJECTIVES,
    per_candidate_weights: dict[str, dict[str, float]] | None = None,
) -> list[RankedCandidate]:
    """Scalarize and sort (descending score, candidate-id tie-break).

    ``per_candidate_weights`` optionally overrides an objective's weight per
    candidate id — how the §7 deployment applies the quota-derived w₁ per
    database while keeping a single global ranking.
    """
    per_trait: dict[str, list[float]] = {}
    for o in objectives:
        per_trait[o.trait] = min_max_normalize(
            [traits[o.trait] for _stats, traits in scored]
        )
    ranked: list[RankedCandidate] = []
    for i, (stats, traits) in enumerate(scored):
        normalized = {o.trait: per_trait[o.trait][i] for o in objectives}
        overrides = (
            per_candidate_weights.get(stats.candidate.id, {})
            if per_candidate_weights
            else {}
        )
        score = 0.0
        for o in objectives:
            w = overrides.get(o.trait, o.weight)
            term = w * normalized[o.trait]
            score += term if o.kind == "benefit" else -term
        ranked.append(
            RankedCandidate(
                stats=stats, traits=dict(traits), normalized=normalized, score=score
            )
        )
    ranked.sort(key=lambda r: (-r.score, r.candidate.id))
    return ranked


@dataclass(frozen=True)
class ThresholdTrigger:
    """Unconstrained decision function: fire when ``trait ≥ threshold``."""

    trait: str
    threshold: float

    def fires(self, traits: dict[str, float]) -> bool:
        return traits.get(self.trait, 0.0) >= self.threshold


def select_top_k(ranked: list[RankedCandidate], k: int) -> list[RankedCandidate]:
    """Fixed-k selection (the paper's initial conservative rollout, §7)."""
    return ranked[: max(0, k)]


@dataclass
class BudgetSelection:
    selected: list[RankedCandidate] = field(default_factory=list)
    total_cost: float = 0.0
    skipped_over_budget: int = 0


def select_within_budget(
    ranked: list[RankedCandidate],
    budget: float,
    cost_trait: str = "compute_cost_gbhr",
) -> BudgetSelection:
    """Greedy budget fill: walk the ranking, take every candidate whose cost
    still fits — the paper's "fit as many high-priority compaction tasks as
    possible within the budget" heuristic (dynamic k, §7 week 22)."""
    sel = BudgetSelection()
    for r in ranked:
        cost = r.traits.get(cost_trait, 0.0)
        if sel.total_cost + cost <= budget:
            sel.selected.append(r)
            sel.total_cost += cost
        else:
            sel.skipped_over_budget += 1
    return sel

"""Unit tests for MOOP ranking, thresholds, and selection (pure Python)."""
import pytest

from repro.core.model import Candidate, CandidateStats
from repro.core.ranking import (
    DEFAULT_OBJECTIVES,
    BudgetSelection,
    MoopObjective,
    ThresholdTrigger,
    min_max_normalize,
    moop_rank,
    quota_weight,
    select_top_k,
    select_within_budget,
)


def scored(name: str, reduction: float, cost: float, db="d"):
    s = CandidateStats(candidate=Candidate(db=db, table=name))
    return (s, {"file_count_reduction": reduction, "compute_cost_gbhr": cost})


class TestNormalize:
    def test_scales_to_unit(self):
        assert min_max_normalize([10.0, 20.0, 30.0]) == [0.0, 0.5, 1.0]

    def test_constant_column_is_zero(self):
        assert min_max_normalize([5.0, 5.0]) == [0.0, 0.0]

    def test_empty(self):
        assert min_max_normalize([]) == []

    def test_single_value(self):
        assert min_max_normalize([7.0]) == [0.0]

    def test_negative_inputs(self):
        assert min_max_normalize([-1.0, 1.0]) == [0.0, 1.0]


class TestMoopObjective:
    def test_rejects_bad_kind(self):
        with pytest.raises(ValueError):
            MoopObjective("x", 0.5, "penalty")

    def test_rejects_negative_weight(self):
        with pytest.raises(ValueError):
            MoopObjective("x", -0.1)

    def test_default_objectives_match_paper(self):
        # §6.1: weights 0.7 (file count reduction) and 0.3 (compute cost).
        [b, c] = DEFAULT_OBJECTIVES
        assert (b.trait, b.weight, b.kind) == ("file_count_reduction", 0.7, "benefit")
        assert (c.trait, c.weight, c.kind) == ("compute_cost_gbhr", 0.3, "cost")


class TestMoopRank:
    def test_high_benefit_low_cost_wins(self):
        ranked = moop_rank(
            [scored("a", 200, 5.0), scored("b", 100, 5.0), scored("c", 10, 0.1)]
        )
        assert ranked[0].candidate.table == "a"

    def test_cost_breaks_benefit_tie(self):
        # §4.2 example: similar reduction, cheaper candidate ranks higher.
        ranked = moop_rank([scored("pricey", 200, 50.0), scored("cheap", 200, 1.0)])
        assert ranked[0].candidate.table == "cheap"

    def test_benefit_cost_tradeoff(self):
        # A candidate with somewhat less benefit at far lower cost can win.
        ranked = moop_rank(
            [scored("big", 200, 100.0), scored("mid", 180, 1.0), scored("low", 0, 0.0)]
        )
        assert ranked[0].candidate.table == "mid"

    def test_deterministic_tie_break_by_id(self):
        ranked = moop_rank([scored("b", 100, 1.0), scored("a", 100, 1.0)])
        assert [r.candidate.table for r in ranked] == ["a", "b"]

    def test_scores_in_range(self):
        ranked = moop_rank([scored("a", 100, 1.0), scored("b", 0, 10.0)])
        for r in ranked:
            assert -0.3 - 1e-9 <= r.score <= 0.7 + 1e-9

    def test_normalized_recorded(self):
        ranked = moop_rank([scored("a", 100, 1.0), scored("b", 0, 3.0)])
        top = ranked[0]
        assert top.normalized["file_count_reduction"] == 1.0
        assert top.normalized["compute_cost_gbhr"] == 0.0

    def test_empty_pool(self):
        assert moop_rank([]) == []

    def test_per_candidate_weight_override(self):
        # Quota-pressured tenant's candidate gets boosted w1 and overtakes.
        # (Three candidates so min-max normalization leaves b a nonzero
        # normalized value for the boost to act on.)
        base = [
            scored("a", 100, 1.0, db="idle"),
            scored("b", 90, 1.0, db="full"),
            scored("z", 0, 1.0, db="idle"),
        ]
        plain = moop_rank(base)
        assert plain[0].candidate.table == "a"
        boosted = moop_rank(
            base, per_candidate_weights={"full.b": {"file_count_reduction": 2.0}}
        )
        assert boosted[0].candidate.table == "b"

    def test_same_input_same_output(self):
        pool = [scored("a", 10, 1.0), scored("b", 20, 2.0), scored("c", 15, 0.5)]
        r1 = [(r.candidate.id, r.score) for r in moop_rank(pool)]
        r2 = [(r.candidate.id, r.score) for r in moop_rank(pool)]
        assert r1 == r2  # NFR2: identical input → identical decisions


class TestQuotaWeight:
    def test_idle_tenant(self):
        assert quota_weight(0, 1000) == 0.5

    def test_full_tenant(self):
        assert quota_weight(1000, 1000) == 1.0

    def test_halfway(self):
        assert quota_weight(500, 1000) == 0.75

    def test_overquota_clamped(self):
        assert quota_weight(2000, 1000) == 1.0

    def test_zero_total_quota(self):
        assert quota_weight(10, 0) == 0.5


class TestThresholdTrigger:
    def test_fires_at_threshold(self):
        t = ThresholdTrigger("file_count_reduction_pct", 0.1)
        assert t.fires({"file_count_reduction_pct": 0.1})
        assert t.fires({"file_count_reduction_pct": 0.5})

    def test_does_not_fire_below(self):
        t = ThresholdTrigger("file_count_reduction_pct", 0.1)
        assert not t.fires({"file_count_reduction_pct": 0.05})

    def test_missing_trait_never_fires(self):
        assert not ThresholdTrigger("entropy", 0.1).fires({})


class TestSelection:
    def _ranked(self, costs):
        pool = [scored(f"t{i}", 100 - i, c) for i, c in enumerate(costs)]
        return moop_rank(pool)

    def test_top_k(self):
        ranked = self._ranked([1.0] * 5)
        assert len(select_top_k(ranked, 3)) == 3
        assert select_top_k(ranked, 0) == []
        assert len(select_top_k(ranked, 99)) == 5

    def test_budget_greedy_fill(self):
        ranked = self._ranked([4.0, 4.0, 4.0])
        sel = select_within_budget(ranked, budget=8.0)
        assert len(sel.selected) == 2
        assert sel.total_cost == pytest.approx(8.0)
        assert sel.skipped_over_budget == 1

    def test_budget_skips_then_fits_smaller(self):
        # Greedy walks the whole ranking: a cheaper lower-ranked task still
        # fits after an expensive one is skipped.
        pool = [scored("a", 100, 9.0), scored("b", 90, 9.0), scored("c", 80, 1.0)]
        sel = select_within_budget(moop_rank(pool), budget=10.0)
        names = [r.candidate.table for r in sel.selected]
        assert names == ["a", "c"]

    def test_zero_budget(self):
        sel = select_within_budget(self._ranked([1.0, 2.0]), budget=0.0)
        assert sel.selected == []
        assert isinstance(sel, BudgetSelection)

"""Unit tests for the deterministic threshold auto-tuner (pure Python)."""
import pytest

from repro.core.tuning import Param, Trial, TuningResult, tune


class TestParam:
    def test_sample_in_range(self):
        import random

        p = Param("x", 1.0, 5.0)
        rng = random.Random(0)
        for _ in range(50):
            assert 1.0 <= p.sample(rng) <= 5.0

    def test_integer_param_rounds(self):
        import random

        p = Param("k", 1, 10, integer=True)
        v = p.sample(random.Random(0))
        assert v == round(v)

    def test_clip(self):
        p = Param("x", 0.0, 1.0)
        assert p.clip(2.0) == 1.0
        assert p.clip(-1.0) == 0.0
        assert Param("k", 0, 10, integer=True).clip(3.4) == 3.0


class TestTune:
    def quad(self, params):
        return (params["x"] - 3.0) ** 2

    def test_finds_near_optimum(self):
        res = tune(self.quad, [Param("x", 0.0, 10.0)], n_iterations=40, seed=1)
        assert abs(res.best.params["x"] - 3.0) < 0.5
        assert res.best.value < 0.25

    def test_deterministic_given_seed(self):
        r1 = tune(self.quad, [Param("x", 0.0, 10.0)], n_iterations=10, seed=7)
        r2 = tune(self.quad, [Param("x", 0.0, 10.0)], n_iterations=10, seed=7)
        assert [(t.params, t.value) for t in r1.history] == [
            (t.params, t.value) for t in r2.history
        ]

    def test_different_seeds_differ(self):
        r1 = tune(self.quad, [Param("x", 0.0, 10.0)], n_iterations=5, seed=1)
        r2 = tune(self.quad, [Param("x", 0.0, 10.0)], n_iterations=5, seed=2)
        assert [t.params for t in r1.history] != [t.params for t in r2.history]

    def test_history_length(self):
        res = tune(self.quad, [Param("x", 0, 1)], n_iterations=13, seed=0)
        assert len(res.history) == 13
        assert [t.iteration for t in res.history] == list(range(13))

    def test_refinement_improves_over_exploration(self):
        res = tune(self.quad, [Param("x", 0.0, 100.0)], n_iterations=30, seed=3)
        explore_best = min(t.value for t in res.history[:15])
        final_best = res.best.value
        assert final_best <= explore_best

    def test_multi_param(self):
        def obj(p):
            return (p["x"] - 1) ** 2 + (p["y"] + 2) ** 2

        res = tune(
            obj,
            [Param("x", -5, 5), Param("y", -5, 5)],
            n_iterations=60,
            seed=4,
        )
        assert res.best.value < 1.0

    def test_rejects_zero_iterations(self):
        with pytest.raises(ValueError):
            tune(self.quad, [Param("x", 0, 1)], n_iterations=0)

    def test_best_ties_break_earliest(self):
        res = TuningResult(
            history=[
                Trial(0, {"x": 1.0}, 5.0),
                Trial(1, {"x": 2.0}, 5.0),
            ]
        )
        assert res.best.iteration == 0

    def test_integer_space(self):
        def obj(p):
            return abs(p["k"] - 4)

        res = tune(obj, [Param("k", 0, 20, integer=True)], n_iterations=30, seed=5)
        assert res.best.params["k"] == res.best.params["k"] // 1
        assert res.best.value <= 1

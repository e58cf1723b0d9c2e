"""Threshold auto-tuning: a deterministic stand-in for MLOS + FLAML (§6.3).

The paper tunes compaction-trigger thresholds (small-file count, file
entropy) by repeatedly running a workload and measuring end-to-end duration,
with FLAML proposing the next threshold each iteration. The optimizer
internals are not the contribution — the loop shape is — so this module
implements a seeded random-search with local refinement around the
incumbent: simple, dependency-free, and fully deterministic given the seed
(NFR2), which FLAML is not.
"""
from __future__ import annotations

import random
from dataclasses import dataclass, field
from typing import Callable


@dataclass(frozen=True)
class Param:
    """One tunable: a closed range, optionally log-scaled / integer-valued."""

    name: str
    lo: float
    hi: float
    integer: bool = False

    def sample(self, rng: random.Random) -> float:
        v = rng.uniform(self.lo, self.hi)
        return float(round(v)) if self.integer else v

    def clip(self, v: float) -> float:
        v = min(self.hi, max(self.lo, v))
        return float(round(v)) if self.integer else v


@dataclass
class Trial:
    iteration: int
    params: dict[str, float]
    value: float


@dataclass
class TuningResult:
    history: list[Trial] = field(default_factory=list)

    @property
    def best(self) -> Trial:
        # Deterministic: earliest trial wins ties.
        return min(self.history, key=lambda t: (t.value, t.iteration))


def tune(
    objective: Callable[[dict[str, float]], float],
    space: list[Param],
    *,
    n_iterations: int,
    seed: int = 0,
    explore_fraction: float = 0.5,
) -> TuningResult:
    """Minimize ``objective`` over ``space`` in ``n_iterations`` evaluations.

    The first ``explore_fraction`` of iterations sample uniformly (global
    exploration); the rest perturb the incumbent by a shrinking ±radius
    (local refinement) — the same explore-then-exploit shape FLAML's
    low-cost-first search exhibits in the paper's Figure 9 traces.
    """
    if n_iterations < 1:
        raise ValueError("need at least one iteration")
    rng = random.Random(seed)
    result = TuningResult()
    n_explore = max(1, int(n_iterations * explore_fraction))
    for i in range(n_iterations):
        if i < n_explore or not result.history:
            params = {p.name: p.sample(rng) for p in space}
        else:
            best = result.best.params
            # Radius shrinks as refinement progresses.
            progress = (i - n_explore) / max(1, n_iterations - n_explore)
            params = {}
            for p in space:
                radius = (p.hi - p.lo) * 0.25 * (1.0 - progress)
                params[p.name] = p.clip(best[p.name] + rng.uniform(-radius, radius))
        value = objective(params)
        result.history.append(Trial(iteration=i, params=params, value=value))
    return result

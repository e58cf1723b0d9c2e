"""Experiment metrics: file counts, GBHr_App, and latency percentiles.

Implements the §6 measurement set: server-side file counts / rewritten
bytes per compaction application (GBHr_App through the same cost model the
orient phase uses) and client-side query latency candlesticks (min, p25,
median, p75, max per hour — the Figure 8 presentation).
"""
from __future__ import annotations

from dataclasses import dataclass, field

from repro.core.traits import CostModelConfig


def gbhr_app(bytes_processed: int, cost_model: CostModelConfig) -> float:
    """GBHr consumed by one application run over ``bytes_processed``."""
    return cost_model.executor_memory_gb * (
        bytes_processed / cost_model.rewrite_bytes_per_hour
    )


def percentile(sorted_values: list[float], q: float) -> float:
    """Linear-interpolated percentile of pre-sorted values, q in [0, 1]."""
    if not sorted_values:
        raise ValueError("no values")
    if len(sorted_values) == 1:
        return sorted_values[0]
    pos = q * (len(sorted_values) - 1)
    lo = int(pos)
    hi = min(lo + 1, len(sorted_values) - 1)
    frac = pos - lo
    return sorted_values[lo] * (1 - frac) + sorted_values[hi] * frac


@dataclass(frozen=True)
class Candlestick:
    """The five-number summary a Figure 8 bar encodes."""

    min: float
    p25: float
    median: float
    p75: float
    max: float
    n: int

    @staticmethod
    def of(values: list[float]) -> "Candlestick":
        vs = sorted(values)
        return Candlestick(
            min=vs[0],
            p25=percentile(vs, 0.25),
            median=percentile(vs, 0.50),
            p75=percentile(vs, 0.75),
            max=vs[-1],
            n=len(vs),
        )


@dataclass
class LatencyRecorder:
    """Per-(hour, kind) latency samples; kind is ``read`` or ``write``."""

    samples: dict[tuple[int, str], list[float]] = field(default_factory=dict)

    def add(self, hour: int, kind: str, seconds: float) -> None:
        self.samples.setdefault((hour, kind), []).append(seconds)

    def candlestick(self, hour: int, kind: str) -> Candlestick | None:
        vals = self.samples.get((hour, kind))
        return Candlestick.of(vals) if vals else None

    def total(self, kind: str | None = None) -> float:
        return sum(
            sum(v)
            for (h, k), v in self.samples.items()
            if kind is None or k == kind
        )

    def hours(self) -> list[int]:
        return sorted({h for (h, _k) in self.samples})


@dataclass
class FileCountSeries:
    """Fleet file count sampled at hour boundaries (Figure 6 y-axis)."""

    points: list[tuple[int, int]] = field(default_factory=list)

    def record(self, hour: int, count: int) -> None:
        self.points.append((hour, count))

    def at(self, hour: int) -> int:
        for h, c in self.points:
            if h == hour:
                return c
        raise KeyError(hour)

    def final(self) -> int:
        return self.points[-1][1]

    def initial(self) -> int:
        return self.points[0][1]

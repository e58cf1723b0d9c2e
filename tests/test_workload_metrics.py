"""Unit tests for metrics helpers (pure Python)."""
import pytest

from repro.core.traits import CostModelConfig
from repro.workload.metrics import (
    Candlestick,
    FileCountSeries,
    LatencyRecorder,
    gbhr_app,
    percentile,
)


class TestGbhrApp:
    def test_formula(self):
        cm = CostModelConfig(executor_memory_gb=8.0, rewrite_bytes_per_hour=1024**3)
        assert gbhr_app(1024**3, cm) == pytest.approx(8.0)

    def test_zero_bytes_free(self):
        assert gbhr_app(0, CostModelConfig()) == 0.0


class TestPercentile:
    def test_median_odd(self):
        assert percentile([1.0, 2.0, 3.0], 0.5) == 2.0

    def test_median_even_interpolates(self):
        assert percentile([1.0, 2.0, 3.0, 4.0], 0.5) == 2.5

    def test_extremes(self):
        vs = [5.0, 1.0, 3.0]
        vs.sort()
        assert percentile(vs, 0.0) == 1.0
        assert percentile(vs, 1.0) == 5.0

    def test_single_value(self):
        assert percentile([7.0], 0.25) == 7.0

    def test_empty_raises(self):
        with pytest.raises(ValueError):
            percentile([], 0.5)


class TestCandlestick:
    def test_five_number_summary(self):
        c = Candlestick.of([4.0, 1.0, 3.0, 2.0, 5.0])
        assert (c.min, c.p25, c.median, c.p75, c.max) == (1.0, 2.0, 3.0, 4.0, 5.0)
        assert c.n == 5

    def test_unsorted_input_ok(self):
        assert Candlestick.of([9.0, 1.0]).min == 1.0


class TestLatencyRecorder:
    def test_add_and_candlestick(self):
        r = LatencyRecorder()
        for v in (1.0, 2.0, 3.0):
            r.add(1, "read", v)
        c = r.candlestick(1, "read")
        assert c.median == 2.0
        assert r.candlestick(1, "write") is None

    def test_total_by_kind(self):
        r = LatencyRecorder()
        r.add(1, "read", 1.0)
        r.add(2, "read", 2.0)
        r.add(1, "write", 10.0)
        assert r.total("read") == 3.0
        assert r.total() == 13.0

    def test_hours(self):
        r = LatencyRecorder()
        r.add(3, "read", 1.0)
        r.add(1, "write", 1.0)
        assert r.hours() == [1, 3]


class TestFileCountSeries:
    def test_record_and_lookup(self):
        s = FileCountSeries()
        s.record(0, 100)
        s.record(1, 150)
        assert s.at(0) == 100
        assert s.initial() == 100
        assert s.final() == 150

    def test_missing_hour_raises(self):
        s = FileCountSeries()
        s.record(0, 1)
        with pytest.raises(KeyError):
            s.at(9)

"""Tests for the benchmark table/shape helpers."""
from repro.benchutil import monotone_nonincreasing, print_table


class TestPrintTable:
    def test_prints_header_and_rows(self, capsys):
        print_table("T", ["a", "bb"], [[1, 2], [30, 4]])
        out = capsys.readouterr().out
        assert "=== T ===" in out
        assert "a" in out and "bb" in out
        assert "30" in out

    def test_empty_rows_ok(self, capsys):
        print_table("T", ["col"], [])
        assert "col" in capsys.readouterr().out


class TestMonotone:
    def test_strictly_decreasing(self):
        assert monotone_nonincreasing([5.0, 4.0, 1.0])

    def test_flat_ok(self):
        assert monotone_nonincreasing([2.0, 2.0, 2.0])

    def test_rise_fails(self):
        assert not monotone_nonincreasing([1.0, 2.0])

    def test_tolerance_allows_small_rise(self):
        assert monotone_nonincreasing([100.0, 104.0], tolerance=0.05)
        assert not monotone_nonincreasing([100.0, 110.0], tolerance=0.05)

    def test_empty_and_single(self):
        assert monotone_nonincreasing([])
        assert monotone_nonincreasing([1.0])

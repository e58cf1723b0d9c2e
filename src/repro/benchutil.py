"""Helpers shared by the benchmark harnesses (table printing, shape checks)."""
from __future__ import annotations


def print_table(title: str, header: list[str], rows: list[list]) -> None:
    """Plain fixed-width table for bench logs / EXPERIMENTS.md diffing."""
    widths = [
        max(len(str(h)), *(len(str(r[i])) for r in rows)) if rows else len(str(h))
        for i, h in enumerate(header)
    ]
    print(f"\n=== {title} ===")
    print("  ".join(str(h).ljust(w) for h, w in zip(header, widths)))
    for r in rows:
        print("  ".join(str(c).ljust(w) for c, w in zip(r, widths)))


def monotone_nonincreasing(values: list[float], tolerance: float = 0.0) -> bool:
    """True if the series never rises by more than ``tolerance`` (relative)."""
    for a, b in zip(values, values[1:]):
        if b > a * (1.0 + tolerance):
            return False
    return True

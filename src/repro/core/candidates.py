"""Candidate generation and filtering (§4.1).

Scopes:

- ``table`` — one candidate per table (the original OpenHouse strategy).
- ``partition`` — one candidate per partition of partitioned tables.
- ``hybrid`` — partition scope when the table is partitioned, table scope
  otherwise (the §6 hybrid strategy).
- ``snapshot`` — one candidate covering files added after a snapshot floor
  (for fresh-data-priority setups).

Filters refine the exhaustively generated pool (FR1). They run at two
points: *pre-orient* filters see :class:`CandidateStats` (e.g. table too
small / too young / recently written), *post-orient* filters see trait
values (e.g. cost above the per-task cap). Every filter is a pure predicate
``(stats) -> bool`` so decisions stay deterministic (NFR2).
"""
from __future__ import annotations

from typing import Callable, Iterable

from repro.core.model import Candidate, CandidateStats
from repro.lst.catalog import Catalog

StatsFilter = Callable[[CandidateStats], bool]


def generate_candidates(
    catalog: Catalog,
    scope: str = "table",
    tables: Iterable[tuple[str, str]] | None = None,
) -> list[Candidate]:
    """Enumerate candidates at the requested scope over the catalog.

    Deterministic: tables come back sorted from the catalog, partitions
    sorted from the snapshot.
    """
    pairs = list(tables) if tables is not None else catalog.list_tables()
    out: list[Candidate] = []
    for db, name in pairs:
        table = catalog.load_table(db, name)
        is_partitioned = table.spec.is_partitioned
        effective = scope
        if scope == "hybrid":
            effective = "partition" if is_partitioned else "table"
        if effective == "partition" and is_partitioned:
            snap = table.current_snapshot()
            if snap is None:
                continue
            for partition in sorted({f.partition for f in snap.files}):
                out.append(
                    Candidate(db=db, table=name, scope="partition", partition=partition)
                )
        elif effective == "snapshot":
            snap = table.current_snapshot()
            if snap is None:
                continue
            out.append(
                Candidate(
                    db=db,
                    table=name,
                    scope="snapshot",
                    snapshot_floor=max(0, snap.version - 1),
                )
            )
        else:
            out.append(Candidate(db=db, table=name, scope="table"))
    return out


# ----------------------------------------------------------------- filters
def min_file_count(n: int) -> StatsFilter:
    """Skip candidates with fewer than ``n`` files — too small to matter."""

    def f(stats: CandidateStats) -> bool:
        return stats.file_count >= n

    return f


def min_small_file_count(n: int) -> StatsFilter:
    """Skip candidates whose estimated reduction is below ``n`` files."""

    def f(stats: CandidateStats) -> bool:
        return stats.small_file_count >= n

    return f


def min_table_age(now: float, min_age: float) -> StatsFilter:
    """Skip recently created tables (the OpenHouse preset-window rule —
    don't spend budget on tables that may be transient)."""

    def f(stats: CandidateStats) -> bool:
        return (now - stats.created_at) >= min_age

    return f


def no_recent_write(now: float, window: float) -> StatsFilter:
    """Skip candidates written within ``window`` — likely to conflict."""

    def f(stats: CandidateStats) -> bool:
        return (now - stats.last_write_at) >= window

    return f


def apply_filters(
    stats: Iterable[CandidateStats], filters: Iterable[StatsFilter]
) -> list[CandidateStats]:
    """Keep stats passing *all* filters, preserving input order."""
    filters = list(filters)
    return [s for s in stats if all(f(s) for f in filters)]

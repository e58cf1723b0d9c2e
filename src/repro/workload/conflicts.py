"""Conflict ledger: the Table 1 bookkeeping.

Two sides, as in the paper (§6.2):

- **client-side** — a workload write hit a versioning conflict (its base
  snapshot went stale while it ran) and was retried/aborted;
- **cluster-side** — a compaction task's commit conflicted with concurrent
  activity on the table.
"""
from __future__ import annotations

from dataclasses import dataclass, field

CLIENT = "client"
CLUSTER = "cluster"


@dataclass(frozen=True)
class ConflictEvent:
    hour: int
    side: str  # client | cluster
    table_key: str
    op_kind: str
    fatal: bool = False  # True when retries were exhausted / op abandoned


@dataclass
class ConflictLog:
    events: list[ConflictEvent] = field(default_factory=list)

    def record(
        self, *, hour: int, side: str, table_key: str, op_kind: str, fatal: bool = False
    ) -> None:
        if side not in (CLIENT, CLUSTER):
            raise ValueError(f"side must be client|cluster, got {side!r}")
        self.events.append(
            ConflictEvent(
                hour=hour, side=side, table_key=table_key, op_kind=op_kind, fatal=fatal
            )
        )

    def count(self, *, side: str | None = None, hour: int | None = None) -> int:
        return sum(
            1
            for e in self.events
            if (side is None or e.side == side)
            and (hour is None or e.hour == hour)
        )

    def by_hour(self, side: str) -> dict[int, int]:
        out: dict[int, int] = {}
        for e in self.events:
            if e.side == side:
                out[e.hour] = out.get(e.hour, 0) + 1
        return out

    def fatal_count(self) -> int:
        return sum(1 for e in self.events if e.fatal)

    def table_rows(self, hours: list[int]) -> list[dict]:
        """Rows shaped like Table 1 for one strategy's run."""
        client, cluster = self.by_hour(CLIENT), self.by_hour(CLUSTER)
        return [
            {
                "hour": h,
                "client_conflicts": client.get(h, 0),
                "cluster_conflicts": cluster.get(h, 0),
            }
            for h in hours
        ]

"""CAB-lite: deterministic per-database query streams (§6, DESIGN.md §4).

The CAB-gen tool models cloud-warehouse usage as stream archetypes; we
reimplement the four archetypes the paper names, seeded and reproducible:

- ``dashboard`` — constant read demand with sinusoidal variation;
- ``interactive`` — short read bursts at pseudo-random hours;
- ``maintenance`` — a large write burst at the spike hour (the §6.1
  "noticeable spike in data write operations around hour four");
- ``hourly`` — a predictable read+write job every hour.

Each database gets one archetype round-robin, and *two* concurrent streams
(like CAB's multi-stream databases) so that same-table write-write races —
the source of the paper's no-compaction client conflicts in Table 1 —
occur organically. Writes are updates on both LINEITEM (partitioned) and
ORDERS (non-partitioned), matching the paper's footnote-1 extension of CAB.
"""
from __future__ import annotations

import random
from dataclasses import dataclass, field

ARCHETYPES = ("dashboard", "interactive", "maintenance", "hourly")

READ_KINDS = ("q1_pricing", "q3_join", "q_orders")
WRITE_KINDS = ("insert_lineitem", "insert_orders", "delete_orders")


@dataclass(frozen=True)
class Op:
    """One workload operation: a read query or a write batch."""

    kind: str
    db: str
    hour: int
    stream: int
    seq: int
    params: tuple[tuple[str, float], ...] = field(default=())

    @property
    def is_write(self) -> bool:
        return self.kind in WRITE_KINDS

    @property
    def table(self) -> str:
        """Target table for writes (reads may touch several)."""
        return "lineitem" if self.kind == "insert_lineitem" else "orders"


@dataclass(frozen=True)
class WorkloadConfig:
    n_databases: int = 4
    n_hours: int = 5
    seed: int = 0
    spike_hour: int = 4
    reads_per_stream: int = 2  # base read demand per stream-hour
    writes_per_stream: int = 1  # base write demand per stream-hour
    streams_per_db: int = 2


def _archetype(db_index: int) -> str:
    return ARCHETYPES[db_index % len(ARCHETYPES)]


def _stream_ops(
    cfg: WorkloadConfig, db: str, archetype: str, stream: int, hour: int
) -> list[tuple[str, dict]]:
    """(kind, params) list for one stream-hour; deterministic in the seed."""
    rng = random.Random(f"{cfg.seed}|{db}|{stream}|{hour}")
    reads, writes = 0, 0
    if archetype == "dashboard":
        # Sinusoid over the experiment duration, never below 1 read. The
        # refresh writes peak early (hour 2), like the paper's Table 1
        # write-count profile (12 writes in hour 2).
        import math

        phase = 2 * math.pi * (hour - 1) / max(1, cfg.n_hours)
        reads = max(1, round(cfg.reads_per_stream * (1.0 + 0.5 * math.sin(phase))))
        if hour == min(2, cfg.n_hours):
            writes = cfg.writes_per_stream + 1
        else:
            writes = cfg.writes_per_stream if rng.random() < 0.5 else 0
    elif archetype == "interactive":
        # Short bursts: ~40% of hours see a burst of reads, few writes.
        if rng.random() < 0.4:
            reads = cfg.reads_per_stream * 2
        writes = cfg.writes_per_stream if rng.random() < 0.3 else 0
    elif archetype == "maintenance":
        # Quiet reads; a large write burst at the spike hour.
        reads = max(1, cfg.reads_per_stream // 2)
        writes = (
            cfg.writes_per_stream * 3 if hour == cfg.spike_hour else cfg.writes_per_stream
        )
    else:  # hourly
        reads = cfg.reads_per_stream
        writes = cfg.writes_per_stream
    ops: list[tuple[str, dict]] = []
    for _ in range(reads):
        ops.append((READ_KINDS[rng.randrange(len(READ_KINDS))], {}))
    for _ in range(writes):
        kind = WRITE_KINDS[rng.randrange(len(WRITE_KINDS))]
        ops.append((kind, {"rows": 1.0 + rng.randrange(3)}))
    rng.shuffle(ops)
    return ops


def generate_workload(cfg: WorkloadConfig) -> dict[int, list[Op]]:
    """Materialize the full workload: hour → interleaved ops of all streams.

    Ops within an hour are round-robined across (db, stream) pairs so that
    concurrent streams interleave — the discrete-event simulator assigns
    commit slots in this order.
    """
    out: dict[int, list[Op]] = {}
    for hour in range(1, cfg.n_hours + 1):
        per_stream: list[list[tuple[str, str, int, dict]]] = []
        for d in range(cfg.n_databases):
            db = f"db{d}"
            archetype = _archetype(d)
            for s in range(cfg.streams_per_db):
                per_stream.append(
                    [
                        (kind, db, s, params)
                        for kind, params in _stream_ops(cfg, db, archetype, s, hour)
                    ]
                )
        ops: list[Op] = []
        seq = 0
        while any(per_stream):
            for lane in per_stream:
                if lane:
                    kind, db, s, params = lane.pop(0)
                    ops.append(
                        Op(
                            kind=kind,
                            db=db,
                            hour=hour,
                            stream=s,
                            seq=seq,
                            params=tuple(sorted(params.items())),
                        )
                    )
                    seq += 1
        out[hour] = ops
    return out


def write_counts_by_hour(workload: dict[int, list[Op]]) -> dict[int, int]:
    """# write queries per hour — the Table 1 left column."""
    return {h: sum(1 for op in ops if op.is_write) for h, ops in workload.items()}

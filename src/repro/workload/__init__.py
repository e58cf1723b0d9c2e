"""CAB-lite workload substrate: stream generation, queries, simulation.

Substitutes the paper's CAB-gen + LST-Bench toolchain (DESIGN.md §4):

- :mod:`repro.workload.cab` — deterministic query streams per database with
  the four CAB archetypes (sinusoidal dashboards, short interactive bursts,
  large maintenance bursts, periodic hourly jobs) and the §6.1 write spike
  at hour 4.
- :mod:`repro.workload.queries` — TPC-H-lite read/write operations executed
  against Iceberg-lite tables through Spark.
- :mod:`repro.workload.conflicts` — client-/cluster-side conflict ledger
  (the Table 1 bookkeeping).
- :mod:`repro.workload.metrics` — file-count series, GBHr_App, latency
  percentiles (the Figure 6/7/8 measurements).
- :mod:`repro.workload.simulator` — the hour-by-hour experiment driver: a
  deterministic discrete-event interleaving of real Spark writes, reads,
  and compaction commits over the optimistic-concurrency protocol.
"""
from repro.workload.cab import Op, WorkloadConfig, generate_workload
from repro.workload.conflicts import ConflictLog
from repro.workload.simulator import SimConfig, SimReport, run_simulation

__all__ = [
    "ConflictLog",
    "Op",
    "SimConfig",
    "SimReport",
    "WorkloadConfig",
    "generate_workload",
    "run_simulation",
]

"""AutoComp core: the paper's contribution, as an OODA pipeline.

- :mod:`repro.core.model` — Candidate / CandidateStats / RankedCandidate.
- :mod:`repro.core.candidates` — candidate generation (table / partition /
  hybrid scope) and the filter chain (§4.1).
- :mod:`repro.core.observe` — statistics collection as a single Spark
  aggregation over the fleet's file metadata (§4.1, observe phase).
- :mod:`repro.core.traits` — benefit traits (file-count reduction ΔF_c,
  file entropy) and cost traits (compute cost GBHr_c) (§4.2).
- :mod:`repro.core.ranking` — unconstrained threshold triggers and the
  resource-constrained MOOP weighted sum with min-max normalization, plus
  top-k / budget selection and the §7 quota-aware weight policy (§4.3).
- :mod:`repro.core.scheduler` — the act phase: parallel across tables,
  sequential within a table's partitions (§4.4).
- :mod:`repro.core.autocomp` — the end-to-end periodic cycle and the
  optimize-after-write hook (§5).
- :mod:`repro.core.tuning` — deterministic threshold auto-tuner standing in
  for MLOS/FLAML (§6.3).
"""
from repro.core.autocomp import AutoComp, AutoCompConfig, CycleReport
from repro.core.model import Candidate, CandidateStats, RankedCandidate

__all__ = [
    "AutoComp",
    "AutoCompConfig",
    "Candidate",
    "CandidateStats",
    "CycleReport",
    "RankedCandidate",
]

"""Figure 9: auto-tuning compaction triggers (§6.3).

Paper findings reproduced in shape:
(a/c) TPC-DS WP1 benefits from compaction when tables get fragmented —
      up to 2× query-time reduction at good thresholds; small-file-count
      and entropy triggers perform comparably;
(b)   TPC-H: the no-compaction default is best — compaction rewrites whole
      non-partitioned tables and the modification phase dominates;
(d)   TPC-DS WP3: decoupled read/write clusters → consistent benefit.

The MLOS/FLAML loop is replaced by the deterministic tuner in
``repro.core.tuning`` (DESIGN.md §4); each iteration evaluates a threshold
by running the scaled workload end-to-end.
"""
import pytest

from repro.benchutil import print_table
from repro.core.tuning import Param, tune
from repro.workload.hookbench import HookWorkloadConfig, run_hook_workload

KB = 1024
N_ITERATIONS = 4


def _cfg(kind):
    # TPC-H's phase mix is modification-dominated (1 read/round); the WP
    # workloads are read-heavy (6 reads/round) with badly mis-tuned writers
    # (25 files/commit), so fragmentation costs dominate there — the §6.3
    # contrast between Fig 9a/9d and 9b.
    reads = {"tpch": 1, "wp1": 6, "wp3": 6}[kind]
    files = {"tpch": 10, "wp1": 25, "wp3": 25}[kind]
    return HookWorkloadConfig(
        kind=kind,
        rounds=4,
        rows_per_round=500,
        files_per_commit=files,
        reads_per_round=reads,
        target_file_size=256 * KB,
        seed=3,
    )


@pytest.fixture(scope="module")
def tuning_runs(spark, tmp_path_factory):
    root = tmp_path_factory.mktemp("fig9")
    out = {}
    counter = [0]

    def objective(kind, trait):
        def f(params):
            counter[0] += 1
            return run_hook_workload(
                spark,
                str(root / f"run{counter[0]}"),
                _cfg(kind),
                trait=trait,
                threshold=params["threshold"],
            ).duration_s

        return f

    # Warm up the JVM/scan path once so the first measured run does not
    # absorb session warm-up costs (wall-clock fairness across runs).
    run_hook_workload(spark, str(root / "warmup"), _cfg("wp1"))
    # Defaults (no auto-compaction) for each workload.
    for kind in ("tpch", "wp1", "wp3"):
        counter[0] += 1
        out[(kind, "default")] = run_hook_workload(
            spark, str(root / f"run{counter[0]}"), _cfg(kind)
        ).duration_s
    # Tuned small-file-count thresholds.
    space = [Param("threshold", 2.0, 60.0)]
    for kind in ("tpch", "wp1", "wp3"):
        out[(kind, "smallfile")] = tune(
            objective(kind, "file_count_reduction"),
            space,
            n_iterations=N_ITERATIONS,
            seed=1,
        )
    # Entropy trigger for WP1 (the Fig 9c comparison).
    out[("wp1", "entropy")] = tune(
        objective("wp1", "file_entropy"),
        [Param("threshold", 0.1, 3.0)],
        n_iterations=N_ITERATIONS,
        seed=2,
    )
    return out


def test_fig9_autotuning(benchmark, tuning_runs):
    runs = benchmark.pedantic(lambda: tuning_runs, rounds=1, iterations=1)
    rows = []
    for kind in ("tpch", "wp1", "wp3"):
        default = runs[(kind, "default")]
        tuned = runs[(kind, "smallfile")]
        rows.append(
            [
                kind,
                f"{default:.1f}",
                f"{tuned.best.value:.1f}",
                f"{tuned.best.params['threshold']:.1f}",
                " ".join(f"{t.value:.1f}" for t in tuned.history),
            ]
        )
    ent = runs[("wp1", "entropy")]
    rows.append(
        [
            "wp1(entropy)",
            f"{runs[('wp1', 'default')]:.1f}",
            f"{ent.best.value:.1f}",
            f"{ent.best.params['threshold']:.2f}",
            " ".join(f"{t.value:.1f}" for t in ent.history),
        ]
    )
    print_table(
        "Figure 9 — end-to-end duration (s) by tuning iteration",
        ["workload", "default_s", "best_tuned_s", "best_threshold", "iterations"],
        rows,
    )
    tpch_default = runs[("tpch", "default")]
    tpch_best = runs[("tpch", "smallfile")].best.value
    wp1_default = runs[("wp1", "default")]
    wp1_best = runs[("wp1", "smallfile")].best.value
    wp3_default = runs[("wp3", "default")]
    wp3 = runs[("wp3", "smallfile")]
    # (b) TPC-H: the default (never compact) stays competitive — tuning
    # cannot beat it by much, because compaction rewrites the whole
    # non-partitioned table (noise margin for wall-clock jitter).
    assert tpch_default <= tpch_best * 1.25
    # (a) WP1: a tuned trigger beats the never-compaction default.
    assert wp1_best < wp1_default
    # (d) WP3: compaction off the critical path — every tuned iteration is
    # at least as good as the default (within noise).
    assert wp3.best.value < wp3_default
    assert sum(t.value <= wp3_default * 1.20 for t in wp3.history) >= (
        len(wp3.history) - 1
    )
    # (c) Small-file-count and entropy triggers land in the same ballpark.
    ent_best = runs[("wp1", "entropy")].best.value
    assert abs(ent_best - wp1_best) <= 0.5 * max(ent_best, wp1_best)

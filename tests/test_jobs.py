"""Smoke tests for the spark-submit entrypoints (tiny configurations).

The jobs attach to the session fixture's SparkSession via ``getOrCreate``,
so these exercise the real argument parsing + harness paths end to end.
"""
import os
import sys

import pytest

JOBS_DIR = os.path.join(os.path.dirname(__file__), "..", "jobs")
sys.path.insert(0, os.path.abspath(JOBS_DIR))


def test_run_experiment_main(spark, tmp_path, capsys):
    import run_experiment

    rc = run_experiment.main(
        [
            "--strategy",
            "table",
            "--k",
            "4",
            "--databases",
            "2",
            "--hours",
            "1",
            "--workdir",
            str(tmp_path),
        ]
    )
    assert rc == 0
    out = capsys.readouterr().out
    assert "CAB experiment" in out
    assert "final:" in out


def test_run_tuning_main(spark, tmp_path, capsys):
    import run_tuning

    rc = run_tuning.main(
        [
            "--workload",
            "wp1",
            "--iterations",
            "1",
            "--workdir",
            str(tmp_path),
        ]
    )
    assert rc == 0
    out = capsys.readouterr().out
    assert "tuning trace" in out
    assert "best tuned" in out

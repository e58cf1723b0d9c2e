"""Micro-benchmark of the compaction mechanism itself.

Times the Spark batch job at the heart of the reproduction — read a
candidate's small Parquet files per partition, bin-pack, rewrite
consolidated files — at SF≈0.1 input scale, separately from the
end-to-end experiment harnesses.
"""
import pytest

from repro import synth_data
from repro.lst import LstTable, PartitionSpec
from repro.lst.maintenance import compact, plan_groups

KB = 1024


def _fragmented_table(spark, path, n_commits, files_per_commit):
    t = LstTable.create(
        str(path), name="bench.li", spec=PartitionSpec.monthly("l_shipdate", "m")
    )
    for i in range(n_commits):
        t.append(
            synth_data.lineitem_batch(
                spark, n_rows=6000, seed=i, start_day=i * 20, n_days=60
            ),
            n_files=files_per_commit,
        )
    return t


@pytest.mark.parametrize("files_per_commit", [4, 12])
def test_bench_compact_fragmented_lineitem(
    benchmark, spark, tmp_path, files_per_commit
):
    """One full compaction of a ~60k-row fragmented partitioned table."""
    paths = iter(range(10**6))

    def setup():
        t = _fragmented_table(
            spark, tmp_path / f"t{next(paths)}", n_commits=5, files_per_commit=files_per_commit
        )
        return (t,), {}

    def run(t):
        return compact(spark, t, target_file_size=1024 * KB)

    res = benchmark.pedantic(run, setup=setup, rounds=3, iterations=1)
    assert res.files_removed > res.files_added
    assert not res.skipped


def test_bench_plan_groups_scales(benchmark, spark, tmp_path):
    """Planning is pure metadata work — it must stay sub-millisecond even
    for thousands of files (fleet-scale candidate evaluation)."""
    from repro.lst.snapshot import DataFile

    files = [
        DataFile(
            path=f"m={i % 24}/f{i}.parquet",
            file_size_bytes=8 * KB + (i % 7) * KB,
            record_count=100,
            partition=(("m", str(i % 24)),),
        )
        for i in range(5000)
    ]
    groups = benchmark(plan_groups, files, target_file_size=256 * KB)
    assert len(groups) == 24

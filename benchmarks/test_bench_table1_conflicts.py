"""Table 1: client- and cluster-side write-write conflicts per execution hour.

Paper (Table 1, §6.2), 20-database CAB run:

    Hour  #Writes  NoComp  Table-10  Hybrid-500 | Table-10  Hybrid-500
                   (client-side conflicts)      | (cluster-side)
    2     12       1       11        4          | 23        0
    3     5        0       2         0          | 17        0
    4     15       1       5         6          | 4         0
    5     8        4       0         2          | 0         0

Shape reproduced here (4-database scale): conflicts exist even without
compaction; table-scope compaction adds both client- and cluster-side
conflicts that decline as tables become compacted; the hybrid strategy has
ZERO cluster-side conflicts because a table's partition compactions run
sequentially (§4.4).
"""
from repro.benchutil import print_table


def _rows(cab_runs):
    hours = list(range(2, 6))
    none = cab_runs["none"].conflicts
    table = cab_runs["table-10"].conflicts
    hybrid = cab_runs["hybrid-50"].conflicts
    writes = cab_runs["none"].write_counts
    rows = []
    for h in hours:
        rows.append(
            [
                h,
                writes[h],
                none.count(side="client", hour=h),
                table.count(side="client", hour=h),
                hybrid.count(side="client", hour=h),
                table.count(side="cluster", hour=h),
                hybrid.count(side="cluster", hour=h),
            ]
        )
    return rows


def test_table1_conflicts(benchmark, cab_runs):
    rows = benchmark.pedantic(_rows, args=(cab_runs,), rounds=1, iterations=1)
    print_table(
        "Table 1 — conflicts per execution hour (measured)",
        [
            "hour",
            "#writes",
            "client:NoComp",
            "client:Table-10",
            "client:Hybrid-50",
            "cluster:Table-10",
            "cluster:Hybrid-50",
        ],
        rows,
    )
    # -- Shape assertions against the paper's Table 1 --------------------
    # (1) Hybrid never conflicts on the cluster side (sequential partitions).
    assert all(r[6] == 0 for r in rows)
    assert cab_runs["hybrid-50"].conflicts.count(side="cluster") == 0
    assert cab_runs["hybrid-6"].conflicts.count(side="cluster") == 0
    # (2) Table-scope compaction does conflict on the cluster side overall.
    table_cluster = sum(r[5] for r in rows)
    assert table_cluster > 0
    # (3) Cluster-side conflicts concentrate in the busy early hours and do
    # not keep growing once the fleet is largely compacted: the early hours
    # (2–3) see at least as many as the final hour.
    active = [r[5] for r in rows]
    assert max(active[:2]) >= active[-1]
    # (4) Compaction adds client-side conflicts relative to no compaction.
    assert sum(r[3] for r in rows) >= sum(r[2] for r in rows)
    # (5) Lost client operations stay rare: a write whose CoW inputs were
    # compacted away concurrently can abort (the paper counts client errors
    # too), but the overwhelming majority of writes land.
    for name in ("none", "table-10", "hybrid-50"):
        run = cab_runs[name]
        total_writes = sum(run.write_counts.values())
        total_errors = sum(h.errors for h in run.hours)
        assert total_errors <= max(2, total_writes * 0.15)

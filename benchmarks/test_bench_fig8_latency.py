"""Figure 8: impact of compaction on query latency.

Paper (§6.2): read-only query performance is similar in hour 1 across
strategies; from hour 2 onward compaction consistently improves latency,
fastest under the aggressive table-scope strategy; variability shrinks; the
no-compaction baseline additionally pays ~25 min of end-to-end overhead.

Local-scale note: wall-clock latencies here are tens of milliseconds, so we
assert on aggregate means over the post-compaction window (hours 3–5)
rather than per-hour medians, and leave a noise margin.
"""
import statistics

from repro.benchutil import print_table


def _candles(cab_runs):
    out = {}
    for name, run in cab_runs.items():
        out[name] = {
            h.hour: h.read_latency for h in run.hours if h.read_latency is not None
        }
    return out


def _late_mean(candles):
    vals = [c.median for h, c in candles.items() if h >= 3]
    return statistics.mean(vals)


def test_fig8_query_latency(benchmark, cab_runs):
    candles = benchmark.pedantic(_candles, args=(cab_runs,), rounds=1, iterations=1)
    rows = []
    for name, by_hour in candles.items():
        for h in sorted(by_hour):
            c = by_hour[h]
            rows.append(
                [
                    name,
                    h,
                    f"{c.min:.3f}",
                    f"{c.p25:.3f}",
                    f"{c.median:.3f}",
                    f"{c.p75:.3f}",
                    f"{c.max:.3f}",
                    c.n,
                ]
            )
    print_table(
        "Figure 8 — read-query latency candlesticks per hour (seconds)",
        ["strategy", "hour", "min", "p25", "median", "p75", "max", "n"],
        rows,
    )
    none_late = _late_mean(candles["none"])
    table_late = _late_mean(candles["table-10"])
    hyb_late = _late_mean(candles["hybrid-50"])
    print(
        f"\nmean median read latency, hours 3-5: none={none_late:.3f}s "
        f"table-10={table_late:.3f}s hybrid-50={hyb_late:.3f}s"
    )
    # (1) After compaction has had effect (hours >= 3), compacted fleets
    # serve reads no slower than the fragmenting baseline (noise margin).
    assert table_late <= none_late * 1.10
    assert hyb_late <= none_late * 1.15
    # (2) End-to-end client time: the baseline pays the most total query
    # time (the paper's +25 min queuing/overhead, scaled down).
    none_total = cab_runs["none"].latency.total("read")
    table_total = cab_runs["table-10"].latency.total("read")
    assert table_total <= none_total * 1.10

"""Property-based tests (hypothesis) for the pure algorithmic kernels."""
import math

from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.model import Candidate, CandidateStats
from repro.core.ranking import min_max_normalize, moop_rank
from repro.core.traits import CostModelConfig, file_entropy
from repro.lst.maintenance import plan_groups
from repro.lst.snapshot import DataFile
from repro.workload.metrics import Candlestick, percentile

sizes = st.lists(st.integers(min_value=1, max_value=10**9), min_size=1, max_size=60)


def files_of(size_list, n_partitions=1):
    return [
        DataFile(
            path=f"p{i % n_partitions}/f{i}.parquet",
            file_size_bytes=s,
            record_count=1,
            partition=(("p", str(i % n_partitions)),),
        )
        for i, s in enumerate(size_list)
    ]


class TestPlanGroupsProperties:
    @given(sizes, st.integers(min_value=1, max_value=10**8))
    @settings(max_examples=60, deadline=None)
    def test_always_reduces_or_skips(self, size_list, target):
        groups = plan_groups(files_of(size_list), target_file_size=target)
        for g in groups:
            assert g.n_out < len(g.files)  # strict reduction per group
            assert g.n_out >= 1

    @given(sizes, st.integers(min_value=1, max_value=10**8))
    @settings(max_examples=60, deadline=None)
    def test_only_small_files_selected(self, size_list, target):
        groups = plan_groups(files_of(size_list), target_file_size=target)
        for g in groups:
            assert all(f.file_size_bytes < target for f in g.files)

    @given(sizes, st.integers(min_value=2, max_value=5))
    @settings(max_examples=40, deadline=None)
    def test_groups_never_cross_partitions(self, size_list, n_parts):
        groups = plan_groups(
            files_of(size_list, n_parts), target_file_size=10**6
        )
        for g in groups:
            assert len({f.partition for f in g.files}) == 1

    @given(sizes)
    @settings(max_examples=40, deadline=None)
    def test_deterministic(self, size_list):
        a = plan_groups(files_of(size_list), target_file_size=12345)
        b = plan_groups(list(reversed(files_of(size_list))), target_file_size=12345)
        assert a == b


class TestNormalizeProperties:
    @given(st.lists(st.floats(allow_nan=False, allow_infinity=False,
                              min_value=-1e12, max_value=1e12), max_size=50))
    @settings(max_examples=60)
    def test_range_and_length(self, values):
        out = min_max_normalize(values)
        assert len(out) == len(values)
        assert all(0.0 <= v <= 1.0 for v in out)

    @given(st.lists(st.floats(min_value=-1e6, max_value=1e6,
                              allow_nan=False), min_size=2, max_size=30))
    @settings(max_examples=60)
    def test_order_preserving(self, values):
        out = min_max_normalize(values)
        for i in range(len(values)):
            for j in range(len(values)):
                if values[i] < values[j]:
                    assert out[i] <= out[j]


class TestEntropyProperties:
    @given(sizes)
    @settings(max_examples=60)
    def test_non_negative(self, size_list):
        s = CandidateStats(candidate=Candidate(db="d", table="t"))
        for sz in size_list:
            s.file_count += 1
            s.total_bytes += sz
            s.sum_bytes_log_bytes += sz * math.log(sz)
        assert file_entropy(s, target_file_size=123_456) >= 0.0


class TestMoopProperties:
    @given(
        st.lists(
            st.tuples(
                st.floats(min_value=0, max_value=1e6, allow_nan=False),
                st.floats(min_value=0, max_value=1e3, allow_nan=False),
            ),
            min_size=1,
            max_size=25,
        )
    )
    @settings(max_examples=60)
    def test_scores_bounded_and_sorted(self, pairs):
        scored = [
            (
                CandidateStats(candidate=Candidate(db="d", table=f"t{i}")),
                {"file_count_reduction": b, "compute_cost_gbhr": c},
            )
            for i, (b, c) in enumerate(pairs)
        ]
        ranked = moop_rank(scored)
        assert len(ranked) == len(pairs)
        assert all(-0.3 - 1e-9 <= r.score <= 0.7 + 1e-9 for r in ranked)
        assert all(a.score >= b.score for a, b in zip(ranked, ranked[1:]))


class TestPercentileProperties:
    # Latency-like values: subnormal floats excluded (interpolation of
    # 5e-324-scale denormals underflows and breaks ordering trivially).
    @given(st.lists(st.floats(min_value=-1e9, max_value=1e9, allow_nan=False,
                              allow_subnormal=False), min_size=1, max_size=40),
           st.floats(min_value=0, max_value=1))
    @settings(max_examples=60)
    def test_within_bounds(self, values, q):
        vs = sorted(values)
        p = percentile(vs, q)
        assert vs[0] <= p <= vs[-1]

    @given(st.lists(st.floats(min_value=1e-9, max_value=1e6,
                              allow_nan=False), min_size=1, max_size=40))
    @settings(max_examples=40)
    def test_candlestick_ordered(self, values):
        c = Candlestick.of(values)
        assert c.min <= c.p25 <= c.median <= c.p75 <= c.max

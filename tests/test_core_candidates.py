"""Tests for candidate generation + filters (Spark only to populate tables)."""
import pytest

from repro import synth_data
from repro.core.candidates import (
    apply_filters,
    generate_candidates,
    min_file_count,
    min_small_file_count,
    min_table_age,
    no_recent_write,
)
from repro.core.model import Candidate, CandidateStats
from repro.lst import Catalog, PartitionSpec


@pytest.fixture(scope="module")
def fleet(spark, tmp_path_factory):
    """Catalog with one partitioned and one unpartitioned populated table,
    plus one empty table."""
    cat = Catalog(str(tmp_path_factory.mktemp("cands") / "wh"))
    cat.create_database("db1")
    cat.create_table(
        "db1", "li", spec=PartitionSpec.monthly("l_shipdate", "m"), created_at=0.0
    )
    cat.create_table("db1", "orders", created_at=0.0)
    cat.create_table("db1", "empty", created_at=0.0)
    li = cat.load_table("db1", "li")
    li.append(
        synth_data.lineitem_batch(spark, n_rows=300, seed=0, n_days=80),
        n_files=2,
        now=10.0,
    )
    o = cat.load_table("db1", "orders")
    o.append(synth_data.orders_batch(spark, n_rows=100, seed=0), n_files=3, now=20.0)
    return cat


class TestGeneration:
    def test_table_scope(self, fleet):
        cands = generate_candidates(fleet, scope="table")
        assert [c.id for c in cands] == ["db1.empty", "db1.li", "db1.orders"]
        assert all(c.scope == "table" for c in cands)

    def test_partition_scope_only_partitioned(self, fleet):
        cands = generate_candidates(fleet, scope="partition")
        # orders is unpartitioned → table-scope candidate; empty → skipped
        # only for partition enumeration... partition scope on unpartitioned
        # falls through to table scope.
        li_parts = [c for c in cands if c.table == "li"]
        assert len(li_parts) >= 2
        assert all(c.scope == "partition" for c in li_parts)

    def test_hybrid_scope(self, fleet):
        cands = generate_candidates(fleet, scope="hybrid")
        by_table = {}
        for c in cands:
            by_table.setdefault(c.table, []).append(c)
        assert all(c.scope == "partition" for c in by_table["li"])
        assert [c.scope for c in by_table["orders"]] == ["table"]

    def test_snapshot_scope(self, fleet):
        cands = generate_candidates(fleet, scope="snapshot")
        ids = {c.id for c in cands}
        assert "db1.orders@>0" in ids or any("orders" in i for i in ids)
        # empty table has no snapshot → excluded
        assert not any("empty" in i for i in ids)

    def test_explicit_table_list(self, fleet):
        cands = generate_candidates(fleet, scope="table", tables=[("db1", "li")])
        assert [c.id for c in cands] == ["db1.li"]

    def test_deterministic(self, fleet):
        a = generate_candidates(fleet, scope="hybrid")
        b = generate_candidates(fleet, scope="hybrid")
        assert a == b


def make_stats(**kw):
    s = CandidateStats(candidate=Candidate(db="d", table="t"))
    for k, v in kw.items():
        setattr(s, k, v)
    return s


class TestFilters:
    def test_min_file_count(self):
        f = min_file_count(5)
        assert f(make_stats(file_count=5))
        assert not f(make_stats(file_count=4))

    def test_min_small_file_count(self):
        f = min_small_file_count(2)
        assert f(make_stats(small_file_count=2))
        assert not f(make_stats(small_file_count=1))

    def test_min_table_age(self):
        f = min_table_age(now=100.0, min_age=50.0)
        assert f(make_stats(created_at=50.0))
        assert not f(make_stats(created_at=80.0))

    def test_no_recent_write(self):
        f = no_recent_write(now=100.0, window=10.0)
        assert f(make_stats(last_write_at=90.0))
        assert not f(make_stats(last_write_at=95.0))

    def test_apply_filters_conjunction(self):
        stats = [
            make_stats(file_count=10, created_at=0.0),
            make_stats(file_count=10, created_at=99.0),
            make_stats(file_count=1, created_at=0.0),
        ]
        kept = apply_filters(
            stats, [min_file_count(5), min_table_age(now=100.0, min_age=50.0)]
        )
        assert kept == [stats[0]]

    def test_apply_no_filters_keeps_all(self):
        stats = [make_stats(), make_stats()]
        assert apply_filters(stats, []) == stats

"""Unit tests for the OODA data model (pure Python)."""
import pytest

from repro.core.model import Candidate, CandidateStats, RankedCandidate


class TestCandidate:
    def test_table_scope_id(self):
        c = Candidate(db="db1", table="li")
        assert c.id == "db1.li"
        assert c.table_key == "db1.li"
        assert c.partition_filter is None

    def test_partition_scope_id(self):
        c = Candidate(
            db="db1", table="li", scope="partition", partition=(("m", "1992-01"),)
        )
        assert c.id == "db1.li/m=1992-01"
        assert c.partition_filter == {"m": "1992-01"}

    def test_snapshot_scope_id(self):
        c = Candidate(db="d", table="t", scope="snapshot", snapshot_floor=4)
        assert c.id == "d.t@>4"

    def test_unknown_scope_rejected(self):
        with pytest.raises(ValueError, match="unknown scope"):
            Candidate(db="d", table="t", scope="file")

    def test_partition_scope_requires_partition(self):
        with pytest.raises(ValueError, match="requires a partition"):
            Candidate(db="d", table="t", scope="partition")

    def test_accepts_list_partition(self):
        c = Candidate(db="d", table="t", scope="partition", partition=[("m", "x")])
        assert c.partition == (("m", "x"),)

    def test_frozen_and_hashable(self):
        a = Candidate(db="d", table="t")
        b = Candidate(db="d", table="t")
        assert a == b and hash(a) == hash(b)

    def test_multi_key_partition_id(self):
        c = Candidate(
            db="d", table="t", scope="partition", partition=(("a", "1"), ("b", "2"))
        )
        assert c.id == "d.t/a=1/b=2"


class TestStatsAndRanked:
    def test_stats_defaults(self):
        s = CandidateStats(candidate=Candidate(db="d", table="t"))
        assert s.file_count == 0
        assert s.small_bytes == 0
        assert s.custom == {}

    def test_ranked_candidate_passthrough(self):
        c = Candidate(db="d", table="t")
        r = RankedCandidate(stats=CandidateStats(candidate=c), score=0.5)
        assert r.candidate is c

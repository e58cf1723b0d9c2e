"""Unit tests for the optimistic commit protocol (pure Python; the commit
layer only touches metadata JSON, so no Spark or Parquet files are needed)."""
import pytest

from repro.lst.commit import PendingCommit, commit_with_retries, try_commit
from repro.lst.errors import CommitConflictError, ValidationError
from repro.lst.snapshot import DataFile, current_version, read_snapshot


def df_(path, size=100):
    return DataFile(path=path, file_size_bytes=size, record_count=1)


def pending(tmp_path, op="append", base=-1, added=(), removed=()):
    return PendingCommit(
        table_name="t",
        metadata_dir=str(tmp_path),
        base_version=base,
        operation=op,
        added=list(added),
        removed_paths=set(removed),
    )


class TestTryCommit:
    def test_first_commit_creates_v0(self, tmp_path):
        snap = try_commit(pending(tmp_path, added=[df_("a")]), timestamp=1.0)
        assert snap.version == 0
        assert current_version(str(tmp_path)) == 0
        assert [f.path for f in snap.files] == ["a"]

    def test_sequential_commits_accumulate(self, tmp_path):
        try_commit(pending(tmp_path, added=[df_("a")]), 1.0)
        snap = try_commit(pending(tmp_path, base=0, added=[df_("b")]), 2.0)
        assert snap.version == 1
        assert {f.path for f in snap.files} == {"a", "b"}

    def test_removal_applied(self, tmp_path):
        try_commit(pending(tmp_path, added=[df_("a"), df_("b")]), 1.0)
        snap = try_commit(
            pending(tmp_path, op="rewrite", base=0, added=[df_("c")], removed=["a", "b"]),
            2.0,
        )
        assert {f.path for f in snap.files} == {"c"}
        assert snap.operation == "rewrite"

    def test_stale_base_conflicts(self, tmp_path):
        try_commit(pending(tmp_path, added=[df_("a")]), 1.0)
        stale = pending(tmp_path, base=-1, added=[df_("b")])
        with pytest.raises(CommitConflictError) as ei:
            try_commit(stale, 2.0)
        assert ei.value.base_version == -1
        assert ei.value.current_version == 0

    def test_summary_counts(self, tmp_path):
        snap = try_commit(pending(tmp_path, added=[df_("a", 10), df_("b", 20)]), 1.0)
        assert snap.summary["added-files"] == 2
        assert snap.summary["added-bytes"] == 30
        assert snap.summary["removed-files"] == 0

    def test_timestamp_recorded(self, tmp_path):
        snap = try_commit(pending(tmp_path, added=[df_("a")]), 42.5)
        assert snap.timestamp == 42.5

    def test_committed_flag(self, tmp_path):
        p = pending(tmp_path, added=[df_("a")])
        assert not p.committed
        try_commit(p, 1.0)
        assert p.committed


class TestRetries:
    def test_append_rebases_and_lands(self, tmp_path):
        try_commit(pending(tmp_path, added=[df_("a")]), 1.0)
        stale = pending(tmp_path, base=-1, added=[df_("b")])
        seen = []
        snap = commit_with_retries(
            stale, 2.0, retries=2, on_conflict=lambda p, e: seen.append(e)
        )
        assert snap.version == 1
        assert len(seen) == 1
        assert {f.path for f in snap.files} == {"a", "b"}

    def test_zero_retries_raises(self, tmp_path):
        try_commit(pending(tmp_path, added=[df_("a")]), 1.0)
        stale = pending(tmp_path, base=-1, added=[df_("b")])
        seen = []
        with pytest.raises(CommitConflictError):
            commit_with_retries(
                stale, 2.0, retries=0, on_conflict=lambda p, e: seen.append(e)
            )
        assert len(seen) == 1

    def test_rewrite_rebases_when_inputs_live(self, tmp_path):
        try_commit(pending(tmp_path, added=[df_("a"), df_("b")]), 1.0)
        rw = pending(
            tmp_path, op="rewrite", base=0, added=[df_("c")], removed=["a", "b"]
        )
        # Concurrent append bumps the version but leaves a,b live.
        try_commit(pending(tmp_path, base=0, added=[df_("x")]), 2.0)
        snap = commit_with_retries(rw, 3.0, retries=2)
        assert {f.path for f in snap.files} == {"c", "x"}

    def test_rewrite_aborts_when_inputs_removed(self, tmp_path):
        try_commit(pending(tmp_path, added=[df_("a"), df_("b")]), 1.0)
        rw = pending(
            tmp_path, op="rewrite", base=0, added=[df_("c")], removed=["a", "b"]
        )
        # Concurrent delete removes 'a' — the rewrite no longer applies.
        try_commit(
            pending(tmp_path, op="delete", base=0, removed=["a"]), 2.0
        )
        with pytest.raises(ValidationError, match="no longer applies"):
            commit_with_retries(rw, 3.0, retries=2)

    def test_delete_rebase_validation(self, tmp_path):
        try_commit(pending(tmp_path, added=[df_("a")]), 1.0)
        del1 = pending(tmp_path, op="delete", base=0, removed=["a"])
        del2 = pending(tmp_path, op="delete", base=0, removed=["a"])
        commit_with_retries(del1, 2.0)
        with pytest.raises(ValidationError):
            commit_with_retries(del2, 3.0, retries=2)

    def test_rebase_sees_commits_made_during_conflict_handling(self, tmp_path):
        try_commit(pending(tmp_path, added=[df_("a")]), 1.0)
        stale = pending(tmp_path, base=-1, added=[df_("z")])
        seen = []

        def on_conflict(p, e):
            seen.append(e)
            if len(seen) == 1:  # sneak in another commit before the rebase
                try_commit(
                    pending(tmp_path, base=current_version(str(tmp_path)), added=[df_("y")]),
                    9.0,
                )

        snap = commit_with_retries(stale, 2.0, retries=3, on_conflict=on_conflict)
        # The rebase reads the version *after* conflict handling, so the
        # sneaked-in commit is absorbed in a single retry.
        assert len(seen) == 1
        assert {f.path for f in snap.files} == {"a", "y", "z"}


class TestLinearizability:
    def test_version_log_is_gapless(self, tmp_path):
        try_commit(pending(tmp_path, added=[df_("a")]), 1.0)
        for i in range(5):
            commit_with_retries(
                pending(tmp_path, base=-1, added=[df_(f"f{i}")]), float(i), retries=10
            )
        assert current_version(str(tmp_path)) == 5
        for v in range(6):
            snap = read_snapshot(str(tmp_path / f"v{v}.json"))
            assert snap.version == v

    def test_old_snapshots_immutable(self, tmp_path):
        s0 = try_commit(pending(tmp_path, added=[df_("a")]), 1.0)
        try_commit(pending(tmp_path, base=0, added=[df_("b")]), 2.0)
        again = read_snapshot(str(tmp_path / "v0.json"))
        assert again == s0

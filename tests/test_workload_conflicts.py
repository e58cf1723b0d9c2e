"""Unit tests for the conflict ledger (pure Python)."""
import pytest

from repro.workload.conflicts import CLIENT, CLUSTER, ConflictLog


class TestConflictLog:
    def test_record_and_count(self):
        log = ConflictLog()
        log.record(hour=2, side=CLIENT, table_key="d.t", op_kind="insert_orders")
        log.record(hour=2, side=CLUSTER, table_key="d.t", op_kind="compact")
        assert log.count() == 2
        assert log.count(side=CLIENT) == 1
        assert log.count(side=CLUSTER, hour=2) == 1
        assert log.count(hour=3) == 0

    def test_invalid_side_rejected(self):
        with pytest.raises(ValueError):
            ConflictLog().record(hour=1, side="server", table_key="t", op_kind="x")

    def test_by_hour(self):
        log = ConflictLog()
        for h in (2, 2, 4):
            log.record(hour=h, side=CLIENT, table_key="t", op_kind="w")
        assert log.by_hour(CLIENT) == {2: 2, 4: 1}
        assert log.by_hour(CLUSTER) == {}

    def test_fatal_count(self):
        log = ConflictLog()
        log.record(hour=1, side=CLUSTER, table_key="t", op_kind="compact", fatal=True)
        log.record(hour=1, side=CLUSTER, table_key="t", op_kind="compact")
        assert log.fatal_count() == 1

    def test_table_rows_shape(self):
        log = ConflictLog()
        log.record(hour=2, side=CLIENT, table_key="t", op_kind="w")
        log.record(hour=3, side=CLUSTER, table_key="t", op_kind="compact")
        rows = log.table_rows([2, 3, 4])
        assert rows == [
            {"hour": 2, "client_conflicts": 1, "cluster_conflicts": 0},
            {"hour": 3, "client_conflicts": 0, "cluster_conflicts": 1},
            {"hour": 4, "client_conflicts": 0, "cluster_conflicts": 0},
        ]

    def test_empty_log(self):
        log = ConflictLog()
        assert log.count() == 0
        assert log.table_rows([1]) == [
            {"hour": 1, "client_conflicts": 0, "cluster_conflicts": 0}
        ]

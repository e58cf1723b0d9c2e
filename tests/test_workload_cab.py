"""Unit tests for the CAB-lite stream generator (pure Python)."""
from repro.workload.cab import (
    ARCHETYPES,
    Op,
    WorkloadConfig,
    generate_workload,
    write_counts_by_hour,
)


def cfg(**kw):
    return WorkloadConfig(**{"n_databases": 4, "n_hours": 5, "seed": 0, **kw})


class TestGeneration:
    def test_all_hours_present(self):
        w = generate_workload(cfg())
        assert sorted(w) == [1, 2, 3, 4, 5]

    def test_deterministic(self):
        assert generate_workload(cfg()) == generate_workload(cfg())

    def test_seed_changes_workload(self):
        assert generate_workload(cfg()) != generate_workload(cfg(seed=1))

    def test_every_db_represented(self):
        w = generate_workload(cfg())
        dbs = {op.db for ops in w.values() for op in ops}
        assert dbs == {"db0", "db1", "db2", "db3"}

    def test_seq_orders_ops_within_hour(self):
        w = generate_workload(cfg())
        for ops in w.values():
            assert [op.seq for op in ops] == list(range(len(ops)))

    def test_streams_interleaved(self):
        # Round-robin lanes: first ops of an hour come from distinct streams.
        w = generate_workload(cfg())
        head = w[1][:4]
        assert len({(op.db, op.stream) for op in head}) == 4

    def test_reads_and_writes_present(self):
        w = generate_workload(cfg())
        kinds = {op.kind for ops in w.values() for op in ops}
        assert any(k.startswith("q") for k in kinds)
        assert any(k.startswith("insert") for k in kinds)

    def test_archetypes_cycle(self):
        assert len(ARCHETYPES) == 4  # dashboard, interactive, maintenance, hourly


class TestWriteSpike:
    def test_spike_hour_has_most_writes(self):
        # The maintenance archetype triples its writes at the spike hour
        # (§6.1's "noticeable spike ... around hour four").
        counts = write_counts_by_hour(generate_workload(cfg(n_databases=8)))
        assert counts[4] == max(counts.values())

    def test_write_counts_positive_every_hour(self):
        counts = write_counts_by_hour(generate_workload(cfg()))
        assert all(c > 0 for c in counts.values())


class TestOp:
    def test_is_write(self):
        w = Op(kind="insert_orders", db="db0", hour=1, stream=0, seq=0)
        r = Op(kind="q1_pricing", db="db0", hour=1, stream=0, seq=1)
        assert w.is_write and not r.is_write

    def test_write_target_table(self):
        assert Op("insert_lineitem", "d", 1, 0, 0).table == "lineitem"
        assert Op("insert_orders", "d", 1, 0, 0).table == "orders"
        assert Op("delete_orders", "d", 1, 0, 0).table == "orders"

    def test_params_tuple_hashable(self):
        op = Op("insert_orders", "d", 1, 0, 0, params=(("rows", 2.0),))
        assert hash(op)
        assert dict(op.params)["rows"] == 2.0

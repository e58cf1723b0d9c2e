"""Tests for the OpenHouse-lite catalog (databases, quotas, table listing)."""
import pytest

from repro import synth_data
from repro.lst import Catalog, PartitionSpec, TableNotFoundError


@pytest.fixture()
def catalog(tmp_path):
    return Catalog(str(tmp_path / "warehouse"))


class TestDatabases:
    def test_create_and_get(self, catalog):
        catalog.create_database("db1", total_quota=500)
        db = catalog.database("db1")
        assert db.name == "db1"
        assert db.total_quota == 500

    def test_default_quota(self, catalog):
        catalog.create_database("db1")
        assert catalog.database("db1").total_quota == 100_000

    def test_missing_database_raises(self, catalog):
        with pytest.raises(TableNotFoundError):
            catalog.database("nope")

    def test_databases_sorted(self, catalog):
        for n in ("zeta", "alpha", "mid"):
            catalog.create_database(n)
        assert [d.name for d in catalog.databases()] == ["alpha", "mid", "zeta"]

    def test_empty_database_has_no_tables(self, catalog):
        catalog.create_database("db1")
        assert catalog.database("db1").tables() == []


class TestTables:
    def test_create_load_roundtrip(self, catalog):
        catalog.create_database("db1")
        catalog.create_table("db1", "t1", created_at=5.0)
        t = catalog.load_table("db1", "t1")
        assert t.name == "db1.t1"
        assert t.created_at == 5.0

    def test_partitioned_table_spec_persisted(self, catalog):
        catalog.create_database("db1")
        catalog.create_table(
            "db1", "li", spec=PartitionSpec.monthly("l_shipdate", "m")
        )
        assert catalog.load_table("db1", "li").spec.names == ["m"]

    def test_list_tables_across_databases(self, catalog):
        catalog.create_database("a")
        catalog.create_database("b")
        catalog.create_table("a", "t1")
        catalog.create_table("b", "t2")
        catalog.create_table("b", "t3")
        assert catalog.list_tables() == [("a", "t1"), ("b", "t2"), ("b", "t3")]

    def test_db_json_not_listed_as_table(self, catalog):
        catalog.create_database("a")
        catalog.create_table("a", "t1")
        assert catalog.database("a").tables() == ["t1"]


class TestQuotasAndCounts:
    def test_used_quota_counts_objects(self, spark, catalog):
        catalog.create_database("db1", total_quota=100)
        catalog.create_table("db1", "t1")
        t = catalog.load_table("db1", "t1")
        df = synth_data.orders_batch(spark, n_rows=100, seed=0)
        t.append(df, n_files=4)
        used = catalog.database("db1").used_quota(catalog)
        # 4 data files + v0.json + table.json + 1
        assert used == t.metadata_object_count() == 4 + 0 + 2

    def test_total_file_count_fleet_wide(self, spark, catalog):
        catalog.create_database("a")
        catalog.create_database("b")
        df = synth_data.orders_batch(spark, n_rows=60, seed=0)
        for db, name, n in (("a", "t1", 2), ("b", "t2", 3)):
            catalog.create_table(db, name)
            catalog.load_table(db, name).append(df, n_files=n)
        assert catalog.total_file_count() == 5

    def test_empty_catalog_zero_files(self, catalog):
        assert catalog.total_file_count() == 0

"""Unit tests for partition specs and transforms (pure metadata, no Spark jobs
except the two DataFrame-apply tests at the end)."""
import pytest

from repro.lst.spec import PartitionField, PartitionSpec


class TestPartitionField:
    def test_identity_default_name(self):
        f = PartitionField("l_returnflag")
        assert f.name == "l_returnflag"
        assert f.transform == "identity"

    def test_month_default_name(self):
        f = PartitionField("l_shipdate", "month")
        assert f.name == "l_shipdate_month"

    def test_explicit_name(self):
        f = PartitionField("l_shipdate", "month", "ship_month")
        assert f.name == "ship_month"

    def test_unknown_transform_rejected(self):
        with pytest.raises(ValueError, match="unknown transform"):
            PartitionField("c", "bucket")

    def test_frozen(self):
        f = PartitionField("c")
        with pytest.raises(AttributeError):
            f.source = "other"


class TestPartitionSpec:
    def test_unpartitioned(self):
        s = PartitionSpec.unpartitioned()
        assert not s.is_partitioned
        assert s.names == []
        assert s.partition_path({}) == ""

    def test_monthly_factory(self):
        s = PartitionSpec.monthly("l_shipdate", "ship_month")
        assert s.is_partitioned
        assert s.names == ["ship_month"]
        assert s.fields[0].transform == "month"

    def test_identity_factory_multi(self):
        s = PartitionSpec.identity("a", "b")
        assert s.names == ["a", "b"]

    def test_partition_path_ordering(self):
        s = PartitionSpec.identity("a", "b")
        assert s.partition_path({"b": "2", "a": "1"}) == "a=1/b=2"

    def test_roundtrip_dict(self):
        s = PartitionSpec.monthly("l_shipdate", "ship_month")
        assert PartitionSpec.from_dict(s.to_dict()) == s

    def test_roundtrip_unpartitioned(self):
        s = PartitionSpec.unpartitioned()
        assert PartitionSpec.from_dict(s.to_dict()) == s

    def test_accepts_list_fields(self):
        s = PartitionSpec([PartitionField("a")])
        assert isinstance(s.fields, tuple)

    def test_equality_hashable(self):
        a = PartitionSpec.monthly("d", "m")
        b = PartitionSpec.monthly("d", "m")
        assert a == b and hash(a) == hash(b)


class TestApply:
    def test_apply_month(self, spark):
        import pandas as pd

        df = spark.createDataFrame(
            pd.DataFrame({"d": pd.to_datetime(["1995-03-15", "1995-04-01"])})
        )
        out = PartitionSpec.monthly("d", "m").apply(df)
        rows = sorted(r["m"] for r in out.collect())
        assert rows == ["1995-03", "1995-04"]

    def test_apply_identity_casts_string(self, spark):
        import pandas as pd

        df = spark.createDataFrame(pd.DataFrame({"k": [1, 2]}))
        out = PartitionSpec.identity("k").apply(df)
        # An identity field whose name equals its source replaces the column
        # with its string form (the value that appears in the dir name).
        assert dict(out.dtypes)["k"] == "string"
        vals = sorted(r["k"] for r in out.collect())
        assert vals == ["1", "2"]

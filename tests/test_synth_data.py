"""Tests for the synthetic data generators (TPC-H-lite + TPC-DS-lite)."""
import pytest

from repro import synth_data


class TestTpchLite:
    def test_lineitem_row_count_scales(self, spark):
        df = synth_data.lineitem(spark, sf=0.001, seed=0)
        assert df.count() == 6000

    def test_lineitem_deterministic(self, spark):
        a = synth_data.lineitem(spark, sf=0.0005, seed=3).toPandas()
        b = synth_data.lineitem(spark, sf=0.0005, seed=3).toPandas()
        assert a.equals(b)

    def test_orders_keys_sequential(self, spark):
        df = synth_data.orders(spark, sf=0.001)
        keys = [r["o_orderkey"] for r in df.select("o_orderkey").collect()]
        assert sorted(keys) == list(range(1, 1501))

    def test_lineitem_batch_date_window(self, spark):
        df = synth_data.lineitem_batch(
            spark, n_rows=200, seed=0, start_day=100, n_days=30
        )
        import pandas as pd

        dates = df.select("l_shipdate").toPandas()["l_shipdate"]
        lo = pd.Timestamp("1992-01-01") + pd.Timedelta(days=100)
        hi = lo + pd.Timedelta(days=30)
        assert dates.min() >= lo
        assert dates.max() <= hi

    def test_orders_batch_key_offset(self, spark):
        df = synth_data.orders_batch(spark, n_rows=10, seed=0, key_offset=100)
        keys = sorted(r["o_orderkey"] for r in df.collect())
        assert keys == list(range(101, 111))

    def test_batch_minimum_one_row(self, spark):
        assert synth_data.lineitem_batch(spark, n_rows=0, seed=0).count() == 1


class TestTpcdsLite:
    def test_store_sales_scales(self, spark):
        df = synth_data.store_sales(spark, sf=0.001)
        assert df.count() == 2880

    def test_store_sales_schema(self, spark):
        cols = set(synth_data.store_sales(spark, sf=0.0005).columns)
        assert {"ss_item_sk", "ss_sold_date", "ss_ext_sales_price"} <= cols

    def test_store_sales_batch_window(self, spark):
        df = synth_data.store_sales_batch(
            spark, n_rows=100, seed=0, start_day=0, n_days=30
        )
        months = {
            r[0]
            for r in df.selectExpr("date_format(ss_sold_date, 'yyyy-MM')")
            .distinct()
            .collect()
        }
        assert months <= {"2000-01", "2000-02"}


class TestKeyGenerators:
    def test_zipf_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.5, seed=0)
        top = (
            df.groupBy("k").count().orderBy("count", ascending=False).first()
        )
        assert top["k"] == 1  # rank-1 key dominates under Zipf

    def test_uniform_coverage(self, spark):
        df = synth_data.uniform_keys(spark, n=2000, n_keys=10, seed=0)
        assert df.select("k").distinct().count() == 10

"""Sanity tests for the DuckDB oracle itself (it must catch wrong results)."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


def test_accepts_matching_result(spark):
    pdf = pd.DataFrame({"k": [1, 1, 2], "v": [1.0, 2.0, 3.0]})
    got = (
        spark.createDataFrame(pdf)
        .groupBy("k")
        .sum("v")
        .withColumnRenamed("sum(v)", "s")
    )
    assert_equivalent(got, "SELECT k, sum(v) AS s FROM t GROUP BY k", t=pdf)


def test_rejects_wrong_rows(spark):
    pdf = pd.DataFrame({"k": [1, 2], "v": [1.0, 2.0]})
    got = spark.createDataFrame(pd.DataFrame({"k": [1, 2], "s": [99.0, 2.0]}))
    with pytest.raises(AssertionError):
        assert_equivalent(got, "SELECT k, v AS s FROM t", t=pdf)

def test_rejects_column_mismatch(spark):
    pdf = pd.DataFrame({"k": [1]})
    got = spark.createDataFrame(pd.DataFrame({"wrong": [1]}))
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(got, "SELECT k FROM t", t=pdf)


def test_accepts_spark_df_as_input_table(spark):
    sdf = spark.createDataFrame(pd.DataFrame({"k": [1, 2, 3]}))
    got = sdf.groupBy().count().withColumnRenamed("count", "n")
    assert_equivalent(got, "SELECT count(*) AS n FROM t", t=sdf)


def test_column_order_irrelevant(spark):
    pdf = pd.DataFrame({"a": [1], "b": [2]})
    got = spark.createDataFrame(pd.DataFrame({"b": [2], "a": [1]}))[["b", "a"]]
    assert_equivalent(got, "SELECT a, b FROM t", t=pdf)

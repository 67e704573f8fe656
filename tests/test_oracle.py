"""Tests for the DuckDB oracle itself (it guards everything else)."""
import pandas as pd
import pytest
import pyspark.sql.functions as F

from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def df(spark):
    return spark.createDataFrame(
        pd.DataFrame({"k": [1, 1, 2], "v": [10.0, 20.0, 30.0]})
    )


def test_accepts_matching_aggregate(df):
    got = df.groupBy("k").agg(F.sum("v").alias("s"))
    assert_equivalent(got, "SELECT k, sum(v) AS s FROM t GROUP BY k", t=df)


def test_accepts_pandas_input(spark, df):
    pdf = pd.DataFrame({"k": [1, 1, 2], "v": [10.0, 20.0, 30.0]})
    got = df.groupBy("k").count().withColumnRenamed("count", "n")
    assert_equivalent(got, "SELECT k, count(*) AS n FROM t GROUP BY k", t=pdf)

def test_rejects_wrong_rows(df):
    got = df.groupBy("k").agg(F.max("v").alias("s"))  # wrong aggregate
    with pytest.raises(AssertionError):
        assert_equivalent(got, "SELECT k, sum(v) AS s FROM t GROUP BY k", t=df)


def test_rejects_column_mismatch(df):
    got = df.groupBy("k").agg(F.sum("v").alias("wrong_name"))
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(got, "SELECT k, sum(v) AS s FROM t GROUP BY k", t=df)


def test_column_order_irrelevant(df):
    got = df.select("v", "k")
    assert_equivalent(got, "SELECT k, v FROM t", t=df)


def test_row_order_irrelevant(df):
    got = df.orderBy(F.desc("v"))
    assert_equivalent(got, "SELECT * FROM t ORDER BY v", t=df)

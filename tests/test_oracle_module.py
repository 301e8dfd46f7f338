"""Tests for the provided DuckDB oracle (repro.oracle.assert_equivalent)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def pair(spark):
    pdf = pd.DataFrame({"k": [1, 1, 2, 3], "v": [1.0, 2.0, 3.0, 4.0]})
    return spark.createDataFrame(pdf), pdf


def test_passes_on_equal_aggregate(pair):
    sdf, pdf = pair
    got = sdf.groupBy("k").agg(F.sum("v").alias("s"))
    assert_equivalent(got, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf)


def test_fails_on_wrong_result(pair):
    sdf, pdf = pair
    got = sdf.groupBy("k").agg((F.sum("v") + 1).alias("s"))
    with pytest.raises(AssertionError):
        assert_equivalent(got, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf)


def test_fails_on_column_name_mismatch(pair):
    sdf, pdf = pair
    got = sdf.groupBy("k").agg(F.sum("v").alias("total"))
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(got, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf)


def test_accepts_spark_df_as_table(pair):
    sdf, _ = pair
    got = sdf.agg(F.count(F.lit(1)).alias("cnt"))
    assert_equivalent(got, "SELECT COUNT(*) AS cnt FROM t", t=sdf)


def test_row_order_irrelevant(spark):
    pdf = pd.DataFrame({"a": [3, 1, 2]})
    sdf = spark.createDataFrame(pdf).orderBy(F.desc("a"))
    assert_equivalent(sdf, "SELECT a FROM t ORDER BY a", t=pdf)

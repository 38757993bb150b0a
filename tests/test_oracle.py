"""Sanity tests for the DuckDB oracle itself."""
import numpy as np
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def pdf():
    rng = np.random.default_rng(0)
    return pd.DataFrame({"k": rng.integers(1, 5, 200), "v": rng.random(200)})


def test_passes_on_equal_aggregation(spark, pdf):
    sdf = spark.createDataFrame(pdf)
    out = sdf.groupBy("k").sum("v").withColumnRenamed("sum(v)", "s")
    assert_equivalent(out, "SELECT k, sum(v) AS s FROM t GROUP BY k", t=pdf)


def test_accepts_spark_inputs(spark, pdf):
    sdf = spark.createDataFrame(pdf)
    out = sdf.selectExpr("k", "v * 2 AS w")
    assert_equivalent(out, "SELECT k, v * 2 AS w FROM t", t=sdf)


def test_fails_on_wrong_result(spark, pdf):
    sdf = spark.createDataFrame(pdf)
    wrong = sdf.selectExpr("k", "v * 3 AS w")
    with pytest.raises(AssertionError):
        assert_equivalent(wrong, "SELECT k, v * 2 AS w FROM t", t=pdf)


def test_fails_on_column_mismatch(spark, pdf):
    sdf = spark.createDataFrame(pdf)
    out = sdf.selectExpr("k", "v AS not_aliased_same")
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(out, "SELECT k, v AS w FROM t", t=pdf)


def test_row_order_irrelevant(spark, pdf):
    sdf = spark.createDataFrame(pdf).orderBy("v")
    assert_equivalent(sdf.select("k", "v"), "SELECT k, v FROM t ORDER BY k", t=pdf)

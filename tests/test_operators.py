"""Operator tests: numpy twin vs Catalyst expression vs DuckDB oracle.

Each of the 9 operators has three implementations that must agree: the
numpy path used inside the RL loop, the Spark Column expression used to
materialize features, and the DuckDB SQL fragment used as an independent
oracle. A wrong rewrite in any one of them fails here.
"""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.operators import ALL_OPS, BINARY_OPS, UNARY_OPS, duckdb_op_sql, numpy_op, spark_op
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def pdf():
    rng = np.random.default_rng(0)
    n = 400
    return pd.DataFrame(
        {
            "a": rng.normal(size=n) * 10,
            # include zeros and negatives to hit the guarded branches
            "b": np.where(rng.random(n) < 0.1, 0.0, rng.normal(size=n) * 3),
        }
    )


@pytest.fixture(scope="module")
def sdf(spark, pdf):
    return spark.createDataFrame(pdf)


class TestNumpySemantics:
    def test_log_safe_on_negatives(self):
        out = numpy_op("log", np.array([-5.0, 0.0, 5.0]))
        assert np.isfinite(out).all()
        assert out[1] == 0.0

    def test_sqrt_abs(self):
        np.testing.assert_allclose(numpy_op("sqrt", np.array([-4.0, 9.0])), [2.0, 3.0])

    def test_reciprocal_zero_guard(self):
        out = numpy_op("reciprocal", np.array([0.0, 2.0]))
        np.testing.assert_allclose(out, [0.0, 0.5])

    def test_minmax_range(self):
        out = numpy_op("minmax", np.array([1.0, 3.0, 5.0]))
        np.testing.assert_allclose(out, [0.0, 0.5, 1.0])

    def test_minmax_constant(self):
        np.testing.assert_allclose(numpy_op("minmax", np.ones(4)), 0.0)

    def test_div_zero_guard(self):
        out = numpy_op("div", np.array([1.0, 1.0]), np.array([0.0, 2.0]))
        np.testing.assert_allclose(out, [0.0, 0.5])

    def test_mod_zero_guard(self):
        out = numpy_op("mod", np.array([5.0, 5.0]), np.array([0.0, 3.0]))
        np.testing.assert_allclose(out, [0.0, 2.0])

    def test_mod_sign_follows_dividend(self):
        out = numpy_op("mod", np.array([-5.0]), np.array([3.0]))
        np.testing.assert_allclose(out, [-2.0])

    def test_binary_requires_two(self):
        with pytest.raises(ValueError):
            numpy_op("add", np.ones(3))

    def test_unknown_op(self):
        with pytest.raises(ValueError):
            numpy_op("pow", np.ones(3), np.ones(3))


@pytest.mark.parametrize("op", UNARY_OPS)
def test_spark_matches_numpy_unary(spark, pdf, sdf, op):
    got = np.array(
        sdf.select(spark_op(op, sdf["a"]).alias("v")).toPandas()["v"], dtype=np.float64
    )
    # minmax is whole-column: Spark may reorder rows, so compare sorted.
    expected = numpy_op(op, pdf["a"].to_numpy())
    np.testing.assert_allclose(np.sort(got), np.sort(expected), rtol=1e-12, atol=1e-12)


@pytest.mark.parametrize("op", BINARY_OPS)
def test_spark_matches_numpy_binary(spark, pdf, sdf, op):
    got = np.array(
        sdf.select(spark_op(op, sdf["a"], sdf["b"]).alias("v")).toPandas()["v"],
        dtype=np.float64,
    )
    expected = numpy_op(op, pdf["a"].to_numpy(), pdf["b"].to_numpy())
    np.testing.assert_allclose(np.sort(got), np.sort(expected), rtol=1e-12, atol=1e-12)


@pytest.mark.parametrize("op", UNARY_OPS)
def test_spark_matches_duckdb_unary(spark, pdf, sdf, op):
    spark_df = sdf.select(spark_op(op, sdf["a"]).alias("v"))
    assert_equivalent(spark_df, f"SELECT {duckdb_op_sql(op, 'a')} AS v FROM t", t=pdf)


@pytest.mark.parametrize("op", BINARY_OPS)
def test_spark_matches_duckdb_binary(spark, pdf, sdf, op):
    spark_df = sdf.select(spark_op(op, sdf["a"], sdf["b"]).alias("v"))
    assert_equivalent(
        spark_df, f"SELECT {duckdb_op_sql(op, 'a', 'b')} AS v FROM t", t=pdf
    )


def test_spark_binary_requires_two(sdf):
    with pytest.raises(ValueError):
        spark_op("add", sdf["a"])


def test_spark_unknown_op(sdf):
    with pytest.raises(ValueError):
        spark_op("pow", sdf["a"], sdf["b"])


def test_duckdb_unknown_op():
    with pytest.raises(ValueError):
        duckdb_op_sql("pow", "a", "b")


def test_duckdb_binary_requires_two():
    with pytest.raises(ValueError):
        duckdb_op_sql("mul", "a")


def test_all_ops_enumeration():
    assert len(ALL_OPS) == 9
    assert set(UNARY_OPS) == {"log", "minmax", "sqrt", "reciprocal"}
    assert set(BINARY_OPS) == {"add", "sub", "mul", "div", "mod"}

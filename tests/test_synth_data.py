"""Tests for the synthetic data generators (provided TPC-H-lite + ours)."""
import numpy as np
import pytest

from repro.synth_data import (
    customer,
    fpe_corpus,
    lineitem,
    make_tabular,
    orders,
    part,
    tabular_spark,
    uniform_keys,
    zipf_keys,
)


class TestTpchLite:
    def test_lineitem_schema_and_size(self, spark):
        df = lineitem(spark, sf=0.001)
        assert df.count() == 6000
        assert "l_orderkey" in df.columns and "l_extendedprice" in df.columns

    def test_orders_keys_sequential(self, spark):
        df = orders(spark, sf=0.001).toPandas()
        assert df["o_orderkey"].min() == 1
        assert df["o_orderkey"].is_unique

    def test_customer_and_part(self, spark):
        assert customer(spark, sf=0.001).count() == 150
        assert part(spark, sf=0.001).count() == 200

    def test_deterministic_in_seed(self, spark):
        a = lineitem(spark, sf=0.0005, seed=3).toPandas()
        b = lineitem(spark, sf=0.0005, seed=3).toPandas()
        assert a.equals(b)

    def test_zipf_skew(self, spark):
        df = zipf_keys(spark, n=20000, n_keys=100, alpha=1.5).toPandas()
        counts = df["k"].value_counts()
        assert counts.iloc[0] > 5 * counts.iloc[-1]

    def test_uniform_keys_range(self, spark):
        df = uniform_keys(spark, n=1000, n_keys=10).toPandas()
        assert set(df["k"].unique()) <= set(range(1, 11))


class TestMakeTabular:
    def test_shapes(self):
        X, y = make_tabular(task="C", n_samples=123, n_features=7, seed=0)
        assert X.shape == (123, 7) and y.shape == (123,)
        assert list(X.columns) == [f"f{i}" for i in range(7)]

    def test_classification_binary_balanced(self):
        _, y = make_tabular(task="C", n_samples=400, n_features=6, seed=1)
        assert set(y) == {0, 1}
        assert 0.4 < y.mean() < 0.6

    def test_multiclass(self):
        _, y = make_tabular(task="C", n_samples=300, n_features=6, n_classes=3, seed=2)
        assert set(y) == {0, 1, 2}

    def test_regression_float_target(self):
        _, y = make_tabular(task="R", n_samples=200, n_features=5, seed=3)
        assert y.dtype == np.float64 and np.std(y) > 0

    def test_deterministic(self):
        a = make_tabular(task="C", n_samples=100, n_features=5, seed=9)
        b = make_tabular(task="C", n_samples=100, n_features=5, seed=9)
        assert a[0].equals(b[0]) and (a[1] == b[1]).all()

    def test_different_seeds_differ(self):
        a, _ = make_tabular(task="C", n_samples=100, n_features=5, seed=1)
        b, _ = make_tabular(task="C", n_samples=100, n_features=5, seed=2)
        assert not a.equals(b)

    def test_invalid_task(self):
        with pytest.raises(ValueError):
            make_tabular(task="Z", n_samples=10, n_features=3)

    def test_target_needs_interactions(self):
        """The planted signal: engineered interactions beat raw columns."""
        from repro.ml.forest import cross_val_score

        X, y = make_tabular(task="C", n_samples=600, n_features=8, seed=4)
        base = cross_val_score(X.values, y, "C", k=3, n_trees=6)
        assert base < 0.97  # headroom must exist

    def test_informative_clipped_to_features(self):
        X, y = make_tabular(task="C", n_samples=100, n_features=3, n_informative=50, seed=5)
        assert X.shape[1] == 3

    def test_spark_rendering(self, spark):
        df = tabular_spark(spark, task="C", n_samples=50, n_features=4, seed=6)
        assert df.count() == 50
        assert "label" in df.columns


class TestFpeCorpus:
    def test_corpus_size_and_fields(self):
        c = fpe_corpus(6, seed=1000)
        assert len(c) == 6
        for e in c:
            assert set(e) == {"name", "task", "X", "y"}
            assert len(e["X"]) == len(e["y"])

    def test_mixes_tasks(self):
        c = fpe_corpus(9, seed=1000)
        tasks = {e["task"] for e in c}
        assert tasks == {"C", "R"}

    def test_deterministic(self):
        a = fpe_corpus(4, seed=42)
        b = fpe_corpus(4, seed=42)
        assert all(x["X"].equals(y["X"]) for x, y in zip(a, b))

    def test_shapes_vary(self):
        c = fpe_corpus(8, seed=7)
        shapes = {e["X"].shape for e in c}
        assert len(shapes) > 4

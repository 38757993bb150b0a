"""Tests for the FPE model: signatures, corpus labeling (Spark), training."""
import numpy as np
import pandas as pd
import pytest

from repro.core.fpe import (
    FPEModel,
    _label_one_dataset,
    _random_spec,
    feature_signature,
    label_corpus,
)
from repro.synth_data import fpe_corpus


@pytest.fixture(scope="module")
def tiny_corpus():
    return fpe_corpus(6, seed=1000)


@pytest.fixture(scope="module")
def labels(spark, tiny_corpus):
    return label_corpus(spark, tiny_corpus, thre=0.01, cv_cfg={"k": 3, "n_trees": 4})


@pytest.fixture(scope="module")
def model(tiny_corpus, labels):
    return FPEModel.fit(
        tiny_corpus, labels, fixed_variant="ccws", d_options=(16, 32), seed=0
    )


class TestSignature:
    def _xy(self):
        rng = np.random.default_rng(0)
        x = rng.normal(size=500)
        y = (x + 0.1 * rng.normal(size=500) > 0).astype(int)
        return x, y

    def test_fixed_size_any_m(self):
        rng = np.random.default_rng(1)
        for m in (30, 300, 3000):
            x = rng.normal(size=m)
            y = (x > 0).astype(int)
            sig = feature_signature(x, y, "C", d=32)
            assert sig.shape == (3 * 32 + 6,)

    def test_deterministic(self):
        x, y = self._xy()
        a = feature_signature(x, y, "C", d=16)
        b = feature_signature(x, y, "C", d=16)
        np.testing.assert_array_equal(a, b)

    def test_target_alignment_scalar(self):
        x, y = self._xy()
        sig = feature_signature(x, y, "C", d=48)
        corr_scalar = sig[3 * 48]  # first scalar: corr(xs, ys)
        assert corr_scalar > 0.3  # x predicts y by construction

    def test_redundancy_block_detects_copy(self):
        x, y = self._xy()
        context = np.c_[x, np.random.default_rng(2).normal(size=len(x))]
        # affine (monotone) reshaping of a context column -> max redundancy
        sig = feature_signature(2.0 * x + 1.0, y, "C", d=32, context=context)
        red_max = sig[-2]
        assert red_max > 0.95

    def test_redundancy_zero_without_context(self):
        x, y = self._xy()
        sig = feature_signature(x, y, "C", d=16)
        assert sig[-2] == 0.0 and sig[-1] == 0.0

    def test_exclude_self(self):
        x, y = self._xy()
        context = x[:, None]
        sig = feature_signature(x, y, "C", d=16, context=context, exclude=0)
        assert sig[-2] == 0.0  # only column excluded -> no redundancy signal

    def test_values_bounded(self):
        x, y = self._xy()
        sig = feature_signature(x * 1e9, y, "C", d=16)
        assert np.isfinite(sig).all()
        assert sig[: 3 * 16].min() >= 0.0 and sig[: 3 * 16].max() <= 1.0


class TestRandomSpec:
    def test_orders_respected(self):
        rng = np.random.default_rng(0)
        for _ in range(50):
            s = _random_spec(4, 3, rng)
            assert 1 <= s.order <= 3
            assert s.leaves() <= {0, 1, 2, 3}


class TestLabeling:
    def test_label_one_dataset_rows(self, tiny_corpus):
        e = tiny_corpus[0]
        df = _label_one_dataset(e, thre=0.01, cv_cfg={"k": 3, "n_trees": 4}, n_generated=5)
        n_orig = e["X"].shape[1]
        assert (df["kind"] == "orig").sum() == n_orig
        assert (df["kind"] == "gen").sum() == 5
        assert set(df["label"]) <= {0, 1}

    def test_label_rule_matches_gain(self, tiny_corpus):
        e = tiny_corpus[0]
        df = _label_one_dataset(e, thre=0.01, cv_cfg={"k": 3, "n_trees": 4}, n_generated=3)
        assert ((df["gain"] > 0.01) == (df["label"] == 1)).all()

    def test_spark_fanout_covers_corpus(self, labels, tiny_corpus):
        assert set(labels["dataset"]) == {e["name"] for e in tiny_corpus}

    def test_spark_matches_local(self, spark, tiny_corpus):
        """The Spark-fanned labeling equals the worker function run locally."""
        local = pd.concat(
            [_label_one_dataset(e, 0.01, {"k": 3, "n_trees": 4}) for e in tiny_corpus]
        ).sort_values(["dataset", "feature"]).reset_index(drop=True)
        via_spark = label_corpus(spark, tiny_corpus, thre=0.01, cv_cfg={"k": 3, "n_trees": 4})
        pd.testing.assert_frame_equal(
            local[["dataset", "feature", "label"]],
            via_spark[["dataset", "feature", "label"]],
            check_dtype=False,  # Spark schema uses int32 for 'feature'
        )


class TestFPEModel:
    def test_fit_selects_valid_config(self, model):
        assert model.variant == "ccws"
        assert model.d in (16, 32)
        assert 0.0 <= model.recall_ <= 1.0

    def test_gain_extremes_recorded(self, model, labels):
        assert model.d_a_max == pytest.approx(labels["gain"].max())
        assert model.d_a_min == pytest.approx(labels["gain"].min())

    def test_predict_proba_in_unit_interval(self, model, tiny_corpus):
        e = tiny_corpus[0]
        X = e["X"].values
        p = model.predict_proba(X[:, 0], e["y"], e["task"], context=X)
        assert 0.0 <= p <= 1.0

    def test_threshold_calibrated(self, model):
        assert 0.05 <= model.threshold_ <= 0.95

    def test_is_positive_consistent(self, model, tiny_corpus):
        e = tiny_corpus[1]
        X = e["X"].values
        p = model.predict_proba(X[:, 1], e["y"], e["task"], context=X)
        assert model.is_positive(X[:, 1], e["y"], e["task"], context=X) == (p >= 0.5)

    def test_picklable(self, model):
        import pickle

        m2 = pickle.loads(pickle.dumps(model))
        assert m2.d == model.d and m2.variant == model.variant

    def test_calibration_median_keep_rate(self, model, tiny_corpus):
        """Roughly half of random candidates should clear the calibrated gate."""
        rng = np.random.default_rng(3)
        e = tiny_corpus[2]
        X = e["X"].values
        ps = []
        for _ in range(60):
            s = _random_spec(X.shape[1], 3, rng)
            v = s.to_numpy(X)
            if np.all(np.isfinite(v)) and v.std() > 0:
                ps.append(model.predict_proba(v, e["y"], e["task"], context=X))
        keep = np.mean([p >= 0.5 for p in ps])
        assert 0.1 <= keep <= 0.9

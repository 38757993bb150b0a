"""Tests for the histogram-CART tree and Random Forest substrate."""
import numpy as np
import pytest

from repro.ml.forest import RandomForest, cross_val_score, kfold_indices
from repro.ml.tree import DecisionTree, apply_bins, bin_features


@pytest.fixture()
def clf_data():
    rng = np.random.default_rng(0)
    X = rng.normal(size=(400, 6))
    y = (X[:, 0] + 0.5 * X[:, 1] > 0).astype(int)
    return X, y


@pytest.fixture()
def reg_data():
    rng = np.random.default_rng(1)
    X = rng.normal(size=(400, 6))
    y = 2.0 * X[:, 0] - X[:, 1] + 0.05 * rng.normal(size=400)
    return X, y


class TestBinning:
    def test_edges_shape(self):
        X = np.random.default_rng(0).normal(size=(100, 4))
        edges = bin_features(X, n_bins=16)
        assert edges.shape == (4, 15)

    def test_bins_in_range(self):
        X = np.random.default_rng(0).normal(size=(100, 3))
        edges = bin_features(X, n_bins=8)
        b = apply_bins(X, edges)
        assert b.dtype == np.uint8
        assert b.min() >= 0 and b.max() <= 7

    def test_constant_column_single_bin(self):
        X = np.ones((50, 1))
        edges = bin_features(X, n_bins=8)
        b = apply_bins(X, edges)
        assert len(np.unique(b)) == 1

    def test_monotone_mapping(self):
        X = np.arange(100, dtype=float)[:, None]
        edges = bin_features(X, n_bins=10)
        b = apply_bins(X, edges)[:, 0].astype(int)
        assert (np.diff(b) >= 0).all()


class TestDecisionTree:
    def test_classification_separable(self, clf_data):
        X, y = clf_data
        t = DecisionTree(task="C", max_depth=6).fit(X, y)
        assert (t.predict(X) == y).mean() > 0.9

    def test_regression_fit(self, reg_data):
        X, y = reg_data
        t = DecisionTree(task="R", max_depth=6).fit(X, y)
        resid = y - t.predict(X)
        assert resid.var() < 0.3 * y.var()

    def test_predict_proba_rows_sum_to_one(self, clf_data):
        X, y = clf_data
        t = DecisionTree(task="C").fit(X, y)
        p = t.predict_proba(X[:20])
        np.testing.assert_allclose(p.sum(axis=1), 1.0)

    def test_proba_regression_raises(self, reg_data):
        X, y = reg_data
        t = DecisionTree(task="R").fit(X, y)
        with pytest.raises(ValueError):
            t.predict_proba(X)

    def test_max_depth_zero_is_constant(self, clf_data):
        X, y = clf_data
        t = DecisionTree(task="C", max_depth=0).fit(X, y)
        assert len(np.unique(t.predict(X))) == 1

    def test_invalid_task(self):
        with pytest.raises(ValueError):
            DecisionTree(task="Z")

    def test_pure_node_stops(self):
        X = np.random.default_rng(0).normal(size=(50, 2))
        y = np.zeros(50, dtype=int)
        t = DecisionTree(task="C").fit(X, y)
        assert (t.predict(X) == 0).all()

    def test_importances_identify_signal(self, clf_data):
        X, y = clf_data
        t = DecisionTree(task="C", max_depth=5).fit(X, y)
        # Signal features 0/1 should dominate the noise columns.
        assert t.feature_importances_[:2].sum() > t.feature_importances_[2:].sum()

    def test_nan_inputs_handled(self, clf_data):
        X, y = clf_data
        X = X.copy()
        X[0, 0] = np.nan
        t = DecisionTree(task="C").fit(X, y)
        assert np.isfinite(t.predict_proba(X)).all()

    def test_deterministic(self, clf_data):
        X, y = clf_data
        p1 = DecisionTree(task="C", seed=3, max_features=2).fit(X, y).predict(X)
        p2 = DecisionTree(task="C", seed=3, max_features=2).fit(X, y).predict(X)
        assert (p1 == p2).all()


class TestRandomForest:
    def test_classification_beats_chance(self, clf_data):
        X, y = clf_data
        rf = RandomForest(task="C", n_trees=8).fit(X, y)
        assert (rf.predict(X) == y).mean() > 0.9

    def test_regression_fit(self, reg_data):
        X, y = reg_data
        rf = RandomForest(task="R", n_trees=8).fit(X, y)
        assert np.corrcoef(rf.predict(X), y)[0, 1] > 0.9

    def test_deterministic_in_seed(self, clf_data):
        X, y = clf_data
        a = RandomForest(task="C", seed=7).fit(X, y).predict(X)
        b = RandomForest(task="C", seed=7).fit(X, y).predict(X)
        assert (a == b).all()

    def test_importances_normalized(self, clf_data):
        X, y = clf_data
        rf = RandomForest(task="C").fit(X, y)
        assert rf.feature_importances_.sum() == pytest.approx(1.0)
        assert np.argmax(rf.feature_importances_) in (0, 1)

    def test_max_features_int(self, clf_data):
        X, y = clf_data
        rf = RandomForest(task="C", max_features=2).fit(X, y)
        assert len(rf.trees_) == rf.n_trees


class TestKFold:
    def test_partition_covers_all(self):
        y = np.arange(100) % 2
        folds = kfold_indices(y, 4, "C", seed=0)
        all_test = np.concatenate([te for _, te in folds])
        assert sorted(all_test) == list(range(100))

    def test_train_test_disjoint(self):
        y = np.random.default_rng(0).integers(0, 2, 60)
        for tr, te in kfold_indices(y, 3, "C"):
            assert not set(tr) & set(te)

    def test_stratification(self):
        y = np.array([0] * 80 + [1] * 20)
        for _, te in kfold_indices(y, 4, "C", seed=1):
            # each fold should hold ~5 positives (exactly, by round-robin)
            assert 3 <= (y[te] == 1).sum() <= 7

    def test_regression_unstratified(self):
        y = np.random.default_rng(0).normal(size=50)
        folds = kfold_indices(y, 5, "R")
        assert len(folds) == 5


class TestCrossVal:
    def test_signal_beats_shuffled(self, clf_data):
        X, y = clf_data
        s_real = cross_val_score(X, y, "C", k=3, n_trees=6)
        s_null = cross_val_score(X, np.random.default_rng(2).permutation(y), "C", k=3, n_trees=6)
        assert s_real > s_null + 0.2

    def test_informative_feature_raises_score(self):
        rng = np.random.default_rng(3)
        X = rng.normal(size=(500, 8))
        y = (X[:, 0] * X[:, 1] > 0).astype(int)  # pure interaction
        base = cross_val_score(X, y, "C", k=3, n_trees=6)
        engineered = cross_val_score(np.c_[X, X[:, 0] * X[:, 1]], y, "C", k=3, n_trees=6)
        assert engineered > base + 0.1

    def test_regression_range(self, reg_data):
        X, y = reg_data
        s = cross_val_score(X, y, "R", k=3, n_trees=6)
        assert 0.5 < s <= 1.0

    def test_deterministic(self, clf_data):
        X, y = clf_data
        assert cross_val_score(X, y, "C", seed=5) == cross_val_score(X, y, "C", seed=5)

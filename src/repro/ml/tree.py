"""Histogram-based CART decision tree (classifier + regressor), numpy only.

This is the substrate under ``repro.ml.forest`` — the paper's downstream
evaluation task is Random-Forest cross-validation, and the box has no
sklearn, so the tree is built from scratch. Features are quantile-binned
to uint8 once per fit; split search is a vectorized histogram scan
(one ``np.add.at`` per node over all features), which keeps a fit on
2000 x 64 data in the low milliseconds — essential because AFE evaluates
hundreds of candidate features per epoch.
"""
from __future__ import annotations

import numpy as np

__all__ = ["bin_features", "apply_bins", "DecisionTree"]

_LEAF = -1


def bin_features(X: np.ndarray, n_bins: int = 32) -> np.ndarray:
    """Quantile bin edges per feature; shape (F, n_bins - 1).

    Edges are interior cut points; values are later assigned with
    ``searchsorted`` so constant features collapse to a single bin.
    """
    X = np.asarray(X, dtype=np.float64)
    qs = np.linspace(0, 1, n_bins + 1)[1:-1]
    return np.quantile(X, qs, axis=0).T.copy()


def apply_bins(X: np.ndarray, edges: np.ndarray) -> np.ndarray:
    """Map raw values to uint8 bin codes using per-feature ``edges``."""
    X = np.asarray(X, dtype=np.float64)
    out = np.empty(X.shape, dtype=np.uint8)
    for f in range(X.shape[1]):
        out[:, f] = np.searchsorted(edges[f], X[:, f], side="right")
    return out


class DecisionTree:
    """CART over pre-binned features.

    Parameters
    ----------
    task : 'C' (gini) or 'R' (variance reduction).
    max_depth, min_leaf : usual stopping rules.
    max_features : number of candidate features per node (random-forest
        style column subsampling); ``None`` means all.
    """

    def __init__(
        self,
        task: str = "C",
        max_depth: int = 6,
        min_leaf: int = 2,
        max_features: int | None = None,
        n_bins: int = 32,
        seed: int = 0,
    ):
        if task not in ("C", "R"):
            raise ValueError("task must be 'C' or 'R'")
        self.task = task
        self.max_depth = max_depth
        self.min_leaf = min_leaf
        self.max_features = max_features
        self.n_bins = n_bins
        self.seed = seed
        self._edges: np.ndarray | None = None
        self.n_classes_ = 0

    # -- fitting -----------------------------------------------------------

    def fit(self, X: np.ndarray, y: np.ndarray) -> "DecisionTree":
        X = np.asarray(X, dtype=np.float64)
        y = np.asarray(y)
        X = np.nan_to_num(X, nan=0.0, posinf=0.0, neginf=0.0)
        self._edges = bin_features(X, self.n_bins)
        Xb = apply_bins(X, self._edges)
        if self.task == "C":
            self.classes_, y_enc = np.unique(y, return_inverse=True)
            self.n_classes_ = len(self.classes_)
        else:
            y_enc = y.astype(np.float64)
        self._rng = np.random.default_rng(self.seed)
        self.feature_importances_ = np.zeros(X.shape[1])
        # Flat array representation: feature, threshold-bin, child ids, value.
        self._feat: list[int] = []
        self._thr: list[int] = []
        self._left: list[int] = []
        self._right: list[int] = []
        self._value: list[np.ndarray | float] = []
        self._grow(Xb, y_enc, np.arange(len(y_enc)), depth=0)
        self._feat_a = np.array(self._feat, dtype=np.int32)
        self._thr_a = np.array(self._thr, dtype=np.int32)
        self._left_a = np.array(self._left, dtype=np.int32)
        self._right_a = np.array(self._right, dtype=np.int32)
        return self

    def _leaf_value(self, y: np.ndarray):
        if self.task == "C":
            return np.bincount(y, minlength=self.n_classes_) / len(y)
        return float(y.mean())

    def _new_node(self) -> int:
        self._feat.append(_LEAF)
        self._thr.append(0)
        self._left.append(_LEAF)
        self._right.append(_LEAF)
        self._value.append(0.0)
        return len(self._feat) - 1

    def _grow(self, Xb: np.ndarray, y: np.ndarray, idx: np.ndarray, depth: int) -> int:
        node = self._new_node()
        y_node = y[idx]
        self._value[node] = self._leaf_value(y_node)
        if depth >= self.max_depth or len(idx) < 2 * self.min_leaf:
            return node
        if self.task == "C" and len(np.unique(y_node)) == 1:
            return node
        split = self._best_split(Xb[idx], y_node)
        if split is None:
            return node
        f, b, gain = split
        go_left = Xb[idx, f] <= b
        left_idx, right_idx = idx[go_left], idx[~go_left]
        if len(left_idx) < self.min_leaf or len(right_idx) < self.min_leaf:
            return node
        # Impurity-decrease importance, weighted by the node's sample share.
        self.feature_importances_[f] += gain * len(idx)
        self._feat[node] = f
        self._thr[node] = b
        self._left[node] = self._grow(Xb, y, left_idx, depth + 1)
        self._right[node] = self._grow(Xb, y, right_idx, depth + 1)
        return node

    def _candidate_features(self, n_features: int) -> np.ndarray:
        if self.max_features is None or self.max_features >= n_features:
            return np.arange(n_features)
        return self._rng.choice(n_features, size=self.max_features, replace=False)

    def _best_split(self, Xb: np.ndarray, y: np.ndarray):
        n, n_features = Xb.shape
        feats = self._candidate_features(n_features)
        Xs = Xb[:, feats]
        nf = len(feats)
        if self.task == "C":
            counts = np.zeros((nf, self.n_bins, self.n_classes_))
            np.add.at(
                counts,
                (np.broadcast_to(np.arange(nf), (n, nf)), Xs, y[:, None]),
                1.0,
            )
            left = np.cumsum(counts, axis=1)[:, :-1, :]  # (nf, bins-1, C)
            total = counts.sum(axis=1, keepdims=True)  # (nf, 1, C)
            right = total - left
            ln = left.sum(-1)  # (nf, bins-1)
            rn = right.sum(-1)
            with np.errstate(divide="ignore", invalid="ignore"):
                gl = 1.0 - np.sum((left / np.maximum(ln, 1)[..., None]) ** 2, -1)
                gr = 1.0 - np.sum((right / np.maximum(rn, 1)[..., None]) ** 2, -1)
            impurity = (ln * gl + rn * gr) / n
            p = total[:, 0, :] / n
            parent = 1.0 - np.sum(p**2, -1)[0]
        else:
            s1 = np.zeros((nf, self.n_bins))
            s2 = np.zeros((nf, self.n_bins))
            cnt = np.zeros((nf, self.n_bins))
            fidx = np.broadcast_to(np.arange(nf), (n, nf))
            np.add.at(s1, (fidx, Xs), y[:, None])
            np.add.at(s2, (fidx, Xs), (y**2)[:, None])
            np.add.at(cnt, (fidx, Xs), 1.0)
            ln = np.cumsum(cnt, 1)[:, :-1]
            l1 = np.cumsum(s1, 1)[:, :-1]
            l2 = np.cumsum(s2, 1)[:, :-1]
            tn, t1, t2 = cnt.sum(1, keepdims=True), s1.sum(1, keepdims=True), s2.sum(1, keepdims=True)
            rn, r1, r2 = tn - ln, t1 - l1, t2 - l2
            with np.errstate(divide="ignore", invalid="ignore"):
                var_l = l2 - l1**2 / np.maximum(ln, 1)
                var_r = r2 - r1**2 / np.maximum(rn, 1)
            impurity = (var_l + var_r) / n
            parent = float(y.var())
        valid = (ln >= self.min_leaf) & (rn >= self.min_leaf)
        if not valid.any():
            return None
        impurity = np.where(valid, impurity, np.inf)
        fi, bi = np.unravel_index(np.argmin(impurity), impurity.shape)
        gain = parent - impurity[fi, bi]
        if gain <= 1e-12:
            return None
        return int(feats[fi]), int(bi), float(gain)

    # -- prediction --------------------------------------------------------

    def _leaf_of(self, Xb: np.ndarray) -> np.ndarray:
        node = np.zeros(len(Xb), dtype=np.int32)
        active = self._feat_a[node] != _LEAF
        while active.any():
            cur = node[active]
            f = self._feat_a[cur]
            go_left = Xb[active, f] <= self._thr_a[cur]
            node[active] = np.where(go_left, self._left_a[cur], self._right_a[cur])
            active = self._feat_a[node] != _LEAF
        return node

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        """Class-probability matrix (classification only)."""
        if self.task != "C":
            raise ValueError("predict_proba is classification-only")
        X = np.nan_to_num(np.asarray(X, dtype=np.float64), nan=0.0, posinf=0.0, neginf=0.0)
        Xb = apply_bins(X, self._edges)
        leaves = self._leaf_of(Xb)
        return np.stack([np.asarray(self._value[i]) for i in leaves])

    def predict(self, X: np.ndarray) -> np.ndarray:
        if self.task == "C":
            return self.classes_[np.argmax(self.predict_proba(X), axis=1)]
        X = np.nan_to_num(np.asarray(X, dtype=np.float64), nan=0.0, posinf=0.0, neginf=0.0)
        Xb = apply_bins(X, self._edges)
        leaves = self._leaf_of(Xb)
        return np.array([self._value[i] for i in leaves], dtype=np.float64)

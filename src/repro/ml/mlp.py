"""Multi-layer perceptron (Table V's 'MLP'; also FE|DL's DL stage).

Two ReLU hidden layers, softmax cross-entropy for classification or MSE
for regression, full-batch Adam, manual backprop — the box has no
autograd framework, and the roster datasets are small enough that
full-batch training is both simpler and faster than minibatching.
"""
from __future__ import annotations

import numpy as np

from .linear import standardize_apply, standardize_fit

__all__ = ["MLP"]


class MLP:
    def __init__(
        self,
        task: str = "C",
        hidden: tuple[int, ...] = (64, 32),
        lr: float = 0.01,
        epochs: int = 200,
        l2: float = 1e-4,
        seed: int = 0,
    ):
        if task not in ("C", "R"):
            raise ValueError("task must be 'C' or 'R'")
        self.task = task
        self.hidden = hidden
        self.lr = lr
        self.epochs = epochs
        self.l2 = l2
        self.seed = seed

    def _init_params(self, sizes: list[int], rng: np.random.Generator):
        self._W = [
            rng.normal(scale=np.sqrt(2.0 / sizes[i]), size=(sizes[i], sizes[i + 1]))
            for i in range(len(sizes) - 1)
        ]
        self._b = [np.zeros(sizes[i + 1]) for i in range(len(sizes) - 1)]

    def fit(self, X: np.ndarray, y: np.ndarray) -> "MLP":
        X = np.nan_to_num(np.asarray(X, dtype=np.float64), nan=0.0, posinf=0.0, neginf=0.0)
        y = np.asarray(y)
        self._mu, self._sd = standardize_fit(X)
        Xs = standardize_apply(X, self._mu, self._sd)
        n = len(Xs)
        rng = np.random.default_rng(self.seed)
        if self.task == "C":
            self.classes_, y_enc = np.unique(y, return_inverse=True)
            out_dim = len(self.classes_)
            T = np.zeros((n, out_dim))
            T[np.arange(n), y_enc] = 1.0
        else:
            out_dim = 1
            self._ym, self._ys = float(np.mean(y)), float(np.std(y) or 1.0)
            T = ((y.astype(np.float64) - self._ym) / self._ys)[:, None]
        sizes = [Xs.shape[1], *self.hidden, out_dim]
        self._init_params(sizes, rng)
        mW = [np.zeros_like(w) for w in self._W]
        vW = [np.zeros_like(w) for w in self._W]
        mb = [np.zeros_like(b) for b in self._b]
        vb = [np.zeros_like(b) for b in self._b]
        for t in range(1, self.epochs + 1):
            acts = self._forward(Xs)
            logits = acts[-1]
            if self.task == "C":
                z = logits - logits.max(axis=1, keepdims=True)
                p = np.exp(z)
                p /= p.sum(axis=1, keepdims=True)
                delta = (p - T) / n
            else:
                delta = 2.0 * (logits - T) / n
            gW, gb = self._backward(acts, delta)
            for i in range(len(self._W)):
                gW[i] += self.l2 * self._W[i]
                mW[i] = 0.9 * mW[i] + 0.1 * gW[i]
                vW[i] = 0.999 * vW[i] + 0.001 * gW[i] ** 2
                self._W[i] -= self.lr * (mW[i] / (1 - 0.9**t)) / (
                    np.sqrt(vW[i] / (1 - 0.999**t)) + 1e-8
                )
                mb[i] = 0.9 * mb[i] + 0.1 * gb[i]
                vb[i] = 0.999 * vb[i] + 0.001 * gb[i] ** 2
                self._b[i] -= self.lr * (mb[i] / (1 - 0.9**t)) / (
                    np.sqrt(vb[i] / (1 - 0.999**t)) + 1e-8
                )
        return self

    def _forward(self, Xs: np.ndarray) -> list[np.ndarray]:
        acts = [Xs]
        h = Xs
        for i in range(len(self._W) - 1):
            h = np.maximum(h @ self._W[i] + self._b[i], 0.0)
            acts.append(h)
        acts.append(h @ self._W[-1] + self._b[-1])
        return acts

    def _backward(self, acts: list[np.ndarray], delta: np.ndarray):
        gW = [np.zeros_like(w) for w in self._W]
        gb = [np.zeros_like(b) for b in self._b]
        for i in range(len(self._W) - 1, -1, -1):
            gW[i] = acts[i].T @ delta
            gb[i] = delta.sum(axis=0)
            if i > 0:
                delta = (delta @ self._W[i].T) * (acts[i] > 0)
        return gW, gb

    def predict(self, X: np.ndarray) -> np.ndarray:
        X = np.nan_to_num(np.asarray(X, dtype=np.float64), nan=0.0, posinf=0.0, neginf=0.0)
        logits = self._forward(standardize_apply(X, self._mu, self._sd))[-1]
        if self.task == "C":
            return self.classes_[np.argmax(logits, axis=1)]
        return logits[:, 0] * self._ys + self._ym

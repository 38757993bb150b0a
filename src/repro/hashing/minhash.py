"""(Weighted) MinHash sample compressors — FPE's hashing module.

A feature column with M samples is treated as a weighted set over the
sample indices {0..M-1}; each of ``d`` hash functions consistently
selects one index, and the compressed representation is the feature's
*values at the selected indices* — "select d instances with the minimum
hashing values as the compressed results" (paper §III-B). Because the
per-(hash, index) random draws depend only on (seed, hash k, index i),
two similar columns select overlapping indices, so the weighted-Jaccard
similarity between columns is approximately preserved (Eq. 2); this is
the property the tests check.

Variants (paper Table III: E-AFE^I = ICWS, E-AFE^L = LICWS/0-bit CWS,
E-AFE^P = PCWS, default = CCWS):

- ``minhash``: unweighted — a_{k,i} ~ U(0,1) independent of the values;
  every feature of a dataset selects the same d rows.
- ``icws`` (Ioffe 2010): r, c ~ Gamma(2,1), b ~ U(0,1);
  t = floor(ln w / r + b), y = exp(r (t - b)), a = c / (y e^r).
- ``licws`` (0-bit CWS, Li 2015): ICWS with the c-dependent component
  dropped (the "0-bit" signature discards t): a = 1 / (y e^r).
- ``pcws`` (Wu et al. 2017): the Gamma(2,1) draws realized from uniforms
  (r = -ln(u1 u2)) and c replaced by a single exponential -ln(u4).
- ``ccws`` (Wu et al. 2016): canonical/linear weighting — t uses w
  directly instead of ln w: t = floor(w / r + b), y = r (t - b),
  a = c / (y + r).

Exact constants of each published scheme matter for tight similarity
bounds, not for this pipeline; what the reproduction needs (and what the
paper itself reports) is that the variants behave near-identically as
sample compressors. DESIGN.md §7 documents this.
"""
from __future__ import annotations

import numpy as np

VARIANTS = ("minhash", "icws", "licws", "pcws", "ccws")

__all__ = ["VARIANTS", "compress", "compress_matrix", "weighted_jaccard"]


def _normalize_weights(x: np.ndarray) -> np.ndarray:
    """Shift to strictly-positive weights with unit mean.

    Weighted MinHash needs w > 0; feature values are arbitrary reals, so
    shift by the minimum and add a small floor. Mean-normalizing makes
    the selection scale-invariant, which keeps signatures comparable
    across features with wildly different magnitudes (a requirement for
    a cross-dataset FPE classifier).
    """
    x = np.asarray(x, dtype=np.float64)
    x = np.nan_to_num(x, nan=0.0, posinf=0.0, neginf=0.0)
    w = x - x.min() + 1e-9
    m = w.mean()
    return w / m if m > 0 else np.full_like(w, 1e-9)


def _draws(d: int, m: int, seed: int) -> tuple[np.ndarray, ...]:
    """Deterministic per-(hash k, index i) random draws, shape (d, m) each.

    The draws depend only on (seed, k, i) — never on the weights — which
    is what makes the selection *consistent* across features and hence
    similarity-preserving.
    """
    g = np.random.default_rng(seed)
    u1 = g.random((d, m))
    u2 = g.random((d, m))
    u3 = g.random((d, m))
    u4 = g.random((d, m))
    return u1, u2, u3, u4


def _scores(w: np.ndarray, d: int, variant: str, seed: int) -> np.ndarray:
    """Matrix a[k, i]; per hash k the argmin_i is the selected sample."""
    m = len(w)
    u1, u2, u3, u4 = _draws(d, m, seed)
    if variant == "minhash":
        return u1
    # Gamma(2,1) via inverse of the product of two uniforms.
    r = -np.log(u1 * u2)
    b = u3
    lw = np.log(w)[None, :]
    if variant in ("icws", "licws", "pcws"):
        t = np.floor(lw / r + b)
        ln_y = r * (t - b)
        # ln a = ln c - ln y - r ; argmin in log space is the same argmin.
        if variant == "icws":
            ln_c = np.log(-np.log(u4 * np.roll(u4, 1, axis=1)))  # Gamma(2,1)
            return ln_c - ln_y - r
        if variant == "licws":
            return -ln_y - r
        # pcws: single exponential in place of the gamma.
        return np.log(-np.log(u4)) - ln_y - r
    if variant == "ccws":
        t = np.floor(w[None, :] / r + b)
        y = r * (t - b)
        c = -np.log(u4 * np.roll(u4, 1, axis=1))
        return c / (y + r)
    raise ValueError(f"unknown MinHash variant {variant!r}; choose from {VARIANTS}")


def select_indices(
    x: np.ndarray, d: int = 48, variant: str = "ccws", seed: int = 0
) -> np.ndarray:
    """The d sample indices the hash family selects for column ``x``."""
    w = _normalize_weights(x)
    return np.argmin(_scores(w, d, variant, seed), axis=1)


def compress(
    x: np.ndarray, d: int = 48, variant: str = "ccws", seed: int = 0
) -> np.ndarray:
    """Compress one feature column (M values) to d selected values."""
    idx = select_indices(x, d, variant, seed)
    return np.asarray(x, dtype=np.float64)[idx]


def compress_matrix(
    X: np.ndarray, d: int = 48, variant: str = "ccws", seed: int = 0
) -> np.ndarray:
    """Compress an (M, N) dataset column-wise to (d, N) (Eq. 2's MinHash(D, d))."""
    X = np.asarray(X, dtype=np.float64)
    return np.stack([compress(X[:, j], d, variant, seed) for j in range(X.shape[1])], axis=1)


def weighted_jaccard(x: np.ndarray, y: np.ndarray) -> float:
    """Generalized (weighted) Jaccard similarity sum(min)/sum(max) on
    the normalized nonnegative weights of two equal-length columns."""
    wx, wy = _normalize_weights(x), _normalize_weights(y)
    denom = np.sum(np.maximum(wx, wy))
    return float(np.sum(np.minimum(wx, wy)) / denom) if denom > 0 else 1.0

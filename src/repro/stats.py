"""Statistical tests for Table VI, from scratch (no scipy on the box).

Implements the regularized incomplete beta function via the standard
Lentz continued-fraction expansion, the Student-t CDF on top of it, and a
paired two-sample t-test. Accuracy is ~1e-10 over the parameter ranges a
36-dataset paired test can produce, verified in tests against closed-form
special cases (df=1 → arctan form, df=2 → algebraic form).
"""
from __future__ import annotations

import math

import numpy as np

__all__ = ["betainc", "student_t_cdf", "student_t_sf", "paired_t_test"]

_MAX_ITER = 500
_EPS = 1e-14


def _betacf(a: float, b: float, x: float) -> float:
    """Continued fraction for the incomplete beta (Numerical Recipes 6.4)."""
    qab, qap, qam = a + b, a + 1.0, a - 1.0
    c = 1.0
    d = 1.0 - qab * x / qap
    if abs(d) < 1e-300:
        d = 1e-300
    d = 1.0 / d
    h = d
    for m in range(1, _MAX_ITER + 1):
        m2 = 2 * m
        aa = m * (b - m) * x / ((qam + m2) * (a + m2))
        d = 1.0 + aa * d
        if abs(d) < 1e-300:
            d = 1e-300
        c = 1.0 + aa / c
        if abs(c) < 1e-300:
            c = 1e-300
        d = 1.0 / d
        h *= d * c
        aa = -(a + m) * (qab + m) * x / ((a + m2) * (qap + m2))
        d = 1.0 + aa * d
        if abs(d) < 1e-300:
            d = 1e-300
        c = 1.0 + aa / c
        if abs(c) < 1e-300:
            c = 1e-300
        d = 1.0 / d
        delta = d * c
        h *= delta
        if abs(delta - 1.0) < _EPS:
            return h
    return h


def betainc(a: float, b: float, x: float) -> float:
    """Regularized incomplete beta I_x(a, b) for a, b > 0, x in [0, 1]."""
    if not (a > 0 and b > 0):
        raise ValueError("betainc requires a > 0 and b > 0")
    if x <= 0.0:
        return 0.0
    if x >= 1.0:
        return 1.0
    ln_front = (
        math.lgamma(a + b)
        - math.lgamma(a)
        - math.lgamma(b)
        + a * math.log(x)
        + b * math.log1p(-x)
    )
    front = math.exp(ln_front)
    # Use the symmetry relation to keep the continued fraction convergent.
    if x < (a + 1.0) / (a + b + 2.0):
        return front * _betacf(a, b, x) / a
    return 1.0 - front * _betacf(b, a, 1.0 - x) / b


def student_t_cdf(t: float, df: float) -> float:
    """CDF of the Student-t distribution with ``df`` degrees of freedom."""
    if df <= 0:
        raise ValueError("df must be positive")
    if t == 0.0:
        return 0.5
    x = df / (df + t * t)
    p = 0.5 * betainc(df / 2.0, 0.5, x)
    return 1.0 - p if t > 0 else p


def student_t_sf(t: float, df: float) -> float:
    """Survival function P(T > t)."""
    return 1.0 - student_t_cdf(t, df)


def paired_t_test(a, b) -> tuple[float, float]:
    """Two-sided paired t-test; returns (t statistic, p-value).

    ``a`` and ``b`` are equal-length score vectors paired by dataset (the
    Table VI setting: one score per target dataset per method). A zero
    variance of the differences with a non-zero mean yields p = 0; with a
    zero mean it yields p = 1 (no evidence either way).
    """
    a = np.asarray(a, dtype=np.float64)
    b = np.asarray(b, dtype=np.float64)
    if a.shape != b.shape or a.ndim != 1:
        raise ValueError("paired_t_test expects two equal-length 1-D vectors")
    n = a.size
    if n < 2:
        raise ValueError("need at least two pairs")
    d = a - b
    mean = d.mean()
    sd = d.std(ddof=1)
    if sd == 0.0:
        return (math.inf if mean > 0 else -math.inf, 0.0) if mean != 0 else (0.0, 1.0)
    t = mean / (sd / math.sqrt(n))
    p = 2.0 * student_t_sf(abs(t), n - 1)
    return float(t), float(min(1.0, p))

"""Tests for the from-scratch Student-t machinery (Table VI substrate).

Closed forms used as oracles:
- t CDF with df=1 (Cauchy): F(t) = 1/2 + arctan(t)/pi
- t CDF with df=2:          F(t) = 1/2 + t / (2*sqrt(2 + t^2))
- betainc(a, b, x) symmetry and known values.
"""
import math

import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.stats import betainc, paired_t_test, student_t_cdf, student_t_sf


class TestBetainc:
    def test_bounds(self):
        assert betainc(2.0, 3.0, 0.0) == 0.0
        assert betainc(2.0, 3.0, 1.0) == 1.0

    def test_uniform_case(self):
        # I_x(1,1) = x
        for x in (0.1, 0.5, 0.9):
            assert betainc(1.0, 1.0, x) == pytest.approx(x, abs=1e-12)

    def test_known_value(self):
        # I_x(2,2) = x^2 (3 - 2x)
        for x in (0.2, 0.5, 0.8):
            assert betainc(2.0, 2.0, x) == pytest.approx(x * x * (3 - 2 * x), abs=1e-12)

    def test_symmetry(self):
        # I_x(a,b) = 1 - I_{1-x}(b,a)
        assert betainc(2.5, 1.5, 0.3) == pytest.approx(
            1.0 - betainc(1.5, 2.5, 0.7), abs=1e-12
        )

    def test_invalid_params(self):
        with pytest.raises(ValueError):
            betainc(0.0, 1.0, 0.5)

    @settings(max_examples=50, deadline=None)
    @given(st.floats(0.01, 0.99), st.floats(0.5, 20), st.floats(0.5, 20))
    def test_monotone_in_x(self, x, a, b):
        assert betainc(a, b, x) <= betainc(a, b, min(x + 0.01, 1.0)) + 1e-12


class TestStudentT:
    def test_cauchy_closed_form(self):
        for t in (-3.0, -0.5, 0.0, 0.7, 2.5):
            expected = 0.5 + math.atan(t) / math.pi
            assert student_t_cdf(t, 1) == pytest.approx(expected, abs=1e-10)

    def test_df2_closed_form(self):
        for t in (-2.0, -0.3, 0.0, 1.0, 4.0):
            expected = 0.5 + t / (2.0 * math.sqrt(2.0 + t * t))
            assert student_t_cdf(t, 2) == pytest.approx(expected, abs=1e-10)

    def test_symmetry(self):
        assert student_t_cdf(1.3, 7) == pytest.approx(1.0 - student_t_cdf(-1.3, 7))

    def test_sf_complement(self):
        assert student_t_sf(0.9, 5) == pytest.approx(1.0 - student_t_cdf(0.9, 5))

    def test_large_df_approaches_normal(self):
        # Phi(1.96) ~ 0.975
        assert student_t_cdf(1.96, 10000) == pytest.approx(0.975, abs=2e-3)

    def test_invalid_df(self):
        with pytest.raises(ValueError):
            student_t_cdf(0.0, 0)


class TestPairedTTest:
    def test_identical_samples(self):
        a = np.array([1.0, 2.0, 3.0])
        t, p = paired_t_test(a, a)
        assert t == 0.0 and p == 1.0

    def test_constant_shift_zero_variance(self):
        a = np.array([1.0, 2.0, 3.0])
        t, p = paired_t_test(a + 1.0, a)
        assert p == 0.0 and t == math.inf

    def test_known_example(self):
        # d = [1, 2, 3]: mean 2, sd 1, t = 2*sqrt(3) ~ 3.4641, df=2
        a = np.array([2.0, 4.0, 6.0])
        b = np.array([1.0, 2.0, 3.0])
        t, p = paired_t_test(a, b)
        assert t == pytest.approx(2 * math.sqrt(3))
        # p = 2*(1 - F(t; 2)) with df-2 closed form
        expected = 2 * (0.5 - t / (2 * math.sqrt(2 + t * t)))
        assert p == pytest.approx(expected, abs=1e-10)

    def test_significant_difference(self):
        rng = np.random.default_rng(0)
        base = rng.normal(size=30)
        t, p = paired_t_test(base + 0.5, base)
        assert p < 1e-6 and t > 0

    def test_insignificant_difference(self):
        rng = np.random.default_rng(0)
        a = rng.normal(size=30)
        _, p = paired_t_test(a, a + rng.normal(scale=1.0, size=30) * 0 + rng.normal(scale=0.001, size=30))
        # tiny random jitter: p may be anything but must be a valid probability
        assert 0.0 <= p <= 1.0

    def test_shape_validation(self):
        with pytest.raises(ValueError):
            paired_t_test(np.array([1.0, 2.0]), np.array([1.0]))

    def test_min_pairs(self):
        with pytest.raises(ValueError):
            paired_t_test(np.array([1.0]), np.array([2.0]))

    def test_symmetry_of_sign(self):
        a = np.array([1.0, 2.0, 3.5, 2.2])
        b = np.array([0.5, 2.5, 3.0, 1.8])
        t1, p1 = paired_t_test(a, b)
        t2, p2 = paired_t_test(b, a)
        assert t1 == pytest.approx(-t2)
        assert p1 == pytest.approx(p2)

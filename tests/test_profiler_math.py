"""Tests for the pure-math parts of the profiler (corr, NMI)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st
from hypothesis.extra.numpy import arrays

from repro.profiles.profiler import normalized_mi, pearson_abs


class TestPearsonAbs:
    def test_perfect_correlation(self):
        x = np.arange(50, dtype=float)
        assert pearson_abs(x, 2 * x + 1) == pytest.approx(1.0)

    def test_perfect_anticorrelation_abs(self):
        x = np.arange(50, dtype=float)
        assert pearson_abs(x, -x) == pytest.approx(1.0)

    def test_independent_near_zero(self):
        g = np.random.default_rng(0)
        assert pearson_abs(g.normal(size=2000), g.normal(size=2000)) < 0.1

    def test_constant_column_zero(self):
        assert pearson_abs(np.ones(20), np.arange(20.0)) == 0.0

    def test_nan_pairs_dropped(self):
        x = np.array([1.0, 2.0, 3.0, np.nan, 5.0])
        y = np.array([2.0, 4.0, 6.0, 100.0, 10.0])
        assert pearson_abs(x, y) == pytest.approx(1.0)

    def test_too_few_points_zero(self):
        assert pearson_abs(np.array([1.0, 2.0]), np.array([1.0, 2.0])) == 0.0

    @settings(max_examples=30, deadline=None)
    @given(arrays(float, 30, elements=st.floats(-100, 100)))
    def test_bounds(self, x):
        g = np.random.default_rng(0)
        y = g.normal(size=30)
        assert 0.0 <= pearson_abs(x, y) <= 1.0


class TestNormalizedMI:
    def test_identical_high(self):
        g = np.random.default_rng(0)
        x = g.normal(size=1000)
        assert normalized_mi(x, x) > 0.8

    def test_independent_low(self):
        g = np.random.default_rng(1)
        assert normalized_mi(g.normal(size=2000), g.normal(size=2000)) < 0.15

    def test_monotone_transform_preserved(self):
        """MI sees nonlinear dependence correlation misses."""
        g = np.random.default_rng(2)
        x = g.normal(size=1000)
        y = x**2 + 0.1 * g.normal(size=1000)
        assert normalized_mi(x, y) > 0.2
        assert pearson_abs(x, y) < 0.2

    def test_constant_zero(self):
        assert normalized_mi(np.ones(50), np.arange(50.0)) == 0.0

    def test_nan_dropped(self):
        x = np.array([np.nan] * 5 + list(range(100)), dtype=float)
        y = np.array([0.0] * 5 + list(range(100)), dtype=float)
        assert normalized_mi(x, y) > 0.5

    @settings(max_examples=20, deadline=None)
    @given(st.integers(0, 10_000))
    def test_bounds(self, seed):
        g = np.random.default_rng(seed)
        x, y = g.normal(size=60), g.normal(size=60)
        assert 0.0 <= normalized_mi(x, y) <= 1.0

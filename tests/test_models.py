"""Unit tests for the numpy model zoo."""
import numpy as np
import pytest

from repro.tasks.models import (
    Logistic,
    RandomForest,
    Ridge,
    accuracy,
    f1_score,
    impute_mean,
    mae,
    standardize,
    train_val_split,
)


class TestImpute:
    def test_no_nans_identity(self):
        X = np.array([[1.0, 2.0], [3.0, 4.0]])
        np.testing.assert_allclose(impute_mean(X), X)

    def test_nan_filled_with_column_mean(self):
        X = np.array([[1.0, np.nan], [3.0, 4.0]])
        out = impute_mean(X)
        assert out[0, 1] == 4.0

    def test_all_nan_column_becomes_zero(self):
        X = np.array([[np.nan], [np.nan]])
        out = impute_mean(X)
        np.testing.assert_allclose(out, 0.0)

    def test_does_not_mutate_input(self):
        X = np.array([[np.nan, 1.0]])
        impute_mean(X)
        assert np.isnan(X[0, 0])


class TestStandardize:
    def test_zero_mean_unit_std(self):
        X = np.random.default_rng(0).normal(5, 3, size=(200, 3))
        Xs, _, _ = standardize(X)
        np.testing.assert_allclose(Xs.mean(axis=0), 0, atol=1e-9)
        np.testing.assert_allclose(Xs.std(axis=0), 1, atol=1e-9)

    def test_constant_column_unchanged_scale(self):
        X = np.ones((10, 1))
        Xs, _, _ = standardize(X)
        np.testing.assert_allclose(Xs, 0.0)

    def test_reuse_params(self):
        X = np.random.default_rng(1).normal(size=(50, 2))
        _, mu, sd = standardize(X)
        X2s, _, _ = standardize(X + 1.0, mu, sd)
        assert X2s.mean() > 0


class TestSplit:
    def test_disjoint_and_complete(self):
        tr, va = train_val_split(100, 0.3, seed=0)
        assert len(set(tr) & set(va)) == 0
        assert len(tr) + len(va) == 100

    def test_deterministic(self):
        a = train_val_split(50, 0.3, seed=3)
        b = train_val_split(50, 0.3, seed=3)
        np.testing.assert_array_equal(a[0], b[0])

    def test_val_fraction(self):
        _, va = train_val_split(100, 0.25, seed=0)
        assert len(va) == 25


class TestMetrics:
    def test_accuracy(self):
        assert accuracy(np.array([1, 0, 1]), np.array([1, 1, 1])) == pytest.approx(2 / 3)

    def test_f1_perfect(self):
        y = np.array([1, 0, 1, 0])
        assert f1_score(y, y) == 1.0

    def test_f1_no_tp(self):
        assert f1_score(np.array([1, 1]), np.array([0, 0])) == 0.0

    def test_f1_known(self):
        y = np.array([1, 1, 0, 0])
        p = np.array([1, 0, 1, 0])
        assert f1_score(y, p) == pytest.approx(0.5)

    def test_mae(self):
        assert mae(np.array([1.0, 2.0]), np.array([2.0, 2.0])) == 0.5


class TestRidge:
    def test_recovers_linear_model(self):
        g = np.random.default_rng(0)
        X = g.normal(size=(500, 3))
        y = 2 * X[:, 0] - 1 * X[:, 1] + 0.1 * g.normal(size=500)
        m = Ridge(lam=1e-3).fit(X, y)
        pred = m.predict(X)
        assert mae(y, pred) < 0.15

    def test_regularization_shrinks(self):
        g = np.random.default_rng(1)
        X = g.normal(size=(100, 2))
        y = X[:, 0]
        small = Ridge(lam=1e-6).fit(X, y).coef_
        big = Ridge(lam=1e3).fit(X, y).coef_
        assert np.abs(big).sum() < np.abs(small).sum()

    def test_intercept_fits_mean(self):
        X = np.zeros((50, 1))
        y = np.full(50, 7.0)
        m = Ridge().fit(X, y)
        np.testing.assert_allclose(m.predict(X), 7.0)


class TestLogistic:
    def test_separable_data_high_accuracy(self):
        g = np.random.default_rng(0)
        X = g.normal(size=(400, 2))
        y = (X[:, 0] + X[:, 1] > 0).astype("int64")
        m = Logistic().fit(X, y)
        assert accuracy(y, m.predict(X)) > 0.95

    def test_proba_in_unit_interval(self):
        g = np.random.default_rng(1)
        X = g.normal(size=(100, 3))
        y = (X[:, 0] > 0).astype("int64")
        p = Logistic().fit(X, y).predict_proba(X)
        assert p.min() >= 0 and p.max() <= 1

    def test_uninformative_features_near_chance(self):
        g = np.random.default_rng(2)
        X = g.normal(size=(300, 2))
        y = g.integers(0, 2, 300)
        m = Logistic().fit(X, y)
        assert 0.3 < accuracy(y, m.predict(X)) < 0.75

    def test_deterministic(self):
        g = np.random.default_rng(3)
        X = g.normal(size=(100, 2))
        y = (X[:, 0] > 0).astype("int64")
        a = Logistic().fit(X, y).coef_
        b = Logistic().fit(X, y).coef_
        np.testing.assert_allclose(a, b)


class TestRandomForest:
    def test_fits_nonlinear_signal(self):
        g = np.random.default_rng(0)
        X = g.normal(size=(400, 3))
        y = np.where(X[:, 0] > 0, 2.0, -2.0) + 0.2 * g.normal(size=400)
        m = RandomForest(n_trees=10, seed=0).fit(X, y)
        assert mae(y, m.predict(X)) < 1.2

    def test_classification_mode(self):
        g = np.random.default_rng(1)
        X = g.normal(size=(300, 2))
        y = (X[:, 0] > 0).astype("int64")
        m = RandomForest(n_trees=10, seed=0, classification=True).fit(X, y)
        assert accuracy(y, m.predict(X)) > 0.8

    def test_importance_ranks_informative_feature_first(self):
        g = np.random.default_rng(2)
        X = g.normal(size=(400, 4))
        y = 3 * X[:, 2] + 0.2 * g.normal(size=400)
        m = RandomForest(n_trees=10, max_features=1.0, seed=0).fit(X, y)
        assert int(np.argmax(m.feature_importances_)) == 2

    def test_importance_normalized(self):
        g = np.random.default_rng(3)
        X = g.normal(size=(200, 3))
        y = X[:, 0]
        m = RandomForest(n_trees=5, seed=0).fit(X, y)
        assert m.feature_importances_.sum() == pytest.approx(1.0)

    def test_deterministic_in_seed(self):
        g = np.random.default_rng(4)
        X = g.normal(size=(150, 2))
        y = X[:, 0]
        a = RandomForest(n_trees=5, seed=9).fit(X, y).predict(X)
        b = RandomForest(n_trees=5, seed=9).fit(X, y).predict(X)
        np.testing.assert_allclose(a, b)

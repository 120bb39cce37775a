"""Tests for classification and regression tasks (pure pandas/numpy)."""
import numpy as np
import pandas as pd
import pytest

from repro.tasks.classification import ClassificationTask
from repro.tasks.regression import RegressionTask


def _clf_frame(n=400, seed=0, signal=True):
    g = np.random.default_rng(seed)
    x_weak = g.normal(size=n)
    x_strong = g.normal(size=n)
    y = (1.5 * x_strong + 0.3 * x_weak + 0.5 * g.normal(size=n) > 0).astype(
        "int64"
    )
    df = pd.DataFrame({"y": y, "weak": x_weak, "key": np.arange(n)})
    if signal:
        df["strong"] = x_strong
    return df


class TestClassification:
    def test_utility_in_unit_interval(self):
        t = ClassificationTask(target="y", exclude=("key",))
        u = t.utility(_clf_frame())
        assert 0.0 <= u <= 1.0

    def test_informative_feature_raises_utility(self):
        t = ClassificationTask(target="y", exclude=("key",))
        u_with = t.utility(_clf_frame(signal=True))
        u_without = t.utility(_clf_frame(signal=False))
        assert u_with > u_without + 0.1

    def test_exclude_respected(self):
        """Excluding the strong feature must drop utility to the weak level."""
        t_all = ClassificationTask(target="y", exclude=("key",))
        t_ex = ClassificationTask(target="y", exclude=("key", "strong"))
        df = _clf_frame()
        assert t_all.utility(df) > t_ex.utility(df) + 0.05

    def test_no_features_majority_baseline(self):
        df = pd.DataFrame({"y": [0, 0, 0, 1]})
        t = ClassificationTask(target="y")
        assert t.utility(df) == pytest.approx(0.75)

    def test_deterministic(self):
        t = ClassificationTask(target="y", exclude=("key",), seed=1)
        df = _clf_frame()
        assert t.utility(df) == t.utility(df)

    def test_f1_metric_mode(self):
        t = ClassificationTask(target="y", exclude=("key",), metric="f1")
        assert 0.0 <= t.utility(_clf_frame()) <= 1.0

    def test_forest_model_mode(self):
        t = ClassificationTask(target="y", exclude=("key",), model="forest")
        u = t.utility(_clf_frame())
        assert u > 0.6

    def test_nan_features_handled(self):
        df = _clf_frame()
        df.loc[:50, "strong"] = np.nan
        t = ClassificationTask(target="y", exclude=("key",))
        assert 0.0 <= t.utility(df) <= 1.0


def _reg_frame(n=400, seed=0, signal=True):
    g = np.random.default_rng(seed)
    x_weak = g.normal(size=n)
    x_strong = g.normal(size=n)
    y = 2.0 * x_strong + 0.3 * x_weak + 0.3 * g.normal(size=n)
    df = pd.DataFrame({"y": y, "weak": x_weak})
    if signal:
        df["strong"] = x_strong
    return df


class TestRegression:
    def test_utility_in_unit_interval(self):
        t = RegressionTask(target="y")
        assert 0.0 <= t.utility(_reg_frame()) <= 1.0

    def test_informative_feature_raises_utility(self):
        t = RegressionTask(target="y")
        assert t.utility(_reg_frame(signal=True)) > t.utility(
            _reg_frame(signal=False)
        ) + 0.2

    def test_no_features_mean_predictor(self):
        df = pd.DataFrame({"y": np.random.default_rng(0).normal(size=100)})
        t = RegressionTask(target="y")
        u = t.utility(df)
        assert 0.0 <= u <= 0.4  # mean predictor ≈ MAE 1 on MAD scale

    def test_forest_model_mode(self):
        t = RegressionTask(target="y", model="forest")
        assert t.utility(_reg_frame()) > 0.3

    def test_deterministic(self):
        t = RegressionTask(target="y", seed=2)
        df = _reg_frame()
        assert t.utility(df) == t.utility(df)

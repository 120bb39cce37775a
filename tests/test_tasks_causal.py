"""Tests for the what-if / how-to causal attribution task."""
import numpy as np
import pandas as pd
import pytest

from repro.tasks.causal import CausalAttributionTask, fisher_z_pvalue


class TestFisherZ:
    def test_zero_correlation_insignificant(self):
        assert fisher_z_pvalue(0.0, 100) == pytest.approx(1.0)

    def test_strong_correlation_significant(self):
        assert fisher_z_pvalue(0.8, 100) < 1e-6

    def test_small_sample_insignificant(self):
        assert fisher_z_pvalue(0.9, 3) == 1.0

    def test_pvalue_decreases_with_n(self):
        assert fisher_z_pvalue(0.2, 500) < fisher_z_pvalue(0.2, 30)

    def test_symmetric_in_sign(self):
        assert fisher_z_pvalue(0.5, 50) == pytest.approx(
            fisher_z_pvalue(-0.5, 50)
        )

    def test_bounds(self):
        for r in (-0.99, -0.3, 0.0, 0.3, 0.99):
            p = fisher_z_pvalue(r, 60)
            assert 0.0 <= p <= 1.0


def _frame(n=400, seed=0):
    g = np.random.default_rng(seed)
    s0 = g.normal(size=n)
    s1 = g.normal(size=n)
    outcome = s0 + s1 + 0.4 * g.normal(size=n)
    return pd.DataFrame(
        {
            "outcome": outcome,
            "proxy_s0": s0 + 0.2 * g.normal(size=n),
            "proxy_s1": s1 + 0.2 * g.normal(size=n),
            "noise_col": g.normal(size=n),
        }
    )


def _task(**kw):
    defaults = dict(
        outcome="outcome",
        true_signals=frozenset({0, 1}),
        signal_of={"proxy_s0": 0, "proxy_s1": 1, "proxy_s0_dup": 0},
    )
    defaults.update(kw)
    return CausalAttributionTask(**defaults)


class TestCausalUtility:
    def test_no_proxies_zero(self):
        t = _task()
        df = _frame()[["outcome", "noise_col"]]
        assert t.utility(df) == 0.0

    def test_one_proxy_half(self):
        t = _task()
        df = _frame()[["outcome", "proxy_s0", "noise_col"]]
        assert t.utility(df) == pytest.approx(0.5)

    def test_both_proxies_full(self):
        t = _task()
        assert t.utility(_frame()) == 1.0

    def test_monotone_adding_columns(self):
        """P3: adding columns never lowers the utility."""
        t = _task()
        df = _frame()
        u1 = t.utility(df[["outcome", "proxy_s0"]])
        u2 = t.utility(df[["outcome", "proxy_s0", "proxy_s1"]])
        u3 = t.utility(df)
        assert u1 <= u2 <= u3

    def test_duplicate_proxies_count_once(self):
        t = _task()
        df = _frame()
        df["proxy_s0_dup"] = df["proxy_s0"] + 0.01
        u = t.utility(df[["outcome", "proxy_s0", "proxy_s0_dup"]])
        assert u == pytest.approx(0.5)

    def test_unmapped_columns_ignored(self):
        t = _task()
        df = _frame()
        df["mystery"] = df["outcome"] * 2  # perfectly correlated, unmapped
        assert t.utility(df[["outcome", "mystery"]]) == 0.0

    def test_insignificant_proxy_not_counted(self):
        g = np.random.default_rng(1)
        n = 200
        df = pd.DataFrame(
            {"outcome": g.normal(size=n), "proxy_s0": g.normal(size=n)}
        )
        t = _task()
        assert t.utility(df) == 0.0

    def test_empty_true_signals(self):
        t = _task(true_signals=frozenset())
        assert t.utility(_frame()) == 0.0

    def test_nan_proxy_handled(self):
        t = _task()
        df = _frame()
        df.loc[: len(df) // 2, "proxy_s1"] = np.nan
        u = t.utility(df)
        assert 0.0 <= u <= 1.0

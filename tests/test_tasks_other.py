"""Tests for entity linking, clustering, and fair classification tasks."""
import numpy as np
import pandas as pd
import pytest

from repro.tasks.clustering_task import ClusteringTask, k_center_assign
from repro.tasks.entity_linking import EntityLinkingTask, KnowledgeBase
from repro.tasks.fairness import FairClassificationTask


class TestKnowledgeBase:
    def _kb(self):
        return KnowledgeBase(
            entities={(1, 10): 100, (1, 20): 101, (2, 10): 102}
        )

    def test_unambiguous_city_single_candidate(self):
        assert self._kb().candidates(2) == [(102, 10)]

    def test_ambiguous_city_two_candidates(self):
        assert len(self._kb().candidates(1)) == 2

    def test_unknown_city_empty(self):
        assert self._kb().candidates(99) == []


class TestEntityLinking:
    def _setup(self):
        kb = KnowledgeBase(
            entities={(1, 10): 100, (1, 20): 101, (2, 10): 102, (3, 30): 103}
        )
        df = pd.DataFrame(
            {
                "city": [1, 1, 2, 3],
                "truth": [100, 101, 102, 103],
            }
        )
        return kb, df

    def test_base_links_only_unambiguous(self):
        kb, df = self._setup()
        t = EntityLinkingTask(kb=kb, city_col="city", true_entity_col="truth")
        assert t.utility(df) == pytest.approx(0.5)  # cities 2 and 3 only

    def test_state_hint_disambiguates(self):
        kb, df = self._setup()
        df["state_code"] = [10.0, 20.0, 10.0, 30.0]
        t = EntityLinkingTask(kb=kb, city_col="city", true_entity_col="truth")
        assert t.utility(df) == 1.0

    def test_wrong_state_hint_does_not_help(self):
        kb, df = self._setup()
        df["state_code"] = [99.0, 77.0, 88.0, 66.0]
        t = EntityLinkingTask(kb=kb, city_col="city", true_entity_col="truth")
        assert t.utility(df) == pytest.approx(0.5)

    def test_nan_hints_ignored(self):
        kb, df = self._setup()
        df["state_code"] = [np.nan, np.nan, np.nan, np.nan]
        t = EntityLinkingTask(kb=kb, city_col="city", true_entity_col="truth")
        assert t.utility(df) == pytest.approx(0.5)

    def test_empty_frame(self):
        kb, _ = self._setup()
        df = pd.DataFrame({"city": [], "truth": []})
        t = EntityLinkingTask(kb=kb, city_col="city", true_entity_col="truth")
        assert t.utility(df) == 0.0


class TestKCenter:
    def test_labels_in_range(self):
        X = np.random.default_rng(0).normal(size=(50, 2))
        labels = k_center_assign(X, 3, seed=0)
        assert set(labels) <= {0, 1, 2}

    def test_separated_blobs_recovered(self):
        g = np.random.default_rng(1)
        X = np.vstack([g.normal(0, 0.1, (20, 2)), g.normal(5, 0.1, (20, 2))])
        labels = k_center_assign(X, 2, seed=0)
        assert len(set(labels[:20])) == 1 and len(set(labels[20:])) == 1
        assert labels[0] != labels[-1]


class TestClusteringTask:
    def _frame(self, informative=True, seed=0, n=120):
        g = np.random.default_rng(seed)
        cats = g.integers(0, 3, n)
        df = pd.DataFrame(
            {"category": cats, "weak": g.normal(size=n)}
        )
        if informative:
            df["oni"] = cats * 4.0 + 0.1 * g.normal(size=n)
        return df

    def test_utility_bounds(self):
        t = ClusteringTask(category_col="category")
        assert 0.0 <= t.utility(self._frame()) <= 1.0

    def test_informative_feature_improves_purity(self):
        t = ClusteringTask(category_col="category")
        assert t.utility(self._frame(True)) > t.utility(self._frame(False)) + 0.15

    def test_no_features_zero(self):
        df = pd.DataFrame({"category": [0, 1, 0, 1]})
        t = ClusteringTask(category_col="category")
        assert t.utility(df) == 0.0

    def test_single_category_zero(self):
        df = pd.DataFrame({"category": [1, 1, 1], "x": [0.1, 0.2, 0.3]})
        t = ClusteringTask(category_col="category")
        assert t.utility(df) == 0.0


class TestFairness:
    def _frame(self, seed=0, n=500):
        g = np.random.default_rng(seed)
        a = g.normal(size=n)  # unfair driver
        b = g.normal(size=n)  # fair driver
        sensitive = (a + 0.2 * g.normal(size=n) > 0).astype("int64")
        y = (a + b + 0.3 * g.normal(size=n) > 0).astype("int64")
        return pd.DataFrame(
            {
                "y": y,
                "sensitive": sensitive,
                "unfair_feat": a + 0.1 * g.normal(size=n),
                "fair_feat": b + 0.1 * g.normal(size=n),
                "noise": g.normal(size=n),
            }
        )

    def test_unfair_feature_filtered(self):
        t = FairClassificationTask(target="y", sensitive="sensitive")
        kept = t.fair_features(self._frame())
        assert "unfair_feat" not in kept
        assert "fair_feat" in kept

    def test_fair_feature_improves_utility(self):
        df = self._frame()
        t = FairClassificationTask(target="y", sensitive="sensitive")
        u_with = t.utility(df)
        u_without = t.utility(df.drop(columns=["fair_feat"]))
        assert u_with > u_without + 0.03

    def test_utility_bounds(self):
        t = FairClassificationTask(target="y", sensitive="sensitive")
        assert 0.0 <= t.utility(self._frame()) <= 1.0

    def test_all_features_unfair_zero(self):
        df = self._frame()[["y", "sensitive", "unfair_feat"]]
        t = FairClassificationTask(target="y", sensitive="sensitive")
        assert t.utility(df) == 0.0

    def test_threshold_configurable(self):
        df = self._frame()
        lax = FairClassificationTask(
            target="y", sensitive="sensitive", unfair_corr=0.99
        )
        assert "unfair_feat" in lax.fair_features(df)

"""Tests for quality-score estimation and profile-importance learning."""
import numpy as np
import pytest

from repro.core.clustering import cluster_partition, singleton_clusters
from repro.core.quality import QualityModel
from repro.profiles.profiler import ProfileSet


def _profiles(vectors):
    names = tuple(f"p{i}" for i in range(len(next(iter(vectors.values())))))
    return ProfileSet(names=names, vectors={k: np.asarray(v, float) for k, v in vectors.items()})


class TestProfileScore:
    def test_uniform_initial_weights(self):
        ps = _profiles({"a": [1.0, 0.0], "b": [0.0, 1.0]})
        qm = QualityModel(ps)
        assert qm.profile_score("a") == pytest.approx(0.5)
        assert qm.profile_score("b") == pytest.approx(0.5)

    def test_weights_sum_to_one(self):
        ps = _profiles({"a": [0.5, 0.5, 0.5]})
        qm = QualityModel(ps)
        assert qm.weights.sum() == pytest.approx(1.0)


class TestWeightLearning:
    def test_refit_recovers_informative_profile(self):
        """Lemma 4's linear model: gains generated from profile 0 only —
        learned weights must concentrate on it."""
        g = np.random.default_rng(0)
        vectors = {f"a{i}": g.random(3) for i in range(40)}
        ps = _profiles(vectors)
        qm = QualityModel(ps)
        for a, v in vectors.items():
            qm.record_gain(a, 0.9 * v[0] + 0.01 * g.normal())
        assert qm.weights[0] > 0.7

    def test_no_refit_before_min_samples(self):
        ps = _profiles({f"a{i}": [0.1, 0.9] for i in range(5)})
        qm = QualityModel(ps)
        qm.record_gain("a0", 1.0)
        np.testing.assert_allclose(qm.weights, 0.5)

    def test_weight_error_shrinks_with_samples(self):
        """E||β* − β̂||² = O(l/m): more samples → closer recovery."""
        g = np.random.default_rng(1)
        beta_star = np.array([0.7, 0.3, 0.0])

        def fit_err(m, seed):
            gg = np.random.default_rng(seed)
            vecs = {f"a{i}": gg.random(3) for i in range(m)}
            ps = _profiles(vecs)
            qm = QualityModel(ps, lam=1e-4)
            for a, v in vecs.items():
                qm.record_gain(a, float(beta_star @ v) + 0.05 * gg.normal())
            w_star = beta_star / beta_star.sum()
            return float(np.linalg.norm(qm.weights - w_star))

        small = np.mean([fit_err(8, s) for s in range(5)])
        large = np.mean([fit_err(200, s) for s in range(5)])
        assert large < small


class TestUtilityScore:
    def test_own_gain_used_when_queried(self):
        ps = _profiles({"a": [0.5], "b": [0.5]})
        qm = QualityModel(ps)
        cl = singleton_clusters(["a", "b"])
        qm.gains["a"] = 0.4
        assert qm.utility_score("a", cl) == 0.4

    def test_clustermate_gain_attenuated_by_distance(self):
        ps = _profiles({"a": [0.5, 0.5], "b": [0.6, 0.5]})
        qm = QualityModel(ps)
        cl = cluster_partition(["a", "b"], ps.matrix(["a", "b"]), epsilon=0.5, seed=0)
        assert cl.n_clusters == 1
        qm.gains["a"] = 0.5
        # d(a,b) = 0.1 → score for b = 0.9 * 0.5
        assert qm.utility_score("b", cl) == pytest.approx(0.45)

    def test_no_info_scores_zero(self):
        ps = _profiles({"a": [0.5], "b": [0.5]})
        qm = QualityModel(ps)
        cl = singleton_clusters(["a", "b"])
        assert qm.utility_score("b", cl) == 0.0

    def test_jpscore_is_sum(self):
        ps = _profiles({"a": [0.4], "b": [0.4]})
        qm = QualityModel(ps)
        cl = singleton_clusters(["a", "b"])
        qm.gains["a"] = 0.3
        assert qm.jpscore("a", cl) == pytest.approx(qm.profile_score("a") + 0.3)

    def test_negative_gain_propagates(self):
        ps = _profiles({"a": [0.5, 0.5], "b": [0.55, 0.5]})
        qm = QualityModel(ps)
        cl = cluster_partition(["a", "b"], ps.matrix(["a", "b"]), epsilon=0.5, seed=0)
        qm.gains["a"] = -0.2
        assert qm.utility_score("b", cl) < 0

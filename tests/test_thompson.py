"""Tests for Thompson sampling over clusters (IDENTIFY-GROUP)."""
import numpy as np

from repro.core.thompson import ThompsonClusters


class TestPosterior:
    def test_initial_mean_half(self):
        ts = ThompsonClusters(3, seed=0)
        assert ts.posterior_mean(0) == 0.5

    def test_reward_raises_mean(self):
        ts = ThompsonClusters(2, seed=0)
        ts.update(0, True)
        assert ts.posterior_mean(0) > 0.5

    def test_penalty_lowers_mean(self):
        ts = ThompsonClusters(2, seed=0)
        ts.update(1, False)
        assert ts.posterior_mean(1) < 0.5

    def test_updates_accumulate(self):
        ts = ThompsonClusters(1, seed=0)
        for _ in range(10):
            ts.update(0, True)
        assert ts.posterior_mean(0) > 0.9


class TestSampling:
    def test_sample_size(self):
        ts = ThompsonClusters(5, seed=0)
        assert len(ts.sample_clusters(3)) == 3

    def test_sample_capped_at_n(self):
        ts = ThompsonClusters(2, seed=0)
        assert len(ts.sample_clusters(10)) == 2

    def test_samples_distinct(self):
        ts = ThompsonClusters(6, seed=0)
        s = ts.sample_clusters(6)
        assert len(set(s)) == 6

    def test_rewarded_cluster_sampled_more(self):
        ts = ThompsonClusters(4, seed=0)
        for _ in range(30):
            ts.update(2, True)
        for c in (0, 1, 3):
            for _ in range(30):
                ts.update(c, False)
        firsts = [ts.sample_clusters(1)[0] for _ in range(50)]
        assert np.mean([f == 2 for f in firsts]) > 0.8

    def test_eligible_filter(self):
        ts = ThompsonClusters(5, seed=0)
        s = ts.sample_clusters(2, eligible=[3, 4])
        assert set(s) <= {3, 4}

    def test_uniform_variant_ignores_posteriors(self):
        ts = ThompsonClusters(3, seed=1)
        for _ in range(50):
            ts.update(0, True)
            ts.update(1, False)
            ts.update(2, False)
        picks = [ts.sample_uniform(1)[0] for _ in range(300)]
        frac0 = np.mean([p == 0 for p in picks])
        assert 0.2 < frac0 < 0.5  # near 1/3, unlike Thompson

    def test_empty_eligible(self):
        ts = ThompsonClusters(3, seed=0)
        assert ts.sample_clusters(2, eligible=[]) == []

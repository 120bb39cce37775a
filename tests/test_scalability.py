"""Tests for the § VI-B scalability harness."""
from repro.experiments.scalability import (
    format_sweep,
    sweep_candidates,
    sweep_profiles,
    synthetic_instance,
    time_methods,
)


class TestSyntheticInstance:
    def test_sizes(self):
        ids, ps, util = synthetic_instance(100, 5, seed=0)
        assert len(ids) == 100
        assert ps.dim == 5
        assert len(ps.vectors) == 100

    def test_true_candidates_cover_universe(self):
        ids, ps, util = synthetic_instance(50, 4, n_true=5, seed=1)
        assert util(frozenset(ids)) == 1.0

    def test_junk_candidates_cover_nothing(self):
        ids, ps, util = synthetic_instance(30, 3, n_true=2, seed=2)
        covering = [a for a in ids if util(frozenset({a})) > 0]
        assert len(covering) == 2

    def test_overlap_profile_present(self):
        _, ps, _ = synthetic_instance(10, 5, seed=0)
        assert "overlap" in ps.names

    def test_deterministic(self):
        a = synthetic_instance(20, 4, seed=3)
        b = synthetic_instance(20, 4, seed=3)
        assert a[0] == b[0]


class TestTiming:
    def test_time_methods_returns_all(self):
        p = time_methods(100, 5, budget=30, seed=0)
        assert set(p.seconds) == {"metam", "mw", "overlap", "uniform"}
        assert all(v >= 0 for v in p.seconds.values())

    def test_sweep_candidates_shapes(self):
        pts = sweep_candidates((50, 100), l=4, budget=20)
        assert [p.n_candidates for p in pts] == [50, 100]

    def test_sweep_profiles_shapes(self):
        pts = sweep_profiles((3, 6), n=60, budget=20)
        assert [p.n_profiles for p in pts] == [3, 6]

    def test_format_sweep(self):
        pts = sweep_candidates((50,), l=3, budget=10)
        out = format_sweep(pts, "n_candidates")
        assert "metam" in out and "50" in out

    def test_runtime_grows_subquadratically(self):
        """§ VI-B: near-linear scaling — 8× candidates should cost far
        less than 64× time (loose CI-safe bound)."""
        small = time_methods(250, 5, budget=60, seed=0).seconds["metam"]
        big = time_methods(2000, 5, budget=60, seed=0).seconds["metam"]
        assert big < max(64 * small, 5.0)

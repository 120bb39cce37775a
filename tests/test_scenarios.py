"""Tests for the evaluation scenarios (full distributed pipeline)."""
import numpy as np
import pytest

from repro.experiments.scenarios import build_tabular_scenario


class TestTabularScenarios:
    def test_classification_scenario_shape(self, clf_scenario):
        sc = clf_scenario
        assert sc.kind == "classification"
        assert len(sc.candidates) > 20
        assert len(sc.true_aug_ids) >= 2
        assert sc.wide_pdf.shape[0] == len(sc.d_in_pdf)

    def test_true_augs_improve_utility(self, clf_scenario):
        fn = clf_scenario.utility_fn()
        base = fn(frozenset())
        full = fn(frozenset(clf_scenario.true_aug_ids))
        assert full > base + 0.05

    def test_utility_bounds(self, clf_scenario):
        fn = clf_scenario.utility_fn()
        for ids in (frozenset(), frozenset(clf_scenario.true_aug_ids)):
            assert 0.0 <= fn(ids) <= 1.0

    def test_unknown_aug_ids_ignored(self, clf_scenario):
        fn = clf_scenario.utility_fn()
        assert fn(frozenset({"nonexistent_column"})) == fn(frozenset())

    def test_causal_scenario_base_zero(self, causal_scenario):
        fn = causal_scenario.utility_fn()
        assert fn(frozenset()) == 0.0

    def test_causal_true_augs_reach_one(self, causal_scenario):
        fn = causal_scenario.utility_fn()
        assert fn(frozenset(causal_scenario.true_aug_ids)) == 1.0

    def test_causal_monotone_in_true_augs(self, causal_scenario):
        fn = causal_scenario.utility_fn()
        ids = sorted(causal_scenario.true_aug_ids)
        us = [fn(frozenset(ids[: i + 1])) for i in range(len(ids))]
        assert us == sorted(us)

    def test_irrelevant_augs_do_not_help_causal(self, causal_scenario):
        gt = causal_scenario.gt
        irr = [
            a.aug_id
            for a in causal_scenario.candidates
            if a.table in set(gt.irrelevant)
        ][:5]
        fn = causal_scenario.utility_fn()
        assert fn(frozenset(irr)) == 0.0

    def test_regression_scenario_builds(self, spark):
        sc = build_tabular_scenario(
            spark, "treg", "regression", sf=0.06, seed=9, n_rows=300
        )
        fn = sc.utility_fn()
        assert fn(frozenset(sc.true_aug_ids)) > fn(frozenset())

    def test_invalid_kind_rejected(self, spark):
        with pytest.raises(ValueError):
            build_tabular_scenario(spark, "bad", "nonsense", sf=0.05)

    def test_deterministic_build(self, spark):
        a = build_tabular_scenario(
            spark, "det", "classification", sf=0.05, seed=4, n_rows=200
        )
        b = build_tabular_scenario(
            spark, "det", "classification", sf=0.05, seed=4, n_rows=200
        )
        assert a.aug_ids == b.aug_ids
        np.testing.assert_allclose(
            a.profiles.matrix(a.aug_ids), b.profiles.matrix(b.aug_ids)
        )


class TestEntityLinkingScenario:
    def test_base_utility_partial(self, el_scenario):
        fn = el_scenario.utility_fn()
        assert 0.2 < fn(frozenset()) < 0.9

    def test_state_augmentation_lifts_utility(self, el_scenario):
        fn = el_scenario.utility_fn()
        assert fn(frozenset(el_scenario.true_aug_ids)) > fn(frozenset()) + 0.1

    def test_irrelevant_augs_do_not_lift(self, el_scenario):
        fn = el_scenario.utility_fn()
        irr = [a for a in el_scenario.aug_ids if a not in el_scenario.true_aug_ids][:3]
        assert fn(frozenset(irr)) <= fn(frozenset()) + 0.02

    def test_candidate_count_small(self, el_scenario):
        # paper found ~185 EL candidates; ours is a scaled-down handful
        assert 5 <= len(el_scenario.candidates) <= 80


class TestFairnessScenario:
    def test_fair_useful_aug_improves(self, fair_scenario):
        fn = fair_scenario.utility_fn()
        assert fn(frozenset(fair_scenario.true_aug_ids)) > fn(frozenset()) + 0.03

    def test_unfair_augs_filtered_to_no_gain(self, fair_scenario):
        fn = fair_scenario.utility_fn()
        unfair = [
            a.aug_id
            for a in fair_scenario.candidates
            if a.table.startswith("cr_unfair_")
        ]
        assert fn(frozenset(unfair)) <= fn(frozenset()) + 0.05

    def test_corr_profile_ranks_unfair_top(self, fair_scenario):
        """The paper's tension: highest-correlation candidates are unfair."""
        ps = fair_scenario.profiles
        k = ps.names.index("corr")
        order = sorted(fair_scenario.aug_ids, key=lambda a: -ps.vectors[a][k])
        top3 = order[:3]
        unfair = {
            a.aug_id
            for a in fair_scenario.candidates
            if a.table.startswith("cr_unfair_")
        }
        assert any(a in unfair for a in top3)


class TestClusteringScenario:
    def test_oni_augmentation_improves_clustering(self, cluster_scenario):
        fn = cluster_scenario.utility_fn()
        assert fn(frozenset(cluster_scenario.true_aug_ids)) > fn(frozenset()) + 0.1

    def test_small_candidate_set(self, cluster_scenario):
        # paper: 8 candidate augmentations for the clustering task
        assert len(cluster_scenario.candidates) <= 12

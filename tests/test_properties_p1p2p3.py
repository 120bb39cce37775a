"""Empirical validations of the paper's properties P1–P3 (§ III-B),
run against the generated scenarios like the paper ran against its
repositories."""
import numpy as np

from repro.core.clustering import cluster_partition


class TestP1FewUsefulAugmentations:
    def test_useful_fraction_small(self, clf_scenario):
        """P1: k ≪ n — the useful candidates are a small fraction (the
        paper found < 0.5%; our scaled lake keeps it under 10%)."""
        frac = len(clf_scenario.true_aug_ids) / len(clf_scenario.candidates)
        assert frac < 0.1

    def test_most_singleton_augs_give_no_causal_gain(self, causal_scenario):
        fn = causal_scenario.utility_fn()
        sample = causal_scenario.aug_ids[:: max(1, len(causal_scenario.aug_ids) // 25)]
        gains = [fn(frozenset({a})) for a in sample]
        useless = sum(1 for u in gains if u == 0.0)
        assert useless / len(gains) > 0.6


class TestP2SimilarDatasetsSimilarUtility:
    def test_high_similarity_implies_similar_utility(self, causal_scenario):
        """P2: profile-similar pairs (d ≤ 0.1) mostly have utility
        difference below 0.1 (paper: 85% of [0.9,1]-similar pairs within
        0.02 utility)."""
        sc = causal_scenario
        fn = sc.utility_fn()
        ids = sc.aug_ids[:: max(1, len(sc.aug_ids) // 40)]
        P = sc.profiles.matrix(ids)
        us = {a: fn(frozenset({a})) for a in ids}
        close_pairs, agree = 0, 0
        for i in range(len(ids)):
            for j in range(i + 1, len(ids)):
                d = float(np.max(np.abs(P[i] - P[j])))
                if d <= 0.1:
                    close_pairs += 1
                    if abs(us[ids[i]] - us[ids[j]]) <= 0.1:
                        agree += 1
        assert close_pairs > 0
        assert agree / close_pairs > 0.6

    def test_duplicates_land_in_same_cluster(self, clf_scenario):
        sc = clf_scenario
        gt = sc.gt
        ids = sc.aug_ids
        cl = cluster_partition(ids, sc.profiles.matrix(ids), epsilon=0.2, seed=0)
        by_table = {}
        for a in sc.candidates:
            by_table.setdefault(a.table, {})[a.column] = a.aug_id
        checked, same = 0, 0
        for dup, orig in gt.dup_of.items():
            if dup not in by_table or orig not in by_table:
                continue
            for col in set(by_table[dup]) & set(by_table[orig]):
                checked += 1
                if (
                    cl.label_of[by_table[dup][col]]
                    == cl.label_of[by_table[orig][col]]
                ):
                    same += 1
        assert checked > 0
        assert same / checked > 0.5


class TestP3Monotonicity:
    def test_causal_task_is_monotone(self, causal_scenario):
        """Paper: what-if / how-to utilities are always monotone."""
        fn = causal_scenario.utility_fn()
        ids = sorted(causal_scenario.true_aug_ids) + causal_scenario.aug_ids[:5]
        cur: set[str] = set()
        last = fn(frozenset())
        for a in ids:
            cur.add(a)
            u = fn(frozenset(cur))
            assert u >= last - 1e-9
            last = u

    def test_classification_wrapper_certifies_monotone(self, clf_scenario):
        """Raw classification utility can dip when junk is added; the
        certified oracle never does."""
        from repro.tasks.monotonic import QueryOracle

        o = QueryOracle(clf_scenario.utility_fn())
        ids = sorted(clf_scenario.true_aug_ids) + clf_scenario.aug_ids[:6]
        cur: set[str] = set()
        last = o.base_utility
        for a in ids:
            cur.add(a)
            u = o.query(frozenset(cur))
            assert u >= last - 1e-9
            last = u

"""Tests for the method-dispatch harness and the table harnesses."""
import pytest

from repro.core.metam import MetamConfig
from repro.experiments.harness import METHODS, make_oracle, run_method
from repro.experiments.table1 import compute_table1, format_table1
from repro.experiments.table2 import (
    PAPER_TABLE2,
    Table2Row,
    format_table2,
)


class TestRunMethod:
    @pytest.mark.parametrize("method", METHODS)
    def test_all_methods_run_on_clf(self, method, clf_scenario):
        res = run_method(method, clf_scenario, budget=20, seed=0)
        assert res.queries <= 20
        assert 0.0 <= res.utility <= 1.0

    @pytest.mark.parametrize(
        "method", ("metam", "mw", "overlap", "uniform")
    )
    def test_all_methods_run_on_causal(self, method, causal_scenario):
        res = run_method(method, causal_scenario, budget=20, seed=0)
        assert res.queries <= 20

    def test_unknown_method_rejected(self, clf_scenario):
        with pytest.raises(ValueError):
            run_method("nope", clf_scenario, budget=5)

    def test_iarda_requires_target(self, el_scenario):
        with pytest.raises(ValueError):
            run_method("iarda", el_scenario, budget=5)

    def test_oracle_counts_base_query(self, clf_scenario):
        o = make_oracle(clf_scenario, budget=None)
        assert o.queries == 1

    def test_custom_config_passthrough(self, clf_scenario):
        cfg = MetamConfig(seed=0, tau=2, group_querying=False)
        res = run_method("metam", clf_scenario, budget=15, cfg=cfg)
        assert res.queries <= 15


class TestShapeClaims:
    """Fig 3 / Table II shape: Metam ≥ every baseline on each scenario
    (with the tolerance the paper's own variance suggests)."""

    def test_metam_dominates_on_causal(self, causal_scenario):
        budget = max(10, int(0.12 * len(causal_scenario.candidates)))
        u = {
            m: run_method(m, causal_scenario, budget=budget, seed=0).utility_at(budget)
            for m in ("metam", "mw", "overlap", "uniform")
        }
        assert u["metam"] >= max(u["mw"], u["overlap"], u["uniform"]) - 1e-9
        assert u["metam"] > 0.4

    def test_metam_at_least_matches_on_clf(self, clf_scenario):
        budget = max(10, int(0.12 * len(clf_scenario.candidates)))
        u = {
            m: run_method(m, clf_scenario, budget=budget, seed=0).utility_at(budget)
            for m in ("metam", "overlap", "uniform")
        }
        assert u["metam"] >= max(u["overlap"], u["uniform"]) - 0.02

    def test_metam_beats_ablation_variants_on_causal(self, causal_scenario):
        """Fig 11 shape: full Metam ≥ NcEq (random-order ablation)."""
        budget = max(10, int(0.12 * len(causal_scenario.candidates)))
        full = run_method("metam", causal_scenario, budget=budget, seed=0)
        nceq = run_method("metam_nceq", causal_scenario, budget=budget, seed=0)
        assert full.utility_at(budget) >= nceq.utility_at(budget) - 1e-9

    def test_entity_linking_metam_few_queries(self, el_scenario):
        """Paper: Metam found the EL augmentation in ~4 queries (185
        candidates); ours is scaled down — allow a small multiple."""
        res = run_method("metam", el_scenario, budget=30, seed=0)
        fn = el_scenario.utility_fn()
        target = fn(frozenset(el_scenario.true_aug_ids))
        reached = res.queries_to_reach(target - 0.01)
        assert reached is not None and reached <= 20

    def test_fairness_metam_finds_fair_useful(self, fair_scenario):
        res = run_method("metam", fair_scenario, budget=25, seed=0)
        assert res.utility_at(25) > res.base_utility + 0.02

    def test_clustering_all_methods_similar(self, cluster_scenario):
        """Paper: with only ~8 candidates all techniques need ≈4 queries."""
        us = {}
        for m in ("metam", "overlap", "uniform"):
            r = run_method(m, cluster_scenario, budget=10, seed=0)
            us[m] = r.utility_at(10)
        assert max(us.values()) - min(us.values()) < 0.25


class TestTable1:
    def test_compute_tiny(self, spark):
        stats = compute_table1(spark, sf=0.04, seed=0)
        assert [s.name for s in stats] == ["Open-Data-lite", "Kaggle-lite"]
        for s in stats:
            assert s.n_tables > 0
            assert s.n_columns >= 2 * s.n_tables
            assert 0 < s.n_joinable_columns <= s.n_columns
            assert s.size_mb > 0

    def test_open_data_bigger_than_kaggle(self, spark):
        stats = compute_table1(spark, sf=0.04, seed=0)
        od, kg = stats
        assert od.n_tables > kg.n_tables

    def test_format_contains_paper_reference(self, spark):
        stats = compute_table1(spark, sf=0.04, seed=0)
        out = format_table1(stats)
        assert "69K" in out and "Open-Data-lite" in out


class TestTable2Format:
    def test_format_includes_paper_rows(self):
        rows = [
            Table2Row(
                dataset="schools_c",
                n_candidates=100,
                budget=20,
                utilities={"metam": 0.9, "mw": 0.5, "overlap": 0.1, "uniform": 0.2},
                base_utility=0.0,
            )
        ]
        out = format_table2(rows)
        assert "schools_c" in out
        assert "0.90" in out
        assert "Paper's Table II" in out

    def test_paper_reference_values_complete(self):
        for vals in PAPER_TABLE2.values():
            assert set(vals) == {"metam", "mw", "overlap", "uniform"}

"""Tests for profile-vector computation over materialized scenarios."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent
from repro.profiles.profiler import (
    PROFILE_NAMES,
    ProfileConfig,
    compute_profiles,
    spark_correlation,
)


class TestProfileVectors:
    def test_dimensions_and_names(self, clf_scenario):
        ps = clf_scenario.profiles
        assert ps.names == PROFILE_NAMES
        for v in ps.vectors.values():
            assert v.shape == (5,)

    def test_values_in_unit_interval(self, clf_scenario):
        for v in clf_scenario.profiles.vectors.values():
            assert (v >= 0).all() and (v <= 1.0 + 1e-9).all()

    def test_all_candidates_profiled(self, clf_scenario):
        assert set(clf_scenario.profiles.vectors) == set(clf_scenario.aug_ids)

    def test_useful_corr_above_irrelevant_mean(self, clf_scenario):
        ps = clf_scenario.profiles
        k = ps.names.index("corr")
        true_corr = np.mean(
            [ps.vectors[a][k] for a in clf_scenario.true_aug_ids]
        )
        gt = clf_scenario.gt
        irr_ids = [
            a.aug_id
            for a in clf_scenario.candidates
            if a.table in set(gt.irrelevant)
        ]
        irr_corr = np.mean([ps.vectors[a][k] for a in irr_ids])
        assert true_corr > irr_corr + 0.15

    def test_sparse_overlap_low(self, clf_scenario):
        ps = clf_scenario.profiles
        k = ps.names.index("overlap")
        gt = clf_scenario.gt
        sparse_ids = [
            a.aug_id for a in clf_scenario.candidates if a.table in set(gt.sparse)
        ]
        dense_ids = [
            a.aug_id
            for a in clf_scenario.candidates
            if a.table in set(gt.irrelevant)
        ]
        assert np.mean([ps.vectors[a][k] for a in sparse_ids]) < np.mean(
            [ps.vectors[a][k] for a in dense_ids]
        )

    def test_semantic_favors_matching_theme(self, clf_scenario):
        """Useful tables share tokens with the input → higher semantic."""
        ps = clf_scenario.profiles
        k = ps.names.index("semantic")
        gt = clf_scenario.gt
        true_sem = np.mean([ps.vectors[a][k] for a in clf_scenario.true_aug_ids])
        unthemed = [
            a.aug_id
            for a in clf_scenario.candidates
            if a.table in set(gt.erroneous)
        ]
        err_sem = np.mean([ps.vectors[a][k] for a in unthemed])
        assert true_sem > err_sem

    def test_dup_profiles_close(self, clf_scenario):
        """P2 structure: near-duplicate tables → near-identical profiles."""
        gt = clf_scenario.gt
        by_table = {}
        for a in clf_scenario.candidates:
            by_table.setdefault(a.table, []).append(a)
        pairs_checked = 0
        for dup, orig in gt.dup_of.items():
            if dup not in by_table or orig not in by_table:
                continue
            da = {a.column: a for a in by_table[dup]}
            oa = {a.column: a for a in by_table[orig]}
            for col in set(da) & set(oa):
                d = np.max(
                    np.abs(
                        clf_scenario.profiles.vectors[da[col].aug_id]
                        - clf_scenario.profiles.vectors[oa[col].aug_id]
                    )
                )
                assert d < 0.4
                pairs_checked += 1
        assert pairs_checked > 0


class TestProfileConfig:
    def test_uninformative_appended(self, clf_scenario):
        from repro.profiles.profiler import compute_profiles

        cfg = ProfileConfig(n_uninformative=3)
        ps = compute_profiles(
            clf_scenario.wide_pdf,
            clf_scenario.candidates,
            clf_scenario.pair_of,
            clf_scenario.lake,
            reference_col=clf_scenario.target_col,
            input_tokens=("city",),
            input_columns=list(clf_scenario.d_in_pdf.columns),
            cfg=cfg,
        )
        assert ps.dim == 8
        assert ps.names[-1] == "uninformative_2"

    def test_drop_removes_profile(self, clf_scenario):
        cfg = ProfileConfig(drop=("mi", "overlap"))
        assert cfg.names == ("corr", "semantic", "metadata")

    def test_matrix_row_order(self, clf_scenario):
        ids = clf_scenario.aug_ids[:5]
        M = clf_scenario.profiles.matrix(ids)
        for i, a in enumerate(ids):
            np.testing.assert_allclose(M[i], clf_scenario.profiles.vectors[a])


class TestSparkCorrelation:
    def test_matches_duckdb(self, spark, clf_scenario):
        """Distributed F.corr vs DuckDB corr on the input dataset."""
        d_in = clf_scenario.d_in
        got = d_in.agg(
            F.corr("feat_a", "target").alias("r")
        )
        assert_equivalent(
            got,
            "SELECT corr(feat_a, target) AS r FROM d",
            d=d_in,
        )

    def test_scalar_value(self, spark, clf_scenario):
        r = spark_correlation(clf_scenario.d_in, "feat_a", "feat_b")
        assert -1.0 <= r <= 1.0

    def test_constant_column_zero(self, spark):
        import pandas as pd

        df = spark.createDataFrame(pd.DataFrame({"a": [1.0, 1.0], "b": [1.0, 2.0]}))
        assert spark_correlation(df, "a", "b") == 0.0

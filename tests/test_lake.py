"""Tests for the lake catalog, generator, and Table I statistics."""
import numpy as np
import pandas as pd
import pytest

from repro.lake.catalog import Lake, TableMeta
from repro.lake.generator import LakeSpec, generate_lake, kaggle_lite, open_data_lite
from repro.lake.stats import compute_stats, estimated_size_mb


class TestCatalog:
    def test_add_and_lookup(self, spark):
        lake = Lake()
        df = spark.createDataFrame(pd.DataFrame({"a": [1, 2]}))
        lake.add("t1", df, TableMeta(source="s", tokens=("x",)))
        assert "t1" in lake
        assert lake.table("t1").count() == 2

    def test_duplicate_name_rejected(self, spark):
        lake = Lake()
        df = spark.createDataFrame(pd.DataFrame({"a": [1]}))
        lake.add("t1", df, TableMeta(source="s", tokens=()))
        with pytest.raises(ValueError):
            lake.add("t1", df, TableMeta(source="s", tokens=()))

    def test_n_columns(self, spark):
        lake = Lake()
        lake.add(
            "t1",
            spark.createDataFrame(pd.DataFrame({"a": [1], "b": [2.0]})),
            TableMeta(source="s", tokens=()),
        )
        lake.add(
            "t2",
            spark.createDataFrame(pd.DataFrame({"c": [1]})),
            TableMeta(source="s", tokens=()),
        )
        assert lake.n_columns() == 3

    def test_names_sorted(self, spark):
        lake = Lake()
        for name in ("zz", "aa"):
            lake.add(
                name,
                spark.createDataFrame(pd.DataFrame({"a": [1]})),
                TableMeta(source="s", tokens=()),
            )
        assert lake.names() == ["aa", "zz"]

    def test_parquet_round_trip(self, spark, tmp_path):
        lake = Lake()
        pdf = pd.DataFrame({"k": [1, 2, 3], "v": [0.1, 0.2, 0.3]})
        lake.add(
            "t1",
            spark.createDataFrame(pdf),
            TableMeta(source="src", tokens=("tok1", "tok2")),
        )
        root = str(tmp_path / "lake")
        lake.to_parquet(root)
        back = Lake.from_parquet(spark, root)
        assert back.names() == ["t1"]
        assert back.meta["t1"].tokens == ("tok1", "tok2")
        got = back.table("t1").toPandas().sort_values("k").reset_index(drop=True)
        pd.testing.assert_frame_equal(got, pdf)


class TestGenerator:
    def test_category_counts(self, tiny_lake):
        lake, gt = tiny_lake
        assert len(gt.useful) >= 3  # originals (+ possible dups)
        assert len(gt.irrelevant) >= 8
        assert len(gt.erroneous) >= 3
        assert len(gt.decoys) >= 4
        assert len(gt.sparse) >= 4

    def test_total_table_count_consistent(self, tiny_lake):
        lake, gt = tiny_lake
        categorized = (
            len(gt.useful) + len(gt.irrelevant) + len(gt.erroneous)
            + len(gt.decoys) + len(gt.sparse)
        )
        assert categorized == len(lake)

    def test_deterministic_in_seed(self, spark):
        spec = LakeSpec(n_useful=2, n_irrelevant=3, n_erroneous=1,
                        n_decoys=1, n_sparse=1, n_keys=50, seed=9)
        l1, g1 = generate_lake(spark, spec)
        l2, g2 = generate_lake(spark, spec)
        assert l1.names() == l2.names()
        t = l1.names()[0]
        pd.testing.assert_frame_equal(
            l1.table(t).toPandas(), l2.table(t).toPandas()
        )

    def test_useful_proxy_correlates_with_signal(self, tiny_lake):
        lake, gt = tiny_lake
        name = sorted(gt.useful)[0]
        sig = gt.useful[name]
        pdf = lake.table(name).toPandas()
        keys = pdf[gt.key_col[name]].to_numpy()
        r = np.corrcoef(
            pdf[gt.useful_col[name]], gt.signal_at_keys(sig, keys)
        )[0, 1]
        assert r > 0.5

    def test_erroneous_decorrelated_from_signal(self, tiny_lake):
        """Erroneous joins pair wrong entities → proxy decorrelated."""
        lake, gt = tiny_lake
        name = [t for t in gt.erroneous if t not in gt.dup_of][0]
        pdf = lake.table(name).toPandas()
        keys = pdf[gt.key_col[name]].to_numpy()
        val_col = [c for c in pdf.columns if c.startswith("metric_")][0]
        rs = [
            abs(np.corrcoef(pdf[val_col], gt.signal_at_keys(j, keys))[0, 1])
            for j in range(gt.signals.shape[0])
        ]
        assert max(rs) < 0.3

    def test_sparse_tables_low_coverage(self, tiny_lake):
        lake, gt = tiny_lake
        name = [t for t in gt.sparse if t not in gt.dup_of][0]
        n_rows = lake.table(name).count()
        assert n_rows < 0.3 * len(gt.key_domain)

    def test_dups_reference_existing_originals(self, tiny_lake):
        lake, gt = tiny_lake
        for dup, orig in gt.dup_of.items():
            assert dup in lake and orig in lake

    def test_dup_close_to_original(self, tiny_lake, spark):
        lake, gt = tiny_lake
        if not gt.dup_of:
            pytest.skip("no dups generated at this size")
        dup, orig = next(iter(gt.dup_of.items()))
        dp, op = lake.table(dup).toPandas(), lake.table(orig).toPandas()
        key = gt.key_col[orig]
        merged = op.merge(dp, on=key, suffixes=("_o", "_d"))
        vcols = [c for c in op.columns if c != key]
        r = np.corrcoef(merged[vcols[0] + "_o"], merged[vcols[0] + "_d"])[0, 1]
        assert r > 0.95

    def test_presets_build(self, spark):
        od, gt_od = open_data_lite(spark, sf=0.05, seed=1)
        kg, gt_kg = kaggle_lite(spark, sf=0.05, seed=1)
        assert len(od) > len(kg) >= 5


class TestStats:
    def test_stats_against_oracle_counts(self, tiny_lake):
        """#Tables / #Columns must match a direct catalog scan."""
        lake, _ = tiny_lake
        s = compute_stats(lake, "tiny")
        assert s.n_tables == len(lake.tables)
        assert s.n_columns == sum(
            len(df.columns) for df in lake.tables.values()
        )

    def test_joinable_bounded_by_columns(self, tiny_lake):
        lake, _ = tiny_lake
        s = compute_stats(lake, "tiny")
        assert 0 < s.n_joinable_columns <= s.n_columns

    def test_shared_key_domain_makes_keys_joinable(self, tiny_lake):
        """Every table joins on the shared key domain, so #joinable ≥
        #tables (each key column pairs with another table's key column)."""
        lake, _ = tiny_lake
        s = compute_stats(lake, "tiny")
        assert s.n_joinable_columns >= len(lake.tables)

    def test_size_positive_and_sane(self, tiny_lake):
        lake, _ = tiny_lake
        mb = estimated_size_mb(lake)
        assert 0 < mb < 100

    def test_row_format(self, tiny_lake):
        lake, _ = tiny_lake
        row = compute_stats(lake, "tiny").row()
        assert row[0] == "tiny" and len(row) == 5

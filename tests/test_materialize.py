"""Tests for augmentation materialization — cross-checked against DuckDB."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.core.types import Augmentation, JoinStep
from repro.discovery.materialize import dedup_by_key, materialize, materialize_batch
from repro.lake.catalog import Lake, TableMeta
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def join_lake(spark):
    lake = Lake()
    right = pd.DataFrame(
        {"rid": [1, 2, 2, 3], "val": [10.0, 20.0, 5.0, 30.0], "txt": list("abcd")}
    )
    lake.add("r", spark.createDataFrame(right), TableMeta("s", ()))
    mid = pd.DataFrame({"mid_k": [1, 2, 3], "fk": [100, 200, 300]})
    far = pd.DataFrame({"far_k": [100, 200, 300], "deep_val": [7.0, 8.0, 9.0]})
    lake.add("mid", spark.createDataFrame(mid), TableMeta("s", ()))
    lake.add("far", spark.createDataFrame(far), TableMeta("s", ()))
    return lake


@pytest.fixture(scope="module")
def d_in(spark):
    return spark.createDataFrame(
        pd.DataFrame({"k": [1, 2, 3, 9], "feat": [0.1, 0.2, 0.3, 0.4]})
    )


class TestDedup:
    def test_one_row_per_key(self, spark, join_lake):
        out = dedup_by_key(join_lake.table("r"), "rid", ["val"])
        assert out.count() == 3

    def test_min_chosen_for_duplicates(self, spark, join_lake):
        out = dedup_by_key(join_lake.table("r"), "rid", ["val"]).toPandas()
        assert float(out.set_index("rid").loc[2, "val"]) == 5.0

    def test_matches_duckdb_group_min(self, spark, join_lake):
        out = dedup_by_key(join_lake.table("r"), "rid", ["val"])
        assert_equivalent(
            out,
            "SELECT rid, MIN(val) AS val FROM r GROUP BY rid",
            r=join_lake.table("r"),
        )


class TestMaterialize:
    def _aug(self):
        return Augmentation(
            steps=(JoinStep("r", "k", "rid"),), column="val"
        )

    def test_left_join_matches_duckdb(self, spark, join_lake, d_in):
        aug = self._aug()
        out = materialize(d_in, join_lake, aug).withColumnRenamed(
            aug.aug_id, "val"
        )
        assert_equivalent(
            out,
            """
            SELECT d.k AS k, d.feat AS feat, r2.val AS val
            FROM d LEFT JOIN (
                SELECT rid, MIN(val) AS val FROM r GROUP BY rid
            ) r2 ON d.k = r2.rid
            """,
            d=d_in,
            r=join_lake.table("r"),
        )

    def test_row_count_preserved(self, spark, join_lake, d_in):
        out = materialize(d_in, join_lake, self._aug())
        assert out.count() == d_in.count()

    def test_unmatched_key_is_null(self, spark, join_lake, d_in):
        aug = self._aug()
        pdf = materialize(d_in, join_lake, aug).toPandas()
        v = pdf.set_index("k")[aug.aug_id]
        assert np.isnan(v.loc[9])

    def test_string_column_projection(self, spark, join_lake, d_in):
        aug = Augmentation(steps=(JoinStep("r", "k", "rid"),), column="txt")
        pdf = materialize(d_in, join_lake, aug).toPandas()
        assert pdf.set_index("k")[aug.aug_id].loc[1] == "a"

    def test_depth2_chain(self, spark, join_lake, d_in):
        aug = Augmentation(
            steps=(JoinStep("mid", "k", "mid_k"), JoinStep("far", "fk", "far_k")),
            column="deep_val",
        )
        pdf = materialize(d_in, join_lake, aug).toPandas().set_index("k")
        assert pdf[aug.aug_id].loc[1] == 7.0
        assert pdf[aug.aug_id].loc[3] == 9.0
        assert np.isnan(pdf[aug.aug_id].loc[9])

    def test_tpch_join_matches_duckdb(self, spark):
        """Γ over TPC-H-lite: augment lineitem with o_totalprice."""
        li = synth_data.lineitem(spark, sf=0.002).limit(300)
        o = synth_data.orders(spark, sf=0.002)
        lake = Lake()
        lake.add("orders", o, TableMeta("tpch", ()))
        d_in = li.select("l_orderkey", "l_quantity")
        aug = Augmentation(
            steps=(JoinStep("orders", "l_orderkey", "o_orderkey"),),
            column="o_totalprice",
        )
        out = materialize(d_in, lake, aug).withColumnRenamed(
            aug.aug_id, "o_totalprice"
        )
        assert_equivalent(
            out,
            """
            SELECT d.l_orderkey AS l_orderkey, d.l_quantity AS l_quantity,
                   o2.o_totalprice AS o_totalprice
            FROM d LEFT JOIN (
                SELECT o_orderkey, MIN(o_totalprice) AS o_totalprice
                FROM orders GROUP BY o_orderkey
            ) o2 ON d.l_orderkey = o2.o_orderkey
            """,
            d=d_in,
            orders=o,
        )


class TestMaterializeBatch:
    def test_batch_equals_per_candidate(self, spark, join_lake, d_in):
        augs = [
            Augmentation(steps=(JoinStep("r", "k", "rid"),), column="val"),
        ]
        wide = materialize_batch(d_in, "k", join_lake, augs)
        single = materialize(d_in, join_lake, augs[0]).toPandas()
        lhs = wide.sort_values("k")[augs[0].aug_id].reset_index(drop=True)
        rhs = single.sort_values("k")[augs[0].aug_id].reset_index(drop=True)
        pd.testing.assert_series_equal(lhs, rhs, check_names=False)

    def test_batch_includes_base_columns(self, spark, join_lake, d_in):
        wide = materialize_batch(d_in, "k", join_lake, [])
        assert list(wide.columns) == ["k", "feat"]

    def test_batch_depth2_fallback(self, spark, join_lake, d_in):
        aug = Augmentation(
            steps=(JoinStep("mid", "k", "mid_k"), JoinStep("far", "fk", "far_k")),
            column="deep_val",
        )
        wide = materialize_batch(d_in, "k", join_lake, [aug])
        assert wide.set_index("k")[aug.aug_id].loc[2] == 8.0

    def test_batch_duplicate_input_keys_aligned(self, spark, join_lake):
        d_in2 = spark.createDataFrame(
            pd.DataFrame({"k": [1, 1, 2], "feat": [0.0, 1.0, 2.0]})
        )
        aug = Augmentation(steps=(JoinStep("r", "k", "rid"),), column="val")
        wide = materialize_batch(d_in2, "k", join_lake, [aug])
        assert len(wide) == 3
        assert list(wide[aug.aug_id]) == [10.0, 10.0, 5.0]

    def test_batch_row_order_matches_base(self, spark, join_lake):
        base = pd.DataFrame({"k": [3, 1, 9, 2], "feat": [1.0, 2.0, 3.0, 4.0]})
        d_in2 = spark.createDataFrame(base)
        aug = Augmentation(steps=(JoinStep("r", "k", "rid"),), column="val")
        wide = materialize_batch(d_in2, "k", join_lake, [aug], base_pdf=base)
        assert list(wide["k"]) == [3, 1, 9, 2]
        assert wide[aug.aug_id].iloc[0] == 30.0
        assert np.isnan(wide[aug.aug_id].iloc[2])

"""Tests for the discovery substrate: value index, containment, join paths.

DuckDB (`repro.oracle.assert_equivalent`) cross-checks the distributed
containment/overlap computations — a wrong join or aggregation fails the
diff, not just "it ran".
"""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.discovery.index import (
    build_value_index,
    column_cardinalities,
    containment_with_input,
    join_eligible_columns,
    joinable_column_count,
    lake_joinable_pairs,
)
from repro.discovery.join_paths import enumerate_candidates, projectable_columns
from repro.lake.catalog import Lake, TableMeta
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def mini_lake(spark):
    """Three hand-built tables with known overlap structure."""
    lake = Lake()
    t1 = pd.DataFrame({"id": [1, 2, 3, 4], "v1": [0.1, 0.2, 0.3, 0.4]})
    t2 = pd.DataFrame({"key": [3, 4, 5, 6], "v2": [1.0, 2.0, 3.0, 4.0]})
    t3 = pd.DataFrame({"name": ["x", "y"], "v3": [9.0, 8.0]})
    for name, pdf, tokens in (
        ("t1", t1, ("alpha",)),
        ("t2", t2, ("beta",)),
        ("t3", t3, ("gamma",)),
    ):
        lake.add(name, spark.createDataFrame(pdf), TableMeta("src", tokens))
    return lake


class TestEligibility:
    def test_int_and_string_eligible(self, spark):
        df = spark.createDataFrame(
            pd.DataFrame({"i": [1], "s": ["a"], "f": [0.5]})
        )
        assert join_eligible_columns(df) == ["i", "s"]

    def test_floats_not_eligible(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"f": [0.5], "g": [1.5]}))
        assert join_eligible_columns(df) == []


class TestValueIndex:
    def test_index_matches_duckdb_distinct_counts(self, spark, mini_lake):
        """Distributed distinct-value index vs DuckDB over the same table."""
        index = build_value_index(mini_lake)
        got = (
            column_cardinalities(index)
            .where(F.col("table") == "t1")
            .select(F.col("column").alias("col"), F.col("n_distinct").alias("n"))
        )
        assert_equivalent(
            got,
            "SELECT 'id' AS col, COUNT(DISTINCT id) AS n FROM t1",
            t1=mini_lake.table("t1"),
        )

    def test_index_excludes_float_columns(self, spark, mini_lake):
        index = build_value_index(mini_lake).toPandas()
        assert set(index["column"]) == {"id", "key", "name"}

    def test_index_values_are_strings(self, spark, mini_lake):
        index = build_value_index(mini_lake)
        assert dict(index.dtypes)["value"] == "string"

    def test_empty_lake_raises(self, spark):
        lake = Lake()
        lake.add(
            "only_floats",
            spark.createDataFrame(pd.DataFrame({"f": [1.0]})),
            TableMeta("s", ()),
        )
        with pytest.raises(ValueError):
            build_value_index(lake)


class TestContainment:
    def test_containment_values(self, spark, mini_lake):
        index = build_value_index(mini_lake)
        vin = spark.createDataFrame(pd.DataFrame({"value": ["1", "2", "3", "4"]}))
        pairs = containment_with_input(spark, index, vin, min_containment=0.0)
        by_col = {(p.right_table, p.right_col): p.containment for p in pairs}
        assert by_col[("t1", "id")] == pytest.approx(1.0)
        assert by_col[("t2", "key")] == pytest.approx(0.5)
        assert ("t3", "name") not in by_col

    def test_containment_threshold(self, spark, mini_lake):
        index = build_value_index(mini_lake)
        vin = spark.createDataFrame(pd.DataFrame({"value": ["1", "2", "3", "4"]}))
        pairs = containment_with_input(spark, index, vin, min_containment=0.9)
        assert [(p.right_table, p.right_col) for p in pairs] == [("t1", "id")]

    def test_containment_against_duckdb(self, spark, mini_lake):
        """Containment count = DuckDB intersection count."""
        index = build_value_index(mini_lake)
        vin = spark.createDataFrame(pd.DataFrame({"value": ["3", "4", "5"]}))
        pairs = containment_with_input(spark, index, vin, min_containment=0.0)
        got = {(p.right_table, p.right_col): p.containment for p in pairs}
        import duckdb

        con = duckdb.connect()
        con.register("t2", mini_lake.table("t2").toPandas())
        n = con.execute(
            "SELECT COUNT(DISTINCT key) FROM t2 WHERE key IN (3,4,5)"
        ).fetchone()[0]
        con.close()
        assert got[("t2", "key")] == pytest.approx(n / 3)

    def test_empty_input(self, spark, mini_lake):
        index = build_value_index(mini_lake)
        vin = spark.createDataFrame([], schema="value string")
        assert containment_with_input(spark, index, vin) == []

    def test_sorted_by_containment_desc(self, spark, mini_lake):
        index = build_value_index(mini_lake)
        vin = spark.createDataFrame(pd.DataFrame({"value": ["1", "2", "3"]}))
        pairs = containment_with_input(spark, index, vin, min_containment=0.0)
        conts = [p.containment for p in pairs]
        assert conts == sorted(conts, reverse=True)


class TestLakeJoinablePairs:
    def test_pair_detected_both_directions(self, spark, mini_lake):
        index = build_value_index(mini_lake)
        pairs = lake_joinable_pairs(index, min_containment=0.1).toPandas()
        keys = set(map(tuple, pairs[["t1", "c1", "t2", "c2"]].to_numpy()))
        assert ("t1", "id", "t2", "key") in keys
        assert ("t2", "key", "t1", "id") in keys

    def test_containment_asymmetric_values(self, spark, mini_lake):
        index = build_value_index(mini_lake)
        pairs = lake_joinable_pairs(index, min_containment=0.1).toPandas()
        a = pairs[(pairs.t1 == "t1") & (pairs.t2 == "t2")].containment.iloc[0]
        assert a == pytest.approx(0.5)  # |{3,4}| / |{1,2,3,4}|

    def test_joinable_column_count(self, spark, mini_lake):
        index = build_value_index(mini_lake)
        assert joinable_column_count(index, min_containment=0.1) == 2


class TestEnumerateCandidates:
    def test_depth1_candidates_from_joinable_tables(self, spark, mini_lake):
        d_in = spark.createDataFrame(
            pd.DataFrame({"id": [1, 2, 3, 4], "feat": [1.0, 2.0, 3.0, 4.0]})
        )
        cands, pair_of = enumerate_candidates(
            spark, d_in, "id", mini_lake, min_containment=0.4
        )
        tables = {a.table for a in cands}
        assert tables == {"t1", "t2"}
        cols = {a.column for a in cands if a.table == "t1"}
        assert cols == {"v1"}
        assert all(a.aug_id in pair_of for a in cands)

    def test_join_key_not_projected(self, spark, mini_lake):
        d_in = spark.createDataFrame(pd.DataFrame({"id": [1, 2, 3]}))
        cands, _ = enumerate_candidates(
            spark, d_in, "id", mini_lake, min_containment=0.3
        )
        for a in cands:
            assert a.column not in ("id", "key")

    def test_max_candidates_cap(self, spark, mini_lake):
        d_in = spark.createDataFrame(pd.DataFrame({"id": [1, 2, 3, 4]}))
        cands, _ = enumerate_candidates(
            spark, d_in, "id", mini_lake, min_containment=0.1, max_candidates=1
        )
        assert len(cands) == 1

    def test_projectable_columns_numeric_only(self, spark, mini_lake):
        cols = projectable_columns(
            mini_lake.table("t3"), exclude=set(), numeric_only=True
        )
        assert cols == ["v3"]

    def test_depth2_chain_on_tpch(self, spark):
        """lineitem → orders → customer: depth-2 path reaches c_acctbal."""
        li = synth_data.lineitem(spark, sf=0.002)
        o = synth_data.orders(spark, sf=0.002)
        c = synth_data.customer(spark, sf=0.002)
        lake = Lake()
        lake.add("orders", o, TableMeta("tpch", ("orders",)))
        lake.add("customer", c, TableMeta("tpch", ("customer",)))
        d_in = li.select("l_orderkey", "l_quantity").limit(200)
        cands, _ = enumerate_candidates(
            spark, d_in, "l_orderkey", lake,
            min_containment=0.05, max_depth=2,
        )
        depth2 = [a for a in cands if a.depth == 2]
        assert any(
            a.table == "customer" and a.column == "c_acctbal" for a in depth2
        )

"""Joinable-column discovery over the lake (Aurum-lite).

The index is a single long-format Spark DataFrame of distinct
``(table, column, value)`` triples over *join-eligible* columns (integer
and string typed — floating-point columns do not join in practice). All
containment scores are computed with distributed joins over this index:

- ``containment_with_input`` — containment of each lake column w.r.t. a
  set of input key values (drives candidate generation for ``D_in``);
- ``lake_joinable_pairs`` — lake-internal joinable column pairs via a
  self-join of the index (drives Table I's "#Joinable Columns").
"""
from __future__ import annotations

from dataclasses import dataclass
from functools import reduce

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.lake.catalog import Lake

#: Spark types whose columns participate in join discovery.
_JOINABLE_TYPES = (
    T.ByteType, T.ShortType, T.IntegerType, T.LongType, T.StringType,
)


@dataclass(frozen=True)
class JoinablePair:
    """A discovered joinable column pair with its containment score."""

    left_table: str
    left_col: str
    right_table: str
    right_col: str
    containment: float  # |V_left ∩ V_right| / |V_left|


def join_eligible_columns(df: DataFrame) -> list[str]:
    """Columns of ``df`` with a join-eligible (int/string) type."""
    return [
        f.name for f in df.schema.fields if isinstance(f.dataType, _JOINABLE_TYPES)
    ]


def _table_long(name: str, df: DataFrame, cols: list[str]) -> DataFrame:
    """Distinct (table, column, value-as-string) triples for one table."""
    kvs = F.array(
        *[
            F.struct(
                F.lit(c).alias("column"), F.col(c).cast("string").alias("value")
            )
            for c in cols
        ]
    )
    return (
        df.select(F.explode(kvs).alias("kv"))
        .select(
            F.lit(name).alias("table"),
            F.col("kv.column").alias("column"),
            F.col("kv.value").alias("value"),
        )
        .where(F.col("value").isNotNull())
        .distinct()
    )


def build_value_index(lake: Lake) -> DataFrame:
    """Long-format distinct-value index over all join-eligible columns."""
    parts = []
    for name in lake.names():
        df = lake.table(name)
        cols = join_eligible_columns(df)
        if cols:
            parts.append(_table_long(name, df, cols))
    if not parts:
        raise ValueError("lake has no join-eligible columns")
    return reduce(DataFrame.unionByName, parts)


def column_cardinalities(index: DataFrame) -> DataFrame:
    """Distinct-value count per (table, column) — denominators for containment."""
    return index.groupBy("table", "column").agg(F.count("*").alias("n_distinct"))


def containment_with_input(
    spark: SparkSession,
    index: DataFrame,
    input_values: DataFrame,
    *,
    min_containment: float = 0.05,
) -> list[JoinablePair]:
    """Lake columns joinable with the input key column.

    ``input_values`` is a one-column DataFrame named ``value`` (strings) of
    the input dataset's distinct key values. Containment is measured
    w.r.t. the *input* side: |V_in ∩ V_col| / |V_in|, the fraction of input
    rows an augmentation could cover.
    """
    vin = input_values.select(F.col("value").cast("string").alias("value")).distinct()
    n_in = vin.count()
    if n_in == 0:
        return []
    hits = (
        index.join(vin, on="value", how="inner")
        .groupBy("table", "column")
        .agg(F.count("*").alias("n_hit"))
        .where(F.col("n_hit") >= min_containment * n_in)
        .collect()
    )
    return sorted(
        (
            JoinablePair(
                left_table="__input__",
                left_col="__key__",
                right_table=r["table"],
                right_col=r["column"],
                containment=r["n_hit"] / n_in,
            )
            for r in hits
        ),
        key=lambda p: (-p.containment, p.right_table, p.right_col),
    )


def lake_joinable_pairs(
    index: DataFrame, *, min_containment: float = 0.05
) -> DataFrame:
    """Lake-internal joinable pairs via a distributed self-join.

    Returns a DataFrame ``(t1, c1, t2, c2, containment)`` with containment
    measured w.r.t. the left column and ``t1 != t2``. Both directions are
    emitted (containment is asymmetric).
    """
    a = index.select(
        F.col("table").alias("t1"), F.col("column").alias("c1"), "value"
    )
    b = index.select(
        F.col("table").alias("t2"), F.col("column").alias("c2"), "value"
    )
    inter = (
        a.join(b, on="value")
        .where(F.col("t1") != F.col("t2"))
        .groupBy("t1", "c1", "t2", "c2")
        .agg(F.count("*").alias("n_inter"))
    )
    card = column_cardinalities(index).select(
        F.col("table").alias("t1"),
        F.col("column").alias("c1"),
        F.col("n_distinct").alias("n_left"),
    )
    return (
        inter.join(card, on=["t1", "c1"])
        .withColumn("containment", F.col("n_inter") / F.col("n_left"))
        .where(F.col("containment") >= min_containment)
        .select("t1", "c1", "t2", "c2", "containment")
    )


def joinable_column_count(
    index: DataFrame, *, min_containment: float = 0.05
) -> int:
    """#columns participating in ≥1 joinable pair (Table I's metric)."""
    pairs = lake_joinable_pairs(index, min_containment=min_containment)
    left = pairs.select(F.col("t1").alias("t"), F.col("c1").alias("c"))
    right = pairs.select(F.col("t2").alias("t"), F.col("c2").alias("c"))
    return left.union(right).distinct().count()

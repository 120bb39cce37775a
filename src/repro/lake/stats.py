"""Repository characteristics — the quantities of the paper's Table I.

``#Tables``/``#Columns`` are catalog scans; ``#Joinable Columns`` runs the
distributed self-join of the discovery index; ``Size`` sums the estimated
in-memory size of every table via a Spark aggregation over all tables.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import functions as F

from repro.discovery.index import build_value_index, joinable_column_count
from repro.lake.catalog import Lake


@dataclass(frozen=True)
class LakeStats:
    """One row of Table I."""

    name: str
    n_tables: int
    n_columns: int
    n_joinable_columns: int
    size_mb: float

    def row(self) -> tuple:
        return (
            self.name,
            self.n_tables,
            self.n_columns,
            self.n_joinable_columns,
            f"{self.size_mb:.1f}MB",
        )


def estimated_size_mb(lake: Lake) -> float:
    """Approximate serialized size of the lake in MB.

    Per-table size = rows × (8 bytes per numeric column, total string
    length per string column). All per-table aggregations are unioned
    into a single Spark action so a 500-table lake costs one job, not 500.
    """
    parts = []
    for name in lake.names():
        df = lake.table(name)
        size_expr = None
        for f in df.schema.fields:
            term = (
                F.coalesce(F.length(F.col(f.name)).cast("long"), F.lit(0))
                if f.dataType.typeName() == "string"
                else F.lit(8).cast("long")
            )
            size_expr = term if size_expr is None else size_expr + term
        parts.append(
            df.select(size_expr.alias("row_bytes")).agg(
                F.coalesce(F.sum("row_bytes"), F.lit(0)).alias("table_bytes")
            )
        )
    if not parts:
        return 0.0
    from functools import reduce

    from pyspark.sql import DataFrame

    union = reduce(DataFrame.unionByName, parts)
    total = union.agg(F.sum("table_bytes").alias("b")).collect()[0]["b"] or 0
    return total / 1e6


def compute_stats(
    lake: Lake, name: str, *, min_containment: float = 0.05
) -> LakeStats:
    """Compute one Table I row for ``lake``."""
    index = build_value_index(lake)
    return LakeStats(
        name=name,
        n_tables=len(lake),
        n_columns=lake.n_columns(),
        n_joinable_columns=joinable_column_count(
            index, min_containment=min_containment
        ),
        size_mb=estimated_size_mb(lake),
    )

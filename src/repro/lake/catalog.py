"""Lake catalog: a named collection of Spark tables plus metadata.

The catalog is the substrate the discovery system (``repro.discovery``)
scans. Metadata (source + descriptive tokens) feeds the semantic and
metadata data profiles; real lakes carry this as portal/catalog metadata.
"""
from __future__ import annotations

import json
import os
from dataclasses import dataclass, field

from pyspark.sql import DataFrame, SparkSession


@dataclass(frozen=True)
class TableMeta:
    """Catalog metadata for one table.

    ``source`` mimics the data portal a table came from; ``tokens`` are the
    descriptive words (title/description) used by the semantic profile.
    """

    source: str
    tokens: tuple[str, ...]


@dataclass
class Lake:
    """A data repository 𝒟 = {D_1, …, D_n} of noisy Spark tables."""

    tables: dict[str, DataFrame] = field(default_factory=dict)
    meta: dict[str, TableMeta] = field(default_factory=dict)

    def add(self, name: str, df: DataFrame, meta: TableMeta) -> None:
        if name in self.tables:
            raise ValueError(f"duplicate table name: {name}")
        self.tables[name] = df
        self.meta[name] = meta

    def __len__(self) -> int:
        return len(self.tables)

    def __contains__(self, name: str) -> bool:
        return name in self.tables

    def table(self, name: str) -> DataFrame:
        return self.tables[name]

    def names(self) -> list[str]:
        return sorted(self.tables)

    def n_columns(self) -> int:
        """Total column count across all tables (Table I's #Columns)."""
        return sum(len(df.columns) for df in self.tables.values())

    def to_parquet(self, root: str) -> None:
        """Persist the lake as one parquet directory per table + a catalog."""
        os.makedirs(root, exist_ok=True)
        for name, df in self.tables.items():
            df.write.mode("overwrite").parquet(os.path.join(root, name))
        catalog = {
            name: {"source": m.source, "tokens": list(m.tokens)}
            for name, m in self.meta.items()
        }
        with open(os.path.join(root, "_catalog.json"), "w") as f:
            json.dump(catalog, f, indent=1, sort_keys=True)

    @staticmethod
    def from_parquet(spark: SparkSession, root: str) -> "Lake":
        """Re-open a lake persisted with :meth:`to_parquet`."""
        with open(os.path.join(root, "_catalog.json")) as f:
            catalog = json.load(f)
        lake = Lake()
        for name, m in catalog.items():
            lake.add(
                name,
                spark.read.parquet(os.path.join(root, name)),
                TableMeta(source=m["source"], tokens=tuple(m["tokens"])),
            )
        return lake

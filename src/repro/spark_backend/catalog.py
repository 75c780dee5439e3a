"""Input catalog: named bags (DataFrames) + schema metadata.

The unique-key metadata drives aggregation pushing (§3.3: "when the
key is known to be unique, based on schema information for inputs").
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.sql import DataFrame


@dataclass
class Catalog:
    """Named input/intermediate bags available to plan Scans."""

    tables: dict[str, DataFrame] = field(default_factory=dict)
    unique_keys: dict[str, set[str]] = field(default_factory=dict)

    def add(self, name: str, df: DataFrame, unique: set[str] | None = None):
        self.tables[name] = df
        if unique:
            self.unique_keys[name] = unique
        return self

    def get(self, name: str) -> DataFrame:
        if name not in self.tables:
            raise KeyError(f"unknown input bag {name!r}")
        return self.tables[name]

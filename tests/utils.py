"""Shared test helpers: row extraction and interpreter environments."""
from __future__ import annotations

from pyspark.sql import DataFrame

from repro.core import nrc_interp as I


def rows_of(df: DataFrame) -> list[dict]:
    """Collect a (possibly nested) DataFrame into plain Python rows."""
    return [r.asDict(recursive=True) for r in df.collect()]


def env_of(catalog) -> dict[str, list[dict]]:
    """Interpreter environment: every catalog table as Python rows."""
    return {name: rows_of(df) for name, df in catalog.tables.items()}


def check(df: DataFrame, expected: list[dict], msg: str = "") -> None:
    """Multiset-compare a Spark result against an interpreter result."""
    I.assert_bags_equal(rows_of(df), expected, msg)

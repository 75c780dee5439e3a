"""Simulated shuffle accounting.

The paper reports total shuffled memory from the Spark UI; the repro
session runs with the UI disabled, so we account shuffle analytically:
every shuffle-inducing operator (join sides, Γ⁺/Γ⊎ input, distinct,
repartition) records ``rows × estimated row width``.  Broadcast bytes
(the heavy plans of Fig. 6) are recorded separately — broadcasting is
exactly what skew-aware plans use *instead of* shuffling heavy keys.

Counting rows costs extra Spark actions, so metrics collection is off
during timing runs; harnesses do a separate accounting pass.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T

_SCALAR_WIDTH = {
    T.IntegerType: 4,
    T.LongType: 8,
    T.DoubleType: 8,
    T.FloatType: 4,
    T.BooleanType: 1,
    T.DateType: 4,
    T.TimestampType: 8,
}
_STRING_WIDTH = 24  # average payload assumption


def _width(dt: T.DataType) -> float:
    """Estimated serialized width (bytes) of one value of type ``dt``."""
    if isinstance(dt, T.StringType):
        return _STRING_WIDTH
    if isinstance(dt, T.StructType):
        return sum(_width(f.dataType) for f in dt.fields)
    if isinstance(dt, T.ArrayType):
        # Arrays counted as 4 elements by default; callers measuring
        # real data override via avg_array_sizes.
        return 16 + 4 * _width(dt.elementType)
    return _SCALAR_WIDTH.get(type(dt), 8)


def row_width(df: DataFrame) -> float:
    return sum(_width(f.dataType) for f in df.schema.fields)


@dataclass
class ShuffleRecord:
    label: str
    kind: str  # "shuffle" | "broadcast"
    rows: int
    bytes: float


@dataclass
class MetricsCollector:
    """Accumulates simulated shuffle/broadcast volume during execution."""

    enabled: bool = True
    records: list[ShuffleRecord] = field(default_factory=list)

    def record(self, label: str, df: DataFrame, kind: str = "shuffle") -> None:
        if not self.enabled:
            return
        n = df.count()
        self.records.append(ShuffleRecord(label, kind, n, n * row_width(df)))

    @property
    def shuffle_bytes(self) -> float:
        return sum(r.bytes for r in self.records if r.kind == "shuffle")

    @property
    def shuffle_rows(self) -> int:
        return sum(r.rows for r in self.records if r.kind == "shuffle")

    @property
    def broadcast_bytes(self) -> float:
        return sum(r.bytes for r in self.records if r.kind == "broadcast")

    @property
    def join_shuffle_bytes(self) -> float:
        """Shuffle attributable to join inputs only — the quantity the
        paper's E.5 plot reports (COP shuffle prior to the Part join)."""
        return sum(
            r.bytes
            for r in self.records
            if r.kind == "shuffle" and r.label.startswith("join:")
        )


NO_METRICS = MetricsCollector(enabled=False)

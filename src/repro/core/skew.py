"""Skew-resilient processing (§5, Fig. 6).

* :func:`heavy_keys` — lightweight per-partition sampling: a key is
  *heavy* when at least ``threshold`` (default 2.5 %) of the sampled
  tuples of some partition carry it.  The threshold bounds the number
  of heavy keys (≤ 100/2.5 = 40 per partition's sample), which keeps
  broadcasting them cheap.
* :class:`SkewTriple` — (light bag, heavy bag, heavy-key set).
* :func:`skew_join` — light⋈light with the standard shuffle join;
  heavy⋈broadcast(heavy side of the smaller relation), so values of
  heavy keys in the big relation stay where they are.
* :func:`skew_bag_to_dict` — BagToDict: repartition only the light
  labels; heavy labels keep their current distribution.

Nest operators merge the two components and run the standard
implementation, returning a triple with an empty heavy part
(Fig. 6, Γ row).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Optional

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

DEFAULT_THRESHOLD = 0.025
DEFAULT_SAMPLE_FRACTION = 0.1
MIN_SAMPLE_PER_PARTITION = 20


@dataclass
class SkewTriple:
    """Light component, heavy component (may be None=empty), heavy keys."""

    light: DataFrame
    heavy: Optional[DataFrame]
    keys: Optional[list]  # heavy key values; None = unknown

    def union(self) -> DataFrame:
        if self.heavy is None:
            return self.light
        return self.light.unionByName(self.heavy)


def heavy_keys(
    df: DataFrame,
    key_col: str,
    threshold: float = DEFAULT_THRESHOLD,
    sample_fraction: float = DEFAULT_SAMPLE_FRACTION,
) -> list:
    """Heavy key values of ``df[key_col]`` via per-partition sampling.

    Mirrors the paper's procedure: sample each partition, mark a key
    heavy when its share of that partition's sample reaches the
    threshold.  Null keys are never heavy.
    """
    sample = df.select(
        F.spark_partition_id().alias("__pid"), F.col(key_col).alias("__k")
    ).sample(fraction=sample_fraction, seed=7)
    counts = (
        sample.groupBy("__pid", "__k")
        .count()
        .withColumn(
            "__total", F.sum("count").over(Window.partitionBy("__pid"))
        )
    )
    rows = (
        counts.where(
            (F.col("count") >= threshold * F.col("__total"))
            & (F.col("__total") >= MIN_SAMPLE_PER_PARTITION)
            & F.col("__k").isNotNull()
        )
        .select("__k")
        .distinct()
        .collect()
    )
    return [r["__k"] for r in rows]


def split(
    df: DataFrame, key_col: str, keys: Optional[list]
) -> SkewTriple:
    """Split a bag into a skew-triple on known heavy keys."""
    if not keys:
        return SkewTriple(light=df, heavy=None, keys=keys or [])
    light = df.where(~F.col(key_col).isin(keys) | F.col(key_col).isNull())
    heavy = df.where(F.col(key_col).isin(keys))
    return SkewTriple(light=light, heavy=heavy, keys=keys)


def skew_join(
    x: SkewTriple,
    y: DataFrame,
    x_key: str,
    y_key: str,
    cond,
    how: str,
) -> SkewTriple:
    """Fig. 6 skew-aware join: X (triple) ⋈ Y on cond.

    Recomputes heavy keys of X on ``x_key`` when unknown, splits Y on
    the same key set, joins light parts with the standard shuffle
    join and heavy parts with a broadcast of Y's heavy part.
    """
    hk = x.keys
    if hk is None:
        hk = heavy_keys(x.union(), x_key)
        x = split(x.union(), x_key, hk)
    if not hk:
        return SkewTriple(light=x.union().join(y, cond, how), heavy=None, keys=[])
    y_light = y.where(~F.col(y_key).isin(hk) | F.col(y_key).isNull())
    y_heavy = y.where(F.col(y_key).isin(hk))
    light = x.light.join(y_light, cond, how)
    heavy = (x.heavy if x.heavy is not None else x.light.limit(0)).join(
        F.broadcast(y_heavy), cond, how
    )
    return SkewTriple(light=light, heavy=heavy, keys=hk)


def skew_bag_to_dict(df: DataFrame, label_col: str = "label") -> SkewTriple:
    """Skew-aware BagToDict: repartition light labels only (Fig. 6)."""
    hk = heavy_keys(df, label_col)
    t = split(df, label_col, hk)
    light = t.light.repartition(label_col)
    return SkewTriple(light=light, heavy=t.heavy, keys=hk)

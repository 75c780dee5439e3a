"""Optimization-level control (§3.3, App. E.4).

The compiler applies plan-level optimizations itself (cogroup fusion,
aggregation pushing — ``core.unnest``).  Projection pushing is
different in our substrate: the paper's Scala code generator emits
typed-Dataset lambdas that Catalyst cannot see through, so *not*
pushing projections really carries every column; our DataFrame plans
are fully Catalyst-visible, and Catalyst prunes columns on its own.
To reproduce the "no pushed projections" configuration faithfully we
disable Catalyst's pruning/pushdown rules for the run (documented
substitution, DESIGN.md §2).
"""
from __future__ import annotations

from contextlib import contextmanager

from pyspark.sql import SparkSession

_NOOPT_RULES = ",".join(
    [
        "org.apache.spark.sql.catalyst.optimizer.ColumnPruning",
        "org.apache.spark.sql.catalyst.optimizer.PushDownPredicates",
        "org.apache.spark.sql.catalyst.optimizer.PushProjectionThroughUnion",
        "org.apache.spark.sql.catalyst.optimizer.PushProjectionThroughLimit",
    ]
)

_KEY = "spark.sql.optimizer.excludedRules"


@contextmanager
def catalyst_opt_level(spark: SparkSession, opt: str):
    """Within the context, emulate the requested optimization level.

    ``opt="none"`` excludes Catalyst's column-pruning / predicate-
    pushdown rules; other levels run with Catalyst defaults (the
    plan-level differences are handled by the compiler).
    """
    if opt != "none":
        yield
        return
    try:
        prev = spark.conf.get(_KEY)
    except Exception:
        prev = None
    spark.conf.set(_KEY, _NOOPT_RULES)
    try:
        yield
    finally:
        if prev is None:
            spark.conf.unset(_KEY)
        else:
            spark.conf.set(_KEY, prev)

"""Fig. 7 (nested-to-flat): telescoped shredded aggregation vs flattening."""
import pytest

from repro.bench import harness, tpch_queries as TQ
from repro.spark_backend import sparksql_competitor as SQL

from benchmarks.conftest import one_shot

LEVELS = [1, 2]


def _setup(spark, cat, level):
    name = harness.materialize_nested_input(spark, cat, level, False)
    return name, TQ.nested_to_flat(level, False), harness.tpch_types(level, False)


@pytest.mark.parametrize("level", LEVELS)
def bench_standard(benchmark, spark, bench_tpch, level):
    _, e, types = _setup(spark, bench_tpch, level)
    one_shot(
        benchmark, harness.run_standard(spark, e, types, bench_tpch, opt="full")
    )


@pytest.mark.parametrize("level", LEVELS)
def bench_shred(benchmark, spark, bench_tpch, level):
    _, e, types = _setup(spark, bench_tpch, level)
    one_shot(
        benchmark, harness.run_shred(e, types, bench_tpch, f"b7x_{level}")
    )


@pytest.mark.parametrize("level", LEVELS)
def bench_sparksql(benchmark, spark, bench_tpch, level):
    view, _, _ = _setup(spark, bench_tpch, level)
    sql = SQL.nested_to_flat_sql(level, False, view)
    one_shot(benchmark, harness.run_sparksql(spark, bench_tpch, sql))

"""Fig. 7 (flat-to-nested): one bench per strategy at 1 and 3 levels."""
import pytest

from repro.bench import harness, tpch_queries as TQ
from repro.spark_backend import sparksql_competitor as SQL

from benchmarks.conftest import one_shot

LEVELS = [1, 3]


@pytest.mark.parametrize("level", LEVELS)
def bench_standard(benchmark, spark, bench_tpch, level):
    e = TQ.flat_to_nested(level, False)
    one_shot(
        benchmark,
        harness.run_standard(spark, e, TQ.BASE_TYPES, bench_tpch, opt="full"),
    )


@pytest.mark.parametrize("level", LEVELS)
def bench_shred(benchmark, spark, bench_tpch, level):
    e = TQ.flat_to_nested(level, False)
    one_shot(
        benchmark,
        harness.run_shred(e, TQ.BASE_TYPES, bench_tpch, f"b7f_{level}"),
    )


@pytest.mark.parametrize("level", LEVELS)
def bench_unshred(benchmark, spark, bench_tpch, level):
    e = TQ.flat_to_nested(level, False)
    one_shot(
        benchmark,
        harness.run_shred(
            e, TQ.BASE_TYPES, bench_tpch, f"b7fu_{level}", unshred=True
        ),
    )


@pytest.mark.parametrize("level", LEVELS)
def bench_sparksql(benchmark, spark, bench_tpch, level):
    sql = SQL.flat_to_nested_sql(level, False)
    one_shot(benchmark, harness.run_sparksql(spark, bench_tpch, sql))

"""App. E.1: RDD backend vs Dataset (Catalyst) backend."""
import pytest

from repro.bench import harness, tpch_queries as TQ
from repro.core.unnest import compile_standard

from benchmarks.conftest import one_shot

LEVELS = [1, 2]


@pytest.mark.parametrize("level", LEVELS)
def bench_dataset(benchmark, spark, bench_tpch, level):
    e = TQ.flat_to_nested(level, False)
    one_shot(
        benchmark,
        harness.run_standard(spark, e, TQ.BASE_TYPES, bench_tpch, opt="full"),
    )


@pytest.mark.parametrize("level", LEVELS)
def bench_rdd(benchmark, spark, bench_tpch, level):
    e = TQ.flat_to_nested(level, False)
    c = compile_standard(TQ.hierarchy_for(e), opt="full")
    one_shot(benchmark, harness.run_rdd(c, bench_tpch))

"""App. E.4: optimization levels of the standard route."""
import pytest

from repro.bench import harness, tpch_queries as TQ

from benchmarks.conftest import one_shot


@pytest.mark.parametrize("opt,push", [("none", False), ("proj", False), ("full", True)])
def bench_opt_level(benchmark, spark, bench_tpch, opt, push):
    harness.materialize_nested_input(spark, bench_tpch, 2, True)
    e = TQ.nested_to_nested(2, True)
    types = harness.tpch_types(2, True)
    one_shot(
        benchmark,
        harness.run_standard(
            spark, e, types, bench_tpch, opt=opt, push_agg=push
        ),
    )

"""App. E.7: skew-handling overhead on non-skewed data."""
import pytest

from repro.bench import harness, tpch_queries as TQ

from benchmarks.conftest import one_shot


@pytest.mark.parametrize("skew_aware", [False, True], ids=["plain", "skew-aware"])
@pytest.mark.parametrize("route", ["standard", "shred"])
def bench_overhead(benchmark, spark, bench_tpch, route, skew_aware):
    harness.materialize_nested_input(spark, bench_tpch, 2, False)
    e = TQ.nested_to_nested(2, False)
    types = harness.tpch_types(2, False)
    if route == "standard":
        fn = harness.run_standard(
            spark, e, types, bench_tpch, opt="full", skew=skew_aware
        )
    else:
        fn = harness.run_shred(
            e, types, bench_tpch, f"be7_{int(skew_aware)}", skew=skew_aware
        )
    one_shot(benchmark, fn)

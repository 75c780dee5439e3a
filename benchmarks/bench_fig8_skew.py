"""Fig. 8: skew-aware vs skew-unaware on Zipf-skewed data (z=3)."""
import pytest

from repro.bench import harness, tpch_queries as TQ

from benchmarks.conftest import one_shot


def _setup(spark, cat):
    harness.materialize_nested_input(spark, cat, 2, False)
    return TQ.nested_to_nested(2, False), harness.tpch_types(2, False)


@pytest.mark.parametrize(
    "strategy,push,skew_aware",
    [
        ("standard", True, False),
        ("standard_skew", False, True),
        ("shred", True, False),
        ("shred_skew", False, True),
    ],
)
def bench_skew(benchmark, spark, bench_tpch_skewed, strategy, push, skew_aware):
    e, types = _setup(spark, bench_tpch_skewed)
    if strategy.startswith("standard"):
        fn = harness.run_standard(
            spark, e, types, bench_tpch_skewed, opt="full",
            push_agg=push, skew=skew_aware,
        )
    else:
        fn = harness.run_shred(
            e, types, bench_tpch_skewed, f"b8_{strategy}", skew=skew_aware
        )
    one_shot(benchmark, fn)

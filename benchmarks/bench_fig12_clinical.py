"""Fig. 12: clinical exploration queries C1–C3."""
import pytest

from repro.bench import biomed_queries as BQ
from repro.bench import harness

from benchmarks.conftest import one_shot


@pytest.mark.parametrize("cname", ["C1", "C2", "C3"])
@pytest.mark.parametrize("strategy", ["standard", "shred"])
def bench_clinical(benchmark, spark, bench_biomed, cname, strategy):
    e = BQ.CLINICAL[cname]()
    if strategy == "standard":
        fn = harness.run_standard(
            spark, e, BQ.BASE_TYPES, bench_biomed, opt="full"
        )
    else:
        fn = harness.run_shred(
            e, BQ.BASE_TYPES, bench_biomed, f"b12_{cname}"
        )
    one_shot(benchmark, fn)

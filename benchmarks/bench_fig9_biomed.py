"""Fig. 9: biomedical pipeline Steps 1–2 (the expensive steps)."""
import pytest

from repro.bench import biomed_queries as BQ
from repro.bench import harness
from repro.core import api
from repro.core import nrc as N

from benchmarks.conftest import one_shot


def _prepare_step2_inputs(spark, cat, types):
    if "HybridMatrix" not in cat.tables:
        e = BQ.step1()
        df = api.standard_route(e, types, cat, opt="full").cache()
        df.count()
        cat.add("HybridMatrix", df)
    if "HybridMatrix__top" not in cat.tables:
        api.shredded_route(BQ.step1(), types, "HybridMatrix", cat)


@pytest.mark.parametrize("step", [0, 1])
def bench_standard(benchmark, spark, bench_biomed, step):
    types = BQ.pipeline_types()
    if step == 1:
        _prepare_step2_inputs(spark, bench_biomed, types)
    e = BQ.STEPS[step]()
    one_shot(
        benchmark,
        harness.run_standard(spark, e, types, bench_biomed, opt="full"),
    )


@pytest.mark.parametrize("step", [0, 1])
def bench_shred(benchmark, spark, bench_biomed, step):
    types = BQ.pipeline_types()
    if step == 1:
        _prepare_step2_inputs(spark, bench_biomed, types)
    e = BQ.STEPS[step]()
    one_shot(
        benchmark,
        harness.run_shred(
            e, types, bench_biomed,
            "HybridMatrix" if step == 0 else "SampleNetwork",
        ),
    )

"""Session-scoped workload fixtures (built on the root `spark` fixture).

Scale factors are tiny (SF 0.002 TPC-H-lite, 8 biomedical samples):
correctness tests compare full results against the reference NRC
interpreter and the DuckDB oracle, so small inputs give complete
coverage of the join/nest/shred code paths without slow runs.
"""
from __future__ import annotations

import pytest

from repro.bench import biomed_queries as BQ
from repro.bench import tpch_queries as TQ
from repro.core import api
from repro.core import nrc_interp as I
from repro.core.unnest import compile_standard
from repro.spark_backend import dataset as DS

from tests.utils import env_of, rows_of

TPCH_SF = 0.002
BIOMED_SAMPLES = 8


@pytest.fixture(scope="session")
def tpch(spark):
    """TPC-H catalog + interpreter env + materialized nested inputs."""
    cat = TQ.load_tpch(spark, sf=TPCH_SF)
    for name in list(cat.tables):
        cat.tables[name] = cat.tables[name].cache()
    env = env_of(cat)
    return {"cat": cat, "env": env, "nested": {}}


def ensure_nested_input(tpch, level: int, wide: bool):
    """Materialize COP{level} (nested + shredded) once per session."""
    key = (level, wide)
    if key in tpch["nested"]:
        return tpch["nested"][key]
    cat = tpch["cat"]
    name = TQ.input_bag_name(level, wide)
    c = compile_standard(
        TQ.hierarchy_for(TQ.flat_to_nested(level, wide)), opt="full"
    )
    df = DS.run(c.plan, cat).cache()
    cat.add(name, df)
    tpch["env"][name] = rows_of(df)
    api.register_shredded(cat, name, api.shred_df(df).cache())
    tpch["nested"][key] = name
    return name


@pytest.fixture(scope="session")
def biomed(spark):
    """Biomedical catalog + env + shredded nested inputs + pipeline
    expectations (computed once by the reference interpreter)."""
    cat = BQ.load_biomed(spark, n_samples=BIOMED_SAMPLES)
    for name in list(cat.tables):
        cat.tables[name] = cat.tables[name].cache()
    env = env_of(cat)
    for nested in ("Occurrences", "Network", "VEP"):
        api.register_shredded(cat, nested, api.shred_df(cat.get(nested)).cache())
    types = dict(BQ.BASE_TYPES)
    expected = {}
    from repro.core import nrc as N

    for name, step in zip(BQ.STEP_NAMES, BQ.STEPS):
        e = step()
        expected[name] = I.evaluate(e, env)
        env[name] = expected[name]
        types[name] = N.infer_type(e, types)
    return {
        "cat": cat,
        "env": env,
        "types": types,
        "expected_steps": expected,
    }

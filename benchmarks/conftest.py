"""Benchmark fixtures: cached catalogs at benchmark scale.

``pytest benchmarks/ --benchmark-only`` regenerates one representative
cell per paper table; the full parameter sweeps (all levels, all skew
factors) are the ``jobs/*.py`` entrypoints recorded in EXPERIMENTS.md.
"""
from __future__ import annotations

import pytest

from repro.bench import biomed_queries as BQ
from repro.bench import harness
from repro.core import api

BENCH_SF = 0.02
BENCH_SKEW_SF = 0.02
BENCH_BIOMED_SAMPLES = 15


@pytest.fixture(scope="session")
def bench_tpch(spark):
    return harness.tpch_catalog(spark, sf=BENCH_SF)


@pytest.fixture(scope="session")
def bench_tpch_skewed(spark):
    return harness.tpch_catalog(spark, sf=BENCH_SKEW_SF, skew=3.0)


@pytest.fixture(scope="session")
def bench_biomed(spark):
    cat = BQ.load_biomed(spark, n_samples=BENCH_BIOMED_SAMPLES)
    for name in list(cat.tables):
        cat.tables[name] = cat.tables[name].cache()
        cat.tables[name].count()
    for nested in ("Occurrences", "Network"):
        s = api.shred_df(cat.get(nested)).cache()
        s.count_all()
        api.register_shredded(cat, nested, s)
    return cat


def one_shot(benchmark, fn):
    """Run a strategy once per measurement (cold Spark jobs dominate)."""
    benchmark.pedantic(fn, rounds=1, iterations=1, warmup_rounds=0)

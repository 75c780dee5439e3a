"""SparkSQL competitor: generated SQL agrees with the interpreter."""
import pytest

from repro.bench import biomed_queries as BQ
from repro.bench import tpch_queries as TQ
from repro.core import nrc_interp as I
from repro.spark_backend import sparksql_competitor as SQL

from tests.conftest import ensure_nested_input
from tests.utils import check


@pytest.mark.parametrize("wide", [False, True], ids=["narrow", "wide"])
@pytest.mark.parametrize("level", [0, 1, 2, 3, 4])
def test_flat_to_nested_sql(spark, tpch, level, wide):
    e = TQ.flat_to_nested(level, wide)
    df = SQL.run_sql(spark, tpch["cat"], SQL.flat_to_nested_sql(level, wide))
    check(df, I.evaluate(e, tpch["env"]), f"sql f2n L{level}")


@pytest.mark.parametrize("wide", [False, True], ids=["narrow", "wide"])
@pytest.mark.parametrize("level", [0, 1, 2, 3])
def test_nested_to_nested_sql(spark, tpch, level, wide):
    view = ensure_nested_input(tpch, level, wide)
    e = TQ.nested_to_nested(level, wide)
    df = SQL.run_sql(
        spark, tpch["cat"], SQL.nested_to_nested_sql(level, wide, view)
    )
    check(df, I.evaluate(e, tpch["env"]), f"sql n2n L{level}")


@pytest.mark.parametrize("wide", [False, True], ids=["narrow", "wide"])
@pytest.mark.parametrize("level", [0, 1, 2, 3])
def test_nested_to_flat_sql(spark, tpch, level, wide):
    view = ensure_nested_input(tpch, level, wide)
    e = TQ.nested_to_flat(level, wide)
    df = SQL.run_sql(
        spark, tpch["cat"], SQL.nested_to_flat_sql(level, wide, view)
    )
    check(df, I.evaluate(e, tpch["env"]), f"sql n2f L{level}")


def test_biomed_pipeline_sql(spark, biomed):
    """All five E2E steps in flattening SQL, chained like the paper's
    SparkSQL runs, each checked against the interpreter."""
    cat = biomed["cat"]
    for i, name in enumerate(BQ.STEP_NAMES):
        df = SQL.run_sql(spark, cat, SQL.BIOMED_STEP_SQL[i])
        check(df, biomed["expected_steps"][name], f"sql {name}")
        cat.add(name, df.cache())
        cat.tables[name].count()


def test_sql_preserves_empty_inner_bags(spark, tpch):
    df = SQL.run_sql(spark, tpch["cat"], SQL.flat_to_nested_sql(2, False))
    n_cust = tpch["cat"].get("Customer").count()
    assert df.count() == n_cust

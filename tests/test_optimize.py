"""Optimization levels (§3.3 / App. E.4): all levels agree on results."""
import pytest

from repro.bench import tpch_queries as TQ
from repro.core import api
from repro.core import nrc_interp as I
from repro.core.optimize import _KEY, catalyst_opt_level

from tests.conftest import ensure_nested_input
from tests.utils import check


@pytest.mark.parametrize("opt", ["none", "proj", "full"])
def test_opt_levels_equivalent(spark, tpch, opt):
    e = TQ.flat_to_nested(2, True)
    expected = I.evaluate(e, tpch["env"])
    with catalyst_opt_level(spark, opt):
        df = api.standard_route(e, TQ.BASE_TYPES, tpch["cat"], opt=opt)
        check(df, expected, f"opt={opt}")


def test_noopt_excludes_catalyst_rules(spark):
    with catalyst_opt_level(spark, "none"):
        assert "ColumnPruning" in spark.conf.get(_KEY)
    # restored afterwards
    try:
        leftover = spark.conf.get(_KEY)
    except Exception:
        leftover = None
    assert not leftover or "ColumnPruning" not in leftover


def test_push_agg_equivalent_on_flat_output(tpch):
    name = ensure_nested_input(tpch, 2, False)
    e = TQ.nested_to_nested(2, False)
    types = {**TQ.BASE_TYPES, name: TQ.flat_to_nested_type(2, False)}
    expected = I.evaluate(e, tpch["env"])
    for push in (False, True):
        df = api.standard_route(
            e, types, tpch["cat"], opt="full", push_agg=push
        )
        check(df, expected, f"push_agg={push}")


def test_cogroup_and_canonical_agree(tpch):
    e = TQ.flat_to_nested(3, False)
    expected = I.evaluate(e, tpch["env"])
    for opt in ("none", "full"):
        df = api.standard_route(e, TQ.BASE_TYPES, tpch["cat"], opt=opt)
        check(df, expected, f"{opt}")

"""Standard compilation route (§3): full differential testing.

Every TPC-H benchmark query (3 families × levels 0–4 × narrow/wide)
is compiled and executed on Spark at every optimization level and
compared against the reference NRC interpreter as a multiset,
nested-bag equality — a complete end-to-end check of unnesting,
code generation and the Γ NULL semantics.
"""
import pytest

from repro.bench import tpch_queries as TQ
from repro.core import nrc_interp as I
from repro.core.unnest import compile_standard, ocol, idcol
from repro.core import plan_ops as P
from repro.spark_backend import dataset as DS

from tests.conftest import ensure_nested_input
from tests.utils import check

LEVELS = [0, 1, 2, 3, 4]


def _expected(tpch, e):
    return I.evaluate(e, tpch["env"])


@pytest.mark.parametrize("wide", [False, True], ids=["narrow", "wide"])
@pytest.mark.parametrize("level", LEVELS)
@pytest.mark.parametrize("opt", ["none", "proj", "full"])
def test_flat_to_nested(tpch, level, wide, opt):
    e = TQ.flat_to_nested(level, wide)
    c = compile_standard(TQ.hierarchy_for(e), opt=opt)
    check(DS.run(c.plan, tpch["cat"]), _expected(tpch, e),
          f"f2n L{level} {opt}")


@pytest.mark.parametrize("wide", [False, True], ids=["narrow", "wide"])
@pytest.mark.parametrize("level", LEVELS)
def test_nested_to_nested(tpch, level, wide):
    name = ensure_nested_input(tpch, level, wide)
    e = TQ.nested_to_nested(level, wide)
    types = {name: TQ.flat_to_nested_type(level, wide)}
    c = compile_standard(TQ.hierarchy_for(e, types), opt="full")
    check(DS.run(c.plan, tpch["cat"]), _expected(tpch, e), f"n2n L{level}")


@pytest.mark.parametrize("level", [1, 2, 3])
def test_nested_to_nested_push_agg(tpch, level):
    name = ensure_nested_input(tpch, level, False)
    e = TQ.nested_to_nested(level, False)
    types = {name: TQ.flat_to_nested_type(level, False)}
    c = compile_standard(
        TQ.hierarchy_for(e, types), opt="full", push_agg=True,
        unique_keys=tpch["cat"].unique_keys,
    )
    # pushing must actually fire: two NestSum operators in the plan
    sums = [n for n in P.walk(c.plan) if isinstance(n, P.NestSum)]
    assert len(sums) == 2, "partial-sum pushing did not apply"
    check(DS.run(c.plan, tpch["cat"]), _expected(tpch, e),
          f"n2n push L{level}")


@pytest.mark.parametrize("wide", [False, True], ids=["narrow", "wide"])
@pytest.mark.parametrize("level", LEVELS)
def test_nested_to_flat(tpch, level, wide):
    name = ensure_nested_input(tpch, level, wide)
    e = TQ.nested_to_flat(level, wide)
    types = {name: TQ.flat_to_nested_type(level, wide)}
    c = compile_standard(TQ.hierarchy_for(e, types), opt="full")
    check(DS.run(c.plan, tpch["cat"]), _expected(tpch, e), f"n2f L{level}")


def test_empty_inner_bags_preserved(tpch):
    """Customers without orders appear with corders == [] (Challenge 1:
    the incomplete-information pitfall of naive flattening)."""
    e = TQ.flat_to_nested(2, False)
    c = compile_standard(TQ.hierarchy_for(e), opt="full")
    rows = DS.run(c.plan, tpch["cat"]).collect()
    n_cust = tpch["cat"].get("Customer").count()
    assert len(rows) == n_cust  # naive flattening would lose customers
    assert all(r["corders"] is not None for r in rows)


def test_cogroup_plan_has_no_ids(tpch):
    """Full-opt flat-to-nested compiles to the cogroup form: no AddId,
    one WithEmptyArray per nesting level."""
    c = compile_standard(TQ.hierarchy_for(TQ.flat_to_nested(3, False)), opt="full")
    kinds = [type(n).__name__ for n in P.walk(c.plan)]
    assert "AddId" not in kinds
    assert kinds.count("WithEmptyArray") == 3


def test_no_opt_plan_uses_outer_join_and_ids(tpch):
    c = compile_standard(TQ.hierarchy_for(TQ.flat_to_nested(2, False)), opt="none")
    kinds = [type(n).__name__ for n in P.walk(c.plan)]
    assert "AddId" in kinds
    joins = [n for n in P.walk(c.plan) if isinstance(n, P.Join)]
    assert all(j.how == "left_outer" for j in joins)


def test_figure3_plan_shape(tpch):
    """The nested-to-nested L2 plan mirrors Fig. 3: two outer unnests,
    an outer join with Part, a Γ⁺, and two Γ⊎ going back up."""
    name = ensure_nested_input(tpch, 2, False)
    types = {name: TQ.flat_to_nested_type(2, False)}
    c = compile_standard(
        TQ.hierarchy_for(TQ.nested_to_nested(2, False), types), opt="none"
    )
    nodes = list(P.walk(c.plan))
    unnests = [n for n in nodes if isinstance(n, P.Unnest)]
    assert [u.outer for u in unnests] == [True, True]
    joins = [n for n in nodes if isinstance(n, P.Join)]
    assert len(joins) == 1 and joins[0].how == "left_outer"
    assert sum(isinstance(n, P.NestSum) for n in nodes) == 1
    assert sum(isinstance(n, P.NestBag) for n in nodes) == 2
    # Γ⁺ grouping attributes extend 𝒢 with the sumBy key (Fig. 3)
    gsum = next(n for n in nodes if isinstance(n, P.NestSum))
    assert idcol(("corders",)) in gsum.keys
    assert idcol(("corders", "oparts")) in gsum.keys
    assert ocol(("corders", "oparts"), "pname") in gsum.keys


def test_output_column_names(tpch):
    c = compile_standard(TQ.hierarchy_for(TQ.flat_to_nested(1, False)), opt="full")
    df = DS.run(c.plan, tpch["cat"])
    assert df.columns == ["odate", "oparts"]
    elem = df.schema["oparts"].dataType.elementType
    assert [f.name for f in elem.fields] == ["pid", "qty"]

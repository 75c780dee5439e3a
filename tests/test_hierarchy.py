"""Comprehension normal form: structure of normalised queries."""
import pytest

from repro.bench import biomed_queries as BQ
from repro.bench import tpch_queries as TQ
from repro.core import nrc as N
from repro.core.hierarchy import (
    NormalizationError,
    to_hierarchy,
)
from repro.core.sexpr import BinOp, Col, IfScalar


def test_flat_projection_level():
    q = to_hierarchy(TQ.flat_to_nested(0, False), TQ.BASE_TYPES)
    assert q.depth() == 0
    assert [g.var for g in q.gens] == ["l"]
    assert q.gens[0].input_name == "Lineitem"
    assert [n for n, _ in q.fields] == ["pid", "qty"]
    assert q.child is None and q.agg is None


@pytest.mark.parametrize("level", [1, 2, 3, 4])
def test_flat_to_nested_depth(level):
    q = to_hierarchy(TQ.flat_to_nested(level, False), TQ.BASE_TYPES)
    assert q.depth() == level


def test_grouping_chain_join_conditions():
    q = to_hierarchy(TQ.flat_to_nested(2, False), TQ.BASE_TYPES)
    fname, child = q.child
    assert fname == "corders"
    g = child.gens[0]
    assert g.input_name == "Orders"
    (l, r), = g.conds
    assert isinstance(l, Col) and l.var == "c" and l.attr == "c_custkey"
    assert isinstance(r, Col) and r.var == "o" and r.attr == "o_custkey"


def test_nested_to_nested_structure():
    name = TQ.input_bag_name(2, False)
    env = {**TQ.BASE_TYPES, name: TQ.flat_to_nested_type(2, False)}
    q = to_hierarchy(TQ.nested_to_nested(2, False), env)
    assert q.gens[0].input_name == name
    _, lvl1 = q.child
    assert lvl1.gens[0].path == ("x0", "corders")
    _, lvl2 = lvl1.child
    assert lvl2.agg is not None and lvl2.agg.kind == "sum"
    assert lvl2.agg.keys == ["pname"] and lvl2.agg.values == ["total"]
    # the Part join attaches to the input generator
    part = lvl2.gens[-1]
    assert part.input_name == "Part" and len(part.conds) == 1


def test_nested_to_flat_root_agg():
    name = TQ.input_bag_name(2, False)
    env = {**TQ.BASE_TYPES, name: TQ.flat_to_nested_type(2, False)}
    q = to_hierarchy(TQ.nested_to_flat(2, False), env)
    assert q.child is None
    assert q.agg.kind == "sum"
    assert q.agg.keys == ["cname", "pname"]
    assert [g.var for g in q.gens] == ["x0", "x1", "x2", "p"]
    assert q.gens[1].path == ("x0", "corders")


def test_elem_field_classification():
    name = TQ.input_bag_name(1, False)
    env = {**TQ.BASE_TYPES, name: TQ.flat_to_nested_type(1, False)}
    q = to_hierarchy(TQ.nested_to_nested(1, False), env)
    g = q.gens[0]
    assert "odate" in g.elem_fields
    assert g.elem_bag_fields == ["oparts"]


def test_scalar_let_is_inlined():
    env = dict(BQ.BASE_TYPES)
    # step1 uses a scalar conditional; ensure the impact expression
    # normalises into an IfScalar tree inside the score field
    q = to_hierarchy(BQ.step1(), env)
    _, scores = q.child
    score_expr = dict(scores.fields)["score"]
    found = []

    def walk(sx):
        if isinstance(sx, IfScalar):
            found.append(sx)
        if isinstance(sx, BinOp):
            walk(sx.left)
            walk(sx.right)
        if isinstance(sx, IfScalar):
            walk(sx.cond)
            walk(sx.then_)
            walk(sx.else_)

    walk(score_expr)
    assert found, "impact conditional should appear in the score expr"


def test_residual_filter_goes_to_where():
    e = N.ForUnion(
        "l",
        N.Var("Lineitem"),
        N.IfThen(
            N.PrimOp("<", N.Proj(N.Var("l"), "l_quantity"), N.const(10.0)),
            N.Singleton(
                N.TupleE((("pid", N.Proj(N.Var("l"), "l_partkey")),))
            ),
        ),
    )
    q = to_hierarchy(e, TQ.BASE_TYPES)
    assert q.where is not None
    assert not q.gens[0].conds


def test_two_bag_fields_rejected():
    inner = N.ForUnion(
        "x", N.Var("Lineitem"), N.Singleton(N.TupleE((("pid", N.Proj(N.Var("x"), "l_partkey")),)))
    )
    e = N.ForUnion(
        "o",
        N.Var("Orders"),
        N.Singleton(
            N.TupleE(
                (
                    ("odate", N.Proj(N.Var("o"), "o_orderdate")),
                    ("a", inner),
                    ("b", inner),
                )
            )
        ),
    )
    with pytest.raises(NormalizationError):
        to_hierarchy(e, TQ.BASE_TYPES)


def test_unsupported_generator_source_rejected():
    e = N.ForUnion(
        "x",
        N.Union(N.Var("Lineitem"), N.Var("Lineitem")),
        N.Singleton(N.TupleE((("pid", N.Proj(N.Var("x"), "l_partkey")),))),
    )
    with pytest.raises(NormalizationError):
        to_hierarchy(e, TQ.BASE_TYPES)


def test_step2_conditions_attach_to_biomart():
    q = to_hierarchy(BQ.step2(), BQ.pipeline_types())
    _, nodes = q.child
    by_var = {g.var: g for g in nodes.gens}
    assert len(by_var["b"].conds) == 2
    assert not by_var["e"].conds  # no filters on path generators
    assert by_var["nw"].input_name == "Network" and not by_var["nw"].conds


def test_clinical_c3_agg_level():
    q = to_hierarchy(BQ.clinical_c3(), BQ.BASE_TYPES)
    _, mutations = q.child
    _, candidates = mutations.child
    assert candidates.agg.kind == "sum"
    assert candidates.agg.keys == ["gene"]

"""Symbolic shredding (Fig. 4) — structure on the paper's Example 4."""
import pytest

from repro.core import nrc as N
from repro.core import shred_symbolic as S

# The running example (Example 1): COP joined with Part at the lowest
# level, summed by part name.
COP_T = N.BagT(
    N.tuple_t(
        cname=N.STRING,
        corders=N.BagT(
            N.tuple_t(
                odate=N.STRING,
                oparts=N.BagT(N.tuple_t(pid=N.INT, qty=N.REAL)),
            )
        ),
    )
)
PART_T = N.BagT(N.tuple_t(pid=N.INT, pname=N.STRING, price=N.REAL))
ENV = {"COP": COP_T, "Part": PART_T}


def _p(v, a):
    return N.Proj(N.Var(v), a)


def running_example() -> N.Expr:
    oparts = N.SumBy(
        ("pname",),
        ("total",),
        N.ForUnion(
            "op",
            _p("co", "oparts"),
            N.ForUnion(
                "p",
                N.Var("Part"),
                N.IfThen(
                    N.eq(_p("op", "pid"), _p("p", "pid")),
                    N.Singleton(
                        N.TupleE(
                            (
                                ("pname", _p("p", "pname")),
                                (
                                    "total",
                                    N.PrimOp("*", _p("op", "qty"), _p("p", "price")),
                                ),
                            )
                        )
                    ),
                ),
            ),
        ),
    )
    corders = N.ForUnion(
        "co",
        _p("cop", "corders"),
        N.Singleton(
            N.TupleE((("odate", _p("co", "odate")), ("oparts", oparts)))
        ),
    )
    return N.ForUnion(
        "cop",
        N.Var("COP"),
        N.Singleton(
            N.TupleE((("cname", _p("cop", "cname")), ("corders", corders)))
        ),
    )


@pytest.fixture(scope="module")
def shredded():
    return S.shred_query(running_example(), ENV)


def test_flat_component_shape(shredded):
    """Q^F: for cop_F in COP_F union {⟨cname, corders := NewLabel⟩}."""
    f, _ = shredded
    assert isinstance(f, N.Let)  # let cop_D := D(COP) in …
    body = f.body
    assert isinstance(body, N.ForUnion)
    assert body.var == "cop_F"
    assert isinstance(body.source, N.Var) and body.source.name == "COP_F"
    head = body.body
    assert isinstance(head, N.Singleton)
    fields = dict(head.expr.fields)
    assert isinstance(fields["corders"], S.NewLabel)


def test_label_captures_only_used_attributes(shredded):
    """The corders label captures cop's corders attribute, not cname
    (the implementation refinement discussed after Example 4)."""
    f, _ = shredded
    label = dict(f.body.body.expr.fields)["corders"]
    captures = dict(label.captures)
    assert set(captures) == {"cop"}
    assert "cname" not in captures["cop"]
    assert "corders" in captures["cop"]


def _dict_tree_fields(d: N.Expr) -> dict:
    # strip let bindings introduced by rule 8/9
    while isinstance(d, N.Let):
        d = d.body
    assert isinstance(d, N.TupleE)
    return dict(d.fields)


def test_dict_tree_top_level(shredded):
    """Q^D has corders_fun (a λ with match) and corders_child."""
    _, d = shredded
    fields = _dict_tree_fields(d)
    assert set(fields) == {"corders_fun", "corders_child"}
    lam = fields["corders_fun"]
    assert isinstance(lam, S.Lam)
    assert isinstance(lam.body, S.Match)


def test_corders_fun_body_is_lookup_comprehension(shredded):
    """match l = NewLabel(cop_F) then for co_F in Lookup(...) union …"""
    _, d = shredded
    lam = _dict_tree_fields(d)["corders_fun"]
    body = lam.body.body
    while isinstance(body, N.Let):
        body = body.body
    assert isinstance(body, N.ForUnion)
    assert body.var == "co_F"
    assert isinstance(body.source, S.Lookup)


def test_child_dict_tree_contains_sumby(shredded):
    """The oparts_fun dictionary wraps the sumBy over the Part join."""
    _, d = shredded
    child_bag = _dict_tree_fields(d)["corders_child"]
    assert isinstance(child_bag, N.Singleton)
    child = _dict_tree_fields(child_bag.expr)
    assert set(child) == {"oparts_fun", "oparts_child"}
    lam = child["oparts_fun"]
    assert isinstance(lam, S.Lam) and isinstance(lam.body, S.Match)
    inner = lam.body.body
    while isinstance(inner, N.Let):
        inner = inner.body
    assert isinstance(inner, N.SumBy)
    assert inner.keys == ("pname",) and inner.values == ("total",)


def test_oparts_child_is_empty(shredded):
    _, d = shredded
    child = _dict_tree_fields(
        _dict_tree_fields(d)["corders_child"].expr
    )
    leaf = child["oparts_child"]
    assert isinstance(leaf, N.Singleton)
    inner = leaf.expr
    while isinstance(inner, N.Let):  # rule 8 introduces let bindings
        inner = inner.body
    assert inner == S.EMPTY_DICT


def test_scalar_expression_shreds_to_itself():
    f, d = S.shred_query(N.const(3), {})
    assert f == N.const(3)
    assert d == S.EMPTY_DICT


def test_flat_bag_query_has_empty_dict_tree():
    e = N.ForUnion(
        "p",
        N.Var("Part"),
        N.Singleton(N.TupleE((("pname", _p("p", "pname")),))),
    )
    f, d = S.shred_query(e, ENV)
    assert isinstance(f, N.Let)
    while isinstance(d, N.Let):
        d = d.body
    assert d == S.EMPTY_DICT


def test_union_produces_dict_tree_union():
    e = N.Union(running_example(), running_example())
    f, d = S.shred_query(e, ENV)
    assert isinstance(f, N.Union)
    assert isinstance(d, S.DictTreeUnion)


def test_used_attrs_analysis():
    e = N.PrimOp("*", _p("op", "qty"), _p("p", "price"))
    ua = S.used_attrs(e)
    assert ua == {"op": {"qty"}, "p": {"price"}}
    ua2 = S.used_attrs(
        N.ForUnion("x", N.Var("B"), N.Singleton(_p("x", "a"))),
    )
    assert ua2 == {"B": set()}


def test_materialized_labels_agree_with_symbolic_captures():
    """Cross-check (DESIGN.md §3.3): the executable shredded compiler
    captures the same free references in its labels as the symbolic
    shredder's NewLabel terms."""
    from repro.core.hierarchy import to_hierarchy
    from repro.core.shred_materialize import _Compiler

    q = to_hierarchy(running_example(), ENV)
    own = {g.var for g in q.gens}
    refs = _Compiler._level_refs(q.child[1], own)
    f, _ = S.shred_query(running_example(), ENV)
    label = dict(f.body.body.expr.fields)["corders"]
    sym = {(v, a) for v, attrs in label.captures for a in attrs}
    assert {(v.replace("_F", ""), a) for v, a in sym} == set(refs)

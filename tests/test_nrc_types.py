"""NRC type checker (Fig. 1 typing rules)."""
import pytest

from repro.core import nrc as N

LI = N.BagT(N.tuple_t(pid=N.INT, qty=N.REAL))
NESTED = N.BagT(
    N.tuple_t(cname=N.STRING, corders=N.BagT(N.tuple_t(odate=N.STRING)))
)
ENV = {"L": LI, "COP": NESTED}


def test_const_types():
    assert N.infer_type(N.const(1), {}) == N.INT
    assert N.infer_type(N.const(1.5), {}) == N.REAL
    assert N.infer_type(N.const("a"), {}) == N.STRING
    assert N.infer_type(N.const(True), {}) == N.BOOL


def test_var_lookup_and_unbound():
    assert N.infer_type(N.Var("L"), ENV) == LI
    with pytest.raises(N.TypeError_):
        N.infer_type(N.Var("missing"), ENV)


def test_proj():
    e = N.ForUnion(
        "x", N.Var("L"), N.Singleton(N.TupleE((("p", N.Proj(N.Var("x"), "pid")),)))
    )
    assert N.infer_type(e, ENV) == N.BagT(N.tuple_t(p=N.INT))


def test_proj_bad_attr():
    e = N.ForUnion("x", N.Var("L"), N.Singleton(N.Proj(N.Var("x"), "nope")))
    with pytest.raises(KeyError):
        N.infer_type(e, ENV)


def test_singleton_and_empty():
    assert N.infer_type(N.Singleton(N.const(1)), {}) == N.BagT(N.INT)
    assert N.infer_type(N.EmptyBag(LI), {}) == LI


def test_get():
    assert N.infer_type(N.Get(N.Singleton(N.const(2))), {}) == N.INT
    with pytest.raises(N.TypeError_):
        N.infer_type(N.Get(N.const(2)), {})


def test_for_over_nonbag_fails():
    with pytest.raises(N.TypeError_):
        N.infer_type(N.ForUnion("x", N.const(1), N.Singleton(N.Var("x"))), {})


def test_for_body_must_be_bag():
    with pytest.raises(N.TypeError_):
        N.infer_type(N.ForUnion("x", N.Var("L"), N.const(1)), ENV)


def test_union_type_match():
    e = N.Union(N.Var("L"), N.Var("L"))
    assert N.infer_type(e, ENV) == LI
    with pytest.raises(N.TypeError_):
        N.infer_type(N.Union(N.Var("L"), N.Var("COP")), ENV)


def test_let():
    e = N.Let("y", N.const(2), N.PrimOp("+", N.Var("y"), N.const(3)))
    assert N.infer_type(e, {}) == N.INT


def test_if_then_requires_bool_cond():
    with pytest.raises(N.TypeError_):
        N.infer_type(N.IfThen(N.const(1), N.Var("L")), ENV)


def test_if_then_without_else_requires_bag():
    with pytest.raises(N.TypeError_):
        N.infer_type(N.IfThen(N.const(True), N.const(1)), {})


def test_if_then_else_scalar():
    e = N.IfThen(N.const(True), N.const(1.0), N.const(2.0))
    assert N.infer_type(e, {}) == N.REAL


def test_if_branch_mismatch():
    with pytest.raises(N.TypeError_):
        N.infer_type(N.IfThen(N.const(True), N.const(1), N.const("x")), {})


def test_primop_arith_and_mixed():
    assert N.infer_type(N.PrimOp("+", N.const(1), N.const(2)), {}) == N.INT
    assert N.infer_type(N.PrimOp("*", N.const(1), N.const(2.0)), {}) == N.REAL
    assert N.infer_type(N.PrimOp("/", N.const(1), N.const(2)), {}) == N.REAL
    assert N.infer_type(N.eq(N.const(1), N.const(2)), {}) == N.BOOL


def test_primop_on_bag_fails():
    with pytest.raises(N.TypeError_):
        N.infer_type(N.PrimOp("+", N.Var("L"), N.const(1)), ENV)


def test_dedup_requires_flat_bag():
    assert N.infer_type(N.Dedup(N.Var("L")), ENV) == LI
    with pytest.raises(N.TypeError_):
        N.infer_type(N.Dedup(N.Var("COP")), ENV)


def test_groupby_type():
    e = N.GroupBy(("pid",), N.Var("L"))
    t = N.infer_type(e, ENV)
    assert isinstance(t, N.BagT)
    assert t.elem.names == ["pid", "GROUP"]
    assert t.elem.field("GROUP") == N.BagT(N.tuple_t(qty=N.REAL))


def test_groupby_key_must_be_flat():
    with pytest.raises(N.TypeError_):
        N.infer_type(N.GroupBy(("corders",), N.Var("COP")), ENV)


def test_sumby_type():
    e = N.SumBy(("pid",), ("qty",), N.Var("L"))
    assert N.infer_type(e, ENV) == N.BagT(N.tuple_t(pid=N.INT, qty=N.REAL))


def test_is_flat():
    assert N.is_flat(LI)
    assert not N.is_flat(NESTED)
    assert N.is_flat(N.BagT(N.INT))


def test_check_program():
    p = N.Program().assign("A", N.Var("L")).assign(
        "B", N.SumBy(("pid",), ("qty",), N.Var("A"))
    )
    typing = N.check_program(p, ENV)
    assert typing["B"] == N.BagT(N.tuple_t(pid=N.INT, qty=N.REAL))


def test_free_vars():
    e = N.ForUnion(
        "x",
        N.Var("L"),
        N.IfThen(
            N.eq(N.Proj(N.Var("x"), "pid"), N.Proj(N.Var("y"), "pid")),
            N.Singleton(N.Var("x")),
        ),
    )
    assert N.free_vars(e) == {"L", "y"}


def test_benchmark_queries_typecheck():
    from repro.bench import tpch_queries as TQ

    for level in range(5):
        for wide in (False, True):
            t = N.infer_type(TQ.flat_to_nested(level, wide), TQ.BASE_TYPES)
            assert isinstance(t, N.BagT)
            env = {**TQ.BASE_TYPES, TQ.input_bag_name(level, wide): t}
            t2 = N.infer_type(TQ.nested_to_nested(level, wide), env)
            assert isinstance(t2, N.BagT)
            t3 = N.infer_type(TQ.nested_to_flat(level, wide), env)
            assert N.is_flat(t3)


def test_biomed_queries_typecheck():
    from repro.bench import biomed_queries as BQ

    env = BQ.pipeline_types()
    assert N.is_flat(env["Connectivity"])
    for builder in BQ.CLINICAL.values():
        assert isinstance(N.infer_type(builder(), env), N.BagT)

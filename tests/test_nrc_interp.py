"""Reference NRC interpreter: semantics + canonical bag comparison."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import nrc as N
from repro.core import nrc_interp as I

L = [
    {"pid": 1, "qty": 2.0},
    {"pid": 1, "qty": 3.0},
    {"pid": 2, "qty": 5.0},
]
P = [{"pid": 1, "name": "a"}, {"pid": 2, "name": "b"}, {"pid": 3, "name": "c"}]
ENV = {"L": L, "P": P}


def _proj(v, a):
    return N.Proj(N.Var(v), a)


def test_const_var_proj():
    assert I.evaluate(N.const(3), {}) == 3
    assert I.evaluate(N.Var("L"), ENV) == L
    e = N.ForUnion("x", N.Var("L"), N.Singleton(_proj("x", "pid")))
    assert I.evaluate(e, ENV) == [1, 1, 2]


def test_singleton_empty_get():
    assert I.evaluate(N.Singleton(N.const(1)), {}) == [1]
    assert I.evaluate(N.EmptyBag(N.BagT(N.INT)), {}) == []
    assert I.evaluate(N.Get(N.Singleton(N.const(9))), {}) == 9
    assert I.evaluate(N.Get(N.EmptyBag(N.BagT(N.INT))), {}) is None


def test_union_preserves_multiplicity():
    e = N.Union(N.Var("L"), N.Var("L"))
    assert len(I.evaluate(e, ENV)) == 6


def test_let_and_if():
    e = N.Let("y", N.const(2), N.PrimOp("*", N.Var("y"), N.const(3)))
    assert I.evaluate(e, {}) == 6
    bag = N.IfThen(N.const(False), N.Var("L"))
    assert I.evaluate(bag, ENV) == []
    scalar = N.IfThen(N.const(False), N.const(1), N.const(2))
    assert I.evaluate(scalar, {}) == 2


def test_join_comprehension():
    e = N.ForUnion(
        "x",
        N.Var("L"),
        N.ForUnion(
            "y",
            N.Var("P"),
            N.IfThen(
                N.eq(_proj("x", "pid"), _proj("y", "pid")),
                N.Singleton(
                    N.TupleE(
                        (("name", _proj("y", "name")), ("qty", _proj("x", "qty")))
                    )
                ),
            ),
        ),
    )
    got = I.evaluate(e, ENV)
    assert I.bags_equal(
        got,
        [
            {"name": "a", "qty": 2.0},
            {"name": "a", "qty": 3.0},
            {"name": "b", "qty": 5.0},
        ],
    )


def test_hash_join_fast_path_matches_naive():
    # force the fast path with a large source (>=64 elements)
    big = [{"pid": i % 7, "v": i} for i in range(200)]
    env = {"B": big, "L": L}
    e = N.ForUnion(
        "x",
        N.Var("L"),
        N.ForUnion(
            "y",
            N.Var("B"),
            N.IfThen(
                N.eq(_proj("x", "pid"), _proj("y", "pid")),
                N.Singleton(_proj("y", "v")),
            ),
        ),
    )
    got = I.evaluate(e, env)
    naive = [
        y["v"] for x in L for y in big if x["pid"] == y["pid"]
    ]
    assert sorted(got) == sorted(naive)


def test_fast_path_with_extra_condition():
    big = [{"pid": i % 7, "v": i} for i in range(200)]
    env = {"B": big, "L": L}
    e = N.ForUnion(
        "x",
        N.Var("L"),
        N.ForUnion(
            "y",
            N.Var("B"),
            N.IfThen(
                N.and_(
                    N.eq(_proj("x", "pid"), _proj("y", "pid")),
                    N.PrimOp(">", _proj("y", "v"), N.const(100)),
                ),
                N.Singleton(_proj("y", "v")),
            ),
        ),
    )
    got = I.evaluate(e, env)
    naive = [
        y["v"]
        for x in L
        for y in big
        if x["pid"] == y["pid"] and y["v"] > 100
    ]
    assert sorted(got) == sorted(naive)


def test_dedup():
    e = N.Dedup(N.Var("L"))
    dup = I.evaluate(N.Union(N.Var("L"), N.Var("L")), ENV)
    assert len(I.evaluate(N.Dedup(N.Var("L")), {"L": dup})) == 3


def test_groupby():
    got = I.evaluate(N.GroupBy(("pid",), N.Var("L")), ENV)
    assert I.bags_equal(
        got,
        [
            {"pid": 1, "GROUP": [{"qty": 2.0}, {"qty": 3.0}]},
            {"pid": 2, "GROUP": [{"qty": 5.0}]},
        ],
    )


def test_sumby():
    got = I.evaluate(N.SumBy(("pid",), ("qty",), N.Var("L")), ENV)
    assert I.bags_equal(
        got, [{"pid": 1, "qty": 5.0}, {"pid": 2, "qty": 5.0}]
    )


def test_sumby_multiple_values():
    L2 = [{"k": 1, "a": 1.0, "b": 2.0}, {"k": 1, "a": 3.0, "b": 4.0}]
    got = I.evaluate(N.SumBy(("k",), ("a", "b"), N.Var("X")), {"X": L2})
    assert got == [{"k": 1, "a": 4.0, "b": 6.0}]


def test_program_pipeline():
    p = (
        N.Program()
        .assign("A", N.SumBy(("pid",), ("qty",), N.Var("L")))
        .assign(
            "B",
            N.ForUnion(
                "x", N.Var("A"), N.Singleton(_proj("x", "qty"))
            ),
        )
    )
    out = I.run_program(p, ENV)
    assert sorted(out["B"]) == [5.0, 5.0]


# --- canonical comparison ---------------------------------------------


def test_bags_equal_order_insensitive_nested():
    a = [{"x": 1, "b": [{"y": 1}, {"y": 2}]}]
    b = [{"x": 1, "b": [{"y": 2}, {"y": 1}]}]
    assert I.bags_equal(a, b)


def test_bags_equal_multiplicity_sensitive():
    assert not I.bags_equal([{"x": 1}, {"x": 1}], [{"x": 1}])


def test_bags_equal_float_tolerance():
    assert I.bags_equal([{"x": 0.30000000004}], [{"x": 0.3}])


def test_assert_bags_equal_raises_with_detail():
    with pytest.raises(AssertionError, match="nested bags differ"):
        I.assert_bags_equal([{"x": 1}], [{"x": 2}], "msg")


@settings(max_examples=50, deadline=None)
@given(
    st.lists(
        st.dictionaries(
            st.sampled_from(["a", "b"]),
            st.one_of(st.integers(), st.lists(st.integers(), max_size=3)),
        ),
        max_size=6,
    ),
    st.randoms(),
)
def test_canon_permutation_invariant(bag, rnd):
    shuffled = list(bag)
    rnd.shuffle(shuffled)
    assert I.bags_equal(bag, shuffled)


@settings(max_examples=30, deadline=None)
@given(st.lists(st.integers(), max_size=6))
def test_union_is_multiset_addition(xs):
    env = {"A": list(xs)}
    got = I.evaluate(N.Union(N.Var("A"), N.Var("A")), env)
    assert sorted(got) == sorted(xs + xs)

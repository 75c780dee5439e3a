"""The nested TPC-H micro-benchmark (App. B).

Three query families, each at 0–4 levels of nesting with a *narrow*
(one attribute per level) and a *wide* (all attributes) variant:

* **flat-to-nested** — iterative grouping of the relational inputs:
  Lineitem (level 0) grouped under Orders (``oparts``), Customer
  (``corders``), Nation (``ncusts``), Region (``rnations``); the
  lowest level keeps ``pid``/``qty`` of Lineitem.
* **nested-to-nested** — takes the materialized flat-to-nested result,
  joins Part at the lowest level and applies
  ``sumBy_pname^{qty·price}`` (the paper's Example 1 at scale).
* **nested-to-flat** — same navigation, but ``sumBy`` at top level
  keyed by top-level attributes, returning a flat collection.

Queries are plain NRC ASTs; output types (used as nested-input types
downstream) come from the NRC type checker.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import SparkSession

from .. import synth_data
from ..core import nrc as N
from ..core.hierarchy import QLevel, to_hierarchy
from ..spark_backend.catalog import Catalog

# ---------------------------------------------------------------------------
# Flat input schemas (NRC types)
# ---------------------------------------------------------------------------

LINEITEM_T = N.tuple_t(
    l_orderkey=N.INT, l_partkey=N.INT, l_linenumber=N.INT,
    l_quantity=N.REAL, l_extendedprice=N.REAL, l_discount=N.REAL,
    l_tax=N.REAL, l_returnflag=N.STRING, l_linestatus=N.STRING,
    l_shipdate=N.DATE,
)
ORDERS_T = N.tuple_t(
    o_orderkey=N.INT, o_custkey=N.INT, o_orderstatus=N.STRING,
    o_totalprice=N.REAL, o_orderdate=N.STRING, o_orderpriority=N.STRING,
    o_comment=N.STRING,
)
CUSTOMER_T = N.tuple_t(
    c_custkey=N.INT, c_name=N.STRING, c_nationkey=N.INT,
    c_acctbal=N.REAL, c_mktsegment=N.STRING, c_comment=N.STRING,
)
NATION_T = N.tuple_t(
    n_nationkey=N.INT, n_name=N.STRING, n_regionkey=N.INT,
    n_comment=N.STRING,
)
REGION_T = N.tuple_t(r_regionkey=N.INT, r_name=N.STRING, r_comment=N.STRING)
PART_T = N.tuple_t(
    p_partkey=N.INT, p_name=N.STRING, p_type=N.STRING, p_brand=N.STRING,
    p_size=N.INT, p_retailprice=N.REAL,
)

BASE_TYPES: dict[str, N.Type] = {
    "Lineitem": N.BagT(LINEITEM_T),
    "Orders": N.BagT(ORDERS_T),
    "Customer": N.BagT(CUSTOMER_T),
    "Nation": N.BagT(NATION_T),
    "Region": N.BagT(REGION_T),
    "Part": N.BagT(PART_T),
}

UNIQUE_KEYS = {
    "Part": {"p_partkey"},
    "Orders": {"o_orderkey"},
    "Customer": {"c_custkey"},
    "Nation": {"n_nationkey"},
    "Region": {"r_regionkey"},
}


@dataclass(frozen=True)
class _Spec:
    table: str
    var: str
    narrow: tuple[tuple[str, str], ...]  # (output name, source column)
    # link to the level below: (bag field name, parent key, child key)
    child: tuple[str, str, str] | None


def _all(t: N.TupleT) -> tuple[tuple[str, str], ...]:
    return tuple((c, c) for c in t.names)


# Bottom-up level specs; level L uses specs[: L + 1] reversed.
_SPECS = [
    _Spec("Lineitem", "l", (("pid", "l_partkey"), ("qty", "l_quantity")), None),
    _Spec("Orders", "o", (("odate", "o_orderdate"),),
          ("oparts", "o_orderkey", "l_orderkey")),
    _Spec("Customer", "c", (("cname", "c_name"),),
          ("corders", "c_custkey", "o_custkey")),
    _Spec("Nation", "n", (("nname", "n_name"),),
          ("ncusts", "n_nationkey", "c_nationkey")),
    _Spec("Region", "r", (("rname", "r_name"),),
          ("rnations", "r_regionkey", "n_regionkey")),
]

_WIDE_ATTRS = {
    "Lineitem": (("pid", "l_partkey"), ("qty", "l_quantity")),  # per App. B.1
    "Orders": _all(ORDERS_T),
    "Customer": _all(CUSTOMER_T),
    "Nation": _all(NATION_T),
    "Region": _all(REGION_T),
}


def _attrs(spec: _Spec, wide: bool) -> tuple[tuple[str, str], ...]:
    return _WIDE_ATTRS[spec.table] if wide else spec.narrow


# ---------------------------------------------------------------------------
# Query builders
# ---------------------------------------------------------------------------


def flat_to_nested(level: int, wide: bool = False) -> N.Expr:
    """The flat-to-nested query with ``level`` ∈ 0..4 nesting levels."""
    specs = list(reversed(_SPECS[: level + 1]))  # top-first

    def body(i: int) -> N.Expr:
        s = specs[i]
        fields: list[tuple[str, N.Expr]] = [
            (name, N.Proj(N.Var(s.var), col)) for name, col in _attrs(s, wide)
        ]
        if i + 1 < len(specs):
            nxt = specs[i + 1]
            bag, pk, ck = s.child  # type: ignore[misc]
            inner = N.ForUnion(
                nxt.var,
                N.Var(nxt.table),
                N.IfThen(
                    N.eq(N.Proj(N.Var(s.var), pk), N.Proj(N.Var(nxt.var), ck)),
                    body(i + 1),
                ),
            )
            fields.append((bag, inner))
        return N.Singleton(N.TupleE(tuple(fields)))

    return N.ForUnion(specs[0].var, N.Var(specs[0].table), body(0))


def flat_to_nested_type(level: int, wide: bool = False) -> N.Type:
    return N.infer_type(flat_to_nested(level, wide), BASE_TYPES)


def _bag_field_names(level: int) -> list[str]:
    """Top-down bag attribute names for a level-``level`` hierarchy."""
    specs = list(reversed(_SPECS[: level + 1]))
    return [s.child[0] for s in specs if s.child is not None][: level]


def _lowest_join_sum(source: N.Expr, lvar: str) -> N.Expr:
    """sumBy_pname^total(for l in source, p in Part, pid match)."""
    return N.SumBy(
        ("pname",),
        ("total",),
        N.ForUnion(
            lvar,
            source,
            N.ForUnion(
                "p",
                N.Var("Part"),
                N.IfThen(
                    N.eq(
                        N.Proj(N.Var(lvar), "pid"),
                        N.Proj(N.Var("p"), "p_partkey"),
                    ),
                    N.Singleton(
                        N.TupleE(
                            (
                                ("pname", N.Proj(N.Var("p"), "p_name")),
                                (
                                    "total",
                                    N.PrimOp(
                                        "*",
                                        N.Proj(N.Var(lvar), "qty"),
                                        N.Proj(N.Var("p"), "p_retailprice"),
                                    ),
                                ),
                            )
                        )
                    ),
                ),
            ),
        ),
    )


def nested_to_nested(
    level: int, wide: bool = False, input_name: str | None = None
) -> N.Expr:
    """Join Part + sumBy at the lowest level of a nested input.

    ``input_name`` defaults to the conventional materialized
    flat-to-nested name (:func:`input_bag_name`).
    """
    src = input_name or input_bag_name(level, wide)
    if level == 0:
        return _lowest_join_sum(N.Var(src), "x0")

    in_t = flat_to_nested_type(level, wide)
    bags = _bag_field_names(level)
    specs = list(reversed(_SPECS[: level + 1]))

    def body(i: int, t: N.TupleT) -> N.Expr:
        var = f"x{i}"
        fields: list[tuple[str, N.Expr]] = []
        for name, ft in t.fields:
            if isinstance(ft, N.Scalar):
                fields.append((name, N.Proj(N.Var(var), name)))
        bag = bags[i]
        if i == level - 1:
            fields.append(
                (bag, _lowest_join_sum(N.Proj(N.Var(var), bag), f"x{i+1}"))
            )
        else:
            child_t = t.field(bag)
            assert isinstance(child_t, N.BagT)
            inner = N.ForUnion(
                f"x{i+1}",
                N.Proj(N.Var(var), bag),
                body(i + 1, child_t.elem),
            )
            fields.append((bag, inner))
        return N.Singleton(N.TupleE(tuple(fields)))

    assert isinstance(in_t, N.BagT) and isinstance(in_t.elem, N.TupleT)
    return N.ForUnion("x0", N.Var(src), body(0, in_t.elem))


def nested_to_flat(
    level: int, wide: bool = False, input_name: str | None = None
) -> N.Expr:
    """sumBy at top level over the full navigation of a nested input."""
    src = input_name or input_bag_name(level, wide)
    if level == 0:
        return _lowest_join_sum(N.Var(src), "x0")

    in_t = flat_to_nested_type(level, wide)
    assert isinstance(in_t, N.BagT) and isinstance(in_t.elem, N.TupleT)
    bags = _bag_field_names(level)
    top_keys = [
        n for n, ft in in_t.elem.fields if isinstance(ft, N.Scalar)
    ]
    if not wide:
        top_keys = top_keys[:1]

    lvar = f"x{level}"
    head_fields: list[tuple[str, N.Expr]] = [
        (k, N.Proj(N.Var("x0"), k)) for k in top_keys
    ]
    head_fields += [
        ("pname", N.Proj(N.Var("p"), "p_name")),
        (
            "total",
            N.PrimOp(
                "*",
                N.Proj(N.Var(lvar), "qty"),
                N.Proj(N.Var("p"), "p_retailprice"),
            ),
        ),
    ]
    inner: N.Expr = N.ForUnion(
        "p",
        N.Var("Part"),
        N.IfThen(
            N.eq(N.Proj(N.Var(lvar), "pid"), N.Proj(N.Var("p"), "p_partkey")),
            N.Singleton(N.TupleE(tuple(head_fields))),
        ),
    )
    for i in range(level, 0, -1):
        inner = N.ForUnion(
            f"x{i}", N.Proj(N.Var(f"x{i-1}"), bags[i - 1]), inner
        )
    comp = N.ForUnion("x0", N.Var(src), inner)
    return N.SumBy(tuple(top_keys) + ("pname",), ("total",), comp)


def input_bag_name(level: int, wide: bool) -> str:
    """Catalog name of the materialized flat-to-nested result."""
    return f"COP{level}_{'wide' if wide else 'narrow'}"


# ---------------------------------------------------------------------------
# Hierarchies + catalog loading
# ---------------------------------------------------------------------------


def hierarchy_for(
    e: N.Expr, extra_types: dict[str, N.Type] | None = None
) -> QLevel:
    env = dict(BASE_TYPES)
    if extra_types:
        env.update(extra_types)
    return to_hierarchy(e, env)


def load_tpch(
    spark: SparkSession, sf: float = 0.01, skew: float = 0.0, seed: int = 0
) -> Catalog:
    """Base TPC-H tables into a catalog (with unique-key metadata)."""
    cat = Catalog()
    cat.add("Lineitem", synth_data.lineitem(spark, sf=sf, skew=skew, seed=seed))
    cat.add(
        "Orders",
        synth_data.orders(spark, sf=sf, skew=skew, seed=seed + 1),
        unique={"o_orderkey"},
    )
    cat.add(
        "Customer",
        synth_data.customer(spark, sf=sf, seed=seed + 2),
        unique={"c_custkey"},
    )
    cat.add("Nation", synth_data.nation(spark), unique={"n_nationkey"})
    cat.add("Region", synth_data.region(spark), unique={"r_regionkey"})
    cat.add(
        "Part",
        synth_data.part(spark, sf=sf, seed=seed + 5),
        unique={"p_partkey"},
    )
    return cat

"""DuckDB differential oracle: flat query results checked against an
independent SQL engine over the base tables (not just the interpreter)."""
import pytest

from repro.bench import tpch_queries as TQ
from repro.core import api
from repro.oracle import assert_equivalent

from tests.conftest import ensure_nested_input


def test_level0_projection(tpch):
    df = api.standard_route(
        TQ.flat_to_nested(0, False), TQ.BASE_TYPES, tpch["cat"], opt="full"
    )
    assert_equivalent(
        df,
        "SELECT l_partkey AS pid, l_quantity AS qty FROM lineitem",
        lineitem=tpch["cat"].get("Lineitem"),
    )


_JOIN_CHAIN = {
    1: (
        "FROM orders o JOIN lineitem l ON o.o_orderkey = l.l_orderkey ",
        "o.o_orderdate AS odate",
        "odate",
    ),
    2: (
        "FROM customer c JOIN orders o ON c.c_custkey = o.o_custkey "
        "JOIN lineitem l ON o.o_orderkey = l.l_orderkey ",
        "c.c_name AS cname",
        "cname",
    ),
    3: (
        "FROM nation n JOIN customer c ON n.n_nationkey = c.c_nationkey "
        "JOIN orders o ON c.c_custkey = o.o_custkey "
        "JOIN lineitem l ON o.o_orderkey = l.l_orderkey ",
        "n.n_name AS nname",
        "nname",
    ),
    4: (
        "FROM region r JOIN nation n ON r.r_regionkey = n.n_regionkey "
        "JOIN customer c ON n.n_nationkey = c.c_nationkey "
        "JOIN orders o ON c.c_custkey = o.o_custkey "
        "JOIN lineitem l ON o.o_orderkey = l.l_orderkey ",
        "r.r_name AS rname",
        "rname",
    ),
}


@pytest.mark.parametrize("level", [1, 2, 3, 4])
@pytest.mark.parametrize("route", ["standard", "shredded"])
def test_nested_to_flat_vs_duckdb(tpch, level, route):
    """The nested-to-flat query over the *materialized nested input*
    must equal a direct flat SQL aggregation over the base tables —
    an end-to-end check that nesting + navigation + aggregation is
    information-preserving."""
    name = ensure_nested_input(tpch, level, False)
    e = TQ.nested_to_flat(level, False)
    types = {**TQ.BASE_TYPES, name: TQ.flat_to_nested_type(level, False)}
    if route == "standard":
        df = api.standard_route(e, types, tpch["cat"], opt="full")
    else:
        df = api.shredded_route(
            e, types, f"ora{level}", tpch["cat"]
        ).flat
    chain, key_sel, key_alias = _JOIN_CHAIN[level]
    sql = (
        f"SELECT {key_sel}, p.p_name AS pname, "
        f"SUM(l.l_quantity * p.p_retailprice) AS total "
        f"{chain} JOIN part p ON l.l_partkey = p.p_partkey "
        f"GROUP BY {key_alias}, pname"
    )
    assert_equivalent(
        df,
        sql,
        lineitem=tpch["cat"].get("Lineitem"),
        orders=tpch["cat"].get("Orders"),
        customer=tpch["cat"].get("Customer"),
        nation=tpch["cat"].get("Nation"),
        region=tpch["cat"].get("Region"),
        part=tpch["cat"].get("Part"),
    )


def test_push_agg_vs_duckdb(tpch):
    name = ensure_nested_input(tpch, 2, False)
    e = TQ.nested_to_flat(2, False)
    types = {**TQ.BASE_TYPES, name: TQ.flat_to_nested_type(2, False)}
    df = api.standard_route(
        e, types, tpch["cat"], opt="full", push_agg=True
    )
    chain, key_sel, key_alias = _JOIN_CHAIN[2]
    sql = (
        f"SELECT {key_sel}, p.p_name AS pname, "
        f"SUM(l.l_quantity * p.p_retailprice) AS total "
        f"{chain} JOIN part p ON l.l_partkey = p.p_partkey "
        f"GROUP BY {key_alias}, pname"
    )
    assert_equivalent(
        df,
        sql,
        lineitem=tpch["cat"].get("Lineitem"),
        orders=tpch["cat"].get("Orders"),
        customer=tpch["cat"].get("Customer"),
        part=tpch["cat"].get("Part"),
    )


def test_sumby_flat_vs_duckdb(tpch):
    """Plain flat sumBy (level 0 nested-to-flat) against DuckDB."""
    e = TQ.nested_to_flat(0, False)
    types = {
        **TQ.BASE_TYPES,
        TQ.input_bag_name(0, False): TQ.flat_to_nested_type(0, False),
    }
    ensure_nested_input(tpch, 0, False)
    df = api.standard_route(e, types, tpch["cat"], opt="full")
    assert_equivalent(
        df,
        "SELECT p.p_name AS pname, SUM(l.l_quantity * p.p_retailprice) AS total "
        "FROM lineitem l JOIN part p ON l.l_partkey = p.p_partkey "
        "GROUP BY pname",
        lineitem=tpch["cat"].get("Lineitem"),
        part=tpch["cat"].get("Part"),
    )

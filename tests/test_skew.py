"""Skew-resilient processing (§5, Fig. 6)."""
import pytest
from pyspark.sql import functions as F

from repro.bench import tpch_queries as TQ
from repro.core import api
from repro.core import nrc_interp as I
from repro.core import skew as SK
from repro.core.unnest import compile_standard
from repro.spark_backend import dataset as DS

from tests.utils import check, env_of, rows_of

SKEW_SF = 0.002
SKEW_Z = 3.0


@pytest.fixture(scope="module")
def skcat(spark):
    cat = TQ.load_tpch(spark, sf=SKEW_SF, skew=SKEW_Z)
    for name in list(cat.tables):
        cat.tables[name] = cat.tables[name].cache()
    env = env_of(cat)
    name = TQ.input_bag_name(2, False)
    c = compile_standard(
        TQ.hierarchy_for(TQ.flat_to_nested(2, False)), opt="full"
    )
    df = DS.run(c.plan, cat).cache()
    cat.add(name, df)
    env[name] = rows_of(df)
    api.register_shredded(cat, name, api.shred_df(df).cache())
    return {"cat": cat, "env": env, "input": name}


def test_zipf_generator_is_skewed(skcat):
    """Skewed l_orderkey: the top key should hold far more than its
    uniform share of lineitems."""
    li = skcat["cat"].get("Lineitem")
    top = (
        li.groupBy("l_orderkey").count().orderBy(F.desc("count")).first()
    )
    n, n_orders = li.count(), skcat["cat"].get("Orders").count()
    assert top["count"] > 20 * (n / n_orders)


def test_heavy_keys_found_on_skewed_data(skcat):
    hk = SK.heavy_keys(
        skcat["cat"].get("Lineitem"), "l_orderkey", sample_fraction=0.5
    )
    assert 1 in hk  # Zipf rank-1 key must be detected
    assert len(hk) <= 40 * 64  # threshold bound per partition


def test_heavy_keys_empty_on_uniform_data(spark):
    cat = TQ.load_tpch(spark, sf=SKEW_SF, skew=0.0)
    hk = SK.heavy_keys(cat.get("Lineitem"), "l_orderkey", sample_fraction=0.3)
    # uniform keys: nothing should clear the 2.5 % per-partition bar
    assert len(hk) <= 5


def test_split_partitions_rows(skcat):
    li = skcat["cat"].get("Lineitem")
    t = SK.split(li, "l_orderkey", [1, 2])
    assert t.light.count() + t.heavy.count() == li.count()
    assert t.heavy.where(~F.col("l_orderkey").isin([1, 2])).count() == 0


def test_split_no_keys_is_all_light(skcat):
    li = skcat["cat"].get("Lineitem")
    t = SK.split(li, "l_orderkey", [])
    assert t.heavy is None and t.light.count() == li.count()


def test_skew_join_matches_plain_join(skcat):
    li = skcat["cat"].get("Lineitem")
    part = skcat["cat"].get("Part")
    cond = li["l_partkey"] == part["p_partkey"]
    plain = li.join(part, cond, "inner").count()
    t = SK.split(li, "l_partkey", SK.heavy_keys(li, "l_partkey", sample_fraction=0.5))
    sk = SK.skew_join(t, part, "l_partkey", "p_partkey", cond, "inner")
    assert sk.union().count() == plain
    assert sk.keys  # heavy keys propagate through the join


def test_skew_bag_to_dict_preserves_rows(skcat):
    d = skcat["cat"].get(f"{skcat['input']}__dict__corders__oparts")
    t = SK.skew_bag_to_dict(d, "label")
    total = t.light.count() + (t.heavy.count() if t.heavy is not None else 0)
    assert total == d.count()


def test_standard_skew_route_correct(skcat):
    e = TQ.nested_to_nested(2, False)
    types = {
        **TQ.BASE_TYPES,
        skcat["input"]: TQ.flat_to_nested_type(2, False),
    }
    expected = I.evaluate(e, skcat["env"])
    df = api.standard_route(e, types, skcat["cat"], opt="full", skew=True)
    check(df, expected, "standard skew-aware")


def test_standard_skew_with_push_agg_correct(skcat):
    e = TQ.nested_to_nested(2, False)
    types = {
        **TQ.BASE_TYPES,
        skcat["input"]: TQ.flat_to_nested_type(2, False),
    }
    expected = I.evaluate(e, skcat["env"])
    df = api.standard_route(
        e, types, skcat["cat"], opt="full", skew=True, push_agg=True
    )
    check(df, expected, "standard skew-aware + pushed aggregation")


def test_shredded_skew_route_correct(skcat):
    e = TQ.nested_to_nested(2, False)
    types = {
        **TQ.BASE_TYPES,
        skcat["input"]: TQ.flat_to_nested_type(2, False),
    }
    expected = I.evaluate(e, skcat["env"])
    run = api.shredded_route(e, types, "sk_n2n", skcat["cat"], skew=True)
    check(api.unshred_result(run), expected, "shredded skew-aware")


def test_skew_flat_output_correct(skcat):
    e = TQ.nested_to_flat(2, False)
    types = {
        **TQ.BASE_TYPES,
        skcat["input"]: TQ.flat_to_nested_type(2, False),
    }
    expected = I.evaluate(e, skcat["env"])
    df = api.standard_route(e, types, skcat["cat"], opt="full", skew=True)
    check(df, expected, "nested-to-flat skew-aware")
    run = api.shredded_route(e, types, "sk_n2f", skcat["cat"], skew=True)
    check(run.flat, expected, "shredded nested-to-flat skew-aware")

"""Simulated shuffle accounting."""
from repro.core.metrics import (
    NO_METRICS,
    MetricsCollector,
    row_width,
)
from repro.core import api
from repro.bench import tpch_queries as TQ


def test_row_width_scalar_types(spark):
    df = spark.createDataFrame(
        [(1, "abc", 2.5, True)], "i long, s string, d double, b boolean"
    )
    # 8 (long) + 24 (string est.) + 8 (double) + 1 (boolean)
    assert row_width(df) == 41


def test_row_width_nested(spark):
    df = spark.createDataFrame(
        [{"id": 1, "xs": [{"a": 1, "b": 2.0}]}],
        "id long, xs array<struct<a:long, b:double>>",
    )
    assert row_width(df) == 8 + 16 + 4 * 16


def test_collector_records_rows_and_bytes(spark):
    m = MetricsCollector()
    df = spark.createDataFrame([(i,) for i in range(10)], "x long")
    m.record("test", df)
    assert m.shuffle_rows == 10
    assert m.shuffle_bytes == 80
    m.record("bc", df, kind="broadcast")
    assert m.broadcast_bytes == 80
    assert m.shuffle_bytes == 80  # unchanged


def test_disabled_collector_is_free(spark):
    df = spark.createDataFrame([(1,)], "x long")
    NO_METRICS.record("x", df)
    assert NO_METRICS.records == []


def test_standard_route_accounts_joins_and_nests(tpch):
    m = MetricsCollector()
    api.standard_route(
        TQ.flat_to_nested(1, False), TQ.BASE_TYPES, tpch["cat"],
        opt="full", metrics=m,
    ).count()
    labels = {r.label.split(":")[0] for r in m.records}
    assert "join" in labels and "nestbag" in labels
    assert m.shuffle_rows > 0


def test_shredded_route_accounts_repartition(tpch):
    m = MetricsCollector()
    run = api.shredded_route(
        TQ.flat_to_nested(2, False), TQ.BASE_TYPES, "met2", tpch["cat"],
        metrics=m,
    )
    run.shredded.top.count()
    labels = {r.label.split(":")[0] for r in m.records}
    assert "repartition" in labels


def test_skew_route_records_broadcast(tpch):
    """With broadcast hints the heavy plan shows up as broadcast bytes
    rather than shuffle (cross joins count as broadcast too)."""
    m = MetricsCollector()
    from repro.bench import tpch_queries as TQ2

    name = None
    from tests.conftest import ensure_nested_input

    name = ensure_nested_input(tpch, 1, False)
    types = {**TQ2.BASE_TYPES, name: TQ2.flat_to_nested_type(1, False)}
    api.standard_route(
        TQ2.nested_to_nested(1, False), types, tpch["cat"],
        opt="full", skew=True, metrics=m,
    ).count()
    assert m.shuffle_rows >= 0  # collector active through skew path
    assert any(r.kind in ("shuffle", "broadcast") for r in m.records)

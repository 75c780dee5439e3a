"""RDD backend: interpret plan trees over RDDs of Python dicts.

The analogue of the paper's Fig. 11 (plan operators over
``RDD[CaseClass]``): rows are boxed Python objects, operators are
opaque lambdas, so Spark gets no operator metadata, no Tungsten
binary format, and no Catalyst optimization — exactly the
representation App. E.1 shows losing to Datasets.  Used by the
E.1 reproduction and as an independent implementation for
cross-checking the Dataset backend.
"""
from __future__ import annotations

from typing import Any

from pyspark import RDD
from pyspark.sql import DataFrame

from ..core import plan_ops as P
from ..core.sexpr import SExpr, eval_row
from .catalog import Catalog


def _hashable(v: Any) -> Any:
    if isinstance(v, dict):
        return tuple(sorted((k, _hashable(x)) for k, x in v.items()))
    if isinstance(v, list):
        return tuple(_hashable(x) for x in v)
    return v


def _row_of(row, var: str) -> dict:
    d = row.asDict(recursive=True)
    return {f"{var}__{k}": v for k, v in d.items()}


def plan_columns(plan: P.Plan, catalog: Catalog) -> list[str]:
    """Output column names of a plan (needed for outer-null filling)."""
    if isinstance(plan, P.Scan):
        return [f"{plan.var}__{c}" for c in catalog.get(plan.table).columns]
    if isinstance(plan, P.ScanRaw):
        return list(catalog.get(plan.table).columns)
    if isinstance(plan, (P.Select, P.Distinct, P.WithEmptyArray, P.Repartition)):
        return plan_columns(plan.child, catalog)
    if isinstance(plan, P.Project):
        return [n for n, _ in plan.cols]
    if isinstance(plan, P.Extend):
        base = plan_columns(plan.child, catalog)
        return base + [n for n, _ in plan.cols if n not in base]
    if isinstance(plan, P.AddId):
        return plan_columns(plan.child, catalog) + [plan.out]
    if isinstance(plan, P.Join):
        return plan_columns(plan.left, catalog) + plan_columns(
            plan.right, catalog
        )
    if isinstance(plan, P.Unnest):
        base = [
            c for c in plan_columns(plan.child, catalog) if c != plan.src_col
        ]
        return base + [f"{plan.var}__{f}" for f, _ in plan.elem_fields]
    if isinstance(plan, P.NestBag):
        return list(plan.keys) + [plan.out]
    if isinstance(plan, P.NestSum):
        return list(plan.keys) + [n for n, _ in plan.values]
    raise TypeError(f"unknown plan node {plan!r}")


def execute(plan: P.Plan, catalog: Catalog) -> RDD:
    """Interpret a plan over RDDs of Python dicts."""
    if isinstance(plan, P.Scan):
        var = plan.var
        return catalog.get(plan.table).rdd.map(lambda r: _row_of(r, var))
    if isinstance(plan, P.ScanRaw):
        return catalog.get(plan.table).rdd.map(
            lambda r: r.asDict(recursive=True)
        )
    if isinstance(plan, P.Select):
        pred = plan.pred
        return execute(plan.child, catalog).filter(
            lambda row: bool(eval_row(pred, row))
        )
    if isinstance(plan, P.Project):
        cols = plan.cols
        return execute(plan.child, catalog).map(
            lambda row: {n: eval_row(sx, row) for n, sx in cols}
        )
    if isinstance(plan, P.Extend):
        cols = plan.cols
        return execute(plan.child, catalog).map(
            lambda row: {**row, **{n: eval_row(sx, row) for n, sx in cols}}
        )
    if isinstance(plan, P.AddId):
        out = plan.out
        return (
            execute(plan.child, catalog)
            .zipWithUniqueId()
            .map(lambda t: {**t[0], out: t[1]})
        )
    if isinstance(plan, P.Join):
        return _join(plan, catalog)
    if isinstance(plan, P.Unnest):
        return _unnest(plan, catalog)
    if isinstance(plan, P.NestBag):
        return _nest_bag(plan, catalog)
    if isinstance(plan, P.NestSum):
        return _nest_sum(plan, catalog)
    if isinstance(plan, P.Distinct):
        return (
            execute(plan.child, catalog)
            .map(lambda row: tuple(sorted((k, _hashable(v)) for k, v in row.items())))
            .distinct()
            .map(dict)
        )
    if isinstance(plan, P.WithEmptyArray):
        col = plan.col
        return execute(plan.child, catalog).map(
            lambda row: {**row, col: row.get(col) or []}
        )
    if isinstance(plan, P.Repartition):
        cols = plan.cols
        rdd = execute(plan.child, catalog)
        n = rdd.getNumPartitions()
        return (
            rdd.keyBy(lambda row: _hashable(tuple(row[c] for c in cols)))
            .partitionBy(n)
            .values()
        )
    raise TypeError(f"unknown plan node {plan!r}")


def _join(plan: P.Join, catalog: Catalog) -> RDD:
    left = execute(plan.left, catalog)
    right = execute(plan.right, catalog)
    if plan.how == "cross" or not plan.conds:
        return left.cartesian(right).map(lambda t: {**t[0], **t[1]})
    lexprs = [l for l, _ in plan.conds]
    rexprs = [r for _, r in plan.conds]
    lk = left.map(
        lambda row: (_hashable(tuple(eval_row(x, row) for x in lexprs)), row)
    )
    rk = right.map(
        lambda row: (_hashable(tuple(eval_row(x, row) for x in rexprs)), row)
    )
    if plan.how == "inner":
        return lk.join(rk).values().map(lambda t: {**t[0], **t[1]})
    rcols = plan_columns(plan.right, catalog)
    nulls = {c: None for c in rcols}
    return (
        lk.leftOuterJoin(rk)
        .values()
        .map(lambda t: {**t[0], **(t[1] if t[1] is not None else nulls)})
    )


def _unnest(plan: P.Unnest, catalog: Catalog) -> RDD:
    src, var, outer = plan.src_col, plan.var, plan.outer
    fields = [f for f, _ in plan.elem_fields]
    nulls = {f"{var}__{f}": None for f in fields}

    def explode(row: dict):
        bag = row.get(src)
        rest = {k: v for k, v in row.items() if k != src}
        if not bag:
            if outer:
                yield {**rest, **nulls}
            return
        for e in bag:
            yield {**rest, **{f"{var}__{f}": e.get(f) for f in fields}}

    return execute(plan.child, catalog).flatMap(explode)


def _nest_bag(plan: P.NestBag, catalog: Catalog) -> RDD:
    keys, struct, out, marker = (
        plan.keys,
        plan.struct_fields,
        plan.out,
        plan.marker,
    )

    def to_kv(row: dict):
        k = _hashable(tuple(row[c] for c in keys))
        v = (
            {n: row[c] for n, c in struct}
            if row.get(marker) is not None
            else None
        )
        return k, (tuple(row[c] for c in keys), v)

    def merge(acc, item):
        acc[1].append(item[1]) if item[1] is not None else None
        return (item[0], acc[1])

    return (
        execute(plan.child, catalog)
        .map(to_kv)
        .groupByKey()
        .map(
            lambda kv: {
                **dict(zip(keys, next(iter(kv[1]))[0])),
                out: [v for _, v in kv[1] if v is not None],
            }
        )
    )


def _nest_sum(plan: P.NestSum, catalog: Catalog) -> RDD:
    keys, values = plan.keys, plan.values

    def to_kv(row: dict):
        k = _hashable(tuple(row[c] for c in keys))
        return k, (
            tuple(row[c] for c in keys),
            tuple(eval_row(sx, row) for _, sx in values),
        )

    def add(a, b):
        sums = tuple(
            (x if y is None else y if x is None else x + y)
            for x, y in zip(a[1], b[1])
        )
        return (a[0], sums)

    return (
        execute(plan.child, catalog)
        .map(to_kv)
        .reduceByKey(add)
        .map(
            lambda kv: {
                **dict(zip(keys, kv[1][0])),
                **{n: v for (n, _), v in zip(values, kv[1][1])},
            }
        )
    )


def collect(plan: P.Plan, catalog: Catalog) -> list[dict]:
    return execute(plan, catalog).collect()


def count(plan: P.Plan, catalog: Catalog) -> int:
    return execute(plan, catalog).count()

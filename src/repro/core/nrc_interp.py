"""Reference (local, tuple-at-a-time) evaluator for NRC.

This is the "local collection program" of the paper's Challenge 1: the
semantics programmers prototype against.  We use it as the correctness
oracle for nested query outputs, which the DuckDB row-diff oracle
cannot compare directly (nested arrays are not orderable there).

Values: bags are Python lists (order-insensitive multisets), tuples
are dicts, scalars are Python scalars.  :func:`canon` converts a value
to a canonical hashable form so two bags can be compared as multisets
regardless of element order at any nesting depth.
"""
from __future__ import annotations

from collections import Counter
from typing import Any

from . import nrc as N

_PY_OPS = {
    "+": lambda a, b: a + b,
    "-": lambda a, b: a - b,
    "*": lambda a, b: a * b,
    "/": lambda a, b: a / b,
    "==": lambda a, b: a == b,
    "!=": lambda a, b: a != b,
    "<": lambda a, b: a < b,
    "<=": lambda a, b: a <= b,
    ">": lambda a, b: a > b,
    ">=": lambda a, b: a >= b,
    "&&": lambda a, b: bool(a) and bool(b),
    "||": lambda a, b: bool(a) or bool(b),
}

_DEFAULTS = {"int": 0, "real": 0.0, "string": "", "bool": False}


def evaluate(e: N.Expr, env: dict[str, Any]) -> Any:
    """Evaluate NRC expression ``e`` under value environment ``env``."""
    if isinstance(e, N.Const):
        return e.value
    if isinstance(e, N.Var):
        return env[e.name]
    if isinstance(e, N.Proj):
        return evaluate(e.expr, env)[e.attr]
    if isinstance(e, N.TupleE):
        return {n: evaluate(x, env) for n, x in e.fields}
    if isinstance(e, N.Singleton):
        return [evaluate(e.expr, env)]
    if isinstance(e, N.EmptyBag):
        return []
    if isinstance(e, N.Get):
        bag = evaluate(e.expr, env)
        if len(bag) == 1:
            return bag[0]
        # Default value on empty / non-singleton input, per Fig. 1 prose.
        return _default_of(e, env)
    if isinstance(e, N.ForUnion):
        fast = _try_hash_join(e, env)
        if fast is not None:
            return fast
        out: list[Any] = []
        for v in evaluate(e.source, env):
            out.extend(evaluate(e.body, {**env, e.var: v}))
        return out
    if isinstance(e, N.Union):
        return evaluate(e.left, env) + evaluate(e.right, env)
    if isinstance(e, N.Let):
        return evaluate(e.body, {**env, e.var: evaluate(e.bound, env)})
    if isinstance(e, N.IfThen):
        if evaluate(e.cond, env):
            return evaluate(e.then_, env)
        if e.else_ is not None:
            return evaluate(e.else_, env)
        return []
    if isinstance(e, N.PrimOp):
        return _PY_OPS[e.op](evaluate(e.left, env), evaluate(e.right, env))
    if isinstance(e, N.NotE):
        return not evaluate(e.expr, env)
    if isinstance(e, N.Dedup):
        bag = evaluate(e.expr, env)
        seen: list[Any] = []
        keys: set[Any] = set()
        for t in bag:
            k = canon(t)
            if k not in keys:
                keys.add(k)
                seen.append(t)
        return seen
    if isinstance(e, N.GroupBy):
        bag = evaluate(e.expr, env)
        groups: dict[tuple, list] = {}
        order: list[tuple] = []
        for t in bag:
            k = tuple(t[a] for a in e.keys)
            if k not in groups:
                groups[k] = []
                order.append(k)
            groups[k].append({a: v for a, v in t.items() if a not in e.keys})
        return [
            {**dict(zip(e.keys, k)), "GROUP": groups[k]} for k in order
        ]
    if isinstance(e, N.SumBy):
        bag = evaluate(e.expr, env)
        sums: dict[tuple, list] = {}
        order = []
        for t in bag:
            k = tuple(t[a] for a in e.keys)
            if k not in sums:
                sums[k] = [0] * len(e.values)
                order.append(k)
            for i, v in enumerate(e.values):
                sums[k][i] += t[v]
        return [
            {**dict(zip(e.keys, k)), **dict(zip(e.values, sums[k]))}
            for k in order
        ]
    raise TypeError(f"unknown expression {e!r}")


def _default_of(e: N.Get, env: dict[str, Any]) -> Any:
    """Best-effort default for get() on a non-singleton bag."""
    return None


# Hash-join fast path.  A pure evaluation-strategy optimization (the
# naive nested loop is quadratic, which makes the reference evaluator
# unusable even at test scale): for
# ``for v in SRC union if a == v.attr then BODY`` where ``a`` does not
# mention ``v``, index SRC on ``attr`` once and only evaluate BODY for
# matching elements.  Multiset semantics are unchanged up to order,
# which :func:`canon` comparisons ignore.
_INDEX_CACHE: dict[int, tuple[Any, dict[str, dict]]] = {}


def _probe_key(cond: N.Expr, var: str):
    """If cond is ``x == y`` with exactly one side ``var.attr``, return
    (attr, other-side expr); else None."""
    if not (isinstance(cond, N.PrimOp) and cond.op == "=="):
        return None
    for mine, other in ((cond.left, cond.right), (cond.right, cond.left)):
        if (
            isinstance(mine, N.Proj)
            and isinstance(mine.expr, N.Var)
            and mine.expr.name == var
            and var not in N.free_vars(other)
        ):
            return mine.attr, other
    return None


def _try_hash_join(e: N.ForUnion, env: dict[str, Any]):
    body = e.body
    if not (isinstance(body, N.IfThen) and body.else_ is None):
        return None
    # Flatten a prefix of conditions: both `a && b` conjunctions and
    # nested `if a then if b then …` chains.
    conds: list[N.Expr] = []
    cur: N.Expr = body
    while isinstance(cur, N.IfThen) and cur.else_ is None:
        c: N.Expr = cur.cond
        stack = [c]
        while stack:
            c = stack.pop()
            if isinstance(c, N.PrimOp) and c.op == "&&":
                stack.append(c.right)
                stack.append(c.left)
            else:
                conds.append(c)
        cur = cur.then_
    body = N.IfThen(conds[0], cur)  # canonical single-cond shape
    pk = None
    rest = []
    for cond in conds:
        k = _probe_key(cond, e.var) if pk is None else None
        if k is not None:
            pk = k
        else:
            rest.append(cond)
    if pk is None:
        return None
    attr, other = pk
    src = evaluate(e.source, env)
    if len(src) < 64:
        return None
    key = id(src)
    entry = _INDEX_CACHE.get(key)
    if entry is None or entry[0] is not src:
        if len(_INDEX_CACHE) > 256:
            _INDEX_CACHE.clear()
        entry = (src, {})
        _INDEX_CACHE[key] = entry
    idx = entry[1].get(attr)
    if idx is None:
        idx = {}
        for t in src:
            idx.setdefault(t[attr], []).append(t)
        entry[1][attr] = idx
    probe = evaluate(other, env)
    inner = body.then_
    if rest:
        cnd = rest[0]
        for c2 in rest[1:]:
            cnd = N.PrimOp("&&", cnd, c2)
        inner = N.IfThen(cnd, inner)
    out: list[Any] = []
    for t in idx.get(probe, ()):
        out.extend(evaluate(inner, {**env, e.var: t}))
    return out


def run_program(p: N.Program, env: dict[str, Any]) -> dict[str, Any]:
    """Run all assignments; returns env extended with assigned values."""
    out = dict(env)
    for a in p.assignments:
        out[a.var] = evaluate(a.expr, out)
    return out


# --------------------------------------------------------------------------
# Canonical multiset form — order-insensitive nested-bag comparison
# --------------------------------------------------------------------------


def canon(v: Any) -> Any:
    """Canonical hashable form of a nested value (bags = sorted tuples)."""
    if isinstance(v, dict):
        return tuple(sorted((k, canon(x)) for k, x in v.items()))
    if isinstance(v, list):
        return ("bag",) + tuple(sorted(canon(x) for x in v))
    if isinstance(v, float):
        return round(v, 6)
    return v


def bags_equal(a: list, b: list) -> bool:
    """Multiset equality of two nested bags."""
    return Counter(canon(x) for x in a) == Counter(canon(x) for x in b)


def assert_bags_equal(a: list, b: list, msg: str = "") -> None:
    ca, cb = Counter(canon(x) for x in a), Counter(canon(x) for x in b)
    if ca != cb:
        only_a = list((ca - cb).items())[:3]
        only_b = list((cb - ca).items())[:3]
        raise AssertionError(
            f"nested bags differ {msg}: sizes {len(a)} vs {len(b)}; "
            f"sample only-left={only_a} only-right={only_b}"
        )

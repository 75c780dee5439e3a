"""Symbolic query shredding (§4.1–4.2, Fig. 4) over NRC^{Lbl+λ}.

The first phase of the paper's shredding transformation: given a
source NRC expression ``e``, produce

* ``𝓕(e)`` — the expression computing the flat (top-level) output,
  with bag-valued tuple attributes replaced by ``NewLabel`` terms
  capturing the free variables of the replaced expression, and
* ``𝓓(e)`` — the dictionary tree, where each dictionary is a λ-term
  ``λl. match l = NewLabel(x) then F(x, y)`` (a *recipe* for
  computing a bag from an arbitrary label — the source of the
  representation's succinctness).

This module is faithful to Fig. 4 and is exercised structurally by
the test-suite on the paper's running example (Example 4).  The
*executable* path of the shredded route composes this transformation
with materialization and domain elimination into the syntax-directed
pass of :mod:`repro.core.shred_materialize` (see DESIGN.md §3.3); the
two agree on which labels capture which free variables, which the
tests cross-check.

Like the paper's implementation [19], ``NewLabel`` capture is refined
to the *attributes* of free variables actually used by the shredded
expression, contributing to succinct labels.
"""
from __future__ import annotations

from dataclasses import dataclass

from . import nrc as N

# --------------------------------------------------------------------------
# NRC^{Lbl+λ} extension nodes
# --------------------------------------------------------------------------


@dataclass(frozen=True)
class NewLabel(N.Expr):
    """NewLabel((var, attrs), …) — a label capturing variable attributes."""

    captures: tuple[tuple[str, tuple[str, ...]], ...]


@dataclass(frozen=True)
class Match(N.Expr):
    """match l = NewLabel(x) then body (label deconstruction)."""

    label: N.Expr
    captures: tuple[tuple[str, tuple[str, ...]], ...]
    body: N.Expr


@dataclass(frozen=True)
class Lam(N.Expr):
    """λ l. body — symbolic dictionary."""

    var: str
    body: N.Expr


@dataclass(frozen=True)
class Lookup(N.Expr):
    """Function application: Lookup(dict, label)."""

    dict: N.Expr
    label: N.Expr


@dataclass(frozen=True)
class MatLookup(N.Expr):
    """Lookup against a *materialized* (label, value)-bag dictionary."""

    dict: N.Expr
    label: N.Expr


@dataclass(frozen=True)
class DictTreeUnion(N.Expr):
    """Union of two dictionary trees (for ⊎ of bag expressions)."""

    left: N.Expr
    right: N.Expr


EMPTY_DICT = N.TupleE(())


def var_f(name: str) -> N.Var:
    """The flat-component variable for source variable ``name``."""
    return N.Var(f"{name}_F")


def var_d(name: str) -> N.Var:
    """The dictionary-tree variable for source variable ``name``."""
    return N.Var(f"{name}_D")


# --------------------------------------------------------------------------
# Capture analysis: free variables of e, refined to used attributes
# --------------------------------------------------------------------------


def used_attrs(e: N.Expr, bound: frozenset[str] = frozenset()) -> dict[str, set[str]]:
    """Free variables of ``e`` with the set of attributes projected."""
    out: dict[str, set[str]] = {}

    def merge(d: dict[str, set[str]]) -> None:
        for k, v in d.items():
            out.setdefault(k, set()).update(v)

    if isinstance(e, N.Proj) and isinstance(e.expr, N.Var):
        if e.expr.name not in bound:
            out.setdefault(e.expr.name, set()).add(e.attr)
        return out
    if isinstance(e, N.Var):
        if e.name not in bound:
            out.setdefault(e.name, set())
        return out
    if isinstance(e, (N.Const, N.EmptyBag)):
        return out
    if isinstance(e, N.Proj):
        merge(used_attrs(e.expr, bound))
        return out
    if isinstance(e, N.TupleE):
        for _, x in e.fields:
            merge(used_attrs(x, bound))
        return out
    if isinstance(e, (N.Singleton, N.Get, N.Dedup, N.NotE)):
        merge(used_attrs(e.expr, bound))
        return out
    if isinstance(e, N.ForUnion):
        merge(used_attrs(e.source, bound))
        merge(used_attrs(e.body, bound | {e.var}))
        return out
    if isinstance(e, N.Union):
        merge(used_attrs(e.left, bound))
        merge(used_attrs(e.right, bound))
        return out
    if isinstance(e, N.Let):
        merge(used_attrs(e.bound, bound))
        merge(used_attrs(e.body, bound | {e.var}))
        return out
    if isinstance(e, N.IfThen):
        merge(used_attrs(e.cond, bound))
        merge(used_attrs(e.then_, bound))
        if e.else_ is not None:
            merge(used_attrs(e.else_, bound))
        return out
    if isinstance(e, N.PrimOp):
        merge(used_attrs(e.left, bound))
        merge(used_attrs(e.right, bound))
        return out
    if isinstance(e, (N.GroupBy, N.SumBy)):
        merge(used_attrs(e.expr, bound))
        return out
    raise TypeError(f"unknown expression {e!r}")


def _new_label(e: N.Expr) -> NewLabel:
    # Capture free variables restricted to flat projections: bag-typed
    # free variables (input relations like Part) are not label
    # material — NewLabel parameters must have flat types (§4.1).
    ua = used_attrs(e)
    return NewLabel(
        tuple(
            sorted((v, tuple(sorted(a))) for v, a in ua.items() if a)
        )
    )


# --------------------------------------------------------------------------
# Fig. 4: the functions 𝓕 and 𝓓
# --------------------------------------------------------------------------


def shred_f(e: N.Expr) -> N.Expr:
    """𝓕(e) — the flat component of the shredded query."""
    if isinstance(e, N.Const):
        return e
    if isinstance(e, N.Var):
        return var_f(e.name)
    if isinstance(e, N.TupleE):
        fields: list[tuple[str, N.Expr]] = []
        for n, x in e.fields:
            if _is_bag(x):
                fields.append((n, _new_label(x)))
            else:
                fields.append((n, shred_f(x)))
        return N.TupleE(tuple(fields))
    if isinstance(e, N.Proj):
        if _is_bag(e):
            return Lookup(
                N.Proj(shred_d(e.expr), f"{e.attr}_fun"),
                N.Proj(shred_f(e.expr), e.attr),
            )
        return N.Proj(shred_f(e.expr), e.attr)
    if isinstance(e, N.Singleton):
        return N.Singleton(shred_f(e.expr))
    if isinstance(e, N.EmptyBag):
        return e
    if isinstance(e, N.Get):
        return N.Get(shred_f(e.expr))
    if isinstance(e, N.ForUnion):
        return N.Let(
            var_d(e.var).name,
            shred_d(e.source),
            N.ForUnion(var_f(e.var).name, shred_f(e.source), shred_f(e.body)),
        )
    if isinstance(e, N.Union):
        return N.Union(shred_f(e.left), shred_f(e.right))
    if isinstance(e, N.Let):
        return N.Let(
            var_d(e.var).name,
            shred_d(e.bound),
            N.Let(var_f(e.var).name, shred_f(e.bound), shred_f(e.body)),
        )
    if isinstance(e, N.IfThen):
        return N.IfThen(
            shred_f(e.cond),
            shred_f(e.then_),
            None if e.else_ is None else shred_f(e.else_),
        )
    if isinstance(e, N.PrimOp):
        return N.PrimOp(e.op, shred_f(e.left), shred_f(e.right))
    if isinstance(e, N.NotE):
        return N.NotE(shred_f(e.expr))
    if isinstance(e, N.Dedup):
        return N.Dedup(shred_f(e.expr))
    if isinstance(e, N.GroupBy):
        return N.GroupBy(e.keys, shred_f(e.expr))
    if isinstance(e, N.SumBy):
        return N.SumBy(e.keys, e.values, shred_f(e.expr))
    raise TypeError(f"unknown expression {e!r}")


def shred_d(e: N.Expr) -> N.Expr:
    """𝓓(e) — the dictionary tree of the shredded query."""
    if isinstance(e, (N.Const, N.EmptyBag)):
        return EMPTY_DICT
    if isinstance(e, N.Var):
        return var_d(e.name)
    if isinstance(e, N.TupleE):
        fields: list[tuple[str, N.Expr]] = []
        for n, x in e.fields:
            if _is_bag(x):
                lbl = _new_label(x)
                fields.append(
                    (
                        f"{n}_fun",
                        Lam("l", Match(N.Var("l"), lbl.captures, shred_f(x))),
                    )
                )
                fields.append((f"{n}_child", N.Singleton(shred_d(x))))
        return N.TupleE(tuple(fields))
    if isinstance(e, N.Proj):
        if _is_bag(e):
            return N.Get(N.Proj(shred_d(e.expr), f"{e.attr}_child"))
        return EMPTY_DICT
    if isinstance(e, N.Singleton):
        return shred_d(e.expr)
    if isinstance(e, N.Get):
        return shred_d(e.expr)
    if isinstance(e, N.ForUnion):
        return N.Let(var_d(e.var).name, shred_d(e.source), shred_d(e.body))
    if isinstance(e, N.Union):
        return DictTreeUnion(shred_d(e.left), shred_d(e.right))
    if isinstance(e, N.Let):
        return N.Let(var_d(e.var).name, shred_d(e.bound), shred_d(e.body))
    if isinstance(e, N.IfThen):
        return shred_d(e.then_)
    if isinstance(e, (N.PrimOp, N.NotE)):
        return EMPTY_DICT
    if isinstance(e, (N.Dedup, N.GroupBy, N.SumBy)):
        return shred_d(e.expr)
    raise TypeError(f"unknown expression {e!r}")


# Bag-typed-ness of subexpressions.  The symbolic shredder is applied
# to *typed* queries; rather than threading a full environment we use
# a lightweight structural judgement that covers NRC as restricted by
# Fig. 1 (bag attributes are exactly those built by bag constructs).
_TYPE_ENV: dict[int, bool] = {}


def shred_query(
    e: N.Expr, env: dict[str, N.Type]
) -> tuple[N.Expr, N.Expr]:
    """Shred a typed query: returns (𝓕(e), 𝓓(e))."""
    _annotate(e, env)
    try:
        return shred_f(e), shred_d(e)
    finally:
        _TYPE_ENV.clear()


def _annotate(e: N.Expr, env: dict[str, N.Type]) -> N.Type:
    t = _infer(e, env)
    _TYPE_ENV[id(e)] = isinstance(t, N.BagT)
    return t


def _infer(e: N.Expr, env: dict[str, N.Type]) -> N.Type:
    if isinstance(e, N.ForUnion):
        st = _annotate(e.source, env)
        assert isinstance(st, N.BagT)
        return _annotate(e.body, {**env, e.var: st.elem})
    if isinstance(e, N.Let):
        bt = _annotate(e.bound, env)
        return _annotate(e.body, {**env, e.var: bt})
    if isinstance(e, N.TupleE):
        return N.TupleT(
            tuple((n, _annotate(x, env)) for n, x in e.fields)
        )
    if isinstance(e, N.Proj):
        t = _annotate(e.expr, env)
        assert isinstance(t, N.TupleT)
        return t.field(e.attr)
    if isinstance(e, N.Singleton):
        return N.BagT(_annotate(e.expr, env))
    if isinstance(e, N.IfThen):
        _annotate(e.cond, env)
        t = _annotate(e.then_, env)
        if e.else_ is not None:
            _annotate(e.else_, env)
        return t
    if isinstance(e, N.Union):
        t = _annotate(e.left, env)
        _annotate(e.right, env)
        return t
    if isinstance(e, N.PrimOp):
        _annotate(e.left, env)
        _annotate(e.right, env)
        return N.BOOL if e.op in ("==", "!=", "<", "<=", ">", ">=", "&&", "||") else N.REAL
    if isinstance(e, N.NotE):
        _annotate(e.expr, env)
        return N.BOOL
    if isinstance(e, (N.Dedup,)):
        return _annotate(e.expr, env)
    if isinstance(e, (N.GroupBy, N.SumBy)):
        _annotate(e.expr, env)
        return N.infer_type(e, env)
    if isinstance(e, N.Get):
        t = _annotate(e.expr, env)
        assert isinstance(t, N.BagT)
        return t.elem
    return N.infer_type(e, env)


def _is_bag(e: N.Expr) -> bool:
    return _TYPE_ENV.get(id(e), False)

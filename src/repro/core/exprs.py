"""Attribute resolution and expression evaluation for SAQL.

Two halves:

- **Spark side** (used on the raw event stream, i.e. the big data path):
  entity attribute resolution to physical event columns and compilation
  of pattern/global constraints to Catalyst ``Column`` predicates
  (``%`` in a string constraint means SQL LIKE, as in the paper's
  ``proc p1["%cmd.exe"]``).

- **pandas side** (used on the tiny per-window state table): a generic
  evaluator for alert conditions, invariant updates, and return items.
  Sets (from the ``set()`` aggregate / ``empty_set`` / ``union`` /
  ``diff``) are frozensets in object columns; ``|e|`` is cardinality
  for sets and abs for numbers.
"""
from __future__ import annotations

from typing import Any, Callable

import numpy as np
import pandas as pd
from pyspark.sql import Column
from pyspark.sql import functions as F

from ..saql import ast
from ..saql.errors import SaqlCompileError
from .schema import DEFAULT_ATTR, EVENT_ATTRS, OBJECT_ATTRS, SUBJECT_ATTRS


# --------------------------------------------------------------- resolution
def resolve_attr(role: str, etype: str, attr: str | None) -> str:
    """Physical event column for ``var.attr`` given the variable's role
    (``subject``/``object``) and entity type. ``attr=None`` resolves the
    paper's context-aware default (proc->exe_name, file->name, ip->dstip).
    """
    attr = attr or DEFAULT_ATTR[etype]
    table = SUBJECT_ATTRS if role == "subject" else OBJECT_ATTRS[etype]
    if attr in EVENT_ATTRS:  # e.g. p.agentid — event-level attr
        return EVENT_ATTRS[attr]
    if attr not in table:
        raise SaqlCompileError(
            f"entity type {etype!r} ({role}) has no attribute {attr!r}"
        )
    return table[attr]


def constraint_predicate(col: Column, op: str, value: Any) -> Column:
    """One attribute constraint as a Catalyst predicate."""
    if op == "=":
        if isinstance(value, str) and "%" in value:
            return col.like(value)
        return col == F.lit(value)
    if op == "!=":
        if isinstance(value, str) and "%" in value:
            return ~col.like(value)
        return col != F.lit(value)
    if op == "<":
        return col < F.lit(value)
    if op == "<=":
        return col <= F.lit(value)
    if op == ">":
        return col > F.lit(value)
    if op == ">=":
        return col >= F.lit(value)
    raise SaqlCompileError(f"unsupported constraint operator {op!r}")


# ----------------------------------------------------------- pandas evaluator
# env: callable Ref -> pd.Series | scalar. Raises SaqlCompileError for
# unresolvable refs so compile-time tests catch typos.
Env = Callable[[ast.Ref], Any]


def _as_series(v: Any, n: int, index) -> pd.Series:
    if isinstance(v, pd.Series):
        return v
    return pd.Series([v] * n, index=index)


def _binop_sets(op: str, a: Any, b: Any) -> Any:
    sa = a if isinstance(a, frozenset) else frozenset() if a is None else a
    sb = b if isinstance(b, frozenset) else frozenset() if b is None else b
    if op == "union":
        return frozenset(sa) | frozenset(sb)
    if op == "diff":
        return frozenset(sa) - frozenset(sb)
    if op == "intersect":
        return frozenset(sa) & frozenset(sb)
    raise SaqlCompileError(f"bad set op {op}")


def eval_expr(expr: ast.Expr, env: Env, n: int, index) -> Any:
    """Evaluate ``expr`` to a Series of length ``n`` (or a scalar).

    Arithmetic treats nulls as 0.0 — the SAQL semantics for a group's
    missing past window state (see DESIGN.md §2): ``ss[1].avg_amount``
    of a group first seen in the current window is 0.
    """
    if isinstance(expr, ast.Literal):
        return expr.value
    if isinstance(expr, ast.Ref):
        return env(expr)
    if isinstance(expr, ast.Card):
        v = eval_expr(expr.operand, env, n, index)
        if isinstance(v, pd.Series):
            return v.map(
                lambda x: len(x)
                if isinstance(x, (frozenset, set, list, tuple))
                else (0 if x is None else abs(float(x)))
            )
        if isinstance(v, (frozenset, set, list, tuple)):
            return len(v)
        return abs(float(v)) if v is not None else 0
    if isinstance(expr, ast.Unary):
        v = eval_expr(expr.operand, env, n, index)
        if expr.op == "!":
            return ~_as_series(v, n, index).fillna(False).astype(bool)
        return -_as_series(v, n, index).astype(float)
    if isinstance(expr, ast.Binary):
        return _eval_binary(expr, env, n, index)
    if isinstance(expr, ast.Call):
        raise SaqlCompileError(f"unknown function {expr.name!r} in this context")
    raise SaqlCompileError(f"cannot evaluate {expr!r}")


def _num(v: Any, n: int, index) -> Any:
    """Coerce to numeric with null->0.0 (missing-state semantics)."""
    if isinstance(v, pd.Series):
        return pd.to_numeric(v, errors="coerce").fillna(0.0)
    return 0.0 if v is None else float(v)


def _eval_binary(expr: ast.Binary, env: Env, n: int, index) -> Any:
    op = expr.op
    lv = eval_expr(expr.left, env, n, index)
    rv = eval_expr(expr.right, env, n, index)
    if op in ("union", "diff", "intersect"):
        ls = _as_series(lv, n, index) if isinstance(lv, pd.Series) or isinstance(rv, pd.Series) else None
        if ls is None:
            return _binop_sets(op, lv, rv)
        rs = _as_series(rv, n, index)
        return pd.Series(
            [_binop_sets(op, a, b) for a, b in zip(ls, rs)], index=ls.index
        )
    if op in ("&&", "||"):
        lb = _as_series(lv, n, index).fillna(False).astype(bool) if isinstance(lv, pd.Series) else bool(lv)
        rb = _as_series(rv, n, index).fillna(False).astype(bool) if isinstance(rv, pd.Series) else bool(rv)
        if not isinstance(lb, pd.Series) and not isinstance(rb, pd.Series):
            return (lb and rb) if op == "&&" else (lb or rb)
        lb = _as_series(lb, n, index).astype(bool)
        rb = _as_series(rb, n, index).astype(bool)
        return (lb & rb) if op == "&&" else (lb | rb)
    if op in ("==", "!="):
        # Equality works for strings and sets too — no numeric coercion
        # unless both sides look numeric.
        def is_numlike(v):
            return isinstance(v, (int, float)) or (
                isinstance(v, pd.Series) and pd.api.types.is_numeric_dtype(v)
            )

        if is_numlike(lv) and is_numlike(rv):
            lv, rv = _num(lv, n, index), _num(rv, n, index)
        eq = _as_series(lv, n, index) == _as_series(rv, n, index) if (
            isinstance(lv, pd.Series) or isinstance(rv, pd.Series)
        ) else (lv == rv)
        if op == "!=":
            return ~eq if isinstance(eq, pd.Series) else (not eq)
        return eq
    # numeric comparisons / arithmetic
    ln, rn = _num(lv, n, index), _num(rv, n, index)
    if op == "<":
        return ln < rn
    if op == "<=":
        return ln <= rn
    if op == ">":
        return ln > rn
    if op == ">=":
        return ln >= rn
    if op == "+":
        return ln + rn
    if op == "-":
        return ln - rn
    if op == "*":
        return ln * rn
    if op == "/":
        with np.errstate(divide="ignore", invalid="ignore"):
            return ln / rn
    raise SaqlCompileError(f"unsupported operator {op!r}")

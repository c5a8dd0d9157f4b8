"""Pandas expression evaluator tests (alert/invariant/return algebra)."""
import pandas as pd
import pytest

from repro.saql import ast
from repro.saql.errors import SaqlCompileError
from repro.saql.parser import _Parser
from repro.saql.lexer import tokenize
from repro.core.exprs import eval_expr


def parse_expr(text: str) -> ast.Expr:
    return _Parser(tokenize(text))._expr()


def ev(text, env=None, n=1, index=None):
    env = env or {}
    index = index if index is not None else pd.RangeIndex(n)

    def lookup(ref: ast.Ref):
        key = ref.name if ref.attr is None else f"{ref.name}.{ref.attr}"
        if ref.index is not None:
            key = f"{ref.name}[{ref.index}].{ref.attr}"
        if key in env:
            return env[key]
        raise SaqlCompileError(f"unknown ref {key}")

    return eval_expr(parse_expr(text), lookup, n, index)


# ------------------------------------------------------------------ scalars
@pytest.mark.parametrize(
    "text,expected",
    [
        ("1 + 2", 3.0),
        ("2 * 3 + 1", 7.0),
        ("10 / 4", 2.5),
        ("7 - 10", -3.0),
        ("-5", -5.0),
        ("1 < 2", True),
        ("2 <= 2", True),
        ("3 > 4", False),
        ("3 >= 4", False),
        ("1 == 1", True),
        ("1 != 1", False),
        ("1 = 1", True),  # single '=' is equality in expressions
        ("(1 > 0) && (2 > 1)", True),
        ("(1 > 0) && (2 > 3)", False),
        ("(1 > 2) || (2 > 1)", True),
        ("!(1 > 2)", True),
        ("|0 - 4|", 4.0),
    ],
)
def test_scalar_expressions(text, expected):
    v = ev(text)
    if isinstance(v, pd.Series):
        v = v.iloc[0]
    assert v == expected


def test_string_equality():
    assert ev('"a" == "a"') is True
    assert ev('"a" == "b"') is False


# ------------------------------------------------------------------- series
def test_series_arithmetic():
    s = pd.Series([1.0, 2.0, 3.0])
    out = ev("x + 1", env={"x": s}, n=3)
    assert list(out) == [2.0, 3.0, 4.0]


def test_series_comparison_and_logic():
    s = pd.Series([5.0, 15.0, 25.0])
    out = ev("(x > 10) && (x < 20)", env={"x": s}, n=3)
    assert list(out) == [False, True, False]


def test_null_is_zero_in_arithmetic():
    """SAQL missing-state semantics: a group's absent past-window state
    contributes 0 (DESIGN.md §2)."""
    s = pd.Series([10.0, None, 30.0])
    out = ev("x / 2", env={"x": s}, n=3)
    assert list(out) == [5.0, 0.0, 15.0]


def test_sma_expression_like_query2():
    cur = pd.Series([30.0, 30000.0])
    p1 = pd.Series([30.0, 0.0])
    p2 = pd.Series([30.0, 0.0])
    out = ev(
        "(a > (a + b + c) / 3) && (a > 10000)",
        env={"a": cur, "b": p1, "c": p2},
        n=2,
    )
    assert list(out) == [False, True]


# --------------------------------------------------------------------- sets
def test_set_union():
    v = ev("a union b", env={"a": frozenset({1}), "b": frozenset({2})})
    assert v == frozenset({1, 2})


def test_set_diff():
    v = ev("a diff b", env={"a": frozenset({1, 2}), "b": frozenset({2})})
    assert v == frozenset({1})


def test_set_intersect():
    v = ev("a intersect b", env={"a": frozenset({1, 2}), "b": frozenset({2, 3})})
    assert v == frozenset({2})


def test_cardinality_of_set():
    assert ev("|a|", env={"a": frozenset({1, 2, 3})}) == 3


def test_cardinality_of_set_series():
    s = pd.Series([frozenset({1}), frozenset(), frozenset({1, 2})])
    out = ev("|a|", env={"a": s}, n=3)
    assert list(out) == [1, 0, 2]


def test_invariant_alert_shape():
    """|ss.set_proc diff a| > 0 with series of sets vs scalar invariant."""
    seen = pd.Series([frozenset({"php.exe"}), frozenset({"evil.exe"})])
    out = ev(
        "|s diff a| > 0",
        env={"s": seen, "a": frozenset({"php.exe"})},
        n=2,
    )
    assert list(out) == [False, True]


def test_set_series_union_scalar():
    s = pd.Series([frozenset({1}), frozenset({2})])
    out = ev("s union a", env={"s": s, "a": frozenset({9})}, n=2)
    assert list(out) == [frozenset({1, 9}), frozenset({2, 9})]


def test_none_set_treated_as_empty():
    s = pd.Series([None, frozenset({1})])
    out = ev("|s diff a|", env={"s": s, "a": frozenset()}, n=2)
    assert list(out) == [0, 1]


def test_empty_set_literal_via_env():
    assert ev("|a|", env={"a": frozenset()}) == 0


def test_unknown_function_raises():
    with pytest.raises(SaqlCompileError):
        ev("median(1, 2)")


def test_division_by_zero_yields_inf():
    out = ev("x / y", env={"x": pd.Series([1.0]), "y": pd.Series([0.0])}, n=1)
    assert out.iloc[0] == float("inf")

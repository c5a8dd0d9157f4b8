"""Tokenizer tests."""
import pytest

from repro.saql.errors import SaqlSyntaxError
from repro.saql.lexer import tokenize


def kinds(text):
    return [(t.kind, t.value) for t in tokenize(text)[:-1]]


@pytest.mark.parametrize(
    "text,expected",
    [
        ("proc p1", [("IDENT", "proc"), ("IDENT", "p1")]),
        ("123", [("NUMBER", "123")]),
        ("1.5", [("NUMBER", "1.5")]),
        ('"x y"', [("STRING", "x y")]),
        ("'x'", [("STRING", "x")]),
        ("->", [("OP", "->")]),
        (":=", [("OP", ":=")]),
        ("<=", [("OP", "<=")]),
        (">=", [("OP", ">=")]),
        ("==", [("OP", "==")]),
        ("!=", [("OP", "!=")]),
        ("&&", [("OP", "&&")]),
        ("||", [("OP", "||")]),
        ("#", [("OP", "#")]),
        ("|", [("OP", "|")]),
        ("a.b", [("IDENT", "a"), ("OP", "."), ("IDENT", "b")]),
    ],
)
def test_single_tokens(text, expected):
    assert kinds(text) == expected


def test_eof_token():
    toks = tokenize("x")
    assert toks[-1].kind == "EOF"


def test_comment_skipped():
    assert kinds("a // comment here\nb") == [("IDENT", "a"), ("IDENT", "b")]


def test_comment_at_eof():
    assert kinds("a // trailing") == [("IDENT", "a")]


def test_ss_index_attr():
    # ss[0].avg — the dot must not be eaten by the number
    assert kinds("ss[0].avg") == [
        ("IDENT", "ss"),
        ("OP", "["),
        ("NUMBER", "0"),
        ("OP", "]"),
        ("OP", "."),
        ("IDENT", "avg"),
    ]


def test_number_then_dot_ident():
    assert kinds("10.min") == [("NUMBER", "10"), ("OP", "."), ("IDENT", "min")]


def test_decimal_number():
    assert kinds("10.5x") == [("NUMBER", "10.5"), ("IDENT", "x")]


@pytest.mark.parametrize("lit", ["1e6", "6.1e-05", "2E+3"])
def test_scientific_notation(lit):
    assert kinds(lit) == [("NUMBER", lit)]


def test_e_suffix_without_digits_is_ident():
    # "10e" is a number then identifier 'e' must NOT be merged
    assert kinds("10 exp") == [("NUMBER", "10"), ("IDENT", "exp")]


def test_escaped_quote_in_string():
    assert kinds(r'"a\"b"') == [("STRING", 'a"b')]


def test_percent_like_pattern_string():
    assert kinds('"%cmd.exe"') == [("STRING", "%cmd.exe")]


def test_line_and_col_tracking():
    toks = tokenize("a\n  b")
    assert (toks[0].line, toks[0].col) == (1, 1)
    assert (toks[1].line, toks[1].col) == (2, 3)


def test_unterminated_string_raises():
    with pytest.raises(SaqlSyntaxError):
        tokenize('"abc')


def test_string_with_newline_raises():
    with pytest.raises(SaqlSyntaxError):
        tokenize('"ab\ncd"')


def test_unexpected_char_raises():
    with pytest.raises(SaqlSyntaxError):
        tokenize("a $ b")


def test_whitespace_and_newline_insensitive():
    assert kinds("a\tb\r\nc") == [("IDENT", "a"), ("IDENT", "b"), ("IDENT", "c")]


def test_underscore_identifiers():
    assert kinds("set_proc _x a_1") == [
        ("IDENT", "set_proc"),
        ("IDENT", "_x"),
        ("IDENT", "a_1"),
    ]


def test_cardinality_bars_tokenize_separately():
    # |a| > 0 : two single bars, not a '||'
    assert kinds("|a| > 0") == [
        ("OP", "|"),
        ("IDENT", "a"),
        ("OP", "|"),
        ("OP", ">"),
        ("NUMBER", "0"),
    ]


def test_full_query_line_tokenizes():
    text = 'proc p1["%cmd.exe"] start proc p2["%osql.exe"] as evt1'
    ks = [k for k, _ in kinds(text)]
    assert ks == [
        "IDENT", "IDENT", "OP", "STRING", "OP", "IDENT", "IDENT", "IDENT",
        "OP", "STRING", "OP", "IDENT", "IDENT",
    ]

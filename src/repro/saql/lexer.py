"""Tokenizer for SAQL.

Newline-insensitive: statements are recognised by leading keywords, as
in the published examples, so whitespace (including newlines) only
separates tokens. ``//`` comments run to end of line.
"""
from __future__ import annotations

from dataclasses import dataclass

from .errors import SaqlSyntaxError

# Multi-char operators first so maximal munch applies.
_OPERATORS = [
    "->", ":=", "<=", ">=", "==", "!=", "&&", "||",
    "[", "]", "{", "}", "(", ")", ",", ".", "=", "<", ">",
    "+", "-", "*", "/", "!", "|", "#",
]


@dataclass(frozen=True)
class Token:
    kind: str  # IDENT | NUMBER | STRING | OP | EOF
    value: str
    line: int
    col: int

    def __repr__(self) -> str:  # compact for parser error messages
        return f"{self.kind}({self.value!r})"


def _is_ident_start(c: str) -> bool:
    return c.isalpha() or c == "_"


def _is_ident(c: str) -> bool:
    return c.isalnum() or c in "_"


def tokenize(text: str) -> list[Token]:
    """Lex ``text`` into tokens; raises SaqlSyntaxError on bad input."""
    toks: list[Token] = []
    i, line, col = 0, 1, 1
    n = len(text)
    while i < n:
        c = text[i]
        if c == "\n":
            i += 1
            line += 1
            col = 1
            continue
        if c in " \t\r":
            i += 1
            col += 1
            continue
        if text.startswith("//", i):
            while i < n and text[i] != "\n":
                i += 1
            continue
        if c == '"' or c == "'":
            quote = c
            j = i + 1
            buf = []
            while j < n and text[j] != quote:
                if text[j] == "\n":
                    raise SaqlSyntaxError("unterminated string", line, col)
                if text[j] == "\\" and j + 1 < n:
                    buf.append(text[j + 1])
                    j += 2
                else:
                    buf.append(text[j])
                    j += 1
            if j >= n:
                raise SaqlSyntaxError("unterminated string", line, col)
            toks.append(Token("STRING", "".join(buf), line, col))
            col += j + 1 - i
            i = j + 1
            continue
        if c.isdigit():
            j = i
            seen_dot = False
            while j < n and (text[j].isdigit() or (text[j] == "." and not seen_dot)):
                if text[j] == ".":
                    # ``ss[0].f`` must not eat the dot: only consume a
                    # dot followed by a digit.
                    if j + 1 >= n or not text[j + 1].isdigit():
                        break
                    seen_dot = True
                j += 1
            # scientific notation: 1e6, 6.1e-05
            if j < n and text[j] in "eE":
                k = j + 1
                if k < n and text[k] in "+-":
                    k += 1
                if k < n and text[k].isdigit():
                    while k < n and text[k].isdigit():
                        k += 1
                    j = k
            toks.append(Token("NUMBER", text[i:j], line, col))
            col += j - i
            i = j
            continue
        if _is_ident_start(c):
            j = i
            while j < n and _is_ident(text[j]):
                j += 1
            toks.append(Token("IDENT", text[i:j], line, col))
            col += j - i
            i = j
            continue
        for op in _OPERATORS:
            if text.startswith(op, i):
                toks.append(Token("OP", op, line, col))
                i += len(op)
                col += len(op)
                break
        else:
            raise SaqlSyntaxError(f"unexpected character {c!r}", line, col)
    toks.append(Token("EOF", "", line, col))
    return toks

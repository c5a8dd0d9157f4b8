"""SAQL error types (the engine's "error reporter" surfaces these)."""
from __future__ import annotations


class SaqlError(Exception):
    """Base class for all SAQL language / compilation errors."""


class SaqlSyntaxError(SaqlError):
    """Lexing or parsing failure, with source position."""

    def __init__(self, message: str, line: int | None = None, col: int | None = None):
        self.line, self.col = line, col
        loc = f" (line {line}, col {col})" if line is not None else ""
        super().__init__(f"{message}{loc}")


class SaqlCompileError(SaqlError):
    """Semantically invalid query (unknown attribute, bad alias, ...)."""

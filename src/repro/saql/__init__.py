"""SAQL — the Stream-based Anomaly Query Language.

The paper builds the language with ANTLR 4; offline we implement an
equivalent hand-written lexer (``lexer``) and recursive-descent parser
(``parser``) over a typed AST (``ast``). The surface covers all four
anomaly-model families and every published example query: event
patterns with attribute constraints and ``%`` wildcards, global
constraints, temporal order (``with e1 -> e2``), sliding windows
(``#time``), stateful computation (``state { f := agg(...) } group
by``), state history (``ss[k]``), invariant learning
(``invariant[N][offline]``), clustering (``cluster(...)``), ``alert``,
and ``return [distinct]`` with context-aware shortcuts.
"""
from .parser import parse_saql  # noqa: F401
from .errors import SaqlError, SaqlSyntaxError  # noqa: F401

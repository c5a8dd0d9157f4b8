"""Recursive-descent parser for SAQL.

Mirrors the published grammar surface (the paper uses ANTLR 4). Every
example query in the paper (Queries 1-4) parses unchanged except for
literal host/IP values.
"""
from __future__ import annotations

import re

from . import ast
from .errors import SaqlSyntaxError
from .lexer import Token, tokenize

_ENTITY_TYPES = {"proc", "file", "ip"}
_CMP_OPS = {"=", "==", "!=", "<", "<=", ">", ">="}
_SET_OPS = {"union", "diff", "intersect"}
_METHOD_RE = re.compile(r"^\s*([A-Za-z_]+)\s*(?:\(([^)]*)\))?\s*$")


class _Parser:
    def __init__(self, toks: list[Token]):
        self.toks = toks
        self.i = 0

    # ------------------------------------------------------------- cursor
    @property
    def cur(self) -> Token:
        return self.toks[self.i]

    def peek(self, k: int = 1) -> Token:
        j = min(self.i + k, len(self.toks) - 1)
        return self.toks[j]

    def advance(self) -> Token:
        t = self.cur
        if t.kind != "EOF":
            self.i += 1
        return t

    def expect(self, kind: str, value: str | None = None) -> Token:
        t = self.cur
        if t.kind != kind or (value is not None and t.value != value):
            want = value or kind
            raise SaqlSyntaxError(f"expected {want!r}, got {t}", t.line, t.col)
        return self.advance()

    def accept(self, kind: str, value: str | None = None) -> Token | None:
        t = self.cur
        if t.kind == kind and (value is None or t.value == value):
            return self.advance()
        return None

    # ------------------------------------------------------------- query
    def parse_query(self) -> ast.Query:
        q = ast.Query()
        self.vars: dict[str, str] = {}  # var -> entity type
        while self.cur.kind != "EOF":
            t = self.cur
            if t.kind == "IDENT" and t.value in _ENTITY_TYPES:
                self._pattern(q)
            elif t.kind == "IDENT" and t.value == "with":
                self._temporal(q)
            elif t.kind == "IDENT" and t.value == "state":
                self._state(q)
            elif t.kind == "IDENT" and t.value == "invariant":
                self._invariant(q)
            elif t.kind == "IDENT" and t.value == "cluster":
                self._cluster(q)
            elif t.kind == "IDENT" and t.value == "alert":
                self.advance()
                q.alert = self._expr()
            elif t.kind == "IDENT" and t.value == "return":
                self._return(q)
            elif t.kind == "IDENT" and self.peek().kind == "OP" and self.peek().value in _CMP_OPS:
                self._global(q)
            else:
                raise SaqlSyntaxError(f"unexpected {t}", t.line, t.col)
        if not q.patterns:
            raise SaqlSyntaxError("query has no event pattern")
        return q

    # ------------------------------------------------------------- pieces
    def _global(self, q: ast.Query) -> None:
        attr = self.expect("IDENT").value
        op = self.expect("OP").value
        if op not in _CMP_OPS:
            raise SaqlSyntaxError(f"bad global constraint operator {op!r}")
        q.globals.append(ast.GlobalConstraint(attr, "=" if op == "==" else op, self._literal()))

    def _literal(self) -> float | str:
        t = self.cur
        if t.kind == "NUMBER":
            self.advance()
            return float(t.value)
        if t.kind == "STRING":
            self.advance()
            return t.value
        if t.kind == "IDENT":  # bare word, e.g. ``agentid = xxx``
            self.advance()
            return t.value
        raise SaqlSyntaxError(f"expected literal, got {t}", t.line, t.col)

    def _entity(self) -> ast.EntityDecl:
        etype = self.expect("IDENT").value
        if etype not in _ENTITY_TYPES:
            raise SaqlSyntaxError(f"unknown entity type {etype!r}")
        var = self.expect("IDENT").value
        constraints: list[ast.Constraint] = []
        if self.accept("OP", "["):
            while True:
                constraints.append(self._constraint())
                if not self.accept("OP", ","):
                    break
            self.expect("OP", "]")
        is_ref = var in self.vars
        if is_ref and self.vars[var] != etype:
            raise SaqlSyntaxError(
                f"variable {var!r} redeclared as {etype!r} (was {self.vars[var]!r})"
            )
        self.vars[var] = etype
        return ast.EntityDecl(etype=etype, var=var, constraints=constraints, is_ref=is_ref)

    def _constraint(self) -> ast.Constraint:
        t = self.cur
        if t.kind == "STRING":  # positional: default attribute, LIKE/=
            self.advance()
            return ast.Constraint(None, "=", t.value)
        attr = self.expect("IDENT").value
        op = self.expect("OP").value
        if op not in _CMP_OPS:
            raise SaqlSyntaxError(f"bad constraint operator {op!r}", t.line, t.col)
        return ast.Constraint(attr, "=" if op == "==" else op, self._literal())

    def _pattern(self, q: ast.Query) -> None:
        subject = self._entity()
        ops = [self.expect("IDENT").value]
        while self.accept("OP", "||"):
            ops.append(self.expect("IDENT").value)
        obj = self._entity()
        alias = None
        if self.accept("IDENT", "as"):
            alias = self.expect("IDENT").value
        q.patterns.append(ast.EventPattern(subject=subject, ops=ops, obj=obj, alias=alias))
        if self.accept("OP", "#"):
            self._window(q)

    def _window(self, q: ast.Query) -> None:
        self.expect("IDENT", "time")
        self.expect("OP", "(")
        length = self._duration()
        slide = length
        if self.accept("OP", ","):
            slide = self._duration()
        self.expect("OP", ")")
        if q.window is not None and q.window != ast.WindowSpec(length, slide):
            raise SaqlSyntaxError("conflicting #time windows in one query")
        q.window = ast.WindowSpec(length_s=length, slide_s=slide)

    def _duration(self) -> float:
        num = float(self.expect("NUMBER").value)
        unit = self.expect("IDENT").value.lower()
        mult = {"s": 1, "sec": 1, "second": 1, "seconds": 1,
                "min": 60, "minute": 60, "minutes": 60,
                "h": 3600, "hour": 3600, "hours": 3600,
                "d": 86400, "day": 86400, "days": 86400}.get(unit)
        if mult is None:
            raise SaqlSyntaxError(f"unknown time unit {unit!r}")
        return num * mult

    def _temporal(self, q: ast.Query) -> None:
        self.expect("IDENT", "with")
        names = [self.expect("IDENT").value]
        while self.accept("OP", "->"):
            names.append(self.expect("IDENT").value)
        if len(names) < 2:
            raise SaqlSyntaxError("temporal clause needs at least two aliases")
        q.temporal = names

    def _state(self, q: ast.Query) -> None:
        self.expect("IDENT", "state")
        history = 1
        if self.accept("OP", "["):
            history = int(self.expect("NUMBER").value)
            self.expect("OP", "]")
        name = self.expect("IDENT").value
        self.expect("OP", "{")
        fields: list[ast.StateField] = []
        while not self.accept("OP", "}"):
            fname = self.expect("IDENT").value
            self.expect("OP", ":=")
            func = self.expect("IDENT").value
            self.expect("OP", "(")
            arg = None if self.cur.kind == "OP" and self.cur.value == ")" else self._expr()
            self.expect("OP", ")")
            fields.append(ast.StateField(name=fname, func=func, arg=arg))
        self.expect("IDENT", "group")
        self.expect("IDENT", "by")
        group_by = [self._ref()]
        while self.accept("OP", ","):
            group_by.append(self._ref())
        q.state = ast.StateDecl(history=history, name=name, fields=fields, group_by=group_by)

    def _invariant(self, q: ast.Query) -> None:
        self.expect("IDENT", "invariant")
        self.expect("OP", "[")
        train = int(self.expect("NUMBER").value)
        self.expect("OP", "]")
        mode = "offline"
        if self.accept("OP", "["):
            mode = self.expect("IDENT").value
            if mode not in ("offline", "online"):
                raise SaqlSyntaxError(f"unknown invariant mode {mode!r}")
            self.expect("OP", "]")
        self.expect("OP", "{")
        var = self.expect("IDENT").value
        self.expect("OP", ":=")
        init = self._expr()
        var2 = self.expect("IDENT").value
        if var2 != var:
            raise SaqlSyntaxError(
                f"invariant update targets {var2!r} but {var!r} was initialised"
            )
        self.expect("OP", "=")
        update = self._expr()
        self.expect("OP", "}")
        q.invariant = ast.InvariantDecl(
            train_windows=train, mode=mode, var=var, init=init, update=update
        )

    def _cluster(self, q: ast.Query) -> None:
        self.expect("IDENT", "cluster")
        self.expect("OP", "(")
        self.expect("IDENT", "points")
        self.expect("OP", "=")
        self.expect("IDENT", "all")
        self.expect("OP", "(")
        points = [self._ref()]
        while self.accept("OP", ","):
            points.append(self._ref())
        self.expect("OP", ")")
        self.expect("OP", ",")
        self.expect("IDENT", "distance")
        self.expect("OP", "=")
        distance = self.expect("STRING").value
        self.expect("OP", ",")
        self.expect("IDENT", "method")
        self.expect("OP", "=")
        method_raw = self.expect("STRING").value
        self.expect("OP", ")")
        m = _METHOD_RE.match(method_raw)
        if not m:
            raise SaqlSyntaxError(f"bad cluster method {method_raw!r}")
        args = [float(x) for x in m.group(2).split(",")] if m.group(2) else []
        q.cluster = ast.ClusterDecl(
            points=points, distance=distance, method=m.group(1).upper(), method_args=args
        )

    def _return(self, q: ast.Query) -> None:
        self.expect("IDENT", "return")
        distinct = self.accept("IDENT", "distinct") is not None
        items = [self._return_item()]
        while self.accept("OP", ","):
            items.append(self._return_item())
        q.ret = ast.ReturnClause(distinct=distinct, items=items)

    def _return_item(self) -> ast.ReturnItem:
        e = self._expr()
        alias = None
        if self.accept("IDENT", "as"):
            alias = self.expect("IDENT").value
        return ast.ReturnItem(expr=e, alias=alias)

    # ------------------------------------------------------- expressions
    def _expr(self) -> ast.Expr:
        return self._or()

    def _or(self) -> ast.Expr:
        e = self._and()
        while self.accept("OP", "||"):
            e = ast.Binary("||", e, self._and())
        return e

    def _and(self) -> ast.Expr:
        e = self._not()
        while self.accept("OP", "&&"):
            e = ast.Binary("&&", e, self._not())
        return e

    def _not(self) -> ast.Expr:
        if self.accept("OP", "!"):
            return ast.Unary("!", self._not())
        return self._comparison()

    def _comparison(self) -> ast.Expr:
        e = self._setop()
        t = self.cur
        if t.kind == "OP" and t.value in _CMP_OPS:
            self.advance()
            op = "==" if t.value == "=" else t.value
            return ast.Binary(op, e, self._setop())
        return e

    def _setop(self) -> ast.Expr:
        e = self._additive()
        while self.cur.kind == "IDENT" and self.cur.value in _SET_OPS:
            op = self.advance().value
            e = ast.Binary(op, e, self._additive())
        return e

    def _additive(self) -> ast.Expr:
        e = self._multiplicative()
        while self.cur.kind == "OP" and self.cur.value in ("+", "-"):
            op = self.advance().value
            e = ast.Binary(op, e, self._multiplicative())
        return e

    def _multiplicative(self) -> ast.Expr:
        e = self._unary()
        while self.cur.kind == "OP" and self.cur.value in ("*", "/"):
            op = self.advance().value
            e = ast.Binary(op, e, self._unary())
        return e

    def _unary(self) -> ast.Expr:
        if self.accept("OP", "-"):
            return ast.Unary("-", self._unary())
        return self._primary()

    def _primary(self) -> ast.Expr:
        t = self.cur
        if t.kind == "NUMBER":
            self.advance()
            return ast.Literal(float(t.value))
        if t.kind == "STRING":
            self.advance()
            return ast.Literal(t.value)
        if self.accept("OP", "("):
            e = self._expr()
            self.expect("OP", ")")
            return e
        if self.accept("OP", "|"):
            e = self._expr()
            self.expect("OP", "|")
            return ast.Card(e)
        if t.kind == "IDENT":
            if t.value == "true":
                self.advance()
                return ast.Literal(True)
            if t.value == "false":
                self.advance()
                return ast.Literal(False)
            return self._ref()
        raise SaqlSyntaxError(f"unexpected {t} in expression", t.line, t.col)

    def _ref(self) -> ast.Expr:
        name = self.expect("IDENT").value
        index = None
        if self.cur.kind == "OP" and self.cur.value == "[":
            self.advance()
            index = int(self.expect("NUMBER").value)
            self.expect("OP", "]")
        attr = None
        if self.accept("OP", "."):
            attr = self.expect("IDENT").value
        # ``name(...)`` function call form (rare; kept for extension).
        if index is None and attr is None and self.cur.kind == "OP" and self.cur.value == "(":
            self.advance()
            args = []
            if not (self.cur.kind == "OP" and self.cur.value == ")"):
                args.append(self._expr())
                while self.accept("OP", ","):
                    args.append(self._expr())
            self.expect("OP", ")")
            return ast.Call(name, tuple(args))
        return ast.Ref(name=name, index=index, attr=attr)


def parse_saql(text: str) -> ast.Query:
    """Parse a SAQL query string to its AST (raises SaqlSyntaxError)."""
    return _Parser(tokenize(text)).parse_query()

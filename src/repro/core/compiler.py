"""Semantic analysis: SAQL AST -> CompiledQuery.

The CompiledQuery carries everything the matcher (Spark joins), the
state maintainer (Spark window aggregation), and the model evaluator
(pandas over the state table) need: per-pattern predicates and variable
roles, group-by key columns, state aggregations, history depth,
invariant/cluster parameters, and the alert/return expressions.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from ..saql import ast
from ..saql.errors import SaqlCompileError
from .schema import (
    DEFAULT_ATTR,
    EVENT_ATTRS,
    IDENTITY_ATTRS,
    OBJ_PROC,
    OPERATIONS,
)

AGG_FUNCS = {"avg", "sum", "count", "min", "max", "set", "distinct_count"}
SET_AGGS = {"set"}


@dataclass
class VarInfo:
    """A pattern variable: entity type + the (pattern index, role) slots
    it occupies. ``roles[i]`` is 'subject' or 'object'."""

    etype: str
    slots: list[tuple[int, str]] = field(default_factory=list)

    def role_in(self, pat_idx: int) -> str:
        for i, role in self.slots:
            if i == pat_idx:
                return role
        raise SaqlCompileError(f"variable not bound in pattern {pat_idx}")


@dataclass
class GroupKey:
    """One group-by key: output column name + how to compute it."""

    out: str  # canonical column name, e.g. "p__exe_name" or "agentid"
    var: str | None  # pattern variable, None for event attrs
    attr: str  # logical attribute name


@dataclass
class StateAgg:
    name: str  # state field name, e.g. "avg_amount"
    func: str  # avg/sum/count/min/max/set/distinct_count
    source_col: str | None  # physical event column (None for count())

    @property
    def is_set(self) -> bool:
        return self.func in SET_AGGS

    @property
    def default(self):  # missing-window state value
        return frozenset() if self.is_set else 0.0


@dataclass
class CompiledQuery:
    name: str
    query: ast.Query
    kind: str
    vars: dict[str, VarInfo]
    aliases: list[str]  # pattern aliases, position-aligned with query.patterns
    window: ast.WindowSpec | None
    # stateful-only fields:
    group_keys: list[GroupKey] = field(default_factory=list)
    state_aggs: list[StateAgg] = field(default_factory=list)
    history: int = 1
    state_name: str | None = None

    @property
    def is_stateful(self) -> bool:
        return self.query.state is not None

    def state_field(self, name: str) -> StateAgg:
        for f in self.state_aggs:
            if f.name == name:
                return f
        raise SaqlCompileError(f"unknown state field {name!r}")


def _collect_vars(q: ast.Query) -> dict[str, VarInfo]:
    vars: dict[str, VarInfo] = {}
    for i, pat in enumerate(q.patterns):
        for decl, role in ((pat.subject, "subject"), (pat.obj, "object")):
            info = vars.get(decl.var)
            if info is None:
                vars[decl.var] = info = VarInfo(etype=decl.etype)
            elif info.etype != decl.etype:
                raise SaqlCompileError(
                    f"variable {decl.var!r} used as both {info.etype!r} and {decl.etype!r}"
                )
            info.slots.append((i, role))
    return vars


def _alias_list(q: ast.Query) -> list[str]:
    aliases = []
    for i, pat in enumerate(q.patterns):
        aliases.append(pat.alias or f"_evt{i}")
    if len(set(aliases)) != len(aliases):
        raise SaqlCompileError("duplicate event pattern aliases")
    return aliases


def _group_key(ref: ast.Ref, cq: CompiledQuery) -> GroupKey:
    if ref.name in cq.vars:
        info = cq.vars[ref.name]
        attr = ref.attr or DEFAULT_ATTR[info.etype]
        return GroupKey(out=f"{ref.name}__{attr}", var=ref.name, attr=attr)
    if ref.name in cq.aliases or ref.name == "evt":
        attr = ref.attr
        if attr not in EVENT_ATTRS:
            raise SaqlCompileError(f"cannot group by event attribute {attr!r}")
        return GroupKey(out=EVENT_ATTRS[attr], var=None, attr=attr)
    raise SaqlCompileError(f"unknown group-by reference {ref.name!r}")


def _agg_source(arg: ast.Expr | None, cq: CompiledQuery, pat_idx: int) -> str | None:
    """Column the aggregate reads in the matched-pattern frame: a
    ``var__{v}__{attr}`` column for entity refs, a physical event column
    for event attrs, None for bare ``count()``."""
    from .exprs import resolve_attr

    if arg is None:
        return None
    if not isinstance(arg, ast.Ref):
        raise SaqlCompileError("aggregate argument must be a simple reference")
    if arg.name in cq.vars:
        info = cq.vars[arg.name]
        attr = arg.attr or DEFAULT_ATTR[info.etype]
        resolve_attr(info.role_in(pat_idx), info.etype, attr)  # validates
        return f"var__{arg.name}__{attr}"
    if arg.name == "evt" or arg.name in cq.aliases:
        attr = arg.attr
        if attr not in EVENT_ATTRS:
            raise SaqlCompileError(f"unknown event attribute {attr!r}")
        return EVENT_ATTRS[attr]
    raise SaqlCompileError(f"unknown aggregate reference {arg.name!r}")


def compile_query(q: ast.Query, name: str = "query") -> CompiledQuery:
    """Validate the AST and produce a CompiledQuery."""
    for pat in q.patterns:
        if pat.subject.etype != OBJ_PROC:
            raise SaqlCompileError("event subjects must be processes")
        for op in pat.ops:
            if op not in OPERATIONS:
                raise SaqlCompileError(f"unknown operation {op!r}")
    vars = _collect_vars(q)
    aliases = _alias_list(q)
    cq = CompiledQuery(
        name=name, query=q, kind=q.kind, vars=vars, aliases=aliases, window=q.window
    )

    if q.temporal:
        for a in q.temporal:
            if a not in aliases:
                raise SaqlCompileError(f"temporal clause references unknown alias {a!r}")

    if q.state is not None:
        if len(q.patterns) != 1:
            raise SaqlCompileError(
                "stateful queries support exactly one event pattern"
            )
        if q.window is None:
            raise SaqlCompileError("stateful queries require a #time window")
        cq.state_name = q.state.name
        cq.history = max(1, q.state.history)
        cq.group_keys = [_group_key(r, cq) for r in q.state.group_by]
        names = set()
        for f in q.state.fields:
            if f.func not in AGG_FUNCS:
                raise SaqlCompileError(f"unknown aggregate function {f.func!r}")
            if f.name in names:
                raise SaqlCompileError(f"duplicate state field {f.name!r}")
            names.add(f.name)
            cq.state_aggs.append(
                StateAgg(name=f.name, func=f.func, source_col=_agg_source(f.arg, cq, 0))
            )
    else:
        for section, label in (
            (q.invariant, "invariant"),
            (q.cluster, "cluster"),
        ):
            if section is not None:
                raise SaqlCompileError(f"{label} requires a state block")

    if q.invariant is not None and q.invariant.train_windows < 1:
        raise SaqlCompileError("invariant needs at least one training window")
    if q.cluster is not None:
        if q.cluster.method != "DBSCAN":
            raise SaqlCompileError(
                f"unsupported clustering method {q.cluster.method!r}"
            )
        if len(q.cluster.method_args) != 2:
            raise SaqlCompileError("DBSCAN needs (eps, minPts)")
        if q.cluster.distance not in ("ed",):
            raise SaqlCompileError(f"unsupported distance {q.cluster.distance!r}")
        for p in q.cluster.points:
            if p.name != q.state.name:
                raise SaqlCompileError("cluster points must be state fields")
            cq.state_field(p.attr)  # validates existence

    if q.ret is None:
        raise SaqlCompileError("query has no return clause")
    # shared-variable identity attrs exist for all shared vars
    for v, info in vars.items():
        if len({i for i, _ in info.slots}) > 1:
            IDENTITY_ATTRS[info.etype]  # noqa: B018 — KeyError would be a bug
    return cq

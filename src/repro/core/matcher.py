"""Multi-event matcher: SAQL event patterns -> Catalyst plan.

Each event pattern becomes a filtered projection of the event stream;
a multi-event query (``with evt1 -> evt2 -> ...``) becomes a join chain
where the join keys are (a) the host — attack steps are host-local, so
all events of one rule match share ``agentid`` (DESIGN.md §2) — and
(b) the identity attributes of every shared entity variable (``f1`` in
Query 1 joins evt2 and evt3 on the file name; ``p4`` joins evt3 and
evt4 on (pid, exe_name)). The temporal order compiles to timestamp
inequalities with the event id as tiebreak.
"""
from __future__ import annotations

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

from ..saql import ast
from .compiler import CompiledQuery
from .exprs import constraint_predicate, resolve_attr
from .schema import DEFAULT_ATTR, IDENTITY_ATTRS, OBJECT_ATTRS, SUBJECT_ATTRS

# Per-alias event-level columns carried through the join for temporal
# predicates and return items.
_ALIAS_EVENT_COLS = ["eid", "ts", "op", "amount"]


def var_col(var: str, attr: str) -> str:
    """Canonical column name for a pattern variable attribute."""
    return f"var__{var}__{attr}"


def alias_col(alias: str, col: str) -> str:
    return f"{alias}__{col}"


def global_filter(events: DataFrame, globals_: list[ast.GlobalConstraint]) -> DataFrame:
    """Apply query-wide constraints (e.g. ``agentid = "db-01"``)."""
    for g in globals_:
        events = events.filter(constraint_predicate(F.col(g.attr), g.op, g.value))
    return events


def _entity_attrs(role: str, etype: str) -> dict[str, str]:
    return dict(SUBJECT_ATTRS) if role == "subject" else dict(OBJECT_ATTRS[etype])


def pattern_frame(events: DataFrame, cq: CompiledQuery, pat_idx: int) -> DataFrame:
    """Filter + project the stream for one event pattern.

    Output columns: ``{alias}__{eid,ts,op,amount}``, ``{alias}__agentid``,
    and ``var__{v}__{attr}`` for each variable bound in this pattern.
    """
    pat = cq.query.patterns[pat_idx]
    alias = cq.aliases[pat_idx]
    cond = F.col("op").isin(pat.ops) & (F.col("obj_type") == pat.obj.etype)
    for decl, role in ((pat.subject, "subject"), (pat.obj, "object")):
        for c in decl.constraints:
            attr = c.attr or DEFAULT_ATTR[decl.etype]
            col = F.col(resolve_attr(role, decl.etype, attr))
            cond = cond & constraint_predicate(col, c.op, c.value)
    out = [
        *[F.col(c).alias(alias_col(alias, c)) for c in _ALIAS_EVENT_COLS],
        F.col("agentid").alias(alias_col(alias, "agentid")),
    ]
    emitted: set[str] = set()
    for decl, role in ((pat.subject, "subject"), (pat.obj, "object")):
        for attr, phys in _entity_attrs(role, decl.etype).items():
            name = var_col(decl.var, attr)
            if name not in emitted:
                emitted.add(name)
                out.append(F.col(phys).alias(name))
    return events.filter(cond).select(*out)


def _shared_join_cols(
    cq: CompiledQuery, pat_idx: int, seen_vars: set[str]
) -> list[str]:
    """var__ columns that must match between the accumulated result and
    pattern ``pat_idx`` (shared entity variables)."""
    pat = cq.query.patterns[pat_idx]
    cols: list[str] = []
    for decl in (pat.subject, pat.obj):
        if decl.var in seen_vars:
            for attr in IDENTITY_ATTRS[decl.etype]:
                cols.append(var_col(decl.var, attr))
    return cols


def match_patterns(events: DataFrame, cq: CompiledQuery) -> DataFrame:
    """Match all patterns and return the joined match relation."""
    events = global_filter(events, cq.query.globals)
    acc = pattern_frame(events, cq, 0)
    seen_vars = {cq.query.patterns[0].subject.var, cq.query.patterns[0].obj.var}
    first_alias = cq.aliases[0]
    for i in range(1, len(cq.query.patterns)):
        right = pattern_frame(events, cq, i)
        alias = cq.aliases[i]
        shared = _shared_join_cols(cq, i, seen_vars)
        # Rename the right side's shared var__ columns so the equality
        # condition is explicit and no ambiguous names survive the join.
        for c in set(shared) & set(acc.columns):
            right = right.withColumnRenamed(c, f"__r_{c}")
        cond: Column = F.col(alias_col(first_alias, "agentid")) == F.col(
            alias_col(alias, "agentid")
        )
        for c in shared:
            if f"__r_{c}" in right.columns:
                cond = cond & (F.col(c) == F.col(f"__r_{c}"))
        for prev_alias in cq.aliases[:i]:
            cond = cond & (
                F.col(alias_col(prev_alias, "eid")) != F.col(alias_col(alias, "eid"))
            )
        acc = acc.join(right, cond, "inner")
        acc = acc.drop(*[f"__r_{c}" for c in shared if f"__r_{c}" in acc.columns])
        seen_vars |= {cq.query.patterns[i].subject.var, cq.query.patterns[i].obj.var}

    # Temporal order: consecutive aliases ordered by (ts, eid).
    for a, b in zip(cq.query.temporal, cq.query.temporal[1:]):
        ta, tb = F.col(alias_col(a, "ts")), F.col(alias_col(b, "ts"))
        ea, eb = F.col(alias_col(a, "eid")), F.col(alias_col(b, "eid"))
        acc = acc.filter((ta < tb) | ((ta == tb) & (ea < eb)))

    # A windowed rule query matches within one (tumbling) window. Spark
    # forbids multiple window() expressions in one plan, so the window id
    # is epoch-aligned floor arithmetic (identical assignment).
    if cq.window is not None and not cq.is_stateful:
        length = int(cq.window.length_s)

        def wid(alias: str) -> Column:
            return F.floor(
                F.unix_timestamp(F.col(alias_col(alias, "ts"))) / F.lit(length)
            )

        first = wid(cq.aliases[0])
        for alias in cq.aliases[1:]:
            acc = acc.filter(wid(alias) == first)
    return acc


def rule_alerts(matched: DataFrame, cq: CompiledQuery) -> DataFrame:
    """Project a rule-query match relation to the alert rows the query
    returns: the requested attributes, plus ``alert_ts`` (time of the
    last event of the match — when detection can fire) and ``agentid``.
    """
    from ..saql.errors import SaqlCompileError

    items = []
    for idx, item in enumerate(cq.query.ret.items):
        e = item.expr
        if not isinstance(e, ast.Ref):
            raise SaqlCompileError("rule-query return items must be references")
        if e.name in cq.vars:
            info = cq.vars[e.name]
            attr = e.attr or DEFAULT_ATTR[info.etype]
            col = F.col(var_col(e.name, attr))
            name = item.alias or f"{e.name}_{attr}"
        elif e.name in cq.aliases:
            col = F.col(alias_col(e.name, e.attr or "eid"))
            name = item.alias or f"{e.name}_{e.attr or 'eid'}"
        else:
            raise SaqlCompileError(f"unknown return reference {e.name!r}")
        items.append(col.alias(name))
    alert_ts = F.greatest(
        *[F.col(alias_col(a, "ts")) for a in cq.aliases]
    ) if len(cq.aliases) > 1 else F.col(alias_col(cq.aliases[0], "ts"))
    out = matched.select(
        alert_ts.alias("alert_ts"),
        F.col(alias_col(cq.aliases[0], "agentid")).alias("agentid"),
        *items,
    )
    return out.distinct() if cq.query.ret.distinct else out

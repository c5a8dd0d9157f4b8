"""Concurrent query scheduler — the master-dependent-query scheme.

Paper §II-C: concurrent queries are divided into groups by semantic
compatibility; each group has one *master* query with direct access to
the stream and several *dependent* queries that execute against the
master's intermediate results, so a group shares a single copy of the
stream data instead of one copy per query.

Compatibility here (a reproduction-scoped but faithful criterion):
stateful queries sharing the identical event-pattern predicate (type,
operations, constraints), global constraints, window spec, group-by
keys, and whose state fields are a subset of the group's union. The
master computes the union state table once (one Catalyst scan +
aggregation of the stream); every member then runs only its model
stages (history/invariant/cluster/alert/return) on that cached table.
Rule-based queries keep direct stream access (their match relations are
query-specific joins), one group each.

``run_concurrent`` is instrumented — stream scans, state rows reused —
so benchmark T3 can compare against independent execution.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import DataFrame

from ..saql import ast
from .compiler import CompiledQuery
from .engine import run_batch, stream_t0
from .models import evaluate_states
from .state import state_table


def _pattern_sig(p: ast.EventPattern) -> tuple:
    def ent(e: ast.EntityDecl) -> tuple:
        return (
            e.etype,
            e.var,
            tuple(sorted((c.attr or "", c.op, str(c.value)) for c in e.constraints)),
        )

    return (ent(p.subject), tuple(sorted(p.ops)), ent(p.obj))


def compat_key(cq: CompiledQuery) -> tuple | None:
    """Grouping key; None means the query cannot share (rule queries)."""
    if not cq.is_stateful:
        return None
    q = cq.query
    return (
        tuple(sorted((g.attr, g.op, str(g.value)) for g in q.globals)),
        _pattern_sig(q.patterns[0]),
        (cq.window.length_s, cq.window.slide_s),
        tuple(gk.out for gk in cq.group_keys),
    )


@dataclass
class QueryGroup:
    """One scheduling group: the master executes the stream scan, the
    dependents reuse its state table."""

    master: CompiledQuery
    dependents: list[CompiledQuery] = field(default_factory=list)

    @property
    def members(self) -> list[CompiledQuery]:
        return [self.master, *self.dependents]


def group_queries(queries: list[CompiledQuery]) -> list[QueryGroup]:
    """Partition queries into master-dependent groups.

    Within a compatible set, the master is the member whose state fields
    cover the union of everyone's aggregations (ties: most fields, then
    first); members whose fields are not covered by the elected master
    fall back to their own group (correctness first, sharing second).
    """
    by_key: dict = {}
    groups: list[QueryGroup] = []
    for cq in queries:
        key = compat_key(cq)
        if key is None:
            groups.append(QueryGroup(master=cq))
        else:
            by_key.setdefault(key, []).append(cq)
    for members in by_key.values():
        members = sorted(
            members, key=lambda c: (-len(c.state_aggs), queries.index(c))
        )
        master = members[0]
        master_fields = {(a.name, a.func, a.source_col) for a in master.state_aggs}
        grp = QueryGroup(master=master)
        for cq in members[1:]:
            fields = {(a.name, a.func, a.source_col) for a in cq.state_aggs}
            if fields <= master_fields:
                grp.dependents.append(cq)
            else:
                groups.append(QueryGroup(master=cq))
        groups.append(grp)
    return groups


@dataclass
class ScheduleMetrics:
    """Instrumentation for benchmark T3."""

    n_queries: int = 0
    n_groups: int = 0
    stream_scans: int = 0  # = data copies of the stream made
    shared_state_rows: int = 0  # state rows dependents reused


def run_concurrent(
    events: DataFrame, queries: list[CompiledQuery]
) -> tuple[dict[str, pd.DataFrame], ScheduleMetrics]:
    """Execute all queries under the master-dependent scheme.

    Returns (alerts by query name, metrics). Alert outputs are
    identical to independent ``run_batch`` execution — asserted by
    tests — only the number of stream scans changes.
    """
    groups = group_queries(queries)
    t0 = stream_t0(events)
    metrics = ScheduleMetrics(n_queries=len(queries), n_groups=len(groups))
    results: dict[str, pd.DataFrame] = {}
    for grp in groups:
        if not grp.master.is_stateful:
            metrics.stream_scans += 1
            results[grp.master.name] = run_batch(events, grp.master, t0=t0)
            continue
        metrics.stream_scans += 1
        states = state_table(events, grp.master).toPandas()
        for member in grp.members:
            cols = ["window_start", "window_end"] + [
                gk.out for gk in member.group_keys
            ] + [a.name for a in member.state_aggs]
            member_states = states[cols]
            if member is not grp.master:
                metrics.shared_state_rows += len(member_states)
            results[member.name] = evaluate_states(member_states, member, t0)
    return results, metrics


def run_independent(
    events: DataFrame, queries: list[CompiledQuery]
) -> tuple[dict[str, pd.DataFrame], ScheduleMetrics]:
    """Baseline: every query scans its own copy of the stream (what the
    paper says existing stream systems must do for concurrent queries)."""
    t0 = stream_t0(events)
    metrics = ScheduleMetrics(
        n_queries=len(queries), n_groups=len(queries), stream_scans=len(queries)
    )
    return {cq.name: run_batch(events, cq, t0=t0) for cq in queries}, metrics

"""State maintainer: per-window stateful computation (Spark side).

Compiles a query's ``state { f := agg(...) } group by ...`` block to a
Catalyst aggregation over the matched single-pattern stream: one output
row per (window, group) carrying the state fields. This is the table
the anomaly models (time-series history, invariant, clustering) then
evaluate — it is O(windows x groups), tiny next to the event stream.
"""
from __future__ import annotations

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

from ..saql.errors import SaqlCompileError
from .compiler import CompiledQuery, StateAgg
from .matcher import global_filter, pattern_frame, var_col
from .windows import spark_window


def _agg_expr(agg: StateAgg) -> Column:
    src = F.col(agg.source_col) if agg.source_col else None
    if agg.func == "avg":
        return F.avg(src)
    if agg.func == "sum":
        return F.sum(src)
    if agg.func == "count":
        return F.count(src if src is not None else F.lit(1))
    if agg.func == "min":
        return F.min(src)
    if agg.func == "max":
        return F.max(src)
    if agg.func == "set":
        return F.collect_set(src)
    if agg.func == "distinct_count":
        return F.count_distinct(src)
    raise SaqlCompileError(f"unknown aggregate {agg.func!r}")


def state_table(events: DataFrame, cq: CompiledQuery) -> DataFrame:
    """Events -> per-(window, group) state rows.

    Columns: window_start, window_end, one per group key (canonical
    ``var__attr`` name), one per state field.
    """
    if not cq.is_stateful:
        raise SaqlCompileError("state_table called on a non-stateful query")
    filtered = pattern_frame(global_filter(events, cq.query.globals), cq, 0)
    alias = cq.aliases[0]
    # pattern_frame prefixes event cols with the alias; restore the
    # physical names the aggregates/groups reference.
    renames = {f"{alias}__{c}": c for c in ("eid", "ts", "op", "amount", "agentid")}
    for old, new in renames.items():
        filtered = filtered.withColumnRenamed(old, new)
    # Aggregate arguments referencing entity attributes resolve to the
    # var__ columns emitted by pattern_frame.
    win = spark_window(F.col("ts"), cq.window)
    group_cols = []
    for gk in cq.group_keys:
        col = F.col(gk.out) if gk.var is None else F.col(var_col(gk.var, gk.attr))
        group_cols.append(col.alias(gk.out))
    aggs = []
    for agg in cq.state_aggs:
        if agg.source_col is not None and agg.source_col not in filtered.columns:
            raise SaqlCompileError(
                f"aggregate source {agg.source_col!r} not found in pattern frame"
            )
        aggs.append(_agg_expr(agg).alias(agg.name))
    out = (
        filtered.groupBy(win.alias("w"), *group_cols)
        .agg(*aggs)
        .select(
            F.col("w.start").alias("window_start"),
            F.col("w.end").alias("window_end"),
            *[F.col(gk.out) for gk in cq.group_keys],
            *[F.col(a.name) for a in cq.state_aggs],
        )
    )
    return out

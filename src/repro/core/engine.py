"""Batch anomaly query engine: events DataFrame -> alert rows.

The batch engine executes a CompiledQuery over a bounded event
DataFrame (a replayed stream, a test fixture, one micro-batch window).
The event-scale stages (pattern matching, multi-event joins, window
aggregation) are Catalyst; the per-window model evaluation runs on the
aggregated state table (see DESIGN.md §2). The streaming executor
(``repro.stream.executor``) reuses exactly these pieces incrementally.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from ..saql.errors import SaqlCompileError
from .compiler import CompiledQuery
from .matcher import match_patterns, rule_alerts
from .models import evaluate_states
from .state import state_table


def stream_t0(events: DataFrame) -> pd.Timestamp:
    """First event time of the stream — origin for window indexing."""
    row = events.agg(F.min("ts").alias("t0")).collect()[0]
    if row["t0"] is None:
        raise SaqlCompileError("empty event stream")
    return pd.Timestamp(row["t0"])


def matched_frame(events: DataFrame, cq: CompiledQuery) -> DataFrame:
    """The rule-query match relation (Spark) — exposed for tests/oracle."""
    return match_patterns(events, cq)


def states_frame(events: DataFrame, cq: CompiledQuery) -> DataFrame:
    """The per-(window, group) state table (Spark) — for tests/oracle."""
    return state_table(events, cq)


def run_batch(
    events: DataFrame, cq: CompiledQuery, t0: pd.Timestamp | None = None
) -> pd.DataFrame:
    """Execute a compiled query over a bounded stream; returns the alert
    rows as pandas (tiny). ``t0`` overrides the stream origin (the
    streaming executor passes the true stream start when evaluating a
    suffix of the stream)."""
    if cq.is_stateful:
        if t0 is None:
            t0 = stream_t0(events)
        states = state_table(events, cq).toPandas()
        return evaluate_states(states, cq, t0)
    alerts = rule_alerts(match_patterns(events, cq), cq)
    pdf = alerts.toPandas()
    return pdf.sort_values(list(pdf.columns), kind="stable").reset_index(drop=True)


def alerts_to_spark(spark: SparkSession, alerts: pd.DataFrame) -> DataFrame:
    """Alert rows as a Spark DataFrame (set values become sorted arrays).

    Only valid for non-empty frames — Spark cannot infer a schema from
    an empty object-dtype frame.
    """
    pdf = alerts.copy()
    for c in pdf.columns:
        if pdf[c].map(lambda v: isinstance(v, frozenset)).any():
            pdf[c] = pdf[c].map(
                lambda v: sorted(v) if isinstance(v, frozenset) else v
            )
    return spark.createDataFrame(pdf)

"""Incremental streaming executor — the engine's state maintainer.

Executes compiled SAQL queries over micro-batches, reusing the exact
batch-engine stages (Catalyst pattern matching / window aggregation,
pandas model evaluation), so streaming output is bit-identical to batch
output on the same data — asserted by the parity tests.

Per stateful query it maintains: a pending-event buffer (events whose
windows have not all closed under the watermark), the state-row history
needed for ``ss[k]``, and the learned invariant. Per rule query it
keeps a bounded time-horizon buffer and an emitted-alert dedup set.
Windows close when the watermark (max event time seen minus allowed
lateness) passes their end — detection latency is therefore one window
plus batch interval, the paper's real-time granularity.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import SparkSession

from ..core.compiler import CompiledQuery
from ..core.matcher import match_patterns, rule_alerts
from ..core.models import evaluate_states
from ..core.schema import empty_events_pdf, to_spark
from ..core.state import state_table
from ..core.windows import floor_window_start
from ..saql.errors import SaqlCompileError


def _empty_alerts(cq: CompiledQuery) -> pd.DataFrame:
    cols = ["alert_ts"]
    if cq.is_stateful:
        cols.append("window_start")
    else:
        cols.append("agentid")
    for i, item in enumerate(cq.query.ret.items):
        from ..core.models import _return_name

        cols.append(_return_name(item, i, cq))
    # rule-query return names come from the matcher; keep best effort —
    # only used when a query never produced an alert.
    return pd.DataFrame({c: pd.Series(dtype="object") for c in dict.fromkeys(cols)})


@dataclass
class _StatefulRuntime:
    cq: CompiledQuery
    pending: pd.DataFrame = field(default_factory=empty_events_pdf)
    history: pd.DataFrame | None = None  # state rows of recent windows
    invariant: dict = field(default_factory=dict)
    trained_upto: int = 0  # training windows folded so far
    last_closed_start: pd.Timestamp | None = None


@dataclass
class _RuleRuntime:
    cq: CompiledQuery
    buffer: pd.DataFrame = field(default_factory=empty_events_pdf)
    emitted: set = field(default_factory=set)


class StreamExecutor:
    """Micro-batch execution of a set of compiled queries."""

    def __init__(
        self,
        spark: SparkSession,
        queries: list[CompiledQuery],
        *,
        allowed_lateness_s: float = 0.0,
        pattern_horizon_s: float = 600.0,
    ):
        for cq in queries:
            if cq.query.invariant is not None and cq.query.invariant.mode != "offline":
                raise SaqlCompileError(
                    "streaming executor supports offline invariants only"
                )
        self.spark = spark
        self.lateness = pd.Timedelta(seconds=allowed_lateness_s)
        self.horizon = pd.Timedelta(seconds=pattern_horizon_s)
        self.t0: pd.Timestamp | None = None
        self.max_ts: pd.Timestamp | None = None
        self._stateful = [
            _StatefulRuntime(cq) for cq in queries if cq.is_stateful
        ]
        self._rules = [_RuleRuntime(cq) for cq in queries if not cq.is_stateful]
        self._alerts: dict[str, list[pd.DataFrame]] = {
            cq.name: [] for cq in queries
        }

    # ----------------------------------------------------------- plumbing
    @property
    def queries(self) -> list[CompiledQuery]:
        return [rt.cq for rt in self._stateful] + [rt.cq for rt in self._rules]

    def alerts(self, name: str) -> pd.DataFrame:
        """All alerts emitted so far for a query."""
        parts = [p for p in self._alerts[name] if not p.empty]
        cq = next(c for c in self.queries if c.name == name)
        if not parts:
            return _empty_alerts(cq)
        return pd.concat(parts, ignore_index=True)

    def _watermark(self) -> pd.Timestamp | None:
        if self.max_ts is None:
            return None
        return self.max_ts - self.lateness

    # -------------------------------------------------------------- steps
    def process_batch(self, batch: pd.DataFrame) -> dict[str, pd.DataFrame]:
        """Ingest one micro-batch; returns the alerts it triggered."""
        if not batch.empty:
            if self.t0 is None:
                self.t0 = pd.Timestamp(batch["ts"].min())
            mx = pd.Timestamp(batch["ts"].max())
            self.max_ts = mx if self.max_ts is None else max(self.max_ts, mx)
        out: dict[str, pd.DataFrame] = {}
        wm = self._watermark()
        for rt in self._stateful:
            new = self._advance_stateful(rt, batch, wm)
            if new is not None and not new.empty:
                self._alerts[rt.cq.name].append(new)
                out[rt.cq.name] = new
        for rt in self._rules:
            new = self._advance_rule(rt, batch, wm)
            if new is not None and not new.empty:
                self._alerts[rt.cq.name].append(new)
                out[rt.cq.name] = new
        return out

    def finalize(self) -> dict[str, pd.DataFrame]:
        """End of stream: close every remaining window."""
        if self.max_ts is None:
            return {}
        flush_wm = self.max_ts + pd.Timedelta(
            seconds=max(q.window.length_s for q in self.queries if q.window)
            if any(q.window for q in self.queries)
            else 1.0
        ) + pd.Timedelta(seconds=1)
        out: dict[str, pd.DataFrame] = {}
        for rt in self._stateful:
            new = self._advance_stateful(rt, empty_events_pdf(), flush_wm)
            if new is not None and not new.empty:
                self._alerts[rt.cq.name].append(new)
                out[rt.cq.name] = new
        return out

    # ---------------------------------------------------------- stateful
    def _advance_stateful(
        self, rt: _StatefulRuntime, batch: pd.DataFrame, wm: pd.Timestamp | None
    ) -> pd.DataFrame | None:
        cq = rt.cq
        if not batch.empty:
            rt.pending = (
                batch.copy()
                if rt.pending.empty
                else pd.concat([rt.pending, batch], ignore_index=True)
            )
        if wm is None or rt.pending.empty:
            return None
        spec = cq.window
        # Windows are closed once wm >= window_end. The newest closed
        # window start on the slide grid:
        newest_closed = floor_window_start(
            wm - pd.Timedelta(seconds=spec.length_s), spec
        )
        if newest_closed + pd.Timedelta(seconds=spec.length_s) > wm:
            newest_closed -= pd.Timedelta(seconds=spec.slide_s)
        if rt.last_closed_start is not None and newest_closed <= rt.last_closed_start:
            return None
        close_upto_ts = newest_closed + pd.Timedelta(seconds=spec.length_s)
        closable = rt.pending[rt.pending["ts"] < close_upto_ts]
        new_states = None
        if not closable.empty:
            sdf = to_spark(self.spark, closable)
            states = state_table(sdf, cq).toPandas()
            states["window_start"] = pd.to_datetime(states["window_start"])
            lo = rt.last_closed_start
            mask = states["window_start"] <= newest_closed
            if lo is not None:
                mask &= states["window_start"] > lo
            new_states = states[mask]
        rt.last_closed_start = newest_closed
        # Retain only events that can still contribute to an open window.
        keep_from = close_upto_ts - pd.Timedelta(
            seconds=max(0.0, spec.length_s - spec.slide_s)
        )
        rt.pending = rt.pending[rt.pending["ts"] >= keep_from].reset_index(drop=True)
        if new_states is None or new_states.empty:
            return None
        return self._emit_states(rt, new_states)

    def _emit_states(
        self, rt: _StatefulRuntime, new_states: pd.DataFrame
    ) -> pd.DataFrame:
        cq = rt.cq
        from ..core.models import (
            _apply_update,
            _init_value,
            normalize_states,
        )
        from ..core.windows import window_index

        new_states = normalize_states(new_states, cq)
        inv = cq.query.invariant
        if inv is not None:
            idx = window_index(new_states["window_start"], self.t0, cq.window)
            train_mask = idx < inv.train_windows
            init = _init_value(cq)
            train_rows = new_states[train_mask]
            order = train_rows.sort_values("window_start", kind="stable").index
            for i in order:
                row = new_states.loc[i]
                g = tuple(row[gk.out] for gk in cq.group_keys)
                rt.invariant[g] = _apply_update(rt.invariant.get(g, init), row, cq)
        combined = (
            new_states
            if rt.history is None or rt.history.empty
            else pd.concat([rt.history, new_states], ignore_index=True)
        )
        alerts = evaluate_states(
            combined,
            cq,
            self.t0,
            pretrained_invariant=rt.invariant if inv is not None else None,
        )
        new_windows = set(new_states["window_start"])
        alerts = alerts[alerts["window_start"].isin(new_windows)].reset_index(
            drop=True
        )
        # History retention: the last (history-1) slide steps.
        if cq.history > 1:
            horizon = new_states["window_start"].max() - pd.Timedelta(
                seconds=(cq.history - 1) * cq.window.slide_s
            )
            rt.history = combined[combined["window_start"] > horizon].reset_index(
                drop=True
            )
        else:
            rt.history = None
        return alerts

    # -------------------------------------------------------------- rules
    def _advance_rule(
        self, rt: _RuleRuntime, batch: pd.DataFrame, wm: pd.Timestamp | None
    ) -> pd.DataFrame | None:
        if not batch.empty:
            rt.buffer = (
                batch.copy()
                if rt.buffer.empty
                else pd.concat([rt.buffer, batch], ignore_index=True)
            )
        if rt.buffer.empty:
            return None
        if wm is not None:
            horizon = (
                pd.Timedelta(seconds=rt.cq.window.length_s)
                if rt.cq.window is not None
                else self.horizon
            )
            rt.buffer = rt.buffer[rt.buffer["ts"] >= wm - horizon].reset_index(
                drop=True
            )
        if batch.empty:
            return None
        sdf = to_spark(self.spark, rt.buffer)
        alerts = rule_alerts(match_patterns(sdf, rt.cq), rt.cq).toPandas()
        if alerts.empty:
            return None
        keys = alerts.apply(lambda r: tuple(map(str, r.values)), axis=1)
        fresh = alerts[[k not in rt.emitted for k in keys]]
        rt.emitted.update(keys)
        return fresh.reset_index(drop=True)

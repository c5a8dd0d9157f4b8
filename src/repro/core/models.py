"""Anomaly-model evaluation over the per-window state table.

The state table (one row per window x group, produced by
``state.state_table`` in Spark) is tiny — O(groups), not O(events) — so
the model stages run in pandas on the driver and are shared verbatim by
the batch engine and the streaming executor (DESIGN.md §2):

- ``attach_history``  — ``ss[k]`` lag columns aligned to the window
  grid (a group with no events in window t-k gets the empty state:
  0.0 / empty set);
- ``attach_invariant`` — offline/online invariant training over the
  first N stream windows and the per-group invariant value column;
- ``attach_cluster``  — per-window DBSCAN over the groups' state
  points (``cluster.outlier``);
- ``apply_alert`` / ``project_return`` — alert predicate and return
  projection via the shared expression evaluator.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from ..clustering.dbscan import dbscan
from ..saql import ast
from ..saql.errors import SaqlCompileError
from .compiler import CompiledQuery
from .exprs import eval_expr
from .schema import DEFAULT_ATTR
from .windows import window_index

INVARIANT_COL = "__invariant"
DETECT_COL = "__detect"


def normalize_states(states_pdf: pd.DataFrame, cq: CompiledQuery) -> pd.DataFrame:
    """Canonicalise a state table fresh out of Spark: set-valued fields
    become frozensets, timestamps become pandas Timestamps, and rows are
    ordered by (window_start, group keys) for deterministic evaluation."""
    pdf = states_pdf.copy()
    for col in ("window_start", "window_end"):
        pdf[col] = pd.to_datetime(pdf[col])
    for agg in cq.state_aggs:
        if agg.is_set:
            pdf[agg.name] = pdf[agg.name].map(
                lambda v: frozenset() if v is None else frozenset(v)
            )
    keys = ["window_start"] + [gk.out for gk in cq.group_keys]
    return pdf.sort_values(keys, kind="stable").reset_index(drop=True)


def _group_tuple_series(pdf: pd.DataFrame, cq: CompiledQuery) -> pd.Series:
    cols = [gk.out for gk in cq.group_keys]
    return pd.Series(list(zip(*[pdf[c] for c in cols])), index=pdf.index)


def attach_history(pdf: pd.DataFrame, cq: CompiledQuery) -> pd.DataFrame:
    """Add ``{field}__lag{k}`` columns for k = 1..history-1.

    ``ss[k]`` addresses the state of the window exactly k slides earlier
    for the same group; a missing (group, window) pair yields the empty
    state (0.0 for numeric aggregates, the empty set for ``set``).
    """
    if cq.history <= 1 or pdf.empty:
        for k in range(1, cq.history):
            for agg in cq.state_aggs:
                pdf[f"{agg.name}__lag{k}"] = pd.Series(dtype="object")
        return pdf
    slide = pd.Timedelta(seconds=cq.window.slide_s)
    gt = _group_tuple_series(pdf, cq)
    lookup = {
        (g, w): i
        for i, (g, w) in enumerate(zip(gt, pdf["window_start"]))
    }
    for k in range(1, cq.history):
        rows = [
            lookup.get((g, w - k * slide))
            for g, w in zip(gt, pdf["window_start"])
        ]
        for agg in cq.state_aggs:
            vals = [
                agg.default if r is None else pdf[agg.name].iat[r] for r in rows
            ]
            pdf[f"{agg.name}__lag{k}"] = pd.Series(vals, index=pdf.index, dtype="object")
            if not agg.is_set:
                pdf[f"{agg.name}__lag{k}"] = pd.to_numeric(pdf[f"{agg.name}__lag{k}"])
    return pdf


def _init_value(cq: CompiledQuery):
    init = cq.query.invariant.init
    if isinstance(init, ast.Ref) and init.name == "empty_set":
        return frozenset()
    if isinstance(init, ast.Literal):
        return init.value
    raise SaqlCompileError("invariant init must be empty_set or a literal")


def _apply_update(value, row: pd.Series, cq: CompiledQuery):
    """One invariant update step: evaluate the update expression with the
    invariant variable bound to its current value and state refs bound
    to this training row."""
    inv = cq.query.invariant

    def env(ref: ast.Ref):
        if ref.name == inv.var and ref.attr is None:
            return value
        if ref.name == "empty_set":
            return frozenset()
        return _state_ref(ref, row, cq)

    return eval_expr(inv.update, env, 1, pd.RangeIndex(1))


def attach_invariant(
    pdf: pd.DataFrame,
    cq: CompiledQuery,
    t0: pd.Timestamp,
    pretrained: dict | None = None,
) -> tuple[pd.DataFrame, dict]:
    """Add the invariant value column and the detection mask.

    Offline mode: the invariant is folded over state rows in the first
    ``N`` stream windows (global index < N, counted from the stream
    start ``t0``), then frozen; rows in those windows are training rows
    (not alerted on). Online mode keeps updating after training.
    ``pretrained`` (streaming executor) short-circuits training.
    Returns (pdf, trained) where trained maps group tuple -> value.
    """
    inv = cq.query.invariant
    pdf = pdf.copy()
    if inv is None:
        pdf[DETECT_COL] = True
        return pdf, {}
    init = _init_value(cq)
    idx = window_index(pdf["window_start"], t0, cq.window) if len(pdf) else pd.Series(dtype="int64")
    gt = _group_tuple_series(pdf, cq)
    trained: dict = dict(pretrained) if pretrained else {}
    if pretrained is None:
        order = np.argsort(idx.to_numpy(), kind="stable")
        for i in order:
            if idx.iat[i] >= inv.train_windows:
                continue
            g = gt.iat[i]
            trained[g] = _apply_update(trained.get(g, init), pdf.iloc[i], cq)
    values = []
    detect = []
    if inv.mode == "online":
        # Fold in stream order; each detection row sees the invariant
        # built from all *earlier* windows, then contributes its own.
        online: dict = dict(trained)
        order = np.argsort(idx.to_numpy(), kind="stable")
        values = [None] * len(pdf)
        detect = [False] * len(pdf)
        for i in order:
            g = gt.iat[i]
            if idx.iat[i] < inv.train_windows:
                values[i] = online.get(g, init)
                detect[i] = False
            else:
                values[i] = online.get(g, init)
                detect[i] = True
                online[g] = _apply_update(online.get(g, init), pdf.iloc[i], cq)
    else:
        for i in range(len(pdf)):
            g = gt.iat[i]
            values.append(trained.get(g, init))
            detect.append(idx.iat[i] >= inv.train_windows)
    pdf[INVARIANT_COL] = pd.Series(values, index=pdf.index, dtype="object")
    pdf[DETECT_COL] = pd.Series(detect, index=pdf.index, dtype="bool")
    return pdf, trained


def attach_cluster(pdf: pd.DataFrame, cq: CompiledQuery) -> pd.DataFrame:
    """Per-window DBSCAN over the groups' state points."""
    cl = cq.query.cluster
    pdf = pdf.copy()
    if cl is None:
        return pdf
    eps, min_pts = cl.method_args
    point_cols = [p.attr for p in cl.points]
    pdf["cluster__id"] = -1
    pdf["cluster__outlier"] = False
    for _, widx in pdf.groupby("window_start").groups.items():
        pts = pdf.loc[widx, point_cols].to_numpy(dtype="float64")
        labels = dbscan(pts, eps, int(min_pts))
        pdf.loc[widx, "cluster__id"] = labels
        pdf.loc[widx, "cluster__outlier"] = labels == -1
    return pdf


def _state_ref(ref: ast.Ref, row_or_pdf, cq: CompiledQuery):
    """Resolve a Ref against a state row (Series) or table (DataFrame)."""
    def col(name: str):
        if isinstance(row_or_pdf, pd.Series):
            return row_or_pdf[name]
        return row_or_pdf[name]

    if ref.name == cq.state_name:
        if ref.attr is None:
            raise SaqlCompileError(f"{ref.name} reference needs a field")
        cq.state_field(ref.attr)
        k = ref.index or 0
        if k == 0:
            return col(ref.attr)
        if k >= cq.history:
            raise SaqlCompileError(
                f"{cq.state_name}[{k}] exceeds declared history {cq.history}"
            )
        return col(f"{ref.attr}__lag{k}")
    if ref.name == "cluster":
        if ref.attr not in ("outlier", "id"):
            raise SaqlCompileError(f"unknown cluster attribute {ref.attr!r}")
        return col(f"cluster__{ref.attr}")
    if cq.query.invariant is not None and ref.name == cq.query.invariant.var and ref.attr is None:
        return col(INVARIANT_COL)
    if ref.name == "empty_set":
        return frozenset()
    for gk in cq.group_keys:
        if gk.var == ref.name and (ref.attr or DEFAULT_ATTR[cq.vars[ref.name].etype]) == gk.attr:
            return col(gk.out)
        if gk.var is None and ref.attr == gk.attr:
            return col(gk.out)
    raise SaqlCompileError(f"unresolvable reference {ref!r} in state context")


def apply_alert(pdf: pd.DataFrame, cq: CompiledQuery) -> pd.DataFrame:
    """Filter state rows by the alert predicate (AND the detection mask)."""
    if pdf.empty:
        return pdf
    alert = cq.query.alert
    mask = pd.Series(True, index=pdf.index)
    if DETECT_COL in pdf.columns:
        mask &= pdf[DETECT_COL]
    if alert is not None:
        v = eval_expr(alert, lambda r: _state_ref(r, pdf, cq), len(pdf), pdf.index)
        if not isinstance(v, pd.Series):
            v = pd.Series(bool(v), index=pdf.index)
        mask &= v.fillna(False).astype(bool)
    return pdf[mask]


def _return_name(item: ast.ReturnItem, i: int, cq: CompiledQuery) -> str:
    if item.alias:
        return item.alias
    e = item.expr
    if isinstance(e, ast.Ref):
        if e.name == cq.state_name and e.attr:
            k = e.index or 0
            return e.attr if k == 0 else f"{e.attr}_{k}"
        if e.name in cq.vars:
            return f"{e.name}_{e.attr or DEFAULT_ATTR[cq.vars[e.name].etype]}"
        if e.attr:
            return f"{e.name}_{e.attr}"
        return e.name
    return f"expr{i}"


def project_return(pdf: pd.DataFrame, cq: CompiledQuery) -> pd.DataFrame:
    """Evaluate the return items; prepend alert provenance columns
    (window_start / alert_ts = window_end — a window's alert fires when
    the window closes)."""
    out = pd.DataFrame(index=pdf.index)
    out["alert_ts"] = pdf["window_end"] if len(pdf) else pd.Series(dtype="datetime64[ns]")
    out["window_start"] = pdf["window_start"] if len(pdf) else pd.Series(dtype="datetime64[ns]")
    for i, item in enumerate(cq.query.ret.items):
        name = _return_name(item, i, cq)
        if pdf.empty:
            out[name] = pd.Series(dtype="object")
            continue
        v = eval_expr(
            item.expr, lambda r: _state_ref(r, pdf, cq), len(pdf), pdf.index
        )
        if not isinstance(v, pd.Series):
            v = pd.Series([v] * len(pdf), index=pdf.index)
        out[name] = v
    if cq.query.ret.distinct and not out.empty:
        hashable = out.map(lambda v: tuple(sorted(v)) if isinstance(v, frozenset) else v)
        out = out.loc[~hashable.duplicated()]
    return out.reset_index(drop=True)


def evaluate_states(
    states_pdf: pd.DataFrame,
    cq: CompiledQuery,
    t0: pd.Timestamp,
    pretrained_invariant: dict | None = None,
) -> pd.DataFrame:
    """Full post-state pipeline: history -> invariant -> cluster ->
    alert -> return. ``t0`` is the stream's first event time (window
    index origin for invariant training)."""
    pdf = normalize_states(states_pdf, cq)
    pdf = attach_history(pdf, cq)
    pdf, _ = attach_invariant(pdf, cq, t0, pretrained=pretrained_invariant)
    pdf = attach_cluster(pdf, cq)
    pdf = apply_alert(pdf, cq)
    return project_return(pdf, cq)

"""Sliding-window assignment over the event stream.

SAQL's ``#time(W)`` is a window of length W that slides by W (tumbling)
unless a slide is given: ``#time(W, S)``. Windows are epoch-aligned
exactly like Spark's ``window()`` function, which we use on the Spark
side; the pandas helpers here mirror that alignment bit-for-bit so the
streaming executor and the oracle tests agree with Catalyst.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import Column
from pyspark.sql import functions as F

from ..saql.ast import WindowSpec


def spark_window(ts_col: str | Column, spec: WindowSpec) -> Column:
    """Catalyst window struct for a spec (use ``.start`` / ``.end``)."""
    length = f"{int(spec.length_s)} seconds"
    if spec.slide_s == spec.length_s:
        return F.window(ts_col, length)
    return F.window(ts_col, length, f"{int(spec.slide_s)} seconds")


def window_starts(ts: pd.Series, spec: WindowSpec) -> list[pd.Series]:
    """All window start times each timestamp belongs to (pandas mirror
    of Spark's assignment; a tumbling window yields one list entry)."""
    epoch = pd.Timestamp("1970-01-01")
    secs = (pd.to_datetime(ts) - epoch).dt.total_seconds()
    n_overlap = max(1, int(round(spec.length_s / spec.slide_s)))
    out = []
    for k in range(n_overlap):
        # Spark: windowId = ceil((t - start_k) / slide); here: the k-th
        # covering window counted back from the latest one containing t.
        latest = (secs // spec.slide_s) * spec.slide_s
        start = latest - k * spec.slide_s
        valid = (secs >= start) & (secs < start + spec.length_s)
        s = epoch + pd.to_timedelta(start, unit="s")
        out.append(s.where(valid))
    return out


def window_index(window_start: pd.Series, t0: pd.Timestamp, spec: WindowSpec) -> pd.Series:
    """Global index of a window in the stream: 0 for the window that
    contains the stream's first event, counting in slide steps. Used by
    invariant training ("the first N windows")."""
    base = floor_window_start(t0, spec)
    delta = (pd.to_datetime(window_start) - base).dt.total_seconds()
    return (delta / spec.slide_s).round().astype("int64")


def floor_window_start(t: pd.Timestamp, spec: WindowSpec) -> pd.Timestamp:
    """Start of the latest window containing ``t`` (epoch-aligned)."""
    epoch = pd.Timestamp("1970-01-01")
    secs = (pd.Timestamp(t) - epoch).total_seconds()
    return epoch + pd.to_timedelta((secs // spec.slide_s) * spec.slide_s, unit="s")

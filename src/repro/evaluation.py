"""Scoring helpers for the reproduction tables (EXPERIMENTS.md).

``detection_table`` turns per-query alert frames into the T1 rows:
which attack step each query targets, whether it alerted, when, and
the detection lag relative to the step's start. The ground truth comes
from the attack injector, never from the engine.
"""
from __future__ import annotations

import pandas as pd

from .monitoring.attack import step_windows
from .queries.demo_queries import DEMO_QUERY_TARGETS


def detection_table(
    alerts_by_query: dict[str, pd.DataFrame],
    attack_start: str | pd.Timestamp,
    targets: dict[str, str] | None = None,
) -> pd.DataFrame:
    """One row per query: target step, #alerts, first alert time, lag.

    Lag is first_alert_ts - step_start; for windowed queries this
    includes the residence time until the window closes (the paper's
    detection granularity). Negative lags would indicate a false alert
    before the step — tests assert they don't happen.
    """
    targets = targets or DEMO_QUERY_TARGETS
    steps = step_windows(attack_start)
    rows = []
    for name, alerts in alerts_by_query.items():
        step = targets.get(name)
        n = len(alerts)
        first = pd.Timestamp(alerts["alert_ts"].min()) if n else pd.NaT
        lag = (
            (first - steps[step]).total_seconds()
            if n and step in steps
            else float("nan")
        )
        rows.append(
            {
                "query": name,
                "target_step": step,
                "alerts": n,
                "first_alert_ts": first,
                "detection_lag_s": lag,
                "detected": bool(n),
            }
        )
    return pd.DataFrame(rows)

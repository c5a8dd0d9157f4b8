"""T2 — the four published query archetypes (paper §II-B Queries 1-4).

Runs each of the paper's example queries in batch over the demo stream
and reports: anomaly model, alert count, the key alert row, and the
batch execution latency. Expressiveness + correctness of each language
family on one table.
"""
from __future__ import annotations

import time

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from ..core.engine import run_batch
from ..core.schema import to_spark
from ..monitoring.feed import demo_feed
from ..queries.demo_queries import PAPER_QUERIES, paper_query

# What each archetype should surface on the demo stream.
EXPECTED_KEY = {
    "paper_q1_rule": ("p4_exe_name", "sbblv.exe"),
    "paper_q2_timeseries": ("p_exe_name", {"sbblv.exe", "sqlservr.exe"}),
    "paper_q3_invariant": (None, None),  # apache is not attacked in the demo
    "paper_q4_outlier": ("i_dstip", "192.168.99.129"),
}


def run(
    spark: SparkSession,
    *,
    events_per_host_per_min: float = 10.0,
    events_df: DataFrame | None = None,
) -> pd.DataFrame:
    if events_df is None:
        feed = demo_feed(events_per_host_per_min=events_per_host_per_min)
        events_df = to_spark(spark, feed.events)
    events_df = events_df.cache()
    n_events = events_df.count()
    rows = []
    for key in PAPER_QUERIES:
        cq = paper_query(key)
        t0 = time.perf_counter()
        alerts = run_batch(events_df, cq)
        dt = time.perf_counter() - t0
        col, want = EXPECTED_KEY[key]
        got = sorted(set(alerts[col])) if (col and len(alerts)) else []
        rows.append(
            {
                "query": key,
                "model": cq.kind,
                "events": n_events,
                "alerts": len(alerts),
                "key_result": ",".join(map(str, got)) if got else "-",
                "latency_s": round(dt, 2),
            }
        )
    return pd.DataFrame(rows)


def format_table(table: pd.DataFrame) -> str:
    return table.to_string(index=False)

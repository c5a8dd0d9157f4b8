"""T4 — engine throughput and per-window latency vs stream rate.

The paper's "timely big-data analytics" requirement: ~50 GB/day for
100 hosts (§I), i.e. enterprise-scale event rates, processed in real
time. We scale the synthetic feed's event rate and measure batch-engine
throughput (events/s) per anomaly model, plus the streaming executor's
per-batch latency at the demo rate.
"""
from __future__ import annotations

import time

import pandas as pd
from pyspark.sql import SparkSession

from ..core.compiler import compile_query
from ..core.engine import run_batch
from ..core.schema import to_spark
from ..monitoring.feed import demo_feed
from ..queries.demo_queries import DEMO_QUERY_TEXTS
from ..saql import parse_saql

# One representative query per anomaly model family.
FAMILY_QUERIES = {
    "rule": DEMO_QUERY_TEXTS["rule_c5"],
    "timeseries": DEMO_QUERY_TEXTS["adv_timeseries"],
    "invariant": DEMO_QUERY_TEXTS["adv_invariant"],
    "outlier": DEMO_QUERY_TEXTS["adv_outlier"],
}


def run(
    spark: SparkSession,
    *,
    rates: tuple[float, ...] = (10.0, 60.0, 240.0),
    n_workstations: int = 4,
) -> pd.DataFrame:
    """Batch-engine throughput per family at increasing feed rates."""
    rows = []
    for rate in rates:
        feed = demo_feed(
            events_per_host_per_min=rate, n_workstations=n_workstations
        )
        events = to_spark(spark, feed.events).cache()
        n = events.count()
        for family, text in FAMILY_QUERIES.items():
            cq = compile_query(parse_saql(text), family)
            t0 = time.perf_counter()
            alerts = run_batch(events, cq)
            dt = time.perf_counter() - t0
            rows.append(
                {
                    "events_per_host_per_min": rate,
                    "events": n,
                    "family": family,
                    "alerts": len(alerts),
                    "time_s": round(dt, 2),
                    "events_per_s": int(n / dt),
                }
            )
        events.unpersist()
    return pd.DataFrame(rows)


def run_streaming_latency(
    spark: SparkSession,
    *,
    events_per_host_per_min: float = 30.0,
    batch_interval_s: float = 60.0,
) -> pd.DataFrame:
    """Per-micro-batch processing latency of the streaming executor with
    the representative per-family queries — the real-time check: batch
    processing time must stay below the batch interval."""
    from ..core.compiler import compile_query
    from ..stream.executor import StreamExecutor
    from ..stream.replayer import StreamReplayer

    feed = demo_feed(events_per_host_per_min=events_per_host_per_min)
    cqs = [
        compile_query(parse_saql(text), family)
        for family, text in FAMILY_QUERIES.items()
    ]
    ex = StreamExecutor(spark, cqs, pattern_horizon_s=1200.0)
    latencies = []
    n_events = 0
    for batch in StreamReplayer(feed.events).batches(batch_interval_s):
        n_events += len(batch)
        t0 = time.perf_counter()
        ex.process_batch(batch)
        latencies.append(time.perf_counter() - t0)
    ex.finalize()
    s = pd.Series(latencies)
    return pd.DataFrame(
        [
            {
                "events": n_events,
                "batches": len(latencies),
                "batch_interval_s": batch_interval_s,
                "mean_batch_latency_s": round(s.mean(), 2),
                "p95_batch_latency_s": round(s.quantile(0.95), 2),
                "max_batch_latency_s": round(s.max(), 2),
                "keeps_up": bool(s.quantile(0.95) < batch_interval_s),
            }
        ]
    )


def format_table(table: pd.DataFrame) -> str:
    return table.to_string(index=False)

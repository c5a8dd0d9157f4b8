"""T1 — APT attack step detection over the replayed stream.

Reproduces the demonstration procedure (§III): the 8 SAQL queries run
continuously over the replayed monitoring stream and report alerts in
real time as the attack unfolds. Rows: query, anomaly model, target
step, #alerts, first alert time, detection lag.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from ..evaluation import detection_table
from ..monitoring.feed import demo_feed
from ..queries import demo_queries
from ..stream.executor import StreamExecutor
from ..stream.replayer import StreamReplayer

ATTACK_START = "2020-04-01 09:30:00"


def run(
    spark: SparkSession,
    *,
    events_per_host_per_min: float = 10.0,
    batch_interval_s: float = 60.0,
    verbose: bool = False,
) -> pd.DataFrame:
    """Replay the demo scenario through the streaming executor."""
    feed = demo_feed(
        events_per_host_per_min=events_per_host_per_min,
        attack_start=ATTACK_START,
    )
    queries = demo_queries()
    ex = StreamExecutor(spark, list(queries.values()), pattern_horizon_s=1200.0)
    for batch in StreamReplayer(feed.events).batches(batch_interval_s):
        fired = ex.process_batch(batch)
        if verbose:
            for name, alerts in fired.items():
                stamp = batch["ts"].max() if len(batch) else "-"
                print(f"[{stamp}] ALERT {name}: {len(alerts)} row(s)")
    ex.finalize()
    alerts = {name: ex.alerts(name) for name in queries}
    table = detection_table(alerts, ATTACK_START)
    kinds = {name: cq.kind for name, cq in queries.items()}
    table.insert(1, "model", table["query"].map(kinds))
    return table


def format_table(table: pd.DataFrame) -> str:
    return table.to_string(index=False)

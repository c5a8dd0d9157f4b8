"""T3 — concurrent query execution: master-dependent vs independent.

Reproduces the §II-C claim: grouping semantically compatible concurrent
queries lets a group share a single copy of the stream, significantly
reducing data copies (and total execution time) versus running each
query with direct stream access. Workload: M time-series variants of
the paper's Query 2 (different alert thresholds — the typical
many-analysts pattern) plus the rule-based Query 1.
"""
from __future__ import annotations

import time

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from ..core.compiler import CompiledQuery, compile_query
from ..core.scheduler import run_concurrent, run_independent
from ..core.schema import to_spark
from ..monitoring.feed import demo_feed
from ..queries.demo_queries import DB_AGENT
from ..saql import parse_saql


def threshold_variants(n: int) -> list[CompiledQuery]:
    """n Query-2 style monitors with distinct thresholds/histories."""
    out = []
    for k in range(n):
        text = f"""
        agentid = "{DB_AGENT}"
        proc p write ip i as evt #time(10 min)
        state[3] ss {{ avg_amount := avg(evt.amount) }} group by p
        alert ss[0].avg_amount > {5000 * (k + 1)}
        return p, ss[0].avg_amount
        """
        out.append(compile_query(parse_saql(text), f"monitor_{k}"))
    return out


def run(
    spark: SparkSession,
    *,
    n_queries: int = 8,
    events_per_host_per_min: float = 10.0,
    events_df: DataFrame | None = None,
) -> pd.DataFrame:
    if events_df is None:
        feed = demo_feed(events_per_host_per_min=events_per_host_per_min)
        events_df = to_spark(spark, feed.events)
    events_df = events_df.cache()
    n_events = events_df.count()
    queries = threshold_variants(n_queries)

    t0 = time.perf_counter()
    res_i, m_i = run_independent(events_df, queries)
    t_indep = time.perf_counter() - t0

    t0 = time.perf_counter()
    res_c, m_c = run_concurrent(events_df, queries)
    t_conc = time.perf_counter() - t0

    same = all(
        len(res_i[q.name]) == len(res_c[q.name]) for q in queries
    )
    rows = [
        {
            "scheme": "independent (baseline)",
            "queries": m_i.n_queries,
            "groups": m_i.n_groups,
            "stream_copies": m_i.stream_scans,
            "events": n_events,
            "time_s": round(t_indep, 2),
            "alerts_identical": same,
        },
        {
            "scheme": "master-dependent (SAQL)",
            "queries": m_c.n_queries,
            "groups": m_c.n_groups,
            "stream_copies": m_c.stream_scans,
            "events": n_events,
            "time_s": round(t_conc, 2),
            "alerts_identical": same,
        },
    ]
    table = pd.DataFrame(rows)
    table["speedup_vs_baseline"] = (t_indep / table["time_s"]).round(2)
    return table


def format_table(table: pd.DataFrame) -> str:
    return table.to_string(index=False)

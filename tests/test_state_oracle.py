"""State maintainer (window aggregation) vs the DuckDB oracle.

Window assignment + every aggregate function is cross-checked against
an independent SQL formulation (epoch-aligned tumbling windows via
integer division on the unix timestamp).
"""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.compiler import compile_query
from repro.core.schema import to_spark
from repro.core.state import state_table
from repro.oracle import assert_equivalent
from repro.saql import parse_saql


def cq_of(text):
    return compile_query(parse_saql(text), "t")


@pytest.fixture(scope="module")
def net_events(spark):
    """120 network events over 30 minutes, three processes, two hosts."""
    import numpy as np

    g = np.random.default_rng(42)
    n = 120
    pdf = pd.DataFrame(
        {
            "eid": range(1, n + 1),
            "ts": pd.Timestamp("2020-04-01 09:00:00")
            + pd.to_timedelta(np.sort(g.uniform(0, 1800, n)), unit="s"),
            "agentid": g.choice(["h1", "h2"], n),
            "subj_exe": g.choice(["a.exe", "b.exe", "c.exe"], n),
            "subj_pid": 1,
            "op": g.choice(["read", "write"], n),
            "obj_type": "ip",
            "obj_exe": None,
            "obj_pid": None,
            "file_name": None,
            "srcip": None,
            "srcport": None,
            "dstip": g.choice(["1.1.1.1", "2.2.2.2", "3.3.3.3"], n),
            "dstport": 443,
            "amount": g.uniform(10, 10000, n).round(1),
        }
    )
    pdf["subj_exe"] = pdf["subj_exe"].astype(str)
    return to_spark(spark, pdf), pdf


# NB: DuckDB's '/' is float division; '//' floors — required for the
# epoch-aligned window id.
WINDOW_SQL = "to_timestamp((epoch(ts)::BIGINT // 600) * 600)"


def states(net_events, text):
    sdf, pdf = net_events
    cq = cq_of(text)
    return state_table(sdf, cq), pdf, cq


@pytest.mark.parametrize(
    "agg,sql_agg",
    [
        ("avg(evt.amount)", "avg(amount)"),
        ("sum(evt.amount)", "sum(amount)"),
        ("count(evt.amount)", "count(amount)"),
        ("min(evt.amount)", "min(amount)"),
        ("max(evt.amount)", "max(amount)"),
        ("distinct_count(i.dstip)", "count(DISTINCT dstip)"),
    ],
)
def test_aggregates_match_duckdb(net_events, agg, sql_agg):
    df, pdf, _ = states(
        net_events,
        f"proc p write ip i as evt #time(10 min)\n"
        f"state ss {{ v := {agg} }} group by p\nreturn p",
    )
    got = df.select(
        F.col("window_start").alias("ws"),
        F.col("p__exe_name").alias("p"),
        F.col("v").cast("double").alias("v"),
    )
    assert_equivalent(
        got,
        f"""
        SELECT {WINDOW_SQL} AS ws, subj_exe AS p,
               CAST({sql_agg} AS DOUBLE) AS v
        FROM ev WHERE op = 'write' AND obj_type = 'ip'
        GROUP BY 1, 2
        """,
        ev=pdf,
    )


def test_group_by_object_attr_matches_duckdb(net_events):
    df, pdf, _ = states(
        net_events,
        "proc p read || write ip i as evt #time(10 min)\n"
        "state ss { amt := sum(evt.amount) } group by i.dstip\nreturn i.dstip",
    )
    got = df.select(
        F.col("window_start").alias("ws"),
        F.col("i__dstip").alias("dstip"),
        F.col("amt").alias("amt"),
    )
    assert_equivalent(
        got,
        f"""
        SELECT {WINDOW_SQL} AS ws, dstip, sum(amount) AS amt
        FROM ev WHERE op IN ('read','write') AND obj_type = 'ip'
        GROUP BY 1, 2
        """,
        ev=pdf,
    )


def test_multiple_group_keys_match_duckdb(net_events):
    df, pdf, _ = states(
        net_events,
        "proc p write ip i as evt #time(10 min)\n"
        "state ss { n := count() } group by p, i.dstip\nreturn p",
    )
    got = df.select(
        F.col("window_start").alias("ws"),
        F.col("p__exe_name").alias("p"),
        F.col("i__dstip").alias("dstip"),
        F.col("n").cast("bigint").alias("n"),
    )
    assert_equivalent(
        got,
        f"""
        SELECT {WINDOW_SQL} AS ws, subj_exe AS p, dstip, count(*) AS n
        FROM ev WHERE op = 'write' AND obj_type = 'ip'
        GROUP BY 1, 2, 3
        """,
        ev=pdf,
    )


def test_global_constraint_restricts_host(net_events):
    df, pdf, _ = states(
        net_events,
        'agentid = "h1"\nproc p write ip i as evt #time(10 min)\n'
        "state ss { amt := sum(evt.amount) } group by p\nreturn p",
    )
    got = df.select(
        F.col("window_start").alias("ws"),
        F.col("p__exe_name").alias("p"),
        F.col("amt"),
    )
    assert_equivalent(
        got,
        f"""
        SELECT {WINDOW_SQL} AS ws, subj_exe AS p, sum(amount) AS amt
        FROM ev WHERE agentid = 'h1' AND op='write' AND obj_type='ip'
        GROUP BY 1, 2
        """,
        ev=pdf,
    )


def test_set_aggregate_collects_distinct(spark, tiny_events):
    pdf = tiny_events(
        [
            {"ts": "2020-01-01 00:00:01", "subj_exe": "apache.exe", "op": "start",
             "obj_type": "proc", "obj_exe": "php.exe", "obj_pid": 2},
            {"ts": "2020-01-01 00:00:02", "subj_exe": "apache.exe", "op": "start",
             "obj_type": "proc", "obj_exe": "php.exe", "obj_pid": 3},
            {"ts": "2020-01-01 00:00:03", "subj_exe": "apache.exe", "op": "start",
             "obj_type": "proc", "obj_exe": "sh.exe", "obj_pid": 4},
        ]
    )
    cq = cq_of(
        "proc p start proc c as evt #time(10 s)\n"
        "state ss { s := set(c.exe_name) } group by p\nreturn p"
    )
    rows = state_table(to_spark(spark, pdf), cq).toPandas()
    assert len(rows) == 1
    assert sorted(rows["s"].iloc[0]) == ["php.exe", "sh.exe"]


def test_hopping_window_states(spark, tiny_events):
    """length 20s, slide 10s: an event appears in two windows."""
    pdf = tiny_events(
        [
            {"ts": "2020-01-01 00:00:15", "subj_exe": "a.exe", "op": "write",
             "obj_type": "ip", "dstip": "1.1.1.1", "amount": 100.0},
        ]
    )
    cq = cq_of(
        "proc p write ip i as evt #time(20 s, 10 s)\n"
        "state ss { amt := sum(evt.amount) } group by p\nreturn p"
    )
    rows = state_table(to_spark(spark, pdf), cq).toPandas()
    starts = sorted(pd.Timestamp(t) for t in rows["window_start"])
    assert starts == [
        pd.Timestamp("2020-01-01 00:00:00"),
        pd.Timestamp("2020-01-01 00:00:10"),
    ]
    assert (rows["amt"] == 100.0).all()


def test_window_end_is_start_plus_length(net_events):
    df, _, cq = states(
        net_events,
        "proc p write ip i as evt #time(10 min)\n"
        "state ss { n := count() } group by p\nreturn p",
    )
    rows = df.toPandas()
    delta = pd.to_datetime(rows["window_end"]) - pd.to_datetime(rows["window_start"])
    assert (delta == pd.Timedelta(minutes=10)).all()


def test_non_stateful_query_rejected(net_events):
    from repro.saql.errors import SaqlCompileError

    sdf, _, = net_events[0], None
    with pytest.raises(SaqlCompileError):
        state_table(net_events[0], cq_of("proc p write ip i return p"))

"""Multi-event matcher tests, oracle-checked against DuckDB SQL.

Every result-shape assertion goes through ``repro.oracle`` so a broken
Catalyst predicate or join is caught as a wrong *result*, not a crash.
"""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.compiler import compile_query
from repro.core.matcher import match_patterns, pattern_frame, rule_alerts
from repro.core.schema import to_spark
from repro.oracle import assert_equivalent
from repro.saql import parse_saql


def cq_of(text):
    return compile_query(parse_saql(text), "t")


@pytest.fixture()
def events(spark, tiny_events):
    rows = [
        # host h1: cmd starts osql; sqlservr writes dump; mal reads dump; mal sends
        {"ts": "2020-01-01 10:00:00", "agentid": "h1", "subj_exe": "cmd.exe",
         "subj_pid": 10, "op": "start", "obj_type": "proc", "obj_exe": "osql.exe",
         "obj_pid": 11},
        {"ts": "2020-01-01 10:00:10", "agentid": "h1", "subj_exe": "sqlservr.exe",
         "subj_pid": 12, "op": "write", "obj_type": "file",
         "file_name": "backup1.dmp", "amount": 5e6},
        {"ts": "2020-01-01 10:00:20", "agentid": "h1", "subj_exe": "mal.exe",
         "subj_pid": 13, "op": "read", "obj_type": "file",
         "file_name": "backup1.dmp", "amount": 5e6},
        {"ts": "2020-01-01 10:00:30", "agentid": "h1", "subj_exe": "mal.exe",
         "subj_pid": 13, "op": "write", "obj_type": "ip", "dstip": "9.9.9.9",
         "dstport": 443, "amount": 5e6},
        # host h2: same file name but different host -> must not join with h1
        {"ts": "2020-01-01 10:00:40", "agentid": "h2", "subj_exe": "mal.exe",
         "subj_pid": 13, "op": "read", "obj_type": "file",
         "file_name": "backup1.dmp"},
        # h1 benign noise
        {"ts": "2020-01-01 10:01:00", "agentid": "h1", "subj_exe": "chrome.exe",
         "subj_pid": 14, "op": "write", "obj_type": "ip", "dstip": "8.8.8.8",
         "dstport": 443, "amount": 100.0},
    ]
    pdf = tiny_events(rows)
    return to_spark(spark, pdf), pdf


# ------------------------------------------------------- single pattern
def test_pattern_filter_matches_duckdb(events):
    sdf, pdf = events
    cq = cq_of('proc p["%mal.exe"] read file f as e return p')
    frame = pattern_frame(sdf, cq, 0)
    got = frame.select(
        F.col("e__eid").alias("eid"), F.col("var__f__name").alias("name")
    )
    assert_equivalent(
        got,
        "SELECT eid, file_name AS name FROM ev "
        "WHERE subj_exe LIKE '%mal.exe' AND op='read' AND obj_type='file'",
        ev=pdf,
    )


def test_op_disjunction_matches_duckdb(events):
    sdf, pdf = events
    cq = cq_of("proc p read || write ip i as e return p")
    got = pattern_frame(sdf, cq, 0).select(F.col("e__eid").alias("eid"))
    assert_equivalent(
        got,
        "SELECT eid FROM ev WHERE op IN ('read','write') AND obj_type='ip'",
        ev=pdf,
    )


def test_named_constraint_matches_duckdb(events):
    sdf, pdf = events
    cq = cq_of('proc p write ip i[dstip="9.9.9.9"] as e return p')
    got = pattern_frame(sdf, cq, 0).select(F.col("e__eid").alias("eid"))
    assert_equivalent(
        got,
        "SELECT eid FROM ev WHERE op='write' AND obj_type='ip' AND dstip='9.9.9.9'",
        ev=pdf,
    )


def test_numeric_constraint(events):
    sdf, pdf = events
    cq = cq_of("proc p read || write ip i[dstport >= 400] as e return p")
    got = pattern_frame(sdf, cq, 0).select(F.col("e__eid").alias("eid"))
    assert_equivalent(
        got,
        "SELECT eid FROM ev WHERE op IN ('read','write') AND obj_type='ip' "
        "AND dstport >= 400",
        ev=pdf,
    )


def test_global_constraint_filters_host(events):
    sdf, pdf = events
    cq = cq_of('agentid = "h2"\nproc p read file f as e return p')
    got = match_patterns(sdf, cq).select(F.col("e__eid").alias("eid"))
    assert_equivalent(
        got,
        "SELECT eid FROM ev WHERE agentid='h2' AND op='read' AND obj_type='file'",
        ev=pdf,
    )


# ------------------------------------------------------- multi-event joins
FULL_CHAIN = """
proc p1["%cmd.exe"] start proc p2["%osql.exe"] as evt1
proc p3["%sqlservr.exe"] write file f1["%backup1.dmp"] as evt2
proc p4["%mal.exe"] read file f1 as evt3
proc p4 read || write ip i1[dstip="9.9.9.9"] as evt4
with evt1 -> evt2 -> evt3 -> evt4
return distinct p1, p2, p3, f1, p4, i1
"""


def test_full_chain_matches(events):
    sdf, _ = events
    alerts = rule_alerts(match_patterns(sdf, cq_of(FULL_CHAIN)), cq_of(FULL_CHAIN))
    rows = alerts.toPandas()
    assert len(rows) == 1
    r = rows.iloc[0]
    assert r["p4_exe_name"] == "mal.exe" and r["i1_dstip"] == "9.9.9.9"
    assert r["agentid"] == "h1"
    assert pd.Timestamp(r["alert_ts"]) == pd.Timestamp("2020-01-01 10:00:30")


def test_chain_join_matches_duckdb(events):
    """Cross-check the 2-pattern shared-file join against DuckDB."""
    sdf, pdf = events
    cq = cq_of(
        "proc a write file f as e1\nproc b read file f as e2\n"
        "with e1 -> e2\nreturn distinct a, b, f"
    )
    got = rule_alerts(match_patterns(sdf, cq), cq).select(
        F.col("a_exe_name"), F.col("b_exe_name"), F.col("f_name")
    )
    assert_equivalent(
        got,
        """
        SELECT DISTINCT w.subj_exe AS a_exe_name, r.subj_exe AS b_exe_name,
               w.file_name AS f_name
        FROM ev w JOIN ev r
          ON w.agentid = r.agentid AND w.file_name = r.file_name
         AND w.eid <> r.eid
         AND (w.ts < r.ts OR (w.ts = r.ts AND w.eid < r.eid))
        WHERE w.op='write' AND w.obj_type='file'
          AND r.op='read' AND r.obj_type='file'
        """,
        ev=pdf,
    )


def test_same_host_required(events, spark, tiny_events):
    """The h2 read of backup1.dmp must not pair with h1's write."""
    sdf, _ = events
    cq = cq_of(
        'proc a["%sqlservr.exe"] write file f as e1\n'
        "proc b read file f as e2\nwith e1 -> e2\nreturn distinct b, b.pid as bpid"
    )
    rows = rule_alerts(match_patterns(sdf, cq), cq).toPandas()
    assert set(rows["agentid"]) == {"h1"}


def test_temporal_order_enforced(spark, tiny_events):
    pdf = tiny_events(
        [
            # read happens BEFORE write: must not match e1 -> e2
            {"ts": "2020-01-01 10:00:00", "subj_exe": "b.exe", "op": "read",
             "obj_type": "file", "file_name": "x"},
            {"ts": "2020-01-01 10:00:10", "subj_exe": "a.exe", "op": "write",
             "obj_type": "file", "file_name": "x"},
        ]
    )
    sdf = to_spark(spark, pdf)
    cq = cq_of(
        "proc a write file f as e1\nproc b read file f as e2\n"
        "with e1 -> e2\nreturn distinct a, b"
    )
    assert rule_alerts(match_patterns(sdf, cq), cq).count() == 0


def test_no_temporal_clause_matches_both_orders(spark, tiny_events):
    pdf = tiny_events(
        [
            {"ts": "2020-01-01 10:00:00", "subj_exe": "b.exe", "op": "read",
             "obj_type": "file", "file_name": "x"},
            {"ts": "2020-01-01 10:00:10", "subj_exe": "a.exe", "op": "write",
             "obj_type": "file", "file_name": "x"},
        ]
    )
    sdf = to_spark(spark, pdf)
    cq = cq_of(
        "proc a write file f as e1\nproc b read file f as e2\nreturn distinct a, b"
    )
    assert rule_alerts(match_patterns(sdf, cq), cq).count() == 1


def test_shared_proc_variable_joins_on_pid(spark, tiny_events):
    pdf = tiny_events(
        [
            {"ts": "2020-01-01 10:00:00", "subj_exe": "m.exe", "subj_pid": 1,
             "op": "read", "obj_type": "file", "file_name": "x"},
            # different pid, same exe: must NOT satisfy shared var p
            {"ts": "2020-01-01 10:00:10", "subj_exe": "m.exe", "subj_pid": 2,
             "op": "write", "obj_type": "ip", "dstip": "9.9.9.9"},
        ]
    )
    sdf = to_spark(spark, pdf)
    cq = cq_of(
        "proc p read file f as e1\nproc p write ip i as e2\n"
        "with e1 -> e2\nreturn distinct p"
    )
    assert rule_alerts(match_patterns(sdf, cq), cq).count() == 0


def test_windowed_rule_query_same_window_only(spark, tiny_events):
    pdf = tiny_events(
        [
            {"ts": "2020-01-01 10:00:05", "subj_exe": "a.exe", "op": "write",
             "obj_type": "file", "file_name": "x"},
            # 15 min later: different 10-minute window -> no match
            {"ts": "2020-01-01 10:15:00", "subj_exe": "b.exe", "op": "read",
             "obj_type": "file", "file_name": "x"},
            # same window pair
            {"ts": "2020-01-01 10:16:00", "subj_exe": "c.exe", "op": "write",
             "obj_type": "file", "file_name": "y"},
            {"ts": "2020-01-01 10:17:00", "subj_exe": "d.exe", "op": "read",
             "obj_type": "file", "file_name": "y"},
        ]
    )
    sdf = to_spark(spark, pdf)
    cq = cq_of(
        "proc a write file f as e1 #time(10 min)\nproc b read file f as e2\n"
        "with e1 -> e2\nreturn distinct a, b, f"
    )
    rows = rule_alerts(match_patterns(sdf, cq), cq).toPandas()
    assert rows["f_name"].tolist() == ["y"]


def test_return_distinct_dedups(events):
    sdf, _ = events
    cq = cq_of('proc p["%mal.exe"] read file f as e return distinct p')
    rows = rule_alerts(match_patterns(sdf, cq), cq).toPandas()
    # distinct over (alert_ts, agentid, p_exe_name): one row per event ts
    assert (rows["p_exe_name"] == "mal.exe").all()


def test_like_wildcard_prefix_and_suffix(spark, tiny_events):
    pdf = tiny_events(
        [
            {"ts": "2020-01-01", "subj_exe": "c:\\windows\\cmd.exe", "op": "read",
             "obj_type": "file", "file_name": "a_credentials_db"},
            {"ts": "2020-01-01", "subj_exe": "cmd.exe.bak", "op": "read",
             "obj_type": "file", "file_name": "other"},
        ]
    )
    sdf = to_spark(spark, pdf)
    cq = cq_of('proc p["%cmd.exe"] read file f["%credentials%"] as e return p')
    rows = rule_alerts(match_patterns(sdf, cq), cq).toPandas()
    assert rows["p_exe_name"].tolist() == ["c:\\windows\\cmd.exe"]

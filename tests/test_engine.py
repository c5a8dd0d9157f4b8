"""Batch engine end-to-end tests on the demo feed (all query families).

Uses the session-scoped ``demo_alerts`` fixture (all 8 demo queries run
once over the small demo feed).
"""
import pandas as pd
import pytest

from repro.core.compiler import compile_query
from repro.core.engine import run_batch, alerts_to_spark, stream_t0
from repro.core.schema import to_spark
from repro.monitoring.attack import ATTACKER_IP
from repro.saql import parse_saql
from repro.saql.errors import SaqlCompileError

ATTACK_START = pd.Timestamp("2020-04-01 09:30:00")


# ------------------------------------------------------------- rule queries
def test_rule_c1_detects_initial_compromise(demo_alerts):
    a = demo_alerts["rule_c1"]
    assert len(a) == 1
    assert a["f1_name"].iloc[0] == "invoice_macro.xlsm"
    assert a["agentid"].iloc[0] == "workstation-01"


def test_rule_c2_detects_malware_infection(demo_alerts):
    a = demo_alerts["rule_c2"]
    assert len(a) >= 1
    assert set(a["p2_exe_name"]) == {"mal_dropper.exe"}
    assert set(a["i1_dstip"]) == {ATTACKER_IP}


def test_rule_c3_detects_privilege_escalation(demo_alerts):
    a = demo_alerts["rule_c3"]
    assert len(a) == 1
    assert a["p2_exe_name"].iloc[0] == "gsecdump.exe"
    assert a["f1_name"].iloc[0] == "credentials.db"


def test_rule_c4_detects_db_penetration(demo_alerts):
    a = demo_alerts["rule_c4"]
    assert len(a) == 1
    assert a["p1_exe_name"].iloc[0] == "cscript.exe"
    assert a["p2_exe_name"].iloc[0] == "backdoor2.exe"


def test_rule_c5_detects_exfiltration(demo_alerts):
    a = demo_alerts["rule_c5"]
    assert len(a) == 10  # one per exfil transfer event
    assert set(a["p4_exe_name"]) == {"sbblv.exe"}
    assert set(a["i1_dstip"]) == {ATTACKER_IP}
    assert set(a["f1_name"]) == {"backup1.dmp"}


def test_rule_alerts_fire_after_step_start(demo_alerts):
    from repro.monitoring.attack import step_windows
    from repro.queries.demo_queries import DEMO_QUERY_TARGETS

    steps = step_windows(ATTACK_START)
    for name in ["rule_c1", "rule_c2", "rule_c3", "rule_c4", "rule_c5"]:
        a = demo_alerts[name]
        step_t = steps[DEMO_QUERY_TARGETS[name]]
        assert pd.Timestamp(a["alert_ts"].min()) >= step_t


# --------------------------------------------------------- advanced queries
def test_adv_invariant_detects_excel_anomaly(demo_alerts):
    a = demo_alerts["adv_invariant"]
    assert len(a) == 1
    assert a["set_proc"].iloc[0] == frozenset({"mal_dropper.exe"})


def test_adv_timeseries_detects_exfil_processes(demo_alerts):
    a = demo_alerts["adv_timeseries"]
    procs = set(a["p_exe_name"])
    assert "sbblv.exe" in procs
    assert "sqlservr.exe" in procs  # the dump session itself spikes
    assert procs <= {"sbblv.exe", "sqlservr.exe"}  # no benign false alarms
    assert (pd.to_datetime(a["window_start"]) >= ATTACK_START).all()


def test_adv_outlier_flags_attacker_ip_only(demo_alerts):
    a = demo_alerts["adv_outlier"]
    assert set(a["i_dstip"]) == {ATTACKER_IP}
    assert (a["amt"] > 1_000_000).all()


def test_no_attack_no_alerts(spark):
    """The full catalog over a benign feed must stay silent."""
    from repro.monitoring.feed import demo_feed
    from repro.queries import demo_queries

    feed = demo_feed(
        with_attack=False, duration_s=1800, events_per_host_per_min=10
    )
    ev = to_spark(spark, feed.events).cache()
    try:
        for name, cq in demo_queries().items():
            assert len(run_batch(ev, cq)) == 0, f"false alerts from {name}"
    finally:
        ev.unpersist()


# ---------------------------------------------------------------- plumbing
def test_stream_t0(spark, tiny_events):
    pdf = tiny_events(
        [{"ts": "2020-01-01 05:00:07", "subj_exe": "a", "file_name": "f"}]
    )
    assert stream_t0(to_spark(spark, pdf)) == pd.Timestamp("2020-01-01 05:00:07")


def test_stream_t0_empty_raises(spark):
    from repro.core.schema import empty_events_pdf

    with pytest.raises(SaqlCompileError):
        stream_t0(to_spark(spark, empty_events_pdf()))


def test_alerts_to_spark_converts_sets(spark, demo_alerts):
    a = demo_alerts["adv_invariant"]
    df = alerts_to_spark(spark, a)
    row = df.collect()[0]
    assert row["set_proc"] == ["mal_dropper.exe"]


def test_paper_q3_apache_scenario(spark, tiny_events):
    """The paper's Query 3 on a crafted Apache trace: benign children in
    the 10 training windows, then a webshell spawn."""
    rows = []
    t0 = pd.Timestamp("2020-04-01 09:00:00")
    for k in range(10):  # training: php + sh children
        rows.append(
            {"ts": t0 + pd.Timedelta(seconds=10 * k + 1), "agentid": "web-01",
             "subj_exe": "apache.exe", "op": "start", "obj_type": "proc",
             "obj_exe": "php-cgi.exe" if k % 2 else "sh.exe", "obj_pid": 50 + k}
        )
    rows.append(  # detection window: unseen child
        {"ts": t0 + pd.Timedelta(seconds=105), "agentid": "web-01",
         "subj_exe": "apache.exe", "op": "start", "obj_type": "proc",
         "obj_exe": "webshell.exe", "obj_pid": 99}
    )
    from repro.queries.demo_queries import PAPER_QUERIES

    cq = compile_query(parse_saql(PAPER_QUERIES["paper_q3_invariant"]), "q3")
    alerts = run_batch(to_spark(spark, tiny_events(rows)), cq)
    assert len(alerts) == 1
    assert alerts["set_proc"].iloc[0] == frozenset({"webshell.exe"})

"""Incremental streaming executor tests.

The key property (DESIGN.md §2): streaming output == batch output on
the same data, for every anomaly-model family. Plus incremental
behaviour: alerts fire as soon as their window closes, not at end of
stream.
"""
import pandas as pd
import pytest

from repro.core.compiler import compile_query
from repro.core.engine import run_batch
from repro.core.schema import to_spark
from repro.saql import parse_saql
from repro.saql.errors import SaqlCompileError
from repro.stream.executor import StreamExecutor
from repro.stream.replayer import StreamReplayer

from tests.helpers import canon_alerts


def cq_of(text, name="q"):
    return compile_query(parse_saql(text), name)


@pytest.fixture(scope="module")
def feed():
    from repro.monitoring.feed import demo_feed

    return demo_feed(duration_s=3600, events_per_host_per_min=6)


def run_stream(spark, feed, cqs, interval=120.0):
    ex = StreamExecutor(spark, cqs, pattern_horizon_s=1200.0)
    for batch in StreamReplayer(feed.events).batches(interval):
        ex.process_batch(batch)
    ex.finalize()
    return ex


PARITY_QUERIES = {
    "timeseries": """
        agentid = "db-01"
        proc p write ip i as evt #time(10 min)
        state[3] ss { avg_amount := avg(evt.amount) } group by p
        alert (ss[0].avg_amount > (ss[0].avg_amount + ss[1].avg_amount + ss[2].avg_amount) / 3) && (ss[0].avg_amount > 10000)
        return p, ss[0].avg_amount, ss[1].avg_amount, ss[2].avg_amount
    """,
    "stateful_count": """
        proc p read || write ip i as evt #time(5 min)
        state ss { n := count() } group by p
        alert ss.n > 10
        return p, ss.n
    """,
    "invariant": """
        proc p1["%excel.exe"] start proc p2 as evt #time(60 s)
        state ss { set_proc := set(p2.exe_name) } group by p1
        invariant[10][offline] { a := empty_set
        a = a union ss.set_proc }
        alert |ss.set_proc diff a| > 0
        return p1, ss.set_proc
    """,
    "outlier": """
        agentid = "db-01"
        proc p read || write ip i as evt #time(10 min)
        state ss { amt := sum(evt.amount) } group by i.dstip
        cluster(points=all(ss.amt), distance="ed", method="DBSCAN(100000, 5)")
        alert cluster.outlier && ss.amt > 1000000
        return i.dstip, ss.amt
    """,
    "rule": """
        agentid = "db-01"
        proc p1["%cmd.exe"] start proc p2["%osql.exe"] as evt1
        proc p3["%sqlservr.exe"] write file f1["%backup1.dmp"] as evt2
        proc p4["%sbblv.exe"] read file f1 as evt3
        proc p4 read || write ip i1 as evt4
        with evt1 -> evt2 -> evt3 -> evt4
        return distinct p1, p2, p3, f1, p4, i1
    """,
}


@pytest.mark.parametrize("family", sorted(PARITY_QUERIES))
def test_stream_batch_parity(spark, feed, family):
    cq = cq_of(PARITY_QUERIES[family], family)
    ex = run_stream(spark, feed, [cq])
    got = ex.alerts(family)
    ev = to_spark(spark, feed.events)
    expected = run_batch(ev, cq)
    pd.testing.assert_frame_equal(
        canon_alerts(got), canon_alerts(expected), check_dtype=False
    )
    assert len(got) > 0, "parity test should exercise non-empty alerts"


def test_parity_with_hopping_window(spark, feed):
    cq = cq_of(
        """
        agentid = "db-01"
        proc p write ip i as evt #time(10 min, 5 min)
        state ss { amt := sum(evt.amount) } group by p
        alert ss.amt > 10000000
        return p, ss.amt
        """,
        "hop",
    )
    ex = run_stream(spark, feed, [cq])
    expected = run_batch(to_spark(spark, feed.events), cq)
    pd.testing.assert_frame_equal(
        canon_alerts(ex.alerts("hop")), canon_alerts(expected), check_dtype=False
    )
    assert len(expected) > 0


def test_alert_fires_when_window_closes(spark, feed):
    """The SMA alert for the 09:40 window must be emitted by the first
    batch at/after 09:50, not at end of stream."""
    cq = cq_of(PARITY_QUERIES["timeseries"], "ts")
    ex = StreamExecutor(spark, [cq])
    fired_at = None
    for batch in StreamReplayer(feed.events).batches(120.0):
        out = ex.process_batch(batch)
        if "ts" in out and fired_at is None:
            fired_at = batch["ts"].max()
    assert fired_at is not None
    close_t = pd.Timestamp("2020-04-01 09:50:00")
    assert fired_at >= close_t
    assert fired_at <= close_t + pd.Timedelta(seconds=240)


def test_rule_alert_fires_incrementally(spark, feed):
    cq = cq_of(PARITY_QUERIES["rule"], "rule")
    ex = StreamExecutor(spark, [cq], pattern_horizon_s=1200.0)
    first_emit = None
    for batch in StreamReplayer(feed.events).batches(120.0):
        out = ex.process_batch(batch)
        if "rule" in out and first_emit is None:
            first_emit = out["rule"]["alert_ts"].min()
    # first exfil event at 09:45:50; emitted within ~2 batches
    assert first_emit is not None
    assert pd.Timestamp(first_emit) <= pd.Timestamp("2020-04-01 09:46:35")


def test_no_duplicate_alerts_across_batches(spark, feed):
    cq = cq_of(PARITY_QUERIES["rule"], "rule")
    ex = run_stream(spark, feed, [cq])
    a = ex.alerts("rule")
    assert not a.duplicated().any()


def test_empty_batches_advance_nothing(spark):
    from repro.core.schema import empty_events_pdf

    cq = cq_of(PARITY_QUERIES["stateful_count"], "c")
    ex = StreamExecutor(spark, [cq])
    assert ex.process_batch(empty_events_pdf()) == {}
    assert ex.finalize() == {}
    assert len(ex.alerts("c")) == 0


def test_online_invariant_rejected_in_streaming(spark):
    cq = cq_of(
        PARITY_QUERIES["invariant"].replace("[offline]", "[online]"), "inv"
    )
    with pytest.raises(SaqlCompileError):
        StreamExecutor(spark, [cq])


def test_multiple_queries_in_one_executor(spark, feed):
    cqs = [
        cq_of(PARITY_QUERIES["timeseries"], "ts"),
        cq_of(PARITY_QUERIES["outlier"], "out"),
    ]
    ex = run_stream(spark, feed, cqs)
    assert len(ex.alerts("ts")) > 0
    assert len(ex.alerts("out")) > 0


def test_lateness_tolerates_out_of_order(spark):
    """With allowed lateness, slightly out-of-order events still land in
    their window before it closes."""
    rows = []
    t0 = pd.Timestamp("2020-04-01 09:00:00")
    for k in range(12):
        rows.append(
            {"eid": k + 1, "ts": t0 + pd.Timedelta(seconds=25 * k),
             "agentid": "h", "subj_exe": "a.exe", "subj_pid": 1, "op": "write",
             "obj_type": "ip", "dstip": "1.1.1.1", "amount": 100.0}
        )
    pdf = pd.DataFrame(rows)
    from repro.core.schema import EVENT_COLUMNS, empty_events_pdf

    base = empty_events_pdf()
    pdf = pd.concat([base, pdf], ignore_index=True)[EVENT_COLUMNS]
    cq = cq_of(
        "proc p write ip i as evt #time(60 s)\n"
        "state ss { n := count() } group by p\nalert ss.n > 0\nreturn p, ss.n",
        "n",
    )
    # Feed batch 2 BEFORE batch 1's last event: the late event is ~225 s
    # older than the stream head, so the lateness allowance must exceed
    # that for it to land in its (still-open) window.
    early = pdf[pdf["eid"] != 3]
    late = pdf[pdf["eid"] == 3]
    ex = StreamExecutor(spark, [cq], allowed_lateness_s=300.0)
    ex.process_batch(early.reset_index(drop=True))
    ex.process_batch(late.reset_index(drop=True))
    ex.finalize()
    got = ex.alerts("n")
    expected = run_batch(to_spark(spark, pdf), cq)
    pd.testing.assert_frame_equal(
        canon_alerts(got), canon_alerts(expected), check_dtype=False
    )

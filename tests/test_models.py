"""Model-evaluation stage tests (history, invariant, cluster, alert).

These operate on hand-built state tables so each semantic rule is
pinned down independently of Spark.
"""
import pandas as pd
import pytest

from repro.core.compiler import compile_query
from repro.core.models import (
    DETECT_COL,
    INVARIANT_COL,
    apply_alert,
    attach_cluster,
    attach_history,
    attach_invariant,
    evaluate_states,
    normalize_states,
    project_return,
)
from repro.saql import parse_saql

T0 = pd.Timestamp("2020-04-01 09:00:00")


def cq_of(text):
    return compile_query(parse_saql(text), "t")


TS_QUERY = """
proc p write ip i as evt #time(10 min)
state[3] ss { avg_amount := avg(evt.amount) } group by p
alert (ss[0].avg_amount > (ss[0].avg_amount + ss[1].avg_amount + ss[2].avg_amount) / 3) && (ss[0].avg_amount > 10000)
return p, ss[0].avg_amount, ss[1].avg_amount, ss[2].avg_amount
"""

INV_QUERY = """
proc p1["%apache.exe"] start proc p2 as evt #time(10 s)
state ss { set_proc := set(p2.exe_name) } group by p1
invariant[3][offline] {
  a := empty_set
  a = a union ss.set_proc
}
alert |ss.set_proc diff a| > 0
return p1, ss.set_proc
"""

CL_QUERY = """
proc p read || write ip i as evt #time(10 min)
state ss { amt := sum(evt.amount) } group by i.dstip
cluster(points=all(ss.amt), distance="ed", method="DBSCAN(1000, 3)")
alert cluster.outlier && ss.amt > 100000
return i.dstip, ss.amt
"""


def w(minutes):
    return T0 + pd.Timedelta(minutes=minutes)


def ts_states(rows):
    pdf = pd.DataFrame(rows, columns=["window_start", "p__exe_name", "avg_amount"])
    pdf["window_end"] = pdf["window_start"] + pd.Timedelta(minutes=10)
    return pdf


# ------------------------------------------------------------------ history
def test_history_lags_align_to_window_grid():
    cq = cq_of(TS_QUERY)
    pdf = normalize_states(
        ts_states(
            [
                (w(0), "a.exe", 100.0),
                (w(10), "a.exe", 200.0),
                (w(20), "a.exe", 400.0),
            ]
        ),
        cq,
    )
    out = attach_history(pdf, cq)
    last = out[out["window_start"] == w(20)].iloc[0]
    assert last["avg_amount__lag1"] == 200.0
    assert last["avg_amount__lag2"] == 100.0


def test_history_missing_window_is_zero():
    cq = cq_of(TS_QUERY)
    pdf = normalize_states(
        ts_states([(w(0), "a.exe", 100.0), (w(20), "a.exe", 400.0)]), cq
    )
    out = attach_history(pdf, cq)
    last = out[out["window_start"] == w(20)].iloc[0]
    assert last["avg_amount__lag1"] == 0.0  # gap window
    assert last["avg_amount__lag2"] == 100.0


def test_history_is_per_group():
    cq = cq_of(TS_QUERY)
    pdf = normalize_states(
        ts_states(
            [
                (w(0), "a.exe", 100.0),
                (w(10), "a.exe", 200.0),
                (w(10), "b.exe", 999.0),
            ]
        ),
        cq,
    )
    out = attach_history(pdf, cq)
    b = out[(out["p__exe_name"] == "b.exe")].iloc[0]
    assert b["avg_amount__lag1"] == 0.0  # b.exe had no window 0 state


def test_sma_alert_fires_on_spike_only():
    cq = cq_of(TS_QUERY)
    pdf = normalize_states(
        ts_states(
            [
                (w(0), "a.exe", 5000.0),
                (w(10), "a.exe", 5000.0),
                (w(20), "a.exe", 5000.0),  # steady: no alert
                (w(30), "a.exe", 50000.0),  # spike: alert
            ]
        ),
        cq,
    )
    pdf = attach_history(pdf, cq)
    pdf[DETECT_COL] = True
    alerted = apply_alert(pdf, cq)
    assert alerted["window_start"].tolist() == [w(30)]


def test_new_group_spike_alerts_with_zero_history():
    cq = cq_of(TS_QUERY)
    pdf = normalize_states(ts_states([(w(40), "mal.exe", 5_000_000.0)]), cq)
    pdf = attach_history(pdf, cq)
    pdf[DETECT_COL] = True
    assert len(apply_alert(pdf, cq)) == 1


# ---------------------------------------------------------------- invariant
def inv_states(rows):
    pdf = pd.DataFrame(rows, columns=["window_start", "p1__exe_name", "set_proc"])
    pdf["window_end"] = pdf["window_start"] + pd.Timedelta(seconds=10)
    pdf["set_proc"] = pdf["set_proc"].map(frozenset)
    return pdf


def s(seconds):
    return T0 + pd.Timedelta(seconds=seconds)


def test_invariant_trains_on_first_n_windows():
    cq = cq_of(INV_QUERY)
    pdf = normalize_states(
        inv_states(
            [
                (s(0), "apache.exe", {"php.exe"}),
                (s(10), "apache.exe", {"sh.exe"}),
                (s(20), "apache.exe", {"php.exe"}),
                (s(40), "apache.exe", {"php.exe", "evil.exe"}),
            ]
        ),
        cq,
    )
    out, trained = attach_invariant(pdf, cq, T0)
    assert trained[("apache.exe",)] == frozenset({"php.exe", "sh.exe"})
    # training windows (idx 0..2) are not detection rows
    assert out[DETECT_COL].tolist() == [False, False, False, True]
    alerted = apply_alert(out, cq)
    assert alerted["window_start"].tolist() == [s(40)]


def test_invariant_no_alert_for_known_children():
    cq = cq_of(INV_QUERY)
    pdf = normalize_states(
        inv_states(
            [
                (s(0), "apache.exe", {"php.exe"}),
                (s(10), "apache.exe", {"sh.exe"}),
                (s(20), "apache.exe", {"php.exe"}),
                (s(40), "apache.exe", {"sh.exe", "php.exe"}),
            ]
        ),
        cq,
    )
    out, _ = attach_invariant(pdf, cq, T0)
    assert len(apply_alert(out, cq)) == 0


def test_invariant_unknown_group_uses_init():
    """A group first seen after training has the empty invariant — any
    child alerts (the Excel scenario)."""
    cq = cq_of(INV_QUERY)
    pdf = normalize_states(
        inv_states([(s(100), "apache.exe", {"anything.exe"})]), cq
    )
    out, trained = attach_invariant(pdf, cq, T0)
    assert trained == {}
    assert out[INVARIANT_COL].iloc[0] == frozenset()
    assert len(apply_alert(out, cq)) == 1


def test_invariant_pretrained_skips_training():
    cq = cq_of(INV_QUERY)
    pdf = normalize_states(
        inv_states([(s(40), "apache.exe", {"php.exe", "evil.exe"})]), cq
    )
    out, _ = attach_invariant(
        pdf, cq, T0, pretrained={("apache.exe",): frozenset({"php.exe"})}
    )
    alerted = apply_alert(out, cq)
    assert len(alerted) == 1


def test_invariant_online_keeps_learning():
    text = INV_QUERY.replace("[offline]", "[online]")
    cq = cq_of(text)
    pdf = normalize_states(
        inv_states(
            [
                (s(0), "apache.exe", {"php.exe"}),
                (s(10), "apache.exe", {"php.exe"}),
                (s(20), "apache.exe", {"php.exe"}),
                (s(30), "apache.exe", {"new.exe"}),  # alerts, then learned
                (s(40), "apache.exe", {"new.exe"}),  # no alert anymore
            ]
        ),
        cq,
    )
    out, _ = attach_invariant(pdf, cq, T0)
    alerted = apply_alert(out, cq)
    assert alerted["window_start"].tolist() == [s(30)]


# ------------------------------------------------------------------ cluster
def cl_states(rows):
    pdf = pd.DataFrame(rows, columns=["window_start", "i__dstip", "amt"])
    pdf["window_end"] = pdf["window_start"] + pd.Timedelta(minutes=10)
    return pdf


def test_cluster_marks_noise_outlier():
    cq = cq_of(CL_QUERY)
    rows = [(w(0), f"10.0.0.{k}", 1000.0 + k * 100) for k in range(6)]
    rows.append((w(0), "9.9.9.9", 500_000.0))
    pdf = normalize_states(cl_states(rows), cq)
    out = attach_cluster(pdf, cq)
    flag = dict(zip(out["i__dstip"], out["cluster__outlier"]))
    assert flag["9.9.9.9"] is True or flag["9.9.9.9"] == True  # noqa: E712
    assert not any(v for k, v in flag.items() if k != "9.9.9.9")


def test_cluster_is_per_window():
    cq = cq_of(CL_QUERY)
    rows = [(w(0), f"10.0.0.{k}", 1000.0) for k in range(5)]
    # second window has only 2 points: both noise under minPts=3
    rows += [(w(10), "10.0.0.1", 1000.0), (w(10), "10.0.0.2", 1200.0)]
    pdf = normalize_states(cl_states(rows), cq)
    out = attach_cluster(pdf, cq)
    w2 = out[out["window_start"] == w(10)]
    assert w2["cluster__outlier"].all()


def test_cluster_alert_requires_threshold_too():
    cq = cq_of(CL_QUERY)
    rows = [(w(0), f"10.0.0.{k}", 1000.0) for k in range(5)]
    rows.append((w(0), "9.9.9.9", 50_000.0))  # outlier but below 100000
    pdf = normalize_states(cl_states(rows), cq)
    pdf = attach_cluster(pdf, cq)
    pdf[DETECT_COL] = True
    assert len(apply_alert(pdf, cq)) == 0


# ------------------------------------------------------------------- return
def test_project_return_names_and_values():
    cq = cq_of(TS_QUERY)
    pdf = normalize_states(
        ts_states([(w(0), "a.exe", 100.0), (w(10), "a.exe", 200.0)]), cq
    )
    pdf = attach_history(pdf, cq)
    out = project_return(pdf, cq)
    assert list(out.columns) == [
        "alert_ts", "window_start", "p_exe_name",
        "avg_amount", "avg_amount_1", "avg_amount_2",
    ]
    row = out[out["window_start"] == w(10)].iloc[0]
    assert row["avg_amount"] == 200.0 and row["avg_amount_1"] == 100.0
    assert row["alert_ts"] == w(20)  # window end


def test_evaluate_states_full_pipeline():
    cq = cq_of(TS_QUERY)
    pdf = ts_states(
        [
            (w(0), "a.exe", 5000.0),
            (w(10), "a.exe", 5000.0),
            (w(20), "a.exe", 90000.0),
        ]
    )
    out = evaluate_states(pdf, cq, T0)
    assert len(out) == 1
    assert out["p_exe_name"].iloc[0] == "a.exe"
    assert out["avg_amount"].iloc[0] == 90000.0


def test_evaluate_states_empty_input():
    cq = cq_of(TS_QUERY)
    pdf = ts_states([])
    out = evaluate_states(pdf, cq, T0)
    assert len(out) == 0
    assert "alert_ts" in out.columns

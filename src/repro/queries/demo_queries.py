"""The 8 demo SAQL queries (paper §III) + the 4 published archetypes.

The demo constructs one rule-based query per attack step (c1-c5, using
knowledge of the attack) and three advanced anomaly queries that assume
no knowledge of the attack details: an invariant query (Excel executing
a never-seen-before process, step c2), a time-series SMA query
(abnormally high network volume per process on the DB server, step c5),
and an outlier query (peer comparison via DBSCAN, step c5).

``PAPER_QUERIES`` are the four example queries printed in the paper
(§II-B Queries 1-4) with the obfuscated literals (``agentid = xxx``,
``dstip = "XXX.129"``) bound to our synthetic enterprise.
"""
from __future__ import annotations

from ..core.compiler import CompiledQuery, compile_query
from ..monitoring.attack import ATTACKER_IP
from ..saql import parse_saql

DB_AGENT = "db-01"  # the synthetic SQL database server's agentid


def _q(name: str, text: str) -> CompiledQuery:
    return compile_query(parse_saql(text), name)


# ------------------------------------------------------------------ paper §II-B
# Query 1 — rule-based: data exfiltration from the database server.
PAPER_Q1 = f"""
agentid = "{DB_AGENT}" // SQL database server
proc p1["%cmd.exe"] start proc p2["%osql.exe"] as evt1
proc p3["%sqlservr.exe"] write file f1["%backup1.dmp"] as evt2
proc p4["%sbblv.exe"] read file f1 as evt3
proc p4 read || write ip i1[dstip="{ATTACKER_IP}"] as evt4
with evt1 -> evt2 -> evt3 -> evt4
return distinct p1, p2, p3, f1, p4, i1
"""

# Query 2 — time-series (SMA): abnormally high network usage per process.
PAPER_Q2 = f"""
agentid = "{DB_AGENT}"
proc p write ip i as evt #time(10 min)
state[3] ss {{
  avg_amount := avg(evt.amount)
}} group by p
alert (ss[0].avg_amount > (ss[0].avg_amount + ss[1].avg_amount + ss[2].avg_amount) / 3) && (ss[0].avg_amount > 10000)
return p, ss[0].avg_amount, ss[1].avg_amount, ss[2].avg_amount
"""

# Query 3 — invariant: unseen child processes of Apache.
PAPER_Q3 = """
proc p1["%apache.exe"] start proc p2 as evt #time(10 s)
state ss {
  set_proc := set(p2.exe_name)
} group by p1
invariant[10][offline] {
  a := empty_set
  a = a union ss.set_proc
}
alert |ss.set_proc diff a| > 0
return p1, ss.set_proc
"""

# Query 4 — outlier (DBSCAN): the suspicious IP of the database dump.
PAPER_Q4 = f"""
agentid = "{DB_AGENT}"
proc p["%sqlservr.exe"] read || write ip i as evt #time(10 min)
state ss {{
  amt := sum(evt.amount)
}} group by i.dstip
cluster(points=all(ss.amt), distance="ed", method="DBSCAN(100000, 5)")
alert cluster.outlier && ss.amt > 1000000
return i.dstip, ss.amt
"""

PAPER_QUERIES = {
    "paper_q1_rule": PAPER_Q1,
    "paper_q2_timeseries": PAPER_Q2,
    "paper_q3_invariant": PAPER_Q3,
    "paper_q4_outlier": PAPER_Q4,
}


def paper_query(key: str) -> CompiledQuery:
    return _q(key, PAPER_QUERIES[key])


# ------------------------------------------------------------------- demo §III
# Five rule-based queries, one per attack step (built from attack
# knowledge, as in the demo).
RULE_C1 = """
proc p1["%outlook.exe"] write file f1["%.xlsm"] as evt1
proc p1 start proc p2["%excel.exe"] as evt2
with evt1 -> evt2
return distinct p1, f1, p2
"""

RULE_C2 = """
proc p1["%excel.exe"] start proc p2 as evt1
proc p2 read || write || connect ip i1 as evt2
with evt1 -> evt2
return distinct p1, p2, i1
"""

RULE_C3 = """
proc p1["%cmd.exe"] start proc p2["%gsecdump.exe"] as evt1
proc p2 read file f1["%credentials%"] as evt2
with evt1 -> evt2
return distinct p1, p2, f1
"""

RULE_C4 = """
proc p1["%cscript.exe"] write file f1["%.vbs"] as evt1
proc p1 start proc p2 as evt2
with evt1 -> evt2
return distinct p1, f1, p2
"""

RULE_C5 = PAPER_Q1  # the paper's Query 1 is exactly the step-c5 rule

# Three advanced anomaly queries (no attack knowledge).
# Invariant: processes started by Excel in the first 100 windows form
# the invariant; later deviations alert (detects step c2).
ADV_INVARIANT = """
proc p1["%excel.exe"] start proc p2 as evt #time(10 s)
state ss {
  set_proc := set(p2.exe_name)
} group by p1
invariant[100][offline] {
  a := empty_set
  a = a union ss.set_proc
}
alert |ss.set_proc diff a| > 0
return p1, ss.set_proc
"""

# Time-series SMA on per-process network volume on the DB server
# (detects step c5).
ADV_TIMESERIES = PAPER_Q2

# Outlier: peer comparison of per-destination network volume on the DB
# server via DBSCAN (detects step c5).
ADV_OUTLIER = f"""
agentid = "{DB_AGENT}"
proc p read || write ip i as evt #time(10 min)
state ss {{
  amt := sum(evt.amount)
}} group by i.dstip
cluster(points=all(ss.amt), distance="ed", method="DBSCAN(100000, 5)")
alert cluster.outlier && ss.amt > 1000000
return i.dstip, ss.amt
"""

DEMO_QUERY_TEXTS = {
    "rule_c1": RULE_C1,
    "rule_c2": RULE_C2,
    "rule_c3": RULE_C3,
    "rule_c4": RULE_C4,
    "rule_c5": RULE_C5,
    "adv_invariant": ADV_INVARIANT,
    "adv_timeseries": ADV_TIMESERIES,
    "adv_outlier": ADV_OUTLIER,
}

# Which attack step each demo query is constructed to detect.
DEMO_QUERY_TARGETS = {
    "rule_c1": "c1",
    "rule_c2": "c2",
    "rule_c3": "c3",
    "rule_c4": "c4",
    "rule_c5": "c5",
    "adv_invariant": "c2",
    "adv_timeseries": "c5",
    "adv_outlier": "c5",
}


def demo_queries() -> dict[str, CompiledQuery]:
    """Compile all 8 demo queries."""
    return {name: _q(name, text) for name, text in DEMO_QUERY_TEXTS.items()}

"""The system-monitoring event model (SVO: subject, operation, object).

Following the paper's data model (SAQL §II-A): system entities are
processes, files, and network connections; a system event is the
interaction of a subject process with an object entity, stamped with the
host (``agentid``) and time it occurred on, plus security-related
attributes (executable names, PIDs, file name, IPs, ports, amount of
data transferred).

Events are stored flat — one row per event, object-type-specific
attributes null when inapplicable — so a single Spark DataFrame carries
the aggregated multi-host event feed.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import types as T

# Object categories (the paper's file/process/network event taxonomy).
OBJ_PROC = "proc"
OBJ_FILE = "file"
OBJ_IP = "ip"

# Operations the generators emit and patterns may reference.
OPERATIONS = ("start", "read", "write", "execute", "delete", "connect")

EVENT_SCHEMA = T.StructType(
    [
        T.StructField("eid", T.LongType(), False),
        T.StructField("ts", T.TimestampType(), False),
        T.StructField("agentid", T.StringType(), False),
        T.StructField("subj_exe", T.StringType(), False),
        T.StructField("subj_pid", T.LongType(), False),
        T.StructField("op", T.StringType(), False),
        T.StructField("obj_type", T.StringType(), False),
        T.StructField("obj_exe", T.StringType(), True),
        T.StructField("obj_pid", T.LongType(), True),
        T.StructField("file_name", T.StringType(), True),
        T.StructField("srcip", T.StringType(), True),
        T.StructField("srcport", T.LongType(), True),
        T.StructField("dstip", T.StringType(), True),
        T.StructField("dstport", T.LongType(), True),
        T.StructField("amount", T.DoubleType(), True),
    ]
)

EVENT_COLUMNS = [f.name for f in EVENT_SCHEMA.fields]

# SAQL attribute name -> physical column, per role. A pattern variable is
# bound either as the subject of an event (always a process) or as the
# object (proc / file / ip); ``exe_name`` therefore resolves differently
# for ``p1`` in ``proc p1 start proc p2`` (subject) vs ``p2`` (object).
SUBJECT_ATTRS = {"exe_name": "subj_exe", "pid": "subj_pid"}
OBJECT_ATTRS = {
    OBJ_PROC: {"exe_name": "obj_exe", "pid": "obj_pid"},
    OBJ_FILE: {"name": "file_name"},
    OBJ_IP: {
        "srcip": "srcip",
        "srcport": "srcport",
        "dstip": "dstip",
        "dstport": "dstport",
    },
}
# Default attribute used by the paper's context-aware shortcuts
# (``return p1`` means ``return p1.exe_name``) and for grouping.
DEFAULT_ATTR = {OBJ_PROC: "exe_name", OBJ_FILE: "name", OBJ_IP: "dstip"}
# Attributes that define entity *identity* when one variable is shared
# between event patterns (``f1`` in Query 1's evt2 and evt3).
IDENTITY_ATTRS = {OBJ_PROC: ["pid", "exe_name"], OBJ_FILE: ["name"], OBJ_IP: ["dstip"]}
# Event-level (not entity-level) attributes.
EVENT_ATTRS = {"amount": "amount", "ts": "ts", "agentid": "agentid", "op": "op"}


def empty_events_pdf() -> pd.DataFrame:
    """An empty pandas frame with the event columns and sane dtypes."""
    pdf = pd.DataFrame({c: pd.Series(dtype="object") for c in EVENT_COLUMNS})
    pdf["eid"] = pdf["eid"].astype("int64")
    pdf["ts"] = pd.to_datetime(pdf["ts"])
    pdf["amount"] = pdf["amount"].astype("float64")
    return pdf


def to_spark(spark: SparkSession, pdf: pd.DataFrame) -> DataFrame:
    """Convert a pandas event frame to a Spark DataFrame with EVENT_SCHEMA.

    Column order is normalised and missing optional columns are added as
    nulls, so generators may emit only the columns they use.
    """
    pdf = pdf.copy()
    for col in EVENT_COLUMNS:
        if col not in pdf.columns:
            pdf[col] = None
    pdf = pdf[EVENT_COLUMNS]
    pdf["ts"] = pd.to_datetime(pdf["ts"])
    for col in ("eid", "subj_pid"):
        pdf[col] = pd.to_numeric(pdf[col]).astype("int64")
    for col in ("obj_pid", "srcport", "dstport"):
        # Nullable longs: plain python int or None (NaN cannot be cast
        # to BIGINT, and all-null columns defeat inference). The dtype
        # must stay object — a plain assignment would re-coerce
        # None/int back to float64 + NaN.
        s = pd.to_numeric(pdf[col], errors="coerce")
        pdf[col] = pd.Series(
            [None if pd.isna(v) else int(v) for v in s],
            index=pdf.index,
            dtype="object",
        )
    s = pd.to_numeric(pdf["amount"], errors="coerce")
    pdf["amount"] = pd.Series(
        [None if pd.isna(v) else float(v) for v in s],
        index=pdf.index,
        dtype="object",
    )
    for col in ("agentid", "subj_exe", "op", "obj_type", "obj_exe", "file_name", "srcip", "dstip"):
        # numpy str_ / NaN break Spark's type verification: force plain
        # python str or None.
        pdf[col] = pdf[col].map(lambda v: None if pd.isna(v) else str(v))
    # Explicit schema: inference would fail on all-null optional columns.
    return spark.createDataFrame(pdf, schema=EVENT_SCHEMA)


def validate_events(pdf: pd.DataFrame) -> list[str]:
    """Sanity checks used by generator tests; returns a list of problems."""
    problems = []
    if pdf["eid"].duplicated().any():
        problems.append("duplicate eid")
    if not pdf["op"].isin(OPERATIONS).all():
        bad = sorted(set(pdf.loc[~pdf["op"].isin(OPERATIONS), "op"]))
        problems.append(f"unknown ops: {bad}")
    if not pdf["obj_type"].isin([OBJ_PROC, OBJ_FILE, OBJ_IP]).all():
        problems.append("unknown obj_type")
    for typ, col in [(OBJ_PROC, "obj_exe"), (OBJ_FILE, "file_name"), (OBJ_IP, "dstip")]:
        sub = pdf[pdf["obj_type"] == typ]
        if sub[col].isna().any():
            problems.append(f"{typ} events with null {col}")
    return problems

"""Event schema / Spark conversion tests."""
import pandas as pd
import pytest

from repro.core.schema import (
    EVENT_COLUMNS,
    EVENT_SCHEMA,
    empty_events_pdf,
    to_spark,
    validate_events,
)


def test_schema_columns_order():
    assert EVENT_COLUMNS[0] == "eid"
    assert "amount" in EVENT_COLUMNS and "dstip" in EVENT_COLUMNS


def test_empty_events_pdf_has_all_columns():
    pdf = empty_events_pdf()
    assert list(pdf.columns) == EVENT_COLUMNS
    assert len(pdf) == 0


def test_to_spark_roundtrip(spark, tiny_events):
    pdf = tiny_events(
        [
            {"ts": "2020-01-01 00:00:00", "subj_exe": "a.exe", "op": "write",
             "obj_type": "ip", "dstip": "1.2.3.4", "dstport": 443, "amount": 10.5},
            {"ts": "2020-01-01 00:00:01", "subj_exe": "b.exe", "op": "read",
             "obj_type": "file", "file_name": "f.txt"},
        ]
    )
    df = to_spark(spark, pdf)
    # nullability flags differ after casts; names + types must match
    assert [(f.name, f.dataType) for f in df.schema.fields] == [
        (f.name, f.dataType) for f in EVENT_SCHEMA.fields
    ]
    back = df.orderBy("eid").toPandas()
    assert back["dstip"].tolist() == ["1.2.3.4", None]
    assert back["dstport"].tolist()[0] == 443
    assert pd.isna(back["amount"].tolist()[1])


def test_to_spark_missing_optional_columns(spark):
    pdf = pd.DataFrame(
        {
            "eid": [1],
            "ts": [pd.Timestamp("2020-01-01")],
            "agentid": ["h"],
            "subj_exe": ["x.exe"],
            "subj_pid": [1],
            "op": ["read"],
            "obj_type": ["file"],
            "file_name": ["f"],
        }
    )
    df = to_spark(spark, pdf)
    assert df.count() == 1
    row = df.collect()[0]
    assert row["dstip"] is None and row["amount"] is None


def test_to_spark_numpy_strings(spark):
    import numpy as np

    pdf = pd.DataFrame(
        {
            "eid": [1],
            "ts": [pd.Timestamp("2020-01-01")],
            "agentid": [np.str_("h")],
            "subj_exe": [np.str_("x.exe")],
            "subj_pid": [np.int64(1)],
            "op": [np.str_("read")],
            "obj_type": [np.str_("file")],
            "file_name": [np.str_("f")],
        }
    )
    assert to_spark(spark, pdf).count() == 1


def test_validate_events_clean(tiny_events):
    pdf = tiny_events([{"ts": "2020-01-01", "subj_exe": "a", "file_name": "f"}])
    assert validate_events(pdf) == []


def test_validate_events_duplicate_eid(tiny_events):
    pdf = tiny_events(
        [
            {"eid": 1, "ts": "2020-01-01", "subj_exe": "a", "file_name": "f"},
            {"eid": 1, "ts": "2020-01-01", "subj_exe": "a", "file_name": "f"},
        ]
    )
    assert any("eid" in p for p in validate_events(pdf))


def test_validate_events_bad_op(tiny_events):
    pdf = tiny_events(
        [{"ts": "2020-01-01", "subj_exe": "a", "op": "levitate", "file_name": "f"}]
    )
    assert any("ops" in p for p in validate_events(pdf))


def test_validate_events_missing_object_attr(tiny_events):
    pdf = tiny_events([{"ts": "2020-01-01", "subj_exe": "a", "obj_type": "ip"}])
    assert any("null" in p for p in validate_events(pdf))

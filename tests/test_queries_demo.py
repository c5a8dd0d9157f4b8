"""The demo catalog (§III): 8 queries, 5 attack steps, detection table."""
import pandas as pd
import pytest

from repro.evaluation import detection_table
from repro.queries.demo_queries import (
    DEMO_QUERY_TARGETS,
    DEMO_QUERY_TEXTS,
    PAPER_QUERIES,
    demo_queries,
    paper_query,
)

ATTACK_START = "2020-04-01 09:30:00"


def test_catalog_has_eight_queries():
    assert len(DEMO_QUERY_TEXTS) == 8
    kinds = [cq.kind for cq in demo_queries().values()]
    assert kinds.count("rule") == 5
    assert {"invariant", "timeseries", "outlier"} <= set(kinds)


def test_every_query_has_a_target_step():
    assert set(DEMO_QUERY_TARGETS) == set(DEMO_QUERY_TEXTS)
    assert set(DEMO_QUERY_TARGETS.values()) == {"c1", "c2", "c3", "c4", "c5"}


@pytest.mark.parametrize("key", sorted(PAPER_QUERIES))
def test_paper_queries_compile(key):
    assert paper_query(key).name == key


def test_all_five_steps_detected(demo_alerts):
    """The demo's headline claim: every attack step is detected."""
    table = detection_table(demo_alerts, ATTACK_START)
    detected_steps = set(table[table["detected"]]["target_step"])
    assert detected_steps == {"c1", "c2", "c3", "c4", "c5"}


def test_all_eight_queries_alert(demo_alerts):
    table = detection_table(demo_alerts, ATTACK_START)
    assert table["detected"].all(), table.to_string()


def test_detection_lags_nonnegative_and_bounded(demo_alerts):
    table = detection_table(demo_alerts, ATTACK_START)
    assert (table["detection_lag_s"] >= 0).all()
    # rule queries fire within the step itself (< 5 min of step start);
    # windowed queries within one window residence (+10 min).
    rules = table[table["query"].str.startswith("rule_")]
    assert (rules["detection_lag_s"] <= 300).all()
    assert (table["detection_lag_s"] <= 1500).all()


def test_detection_table_shape(demo_alerts):
    table = detection_table(demo_alerts, ATTACK_START)
    assert list(table.columns) == [
        "query", "target_step", "alerts", "first_alert_ts",
        "detection_lag_s", "detected",
    ]
    assert len(table) == 8


def test_detection_table_handles_empty_alerts():
    empty = pd.DataFrame({"alert_ts": pd.Series(dtype="datetime64[ns]")})
    table = detection_table({"rule_c1": empty}, ATTACK_START)
    assert not table["detected"].iloc[0]
    assert pd.isna(table["first_alert_ts"].iloc[0])

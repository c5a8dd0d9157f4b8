"""Shared fixtures for the test suite.

``SPARK_SHUFFLE_PARTITIONS`` is lowered before the root conftest's
``spark`` fixture materialises the session — the state tables here are
tiny and 64 shuffle partitions would be pure overhead.

The demo feed and the alerts of all 8 demo queries are computed once
per session (expensive: 8 Catalyst pipelines) and shared.
"""
import os

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "8")

import pandas as pd  # noqa: E402
import pytest  # noqa: E402


@pytest.fixture(scope="session")
def demo_feed_small():
    """The demo scenario at unit-test scale (~7 hosts, 1 h, low rate)."""
    from repro.monitoring.feed import demo_feed

    return demo_feed(events_per_host_per_min=10.0, seed=7)


@pytest.fixture(scope="session")
def demo_events_df(spark, demo_feed_small):
    from repro.core.schema import to_spark

    df = to_spark(spark, demo_feed_small.events).cache()
    df.count()  # materialise once
    yield df
    df.unpersist()


@pytest.fixture(scope="session")
def demo_alerts(demo_events_df):
    """Batch alerts of all 8 demo queries over the small demo feed."""
    from repro.core.engine import run_batch
    from repro.queries import demo_queries

    return {
        name: run_batch(demo_events_df, cq)
        for name, cq in demo_queries().items()
    }


@pytest.fixture()
def tiny_events():
    """Hand-written micro event log builder for precise semantics tests."""

    def build(rows):
        from repro.core.schema import EVENT_COLUMNS

        pdf = pd.DataFrame(rows)
        defaults = {
            "agentid": "h1",
            "subj_pid": 100,
            "op": "read",
            "obj_type": "file",
        }
        for col, val in defaults.items():
            if col not in pdf.columns:
                pdf[col] = val
        for col in EVENT_COLUMNS:
            if col not in pdf.columns:
                pdf[col] = None
        if pdf["eid"].isna().any():
            pdf["eid"] = range(1, len(pdf) + 1)
        pdf["ts"] = pd.to_datetime(pdf["ts"])
        return pdf[EVENT_COLUMNS]

    return build

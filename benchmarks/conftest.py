"""Benchmark fixtures.

Each bench times the corresponding experiment once (Spark pipelines run
seconds — classic ``benchmark()`` auto-calibration would re-run them
dozens of times) and writes the produced table to ``benchmarks/out/``
so EXPERIMENTS.md numbers can be regenerated from the bench run.
"""
import os

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "8")

import pytest  # noqa: E402

OUT_DIR = os.path.join(os.path.dirname(__file__), "out")


@pytest.fixture(scope="session")
def table_out():
    os.makedirs(OUT_DIR, exist_ok=True)

    def save(name: str, text: str) -> None:
        path = os.path.join(OUT_DIR, name)
        with open(path, "w") as f:
            f.write(text + "\n")

    return save


@pytest.fixture(scope="session")
def bench_events(spark):
    """Shared demo feed at benchmark scale (~30 ev/host/min, 7 hosts, 1 h)."""
    from repro.core.schema import to_spark
    from repro.monitoring.feed import demo_feed

    feed = demo_feed(events_per_host_per_min=30.0)
    df = to_spark(spark, feed.events).cache()
    df.count()
    yield df
    df.unpersist()

"""End-to-end Structured Streaming integration (readStream file source).

One real ``readStream`` -> ``foreachBatch`` run over the replayed JSON
micro-batch files, checked for exact parity with the batch engine.
"""
import os

import pandas as pd
import pytest

from repro.core.compiler import compile_query
from repro.core.engine import run_batch
from repro.core.schema import to_spark
from repro.monitoring.feed import demo_feed
from repro.saql import parse_saql
from repro.stream.executor import StreamExecutor
from repro.stream.replayer import StreamReplayer
from repro.stream.source import run_structured_stream

from tests.helpers import canon_alerts


@pytest.fixture(scope="module")
def small_feed():
    # Short + sparse so the readStream run stays fast: attack early.
    return demo_feed(
        duration_s=1500,
        attack_start="2020-04-01 09:05:00",
        events_per_host_per_min=4,
    )


def test_structured_stream_matches_batch(spark, small_feed, tmp_path_factory):
    d = str(tmp_path_factory.mktemp("stream_json"))
    rep = StreamReplayer(small_feed.events)
    rep.write_json_batches(d, batch_interval_s=120.0)
    assert len(os.listdir(d)) > 0

    cq = compile_query(
        parse_saql(
            """
            agentid = "db-01"
            proc p read || write ip i as evt #time(10 min)
            state ss { amt := sum(evt.amount) } group by i.dstip
            cluster(points=all(ss.amt), distance="ed", method="DBSCAN(100000, 5)")
            alert cluster.outlier && ss.amt > 1000000
            return i.dstip, ss.amt
            """
        ),
        "outlier",
    )
    ex = StreamExecutor(spark, [cq])
    run_structured_stream(spark, d, ex, max_files_per_trigger=4)
    got = ex.alerts("outlier")
    expected = run_batch(to_spark(spark, small_feed.events), cq)
    assert len(expected) > 0
    pd.testing.assert_frame_equal(
        canon_alerts(got), canon_alerts(expected), check_dtype=False
    )

"""Stream replayer tests (storage, selection, batching, JSON export)."""
import json
import os

import pandas as pd
import pytest

from repro.monitoring.feed import demo_feed
from repro.stream.replayer import StreamReplayer


@pytest.fixture(scope="module")
def feed():
    return demo_feed(duration_s=600, events_per_host_per_min=6)


@pytest.fixture(scope="module")
def rep(feed):
    return StreamReplayer(feed.events)


def test_events_sorted(rep):
    assert rep.events["ts"].is_monotonic_increasing


def test_batches_cover_all_events(rep):
    batches = list(rep.batches(30.0))
    total = sum(len(b) for b in batches)
    assert total == len(rep.events)


def test_batches_are_time_ordered_partitions(rep):
    batches = list(rep.batches(30.0))
    prev_max = None
    for b in batches:
        if b.empty:
            continue
        if prev_max is not None:
            assert b["ts"].min() >= prev_max
        prev_max = b["ts"].max()


def test_batches_respect_interval(rep):
    for b in rep.batches(30.0):
        if len(b) > 1:
            span = (b["ts"].max() - b["ts"].min()).total_seconds()
            assert span < 30.0


def test_batch_count_matches_duration(rep):
    batches = list(rep.batches(60.0))
    dur = (rep.events["ts"].iloc[-1] - rep.events["ts"].iloc[0]).total_seconds()
    assert len(batches) == int(dur // 60) + 1


def test_empty_feed_yields_no_batches():
    from repro.core.schema import empty_events_pdf

    assert list(StreamReplayer(empty_events_pdf()).batches(10.0)) == []


def test_select_hosts(rep):
    sub = rep.select(hosts=["db-01"])
    assert set(sub.events["agentid"]) == {"db-01"}


def test_select_time_range(rep):
    start = pd.Timestamp("2020-04-01 09:02:00")
    end = pd.Timestamp("2020-04-01 09:04:00")
    sub = rep.select(start=start, end=end)
    assert (sub.events["ts"] >= start).all()
    assert (sub.events["ts"] < end).all()


def test_select_combined(rep):
    sub = rep.select(hosts=["web-01"], start="2020-04-01 09:01:00")
    assert set(sub.events["agentid"]) <= {"web-01"}


def test_parquet_roundtrip(rep, tmp_path):
    path = os.path.join(tmp_path, "events.parquet")
    rep.store_parquet(path)
    back = StreamReplayer.from_parquet(path)
    pd.testing.assert_frame_equal(rep.events, back.events)


def test_write_json_batches(rep, tmp_path):
    d = os.path.join(tmp_path, "stream")
    paths = rep.write_json_batches(d, batch_interval_s=60.0)
    assert len(paths) == len(list(rep.batches(60.0)))
    n = 0
    for p in paths:
        with open(p) as f:
            for line in f:
                row = json.loads(line)
                assert "eid" in row and "ts" in row
                assert all(v is not None for v in row.values())
                n += 1
    assert n == len(rep.events)


def test_json_batches_sorted_filenames(rep, tmp_path):
    d = os.path.join(tmp_path, "stream2")
    paths = rep.write_json_batches(d, batch_interval_s=120.0)
    assert paths == sorted(paths)

"""Window assignment: the pandas mirror must match Spark's window()."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.windows import (
    floor_window_start,
    spark_window,
    window_index,
    window_starts,
)
from repro.saql.ast import WindowSpec


@pytest.mark.parametrize(
    "length,slide",
    [(600.0, 600.0), (10.0, 10.0), (120.0, 30.0), (60.0, 20.0)],
)
def test_pandas_matches_spark_assignment(spark, length, slide):
    spec = WindowSpec(length, slide)
    ts = pd.date_range("2020-04-01 09:00:03", periods=200, freq="7s")
    pdf = pd.DataFrame({"ts": ts, "v": range(200)})
    sdf = spark.createDataFrame(pdf)
    got = (
        sdf.select(F.col("v"), spark_window("ts", spec).start.alias("ws"))
        .toPandas()
        .groupby("v")["ws"]
        .apply(lambda s: tuple(sorted(s)))
    )
    starts = window_starts(pdf["ts"], spec)
    expected = {}
    for v in range(200):
        ws = sorted(
            {s.iloc[v] for s in starts if pd.notna(s.iloc[v])}
        )
        expected[v] = tuple(ws)
    for v in range(200):
        assert got[v] == expected[v], f"mismatch at row {v}"


def test_tumbling_yields_single_window():
    spec = WindowSpec(600.0, 600.0)
    ts = pd.Series(pd.to_datetime(["2020-04-01 09:05:00"]))
    starts = window_starts(ts, spec)
    assert len(starts) == 1
    assert starts[0].iloc[0] == pd.Timestamp("2020-04-01 09:00:00")


def test_hopping_yields_multiple_windows():
    spec = WindowSpec(120.0, 30.0)
    ts = pd.Series(pd.to_datetime(["2020-04-01 09:02:10"]))
    starts = window_starts(ts, spec)
    covering = sorted(s.iloc[0] for s in starts if pd.notna(s.iloc[0]))
    assert len(covering) == 4
    for s in covering:
        assert s <= ts.iloc[0] < s + pd.Timedelta(seconds=120)


def test_floor_window_start_alignment():
    spec = WindowSpec(600.0, 600.0)
    assert floor_window_start(
        pd.Timestamp("2020-04-01 09:07:31"), spec
    ) == pd.Timestamp("2020-04-01 09:00:00")


def test_window_index_counts_from_stream_start():
    spec = WindowSpec(10.0, 10.0)
    t0 = pd.Timestamp("2020-04-01 09:00:03")  # stream starts mid-window
    ws = pd.Series(
        pd.to_datetime(
            ["2020-04-01 09:00:00", "2020-04-01 09:00:10", "2020-04-01 09:01:40"]
        )
    )
    idx = window_index(ws, t0, spec)
    assert idx.tolist() == [0, 1, 10]


def test_window_index_hopping():
    spec = WindowSpec(120.0, 30.0)
    t0 = pd.Timestamp("2020-04-01 09:00:00")
    ws = pd.Series(pd.to_datetime(["2020-04-01 09:00:00", "2020-04-01 09:01:30"]))
    assert window_index(ws, t0, spec).tolist() == [0, 3]

"""Stream replayer — stored monitoring data replayed as an event stream.

The paper stores the collected data in databases and replays it as a
stream through a web UI that selects hosts and a start/end time. Here
the "database" is a parquet file, the selection is ``select()``, and
the replay is an iterator of micro-batches cut on event time (the
central server forwards events in arrival order). ``write_json_batches``
materialises the batches as files for the Structured Streaming source.
"""
from __future__ import annotations

import json
import math
import os
from collections.abc import Iterator

import pandas as pd

from ..core.schema import EVENT_COLUMNS


class StreamReplayer:
    """Replay a stored event table as timed micro-batches."""

    def __init__(self, events: pd.DataFrame):
        pdf = (
            events[EVENT_COLUMNS]
            .sort_values(["ts", "eid"], kind="stable")
            .reset_index(drop=True)
            .copy()
        )
        # Canonical dtypes so a parquet round-trip is value-identical.
        for col in ("obj_pid", "srcport", "dstport", "amount"):
            pdf[col] = pd.to_numeric(pdf[col], errors="coerce").astype("float64")
        pdf["ts"] = pd.to_datetime(pdf["ts"])
        self.events = pdf

    # ------------------------------------------------------------ storage
    def store_parquet(self, path: str) -> None:
        self.events.to_parquet(path, index=False)

    @classmethod
    def from_parquet(cls, path: str) -> "StreamReplayer":
        return cls(pd.read_parquet(path))

    # ---------------------------------------------------------- selection
    def select(
        self,
        hosts: list[str] | None = None,
        start: str | pd.Timestamp | None = None,
        end: str | pd.Timestamp | None = None,
    ) -> "StreamReplayer":
        """The web UI's host / start / end replay selection."""
        pdf = self.events
        if hosts is not None:
            pdf = pdf[pdf["agentid"].isin(hosts)]
        if start is not None:
            pdf = pdf[pdf["ts"] >= pd.Timestamp(start)]
        if end is not None:
            pdf = pdf[pdf["ts"] < pd.Timestamp(end)]
        return StreamReplayer(pdf.reset_index(drop=True))

    # ------------------------------------------------------------- replay
    def batches(self, batch_interval_s: float = 30.0) -> Iterator[pd.DataFrame]:
        """Micro-batches cut on event time: batch k holds events with
        ``t0 + k*I <= ts < t0 + (k+1)*I``. Empty intervals still yield an
        empty batch so window close-out ticks with time, as it would on
        a live stream."""
        if self.events.empty:
            return
        t0 = self.events["ts"].iloc[0]
        t_end = self.events["ts"].iloc[-1]
        n = max(1, math.ceil((t_end - t0).total_seconds() / batch_interval_s + 1e-9))
        for k in range(n):
            lo = t0 + pd.Timedelta(seconds=k * batch_interval_s)
            hi = t0 + pd.Timedelta(seconds=(k + 1) * batch_interval_s)
            mask = (self.events["ts"] >= lo) & (self.events["ts"] < hi)
            yield self.events[mask].reset_index(drop=True)

    def write_json_batches(
        self, directory: str, batch_interval_s: float = 30.0
    ) -> list[str]:
        """One JSON-lines file per micro-batch (numbered, so a
        Structured Streaming file source picks them up in order)."""
        os.makedirs(directory, exist_ok=True)
        paths = []
        for k, batch in enumerate(self.batches(batch_interval_s)):
            path = os.path.join(directory, f"batch-{k:06d}.json")
            with open(path, "w") as f:
                for row in batch.to_dict("records"):
                    row = dict(row)
                    row["ts"] = pd.Timestamp(row["ts"]).isoformat(sep=" ")
                    f.write(json.dumps({k: v for k, v in row.items() if v is not None and v == v}) + "\n")
            paths.append(path)
        return paths

"""Stream replayer utility (the paper's replayer, CLI edition).

Generates the demo feed, stores it as parquet ("the database"), and
re-emits it as JSON micro-batch files a Structured Streaming file
source can consume. Host/time selection mirrors the web UI.

    spark-submit jobs/replay_stream.py OUT_DIR [host1,host2] [start] [end]
"""
import os
import sys

from repro.monitoring.feed import demo_feed
from repro.stream.replayer import StreamReplayer


def main() -> None:
    out = sys.argv[1] if len(sys.argv) > 1 else "/tmp/saql_stream"
    hosts = sys.argv[2].split(",") if len(sys.argv) > 2 else None
    start = sys.argv[3] if len(sys.argv) > 3 else None
    end = sys.argv[4] if len(sys.argv) > 4 else None
    os.makedirs(out, exist_ok=True)

    feed = demo_feed()
    rep = StreamReplayer(feed.events)
    rep.store_parquet(os.path.join(out, "events.parquet"))
    sel = rep.select(hosts=hosts, start=start, end=end)
    paths = sel.write_json_batches(os.path.join(out, "stream"), 30.0)
    print(f"stored {len(rep.events)} events; replayed {len(sel.events)} "
          f"events into {len(paths)} micro-batch files under {out}/stream")


if __name__ == "__main__":
    main()

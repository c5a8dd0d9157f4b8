"""Structured Streaming wiring for the SAQL executor.

``run_structured_stream`` reads the replayed event feed with a real
``readStream`` file source (JSON-lines micro-batch files produced by
``StreamReplayer.write_json_batches``) and drives the incremental
executor from ``foreachBatch``. Used by the end-to-end integration
tests; unit/parity tests drive the executor directly from
``StreamReplayer.batches`` for determinism and speed.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from ..core.schema import EVENT_COLUMNS, EVENT_SCHEMA
from .executor import StreamExecutor


def run_structured_stream(
    spark: SparkSession,
    events_dir: str,
    executor: StreamExecutor,
    *,
    max_files_per_trigger: int = 1,
) -> None:
    """Consume every available file in ``events_dir`` through Structured
    Streaming, feeding each micro-batch to ``executor`` in order, then
    stop the query and flush the executor."""
    stream = (
        spark.readStream.schema(EVENT_SCHEMA)
        .option("maxFilesPerTrigger", max_files_per_trigger)
        .json(events_dir)
    )

    def handle(batch_df, batch_id: int) -> None:
        pdf = batch_df.orderBy(F.col("ts"), F.col("eid")).toPandas()
        pdf["ts"] = pd.to_datetime(pdf["ts"]).dt.tz_localize(None)
        executor.process_batch(pdf[EVENT_COLUMNS])

    query = stream.writeStream.foreachBatch(handle).trigger(
        availableNow=True
    ).start()
    query.awaitTermination()
    executor.finalize()

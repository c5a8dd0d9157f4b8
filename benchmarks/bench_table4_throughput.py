"""T4 bench — engine throughput vs stream rate + streaming latency.

Batch-engine events/s per anomaly-model family at increasing synthetic
feed rates, plus the real-time check: streaming per-batch latency must
stay under the batch interval at the demo rate. Tables written to
out/table4a.txt / out/table4b.txt.
"""
import pytest

from repro.experiments import table4


@pytest.mark.benchmark(group="table4")
def test_t4a_batch_throughput(benchmark, spark, table_out):
    table = benchmark.pedantic(
        table4.run, args=(spark,), kwargs={"rates": (10.0, 30.0, 120.0)},
        rounds=1, iterations=1,
    )
    table_out("table4a.txt", table4.format_table(table))
    # Shape: the engine is not per-event bound — for every family the
    # peak throughput across rates beats the smallest feed's (fixed
    # per-query overhead amortises). Strict monotonicity is not
    # asserted: post-aggregation model cost (e.g. DBSCAN window count)
    # can bend the curve at the top rate.
    for family in table["family"].unique():
        sub = table[table["family"] == family].sort_values("events")
        assert sub["events_per_s"].max() > sub["events_per_s"].iloc[0]


@pytest.mark.benchmark(group="table4")
def test_t4b_streaming_latency(benchmark, spark, table_out):
    table = benchmark.pedantic(
        table4.run_streaming_latency, args=(spark,),
        kwargs={"events_per_host_per_min": 30.0, "batch_interval_s": 60.0},
        rounds=1, iterations=1,
    )
    table_out("table4b.txt", table4.format_table(table))
    assert bool(table["keeps_up"].iloc[0])

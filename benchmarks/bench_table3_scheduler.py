"""T3 bench — master-dependent vs independent concurrent execution.

8 concurrent Query-2-style monitors. The scheme must produce identical
alerts with a single stream copy instead of 8, and run faster. Table
written to out/table3.txt.
"""
import pytest

from repro.core.scheduler import run_concurrent, run_independent
from repro.experiments import table3


@pytest.fixture(scope="module")
def monitors():
    return table3.threshold_variants(8)


@pytest.mark.benchmark(group="table3")
def test_t3_independent_baseline(benchmark, bench_events, monitors):
    _, metrics = benchmark.pedantic(
        run_independent, args=(bench_events, monitors), rounds=1, iterations=1
    )
    assert metrics.stream_scans == 8


@pytest.mark.benchmark(group="table3")
def test_t3_master_dependent(benchmark, bench_events, monitors):
    _, metrics = benchmark.pedantic(
        run_concurrent, args=(bench_events, monitors), rounds=1, iterations=1
    )
    assert metrics.stream_scans == 1
    assert metrics.n_groups == 1


@pytest.mark.benchmark(group="table3")
def test_t3_table(benchmark, spark, bench_events, table_out):
    table = benchmark.pedantic(
        table3.run, args=(spark,),
        kwargs={"n_queries": 8, "events_df": bench_events},
        rounds=1, iterations=1,
    )
    table_out("table3.txt", table3.format_table(table))
    indep, conc = table.iloc[0], table.iloc[1]
    assert conc["stream_copies"] == 1 and indep["stream_copies"] == 8
    assert conc["alerts_identical"] and indep["alerts_identical"]
    assert conc["time_s"] < indep["time_s"]

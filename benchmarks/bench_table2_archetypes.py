"""T2 bench — batch latency of the paper's Queries 1-4 (one per family).

Times each published archetype over the shared benchmark feed and
writes the expressiveness/correctness table to out/table2.txt.
"""
import pytest

from repro.core.engine import run_batch
from repro.experiments import table2
from repro.queries.demo_queries import PAPER_QUERIES, paper_query


@pytest.mark.benchmark(group="table2")
@pytest.mark.parametrize("key", sorted(PAPER_QUERIES))
def test_t2_archetype_latency(benchmark, bench_events, key):
    cq = paper_query(key)
    alerts = benchmark.pedantic(
        run_batch, args=(bench_events, cq), rounds=1, iterations=1
    )
    col, want = table2.EXPECTED_KEY[key]
    if want is None:
        assert len(alerts) == 0  # apache untouched by this attack
    elif isinstance(want, set):
        assert set(alerts[col]) == want
    else:
        assert want in set(alerts[col])


@pytest.mark.benchmark(group="table2")
def test_t2_table(benchmark, spark, bench_events, table_out):
    table = benchmark.pedantic(
        table2.run, args=(spark,), kwargs={"events_df": bench_events},
        rounds=1, iterations=1,
    )
    table_out("table2.txt", table2.format_table(table))
    assert (table["model"] == ["rule", "timeseries", "invariant", "outlier"]).all()

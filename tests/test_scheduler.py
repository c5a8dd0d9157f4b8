"""Master-dependent concurrent query scheduler tests."""
import pandas as pd
import pytest

from repro.core.compiler import compile_query
from repro.core.scheduler import (
    compat_key,
    group_queries,
    run_concurrent,
    run_independent,
)
from repro.saql import parse_saql

from tests.helpers import canon_alerts


def cq_of(text, name):
    return compile_query(parse_saql(text), name)


def ts_variant(name, threshold):
    """Time-series variants differing only in the alert threshold —
    the classic 'many analysts, same feed slice' concurrent workload."""
    return cq_of(
        f"""
        agentid = "db-01"
        proc p write ip i as evt #time(10 min)
        state[3] ss {{ avg_amount := avg(evt.amount) }} group by p
        alert ss[0].avg_amount > {threshold}
        return p, ss[0].avg_amount
        """,
        name,
    )


def test_compat_key_same_for_threshold_variants():
    a, b = ts_variant("a", 1000), ts_variant("b", 99999)
    assert compat_key(a) == compat_key(b)


def test_compat_key_differs_on_window():
    a = ts_variant("a", 1000)
    b = cq_of(
        'agentid = "db-01"\nproc p write ip i as evt #time(5 min)\n'
        "state[3] ss { avg_amount := avg(evt.amount) } group by p\n"
        "alert ss[0].avg_amount > 10\nreturn p",
        "b",
    )
    assert compat_key(a) != compat_key(b)


def test_compat_key_differs_on_constraints():
    a = ts_variant("a", 1000)
    b = cq_of(
        'agentid = "db-01"\nproc p["%sqlservr.exe"] write ip i as evt #time(10 min)\n'
        "state[3] ss { avg_amount := avg(evt.amount) } group by p\n"
        "alert ss[0].avg_amount > 10\nreturn p",
        "b",
    )
    assert compat_key(a) != compat_key(b)


def test_rule_queries_never_share():
    from repro.queries.demo_queries import DEMO_QUERY_TEXTS

    r = cq_of(DEMO_QUERY_TEXTS["rule_c3"], "r")
    assert compat_key(r) is None


def test_grouping_elects_master_with_superset_fields():
    rich = cq_of(
        "proc p write ip i as evt #time(10 min)\n"
        "state ss { avg_amount := avg(evt.amount)\n total := sum(evt.amount) } group by p\n"
        "alert total > 5\nreturn p",
        "rich",
    )
    poor = cq_of(
        "proc p write ip i as evt #time(10 min)\n"
        "state ss { avg_amount := avg(evt.amount) } group by p\n"
        "alert avg_amount > 5\nreturn p",
        "poor",
    )
    # 'poor' alert refs need the state name; rewrite to valid refs
    poor = cq_of(
        "proc p write ip i as evt #time(10 min)\n"
        "state ss { avg_amount := avg(evt.amount) } group by p\n"
        "alert ss.avg_amount > 5\nreturn p",
        "poor",
    )
    rich = cq_of(
        "proc p write ip i as evt #time(10 min)\n"
        "state ss { avg_amount := avg(evt.amount)\n total := sum(evt.amount) } group by p\n"
        "alert ss.total > 5\nreturn p",
        "rich",
    )
    groups = group_queries([poor, rich])
    assert len(groups) == 1
    assert groups[0].master.name == "rich"
    assert [d.name for d in groups[0].dependents] == ["poor"]


def test_grouping_incompatible_fields_split():
    a = cq_of(
        "proc p write ip i as evt #time(10 min)\n"
        "state ss { x := avg(evt.amount) } group by p\nalert ss.x > 5\nreturn p",
        "a",
    )
    b = cq_of(
        "proc p write ip i as evt #time(10 min)\n"
        "state ss { y := sum(evt.amount) } group by p\nalert ss.y > 5\nreturn p",
        "b",
    )
    groups = group_queries([a, b])
    assert len(groups) == 2


def test_grouping_mixed_catalog():
    qs = [ts_variant(f"t{k}", 1000 * (k + 1)) for k in range(4)]
    qs.append(
        cq_of(
            "proc p1 start proc p2 as e1\nproc p2 write ip i as e2\n"
            "with e1 -> e2\nreturn distinct p1, p2",
            "rule",
        )
    )
    groups = group_queries(qs)
    sizes = sorted(len(g.members) for g in groups)
    assert sizes == [1, 4]


def test_concurrent_matches_independent(demo_events_df):
    """The paper's core claim for the scheme: identical alerts, fewer
    stream copies."""
    qs = [ts_variant(f"t{k}", th) for k, th in enumerate([5000, 10000, 100000])]
    conc, m_conc = run_concurrent(demo_events_df, qs)
    indep, m_indep = run_independent(demo_events_df, qs)
    assert m_conc.stream_scans == 1
    assert m_indep.stream_scans == 3
    for q in qs:
        pd.testing.assert_frame_equal(
            canon_alerts(conc[q.name]), canon_alerts(indep[q.name]),
            check_dtype=False,
        )


def test_concurrent_mixed_with_rule(demo_events_df):
    from repro.queries.demo_queries import DEMO_QUERY_TEXTS

    qs = [
        ts_variant("t1", 10000),
        ts_variant("t2", 20000),
        cq_of(DEMO_QUERY_TEXTS["rule_c3"], "rule_c3"),
    ]
    conc, m = run_concurrent(demo_events_df, qs)
    assert m.stream_scans == 2  # 1 shared stateful group + 1 rule query
    assert m.n_groups == 2
    assert len(conc["rule_c3"]) == 1


def test_metrics_shared_rows_counted(demo_events_df):
    qs = [ts_variant("t1", 10000), ts_variant("t2", 20000)]
    _, m = run_concurrent(demo_events_df, qs)
    assert m.shared_state_rows > 0
    assert m.n_queries == 2 and m.n_groups == 1

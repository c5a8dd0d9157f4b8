"""Semantic analysis (AST -> CompiledQuery) tests."""
import pytest

from repro.queries.demo_queries import DEMO_QUERY_TEXTS, PAPER_QUERIES
from repro.saql import parse_saql
from repro.saql.errors import SaqlCompileError
from repro.core.compiler import compile_query


def c(text, name="q"):
    return compile_query(parse_saql(text), name)


@pytest.mark.parametrize("key", sorted(PAPER_QUERIES))
def test_paper_queries_compile(key):
    cq = c(PAPER_QUERIES[key], key)
    assert cq.name == key


@pytest.mark.parametrize("key", sorted(DEMO_QUERY_TEXTS))
def test_demo_queries_compile(key):
    assert c(DEMO_QUERY_TEXTS[key], key).kind in (
        "rule", "timeseries", "invariant", "outlier", "stateful",
    )


def test_var_roles_collected():
    cq = c(PAPER_QUERIES["paper_q1_rule"])
    assert cq.vars["p4"].etype == "proc"
    # p4 is subject in patterns 2 and 3 (0-indexed)
    assert {(i, r) for i, r in cq.vars["p4"].slots} == {(2, "subject"), (3, "subject")}
    assert cq.vars["f1"].etype == "file"
    assert len(cq.vars["f1"].slots) == 2


def test_aliases_positional_default():
    cq = c("proc p write ip i return p")
    assert cq.aliases == ["_evt0"]


def test_duplicate_alias_raises():
    with pytest.raises(SaqlCompileError):
        c("proc p write ip i as e\nproc p read ip i as e\nreturn p")


def test_group_key_default_attr():
    cq = c(PAPER_QUERIES["paper_q2_timeseries"])
    (gk,) = cq.group_keys
    assert gk.out == "p__exe_name" and gk.attr == "exe_name"


def test_group_key_explicit_attr():
    cq = c(PAPER_QUERIES["paper_q4_outlier"])
    (gk,) = cq.group_keys
    assert gk.out == "i__dstip"


def test_state_agg_sources():
    cq = c(PAPER_QUERIES["paper_q3_invariant"])
    (agg,) = cq.state_aggs
    assert agg.func == "set" and agg.source_col == "var__p2__exe_name"
    assert agg.is_set and agg.default == frozenset()


def test_event_attr_agg_source():
    cq = c(PAPER_QUERIES["paper_q2_timeseries"])
    (agg,) = cq.state_aggs
    assert agg.source_col == "amount" and agg.default == 0.0


def test_history_depth():
    assert c(PAPER_QUERIES["paper_q2_timeseries"]).history == 3
    assert c(PAPER_QUERIES["paper_q4_outlier"]).history == 1


def test_state_field_lookup():
    cq = c(PAPER_QUERIES["paper_q4_outlier"])
    assert cq.state_field("amt").func == "sum"
    with pytest.raises(SaqlCompileError):
        cq.state_field("nope")


# ----------------------------------------------------------------- rejects
def test_subject_must_be_process():
    with pytest.raises(SaqlCompileError):
        c("file f write ip i return f")


def test_unknown_operation_rejected():
    with pytest.raises(SaqlCompileError):
        c("proc p teleport ip i return p")


def test_stateful_requires_window():
    with pytest.raises(SaqlCompileError):
        c("proc p write ip i as evt\nstate ss { a := sum(evt.amount) } group by p\nreturn p")


def test_stateful_single_pattern_only():
    with pytest.raises(SaqlCompileError):
        c(
            "proc p write ip i as e1 #time(10 s)\nproc p read ip i as e2\n"
            "state ss { a := sum(e1.amount) } group by p\nreturn p"
        )


def test_invariant_without_state_rejected():
    with pytest.raises(SaqlCompileError):
        c(
            "proc p start proc q as evt\n"
            "invariant[5][offline] { a := empty_set\n a = a union ss.s }\nreturn p"
        )


def test_cluster_without_state_rejected():
    with pytest.raises(SaqlCompileError):
        c(
            "proc p write ip i as evt\n"
            'cluster(points=all(ss.amt), distance="ed", method="DBSCAN(1, 2)")\nreturn p'
        )


def test_cluster_unknown_method_rejected():
    with pytest.raises(SaqlCompileError):
        c(
            "proc p write ip i as evt #time(10 min)\n"
            "state ss { amt := sum(evt.amount) } group by i.dstip\n"
            'cluster(points=all(ss.amt), distance="ed", method="KMEANS(3)")\nreturn p'
        )


def test_cluster_bad_arity_rejected():
    with pytest.raises(SaqlCompileError):
        c(
            "proc p write ip i as evt #time(10 min)\n"
            "state ss { amt := sum(evt.amount) } group by i.dstip\n"
            'cluster(points=all(ss.amt), distance="ed", method="DBSCAN(1)")\nreturn p'
        )


def test_cluster_unknown_distance_rejected():
    with pytest.raises(SaqlCompileError):
        c(
            "proc p write ip i as evt #time(10 min)\n"
            "state ss { amt := sum(evt.amount) } group by i.dstip\n"
            'cluster(points=all(ss.amt), distance="manhattan", method="DBSCAN(1, 2)")\nreturn p'
        )


def test_cluster_unknown_point_field_rejected():
    with pytest.raises(SaqlCompileError):
        c(
            "proc p write ip i as evt #time(10 min)\n"
            "state ss { amt := sum(evt.amount) } group by i.dstip\n"
            'cluster(points=all(ss.nope), distance="ed", method="DBSCAN(1, 2)")\nreturn p'
        )


def test_unknown_agg_function_rejected():
    with pytest.raises(SaqlCompileError):
        c(
            "proc p write ip i as evt #time(10 min)\n"
            "state ss { a := median(evt.amount) } group by p\nreturn p"
        )


def test_duplicate_state_field_rejected():
    with pytest.raises(SaqlCompileError):
        c(
            "proc p write ip i as evt #time(10 min)\n"
            "state ss { a := sum(evt.amount)\n a := avg(evt.amount) } group by p\nreturn p"
        )


def test_unknown_attribute_rejected():
    with pytest.raises(SaqlCompileError):
        c(
            "proc p write ip i as evt #time(10 min)\n"
            "state ss { a := sum(i.flavor) } group by p\nreturn p"
        )


def test_missing_return_rejected():
    with pytest.raises(SaqlCompileError):
        c("proc p write ip i as evt")


def test_group_by_unknown_var_rejected():
    with pytest.raises(SaqlCompileError):
        c(
            "proc p write ip i as evt #time(10 min)\n"
            "state ss { a := sum(evt.amount) } group by z\nreturn p"
        )

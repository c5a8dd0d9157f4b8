"""Property-based robustness tests for the SAQL front end.

Hypothesis generates query fragments (identifiers, thresholds, window
sizes, constraint values) and checks the lexer/parser/compiler either
accept them cleanly or raise a typed SaqlError — never crash with an
arbitrary exception.
"""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.compiler import compile_query
from repro.saql import parse_saql
from repro.saql.errors import SaqlError
from repro.saql.lexer import tokenize

idents = st.from_regex(r"[a-z][a-z0-9_]{0,10}", fullmatch=True)
exes = st.from_regex(r"%?[a-z0-9_.]{1,12}(\.exe)?", fullmatch=True)


@settings(max_examples=60, deadline=None)
@given(st.text(max_size=200))
def test_lexer_total(text):
    """The lexer accepts or raises SaqlError — nothing else."""
    try:
        toks = tokenize(text)
        assert toks[-1].kind == "EOF"
    except SaqlError:
        pass


@settings(max_examples=60, deadline=None)
@given(st.text(max_size=200))
def test_parser_total(text):
    try:
        parse_saql(text)
    except SaqlError:
        pass


@settings(max_examples=40, deadline=None)
@given(p=idents, c=idents, exe=exes, win=st.integers(1, 3600))
def test_rule_template_always_parses(p, c, exe, win):
    if p == c or {p, c} & {"proc", "file", "ip", "as", "with", "return"}:
        return
    q = parse_saql(
        f'proc {p}["{exe}"] start proc {c} as evt #time({win} s)\n'
        f"return distinct {p}, {c}"
    )
    assert q.window.length_s == float(win)
    cq = compile_query(q, "t")
    assert cq.kind == "rule"


@settings(max_examples=40, deadline=None)
@given(
    threshold=st.floats(0, 1e12, allow_nan=False),
    hist=st.integers(1, 8),
    win=st.integers(1, 86400),
)
def test_timeseries_template_always_compiles(threshold, hist, win):
    text = f"""
    proc p write ip i as evt #time({win} s)
    state[{hist}] ss {{ v := avg(evt.amount) }} group by p
    alert ss[0].v > {threshold}
    return p, ss[0].v
    """
    cq = compile_query(parse_saql(text), "t")
    assert cq.history == hist


@settings(max_examples=30, deadline=None)
@given(eps=st.floats(0.1, 1e9, allow_nan=False), minpts=st.integers(1, 50))
def test_cluster_template_always_compiles(eps, minpts):
    text = f"""
    proc p write ip i as evt #time(60 s)
    state ss {{ amt := sum(evt.amount) }} group by i.dstip
    cluster(points=all(ss.amt), distance="ed", method="DBSCAN({eps}, {minpts})")
    alert cluster.outlier
    return i.dstip, ss.amt
    """
    cq = compile_query(parse_saql(text), "t")
    assert cq.query.cluster.method_args[0] == pytest.approx(eps)


@settings(max_examples=30, deadline=None)
@given(st.sampled_from(["read", "write", "start", "execute", "delete", "connect"]),
       st.sampled_from(["proc", "file", "ip"]))
def test_all_op_entity_combinations_parse(op, etype):
    q = parse_saql(f"proc p {op} {etype} o as evt\nreturn p")
    assert q.patterns[0].ops == [op]
    assert q.patterns[0].obj.etype == etype

"""Parser tests — every published query plus clause-level coverage."""
import pytest

from repro.queries.demo_queries import DEMO_QUERY_TEXTS, PAPER_QUERIES
from repro.saql import ast, parse_saql
from repro.saql.errors import SaqlSyntaxError


@pytest.mark.parametrize("key", sorted(PAPER_QUERIES))
def test_paper_queries_parse(key):
    q = parse_saql(PAPER_QUERIES[key])
    assert q.patterns


@pytest.mark.parametrize("key", sorted(DEMO_QUERY_TEXTS))
def test_demo_queries_parse(key):
    q = parse_saql(DEMO_QUERY_TEXTS[key])
    assert q.ret is not None


# ------------------------------------------------------------------ patterns
def test_simple_pattern():
    q = parse_saql("proc p write ip i as evt return p")
    (pat,) = q.patterns
    assert pat.subject.var == "p" and pat.subject.etype == "proc"
    assert pat.obj.var == "i" and pat.obj.etype == "ip"
    assert pat.ops == ["write"]
    assert pat.alias == "evt"


def test_op_disjunction():
    q = parse_saql("proc p read || write || connect ip i as evt return p")
    assert q.patterns[0].ops == ["read", "write", "connect"]


def test_positional_constraint_is_default_attr():
    q = parse_saql('proc p["%cmd.exe"] start proc c return p')
    (c,) = q.patterns[0].subject.constraints
    assert c.attr is None and c.op == "=" and c.value == "%cmd.exe"


def test_named_constraint():
    q = parse_saql('proc p write ip i[dstip="10.0.0.1", dstport=443] return p')
    cs = q.patterns[0].obj.constraints
    assert [(c.attr, c.op, c.value) for c in cs] == [
        ("dstip", "=", "10.0.0.1"),
        ("dstport", "=", 443.0),
    ]


@pytest.mark.parametrize("op", ["!=", "<", "<=", ">", ">="])
def test_constraint_operators(op):
    q = parse_saql(f"proc p write ip i[dstport {op} 1024] return p")
    assert q.patterns[0].obj.constraints[0].op == op


def test_variable_reuse_marks_is_ref():
    q = parse_saql(
        "proc a write file f as e1\nproc b read file f as e2\nreturn f"
    )
    assert not q.patterns[0].obj.is_ref
    assert q.patterns[1].obj.is_ref


def test_variable_type_conflict_raises():
    with pytest.raises(SaqlSyntaxError):
        parse_saql("proc p write file x as e1\nproc p read ip x as e2\nreturn p")


# ------------------------------------------------------------------- globals
def test_global_constraint_quoted():
    q = parse_saql('agentid = "db-01"\nproc p write ip i return p')
    assert q.globals == [ast.GlobalConstraint("agentid", "=", "db-01")]


def test_global_constraint_bare_word():
    q = parse_saql("agentid = xxx\nproc p write ip i return p")
    assert q.globals[0].value == "xxx"


# ------------------------------------------------------------------- windows
@pytest.mark.parametrize(
    "spec,length,slide",
    [
        ("#time(10 min)", 600.0, 600.0),
        ("#time(10 s)", 10.0, 10.0),
        ("#time(1 hour)", 3600.0, 3600.0),
        ("#time(2 min, 30 s)", 120.0, 30.0),
        ("#time(1 day)", 86400.0, 86400.0),
    ],
)
def test_window_spec(spec, length, slide):
    q = parse_saql(f"proc p write ip i as evt {spec} return p")
    assert q.window == ast.WindowSpec(length, slide)


def test_unknown_time_unit_raises():
    with pytest.raises(SaqlSyntaxError):
        parse_saql("proc p write ip i as evt #time(3 fortnight) return p")


def test_conflicting_windows_raise():
    with pytest.raises(SaqlSyntaxError):
        parse_saql(
            "proc p write ip i as e1 #time(10 s)\n"
            "proc p read ip i as e2 #time(20 s)\nreturn p"
        )


# ------------------------------------------------------------------ temporal
def test_temporal_clause():
    q = parse_saql(
        "proc p start proc c as e1\nproc c write ip i as e2\n"
        "with e1 -> e2\nreturn p"
    )
    assert q.temporal == ["e1", "e2"]


def test_temporal_chain_of_four():
    q = parse_saql(PAPER_QUERIES["paper_q1_rule"])
    assert q.temporal == ["evt1", "evt2", "evt3", "evt4"]


# -------------------------------------------------------------------- state
def test_state_block():
    q = parse_saql(
        "proc p write ip i as evt #time(10 min)\n"
        "state[3] ss { avg_amount := avg(evt.amount) } group by p\nreturn p"
    )
    s = q.state
    assert s.history == 3 and s.name == "ss"
    assert s.fields[0].name == "avg_amount" and s.fields[0].func == "avg"
    assert s.group_by == [ast.Ref("p")]


def test_state_default_history_is_one():
    q = parse_saql(
        "proc p write ip i as evt #time(10 min)\n"
        "state ss { amt := sum(evt.amount) } group by i.dstip\nreturn p"
    )
    assert q.state.history == 1
    assert q.state.group_by == [ast.Ref("i", None, "dstip")]


def test_state_multiple_fields_and_groups():
    q = parse_saql(
        "proc p write ip i as evt #time(10 min)\n"
        "state ss { a := sum(evt.amount)\n b := count() } group by p, i.dstip\n"
        "return p"
    )
    assert [f.name for f in q.state.fields] == ["a", "b"]
    assert q.state.fields[1].arg is None
    assert len(q.state.group_by) == 2


def test_query_kind_classification():
    assert parse_saql(PAPER_QUERIES["paper_q1_rule"]).kind == "rule"
    assert parse_saql(PAPER_QUERIES["paper_q2_timeseries"]).kind == "timeseries"
    assert parse_saql(PAPER_QUERIES["paper_q3_invariant"]).kind == "invariant"
    assert parse_saql(PAPER_QUERIES["paper_q4_outlier"]).kind == "outlier"


# ---------------------------------------------------------------- invariant
def test_invariant_block():
    q = parse_saql(PAPER_QUERIES["paper_q3_invariant"])
    inv = q.invariant
    assert inv.train_windows == 10 and inv.mode == "offline"
    assert inv.var == "a"
    assert isinstance(inv.init, ast.Ref) and inv.init.name == "empty_set"
    assert isinstance(inv.update, ast.Binary) and inv.update.op == "union"


def test_invariant_mismatched_var_raises():
    with pytest.raises(SaqlSyntaxError):
        parse_saql(
            "proc p start proc c as evt #time(10 s)\n"
            "state ss { s := set(c.exe_name) } group by p\n"
            "invariant[5][offline] { a := empty_set\n b = b union ss.s }\n"
            "return p"
        )


def test_invariant_bad_mode_raises():
    with pytest.raises(SaqlSyntaxError):
        parse_saql(
            "proc p start proc c as evt #time(10 s)\n"
            "state ss { s := set(c.exe_name) } group by p\n"
            "invariant[5][sometimes] { a := empty_set\n a = a union ss.s }\n"
            "return p"
        )


# ------------------------------------------------------------------ cluster
def test_cluster_clause():
    q = parse_saql(PAPER_QUERIES["paper_q4_outlier"])
    cl = q.cluster
    assert cl.method == "DBSCAN" and cl.method_args == [100000.0, 5.0]
    assert cl.distance == "ed"
    assert cl.points == [ast.Ref("ss", None, "amt")]


def test_cluster_bad_method_string_raises():
    with pytest.raises(SaqlSyntaxError):
        parse_saql(
            "proc p write ip i as evt #time(10 min)\n"
            "state ss { amt := sum(evt.amount) } group by i.dstip\n"
            'cluster(points=all(ss.amt), distance="ed", method="((")\nreturn p'
        )


# -------------------------------------------------------------------- alert
def test_alert_expression_structure():
    q = parse_saql(PAPER_QUERIES["paper_q2_timeseries"])
    assert isinstance(q.alert, ast.Binary) and q.alert.op == "&&"


def test_alert_cardinality_diff():
    q = parse_saql(PAPER_QUERIES["paper_q3_invariant"])
    assert isinstance(q.alert, ast.Binary) and q.alert.op == ">"
    assert isinstance(q.alert.left, ast.Card)
    assert isinstance(q.alert.left.operand, ast.Binary)
    assert q.alert.left.operand.op == "diff"


def test_precedence_and_over_or():
    q = parse_saql("proc p write ip i as e return p\nalert 1 > 0 || 2 > 1 && 0 > 1")
    # || binds loosest: (1>0) || ((2>1) && (0>1))
    assert q.alert.op == "||"
    assert q.alert.right.op == "&&"


def test_precedence_arithmetic():
    q = parse_saql("proc p write ip i as e return p\nalert 1 + 2 * 3 > 6")
    cmp = q.alert
    assert cmp.op == ">"
    assert cmp.left.op == "+" and cmp.left.right.op == "*"


def test_not_operator():
    q = parse_saql("proc p write ip i as e return p\nalert !(1 > 2)")
    assert isinstance(q.alert, ast.Unary) and q.alert.op == "!"


# ------------------------------------------------------------------- return
def test_return_distinct_and_shortcuts():
    q = parse_saql(PAPER_QUERIES["paper_q1_rule"])
    assert q.ret.distinct
    assert [i.expr.name for i in q.ret.items] == ["p1", "p2", "p3", "f1", "p4", "i1"]


def test_return_with_alias():
    q = parse_saql("proc p write ip i as e return p.exe_name as app")
    assert q.ret.items[0].alias == "app"


def test_return_state_indexed_refs():
    q = parse_saql(PAPER_QUERIES["paper_q2_timeseries"])
    refs = [i.expr for i in q.ret.items]
    assert refs[1] == ast.Ref("ss", 0, "avg_amount")
    assert refs[3] == ast.Ref("ss", 2, "avg_amount")


# ------------------------------------------------------------------- errors
@pytest.mark.parametrize(
    "text",
    [
        "",  # no pattern
        "return p",  # no pattern
        "proc p write",  # truncated pattern
        "proc p write ip",  # object without var
        "with e1 -> e2",  # temporal without patterns
        "proc p write ip i as e ##time(10 s) return p",  # bad window
        "widget w write ip i return w",  # unknown entity type
        "proc p write ip i [ return p",  # unterminated constraints
    ],
)
def test_syntax_errors(text):
    with pytest.raises(SaqlSyntaxError):
        parse_saql(text)


def test_error_carries_position():
    try:
        parse_saql('proc p write ip i[dstip=="x" return p')
    except SaqlSyntaxError as e:
        assert e.line is not None
    else:  # pragma: no cover
        pytest.fail("expected syntax error")

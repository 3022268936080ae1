"""Tests for the EQL AST and parser (§2 syntax)."""
import pytest

from repro.lang import BGP, CTP, Cond, EdgePattern, ParseError, Pred, Query, parse
from repro.lang.ast import const, typed, var


# ---- AST construction ----------------------------------------------------

def test_pred_shorthand_const():
    p = const("Alice")
    assert p.conds == (Cond("label", "=", "Alice"),)


def test_cond_matches_label_eq():
    c = Cond("label", "=", "Alice")
    assert c.matches("Alice", frozenset())
    assert not c.matches("Bob", frozenset())


def test_cond_matches_like():
    c = Cond("label", "~", "*lice")
    assert c.matches("Alice", frozenset())
    assert not c.matches("Alicia", frozenset())


def test_cond_matches_type():
    c = Cond("type", "=", "entrepreneur")
    assert c.matches("x", frozenset({"entrepreneur", "person"}))
    assert not c.matches("x", frozenset({"person"}))


def test_cond_lt():
    assert Cond("label", "<", "b").matches("a", frozenset())
    assert not Cond("label", "<", "a").matches("a", frozenset())
    assert Cond("label", "<=", "a").matches("a", frozenset())


def test_bgp_requires_connected_patterns():
    with pytest.raises(ValueError):
        BGP((
            EdgePattern(var("a"), var("e1"), var("b")),
            EdgePattern(var("c"), var("e2"), var("d")),
        ))


def test_bgp_connected_ok():
    b = BGP((
        EdgePattern(var("a"), var("e1"), var("b")),
        EdgePattern(var("b"), var("e2"), var("c")),
    ))
    assert b.variables() == ["a", "e1", "b", "e2", "c"]
    assert b.node_vars() == ["a", "b", "c"]


def test_ctp_m_and_distinct_vars():
    c = CTP((var("x"), var("y")), "w")
    assert c.m == 2
    with pytest.raises(ValueError):
        CTP((var("x"), var("x")), "w")
    with pytest.raises(ValueError):
        CTP((var("x"),), "w")


def test_query_validations():
    ctp = CTP((var("x"), var("y")), "w")
    q = Query(("x", "w"), (), (ctp,))
    assert q.simple_variables() == ["x", "y"]
    with pytest.raises(ValueError):
        Query(("zz",), (), (ctp,))  # head var not in body
    with pytest.raises(ValueError):
        Query((), (), ())  # empty body


def test_query_duplicate_tree_var_rejected():
    c1 = CTP((var("x"), var("y")), "w")
    c2 = CTP((var("a"), var("b")), "w")
    with pytest.raises(ValueError):
        Query(("x",), (), (c1, c2))


# ---- parser --------------------------------------------------------------

def test_parse_q1_like():
    q = parse('''
        SELECT x, y, z, w
        WHERE (x{type="entrepreneur"}, "citizenOf", "USA")
        AND (y{type="entrepreneur"}, "citizenOf", "France")
        AND (z{type="politician"}, "citizenOf", "France")
        AND CTP(x, y, z, *w)
    ''')
    assert q.head == ("x", "y", "z", "w")
    assert len(q.bgps) == 3 and len(q.ctps) == 1
    assert q.ctps[0].m == 3 and q.ctps[0].tree_var == "w"


def test_parse_groups_connected_patterns_into_one_bgp():
    q = parse('''
        SELECT x
        WHERE (x, "a", y) AND (y, "b", z) AND CTP(x, z, *w)
    ''')
    assert len(q.bgps) == 1
    assert len(q.bgps[0].patterns) == 2


def test_parse_filters():
    q = parse('''
        SELECT w
        WHERE CTP("A", "B", *w) UNI LABEL {up, "down"} MAX 5 TOP 3 TIMEOUT 2.5
    ''')
    f = q.ctps[0].filters
    assert f.uni and f.labels == frozenset({"up", "down"})
    assert f.max_edges == 5 and f.top_k == 3 and f.timeout_s == 2.5


def test_parse_limit_and_score():
    q = parse('SELECT w WHERE CTP("A", "B", *w) SCORE size LIMIT 1')
    f = q.ctps[0].filters
    assert f.score == "size" and f.limit == 1


def test_parse_label_pattern_pred():
    q = parse('SELECT x WHERE (x{label~"*lice"}, "knows", y) AND CTP(x, y, *w)')
    (cond,) = q.bgps[0].patterns[0].s.conds
    assert cond.op == "~" and cond.value == "*lice"


def test_parse_constants_get_fresh_vars():
    q = parse('SELECT w WHERE CTP("A", "B", *w)')
    p1, p2 = q.ctps[0].preds
    assert p1.var != p2.var
    assert p1.conds[0].value == "A"


def test_parse_errors():
    with pytest.raises(ParseError):
        parse("WHERE (x, y, z)")
    with pytest.raises(ParseError):
        parse("SELECT x WHERE (x, y)")  # malformed triple
    with pytest.raises(ParseError):
        parse("SELECT x WHERE CTP(x, y)")  # no tree var


def test_parse_two_ctps():
    q = parse('''
        SELECT x, w1, w2
        WHERE (x, "knows", y)
        AND CTP(x, "B", *w1) AND CTP(y, "C", *w2) MAX 4
    ''')
    assert len(q.ctps) == 2
    assert q.ctps[0].filters.max_edges is None
    assert q.ctps[1].filters.max_edges == 4

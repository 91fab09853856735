"""SGQParser (§5.2): RQ → canonical SGA expression shape tests."""
import pytest

from repro.core.algebra import Path, Pattern, Union, Wscan, explain_sga
from repro.core.rq import parse_rq
from repro.core.sgq_parser import build_sga, rpq_plan


def test_single_edb_rule_is_relabel_over_wscan():
    plan = build_sga(parse_rq("Ans(x, y) <- a(x, y)"), window=10)
    assert isinstance(plan, Union) and plan.label == "Ans"
    (child,) = plan.children
    assert isinstance(child, Wscan) and child.source == "a" and child.size == 10


def test_closure_rule_builds_path():
    plan = build_sga(parse_rq("Ans(x, y) <- a+(x, y)"), window=10)
    assert isinstance(plan, Union)
    (path,) = plan.children
    assert isinstance(path, Path) and path.regex == "a+"
    assert isinstance(path.children[0], Wscan)


def test_star_treated_as_plus():
    plan = build_sga(parse_rq("Ans(x, y) <- a*(x, y)"), window=10)
    (path,) = plan.children
    assert path.regex == "a+"


def test_conjunctive_rule_builds_pattern():
    plan = build_sga(parse_rq("Ans(x, y) <- a(x, z), b(z, y)"), window=5)
    assert isinstance(plan, Pattern)
    assert plan.label == "Ans"
    assert plan.phi == [((0, "trg"), (1, "src"))]
    assert plan.src_sel == (0, "src") and plan.trg_sel == (1, "trg")


def test_triangle_pattern_phi():
    # Recent-liker triangle of Example 5: RL(u1,u2) <- l(u1,m1), f(u1,u2), p(u2,m1)
    plan = build_sga(
        parse_rq("Ans(u1, u2) <- l(u1, m1), f(u1, u2), p(u2, m1)"), window=24
    )
    assert isinstance(plan, Pattern)
    # m1: l.trg = p.trg ; u1: l.src = f.src ; u2: f.trg = p.src
    assert (((0, "src"), (1, "src"))) in plan.phi
    assert (((1, "trg"), (2, "src"))) in plan.phi
    assert (((0, "trg"), (2, "trg"))) in plan.phi
    assert len(plan.phi) == 3


def test_union_of_rules():
    plan = build_sga(
        parse_rq("Ans(x, y) <- a(x, y); Ans(x, y) <- b(x, y)"), window=3
    )
    assert isinstance(plan, Union) and len(plan.children) == 2


def test_nested_idb_q7_shape():
    plan = build_sga(
        parse_rq(
            """
            RL(x, y) <- a+(x, y), b(x, m), c(m, y)
            Ans(x, m) <- RL+(x, y), c(m, y)
            """
        ),
        window=30,
    )
    assert isinstance(plan, Pattern) and plan.label == "Ans"
    outer_path = plan.children[0]
    assert isinstance(outer_path, Path)
    inner = outer_path.children[0]
    assert isinstance(inner, Pattern) and inner.label == "RL"
    assert isinstance(inner.children[0], Path)  # a+ closure
    # head of Ans is (x, m): x is RL+'s src, m is c's src
    assert plan.src_sel == (0, "src") and plan.trg_sel == (1, "src")


def test_reversed_head_projection():
    plan = build_sga(parse_rq("Ans(y, x) <- a(x, y)"), window=2)
    assert isinstance(plan, Pattern)
    assert plan.src_sel == (0, "trg") and plan.trg_sel == (0, "src")


def test_unbound_head_variable_rejected():
    with pytest.raises(ValueError):
        build_sga(parse_rq("Ans(x, q) <- a(x, y)"), window=2)


def test_rpq_plan():
    plan = rpq_plan("a . b*", window=7, slide=2)
    assert isinstance(plan, Path) and plan.regex == "a . b*"
    assert sorted(c.source for c in plan.children) == ["a", "b"]
    assert all(c.size == 7 and c.slide == 2 for c in plan.children)


def test_explain_renders_all_nodes():
    plan = build_sga(
        parse_rq("RL(x, y) <- a+(x, y), b(x, m), c(m, y); Ans(x, y) <- RL+(x, y)"),
        window=30,
    )
    text = explain_sga(plan)
    for frag in ("PATH", "PATTERN", "WSCAN", "T=30"):
        assert frag in text


def test_window_propagates_to_all_wscans():
    plan = build_sga(
        parse_rq("Ans(x, y) <- a(x, z), b+(z, y)"), window=11, slide=3
    )

    def wscans(n):
        if isinstance(n, Wscan):
            yield n
        for c in n.children_nodes():
            yield from wscans(c)

    ws = list(wscans(plan))
    assert len(ws) == 2
    assert all(w.size == 11 and w.slide == 3 for w in ws)

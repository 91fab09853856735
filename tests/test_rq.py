"""Regular Query representation / parser tests (Def. 14)."""
import pytest

from repro.core.rq import ANSWER, Atom, Rule, parse_rq


def test_parse_single_rule():
    rq = parse_rq("Ans(x, y) <- a(x, y)")
    assert len(rq.rules) == 1
    r = rq.rules[0]
    assert r.head == ANSWER and (r.head_src, r.head_trg) == ("x", "y")
    assert r.body == (Atom("a", "x", "y"),)


def test_parse_closure_atoms():
    rq = parse_rq("Ans(x, y) <- a+(x, z), b*(z, y)")
    a, b = rq.rules[0].body
    assert a.closure == "+" and b.closure == "*"


def test_parse_multiline_and_semicolons():
    rq = parse_rq(
        """
        RL(x, y) <- a+(x, y), b(x, m), c(m, y)
        Ans(x, m) <- RL+(x, y), c(m, y)
        """
    )
    assert rq.heads() == {"RL", ANSWER}
    assert rq.edb_labels() == {"a", "b", "c"}
    assert rq.dependency_order() == ["RL", ANSWER]


def test_parse_union_rules():
    rq = parse_rq("Ans(x, y) <- a(x, y); Ans(x, y) <- b(x, y)")
    assert len(rq.rules_for(ANSWER)) == 2


def test_example3_notification_query():
    # Example 3 of the paper (labels l, f, p).
    rq = parse_rq(
        """
        RL(u1, u2) <- l(u1, m1), f(u1, u2), p(u2, m1)
        Notify(u, m) <- RL+(u, u2), p(u2, m)
        Ans(u, m) <- Notify(u, m)
        """
    )
    assert rq.edb_labels() == {"l", "f", "p"}
    assert rq.dependency_order() == ["Notify", "RL", ANSWER] or rq.dependency_order()[
        -1
    ] == ANSWER


def test_dependency_order_respects_deps():
    rq = parse_rq(
        """
        P(x, y) <- a(x, z), a(y, z)
        Ans(x, y) <- P+(x, y)
        """
    )
    order = rq.dependency_order()
    assert order.index("P") < order.index(ANSWER)


@pytest.mark.parametrize(
    "bad",
    [
        "Ans(x, y)",  # no body
        "Ans(x, y) <- ",  # empty body
        "Foo(x, y) <- a(x, y)",  # no Ans
        "Ans(x, y) <- Ans(x, y)",  # recursion
        "Ans+(x, y) <- a(x, y)",  # closed head
    ],
)
def test_parse_rejects(bad):
    with pytest.raises(ValueError):
        parse_rq(bad)


def test_mutual_recursion_rejected():
    with pytest.raises(ValueError):
        parse_rq(
            """
            P(x, y) <- Q(x, y)
            Q(x, y) <- P(x, y)
            Ans(x, y) <- P(x, y)
            """
        )


def test_str_roundtrip():
    rq = parse_rq("Ans(x, y) <- a+(x, z), b(z, y)")
    rq2 = parse_rq(str(rq))
    assert rq2.rules == rq.rules


def test_rule_str():
    r = Rule("Ans", "x", "y", (Atom("a", "x", "y", "+"),))
    assert str(r) == "Ans(x, y) <- a+(x, y)"

"""Regex parser + DFA compiler tests, cross-checked against Python ``re``."""
import re

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.regex import (
    Alt,
    Concat,
    Label,
    Plus,
    Star,
    compile_dfa,
    parse_regex,
)


def words(alphabet, max_len):
    out = [[]]
    frontier = [[]]
    for _ in range(max_len):
        frontier = [w + [a] for w in frontier for a in alphabet]
        out.extend(frontier)
    return out


def py_regex(expr: str) -> str:
    """Translate our label-regex into a Python re over single-char labels."""
    return "^(?:" + expr.replace(" ", "").replace(".", "") + ")$"


CASES = [
    ("a", ["a"], ["", "b", "aa"]),
    ("a*", ["", "a", "aa", "aaa"], ["b", "ab"]),
    ("a+", ["a", "aa"], ["", "b"]),
    ("a . b", ["ab"], ["a", "b", "ba", "abb"]),
    ("a b", ["ab"], ["a", "b"]),
    ("a | b", ["a", "b"], ["", "ab", "c"]),
    ("(a . b)+", ["ab", "abab"], ["", "a", "aba"]),
    ("a . b*", ["a", "ab", "abb"], ["", "b", "ba"]),
    ("a . b* . c*", ["a", "ab", "ac", "abc", "abbcc"], ["", "c", "ca"]),
    ("(a | b) . c", ["ac", "bc"], ["c", "ab", "acc"]),
    ("(a . b . c)+", ["abc", "abcabc"], ["", "ab", "abca"]),
    ("a . (b | c)*", ["a", "ab", "ac", "abc", "acb"], ["b", ""]),
]


@pytest.mark.parametrize("expr,accepted,rejected", CASES)
def test_dfa_accepts(expr, accepted, rejected):
    dfa = compile_dfa(expr)
    for w in accepted:
        assert dfa.accepts(list(w)), (expr, w)
    for w in rejected:
        assert not dfa.accepts(list(w)), (expr, w)


@pytest.mark.parametrize(
    "expr",
    ["a*", "a+", "a.b", "a.b*", "(a.b.c)+", "a|b", "(a|b)*", "a.(b|c)+.a"],
)
def test_dfa_matches_python_re(expr):
    dfa = compile_dfa(expr)
    pat = re.compile(py_regex(expr))
    for w in words(["a", "b", "c"], 5):
        assert dfa.accepts(w) == bool(pat.match("".join(w))), (expr, w)


@st.composite
def regexes(draw, depth=0):
    if depth >= 3 or draw(st.booleans()):
        return Label(draw(st.sampled_from(["a", "b", "c"])))
    kind = draw(st.sampled_from(["cat", "alt", "star", "plus"]))
    if kind == "cat":
        return Concat(draw(regexes(depth + 1)), draw(regexes(depth + 1)))
    if kind == "alt":
        return Alt(draw(regexes(depth + 1)), draw(regexes(depth + 1)))
    if kind == "star":
        return Star(draw(regexes(depth + 1)))
    return Plus(draw(regexes(depth + 1)))


def to_py(node) -> str:
    if isinstance(node, Label):
        return node.name
    if isinstance(node, Concat):
        return f"(?:{to_py(node.left)}{to_py(node.right)})"
    if isinstance(node, Alt):
        return f"(?:{to_py(node.left)}|{to_py(node.right)})"
    if isinstance(node, Star):
        return f"(?:{to_py(node.inner)})*"
    if isinstance(node, Plus):
        return f"(?:{to_py(node.inner)})+"
    raise TypeError(node)


@settings(max_examples=60, deadline=None)
@given(regexes(), st.lists(st.sampled_from(["a", "b", "c"]), max_size=6))
def test_dfa_matches_python_re_hypothesis(node, word):
    dfa = compile_dfa(node)
    pat = re.compile(f"^(?:{to_py(node)})$")
    assert dfa.accepts(word) == bool(pat.match("".join(word)))


def test_parse_roundtrip_structure():
    node = parse_regex("(a . b)+ | c*")
    assert isinstance(node, Alt)
    assert isinstance(node.left, Plus)
    assert isinstance(node.right, Star)


def test_parse_implicit_concat():
    assert parse_regex("a b c") == parse_regex("a . b . c")


@pytest.mark.parametrize("bad", ["", "(", "a |", "* a", "a )", "a **+ |"])
def test_parse_errors(bad):
    with pytest.raises(ValueError):
        parse_regex(bad)


def test_dfa_table_shape():
    dfa = compile_dfa("a+")
    assert dfa.start == 0
    table = dfa.table()
    assert all(len(row) == 3 for row in table)
    assert dfa.labels() == {"a"}
    assert len(dfa.finals) >= 1


def test_dead_state_removal():
    # 'a . b' has no use for a second consecutive 'a' — the DFA should stay tiny.
    dfa = compile_dfa("a . b")
    assert dfa.n_states <= 3

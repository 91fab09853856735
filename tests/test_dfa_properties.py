"""Systematic DFA/regex properties over an enumerated word space — pure
Python, no Spark. Complements tests/test_regex.py with exhaustive small
cases and determinism/structure invariants."""
import itertools
import re

import pytest

from repro.core.regex import compile_dfa, parse_regex

ALPHABET = ["a", "b", "c"]

EXPRS = [
    "a", "b", "a+", "a*", "a . a", "a . b", "b . a", "a | b", "a | b | c",
    "(a | b)+", "(a | b)*", "a . b . c", "(a . b)+", "(a . b)*", "(a . b . c)+",
    "a . b*", "a* . b", "a . b* . c*", "a+ . b+", "(a . (b | c))+",
    "a . (b . c)*", "((a | b) . c)+", "a | (b . c)", "(a+ | b)+",
]


def py_pattern(expr: str):
    return re.compile("^(?:" + expr.replace(" ", "").replace(".", "") + ")$")


@pytest.mark.parametrize("expr", EXPRS)
def test_exhaustive_words_up_to_4(expr):
    dfa = compile_dfa(expr)
    pat = py_pattern(expr)
    for n in range(0, 5):
        for word in itertools.product(ALPHABET, repeat=n):
            assert dfa.accepts(list(word)) == bool(pat.match("".join(word))), (
                expr,
                word,
            )


@pytest.mark.parametrize("expr", EXPRS)
def test_dfa_is_deterministic(expr):
    dfa = compile_dfa(expr)
    seen = {}
    for s, l, t in dfa.table():
        assert (s, l) not in seen, f"nondeterministic transition on {(s, l)}"
        seen[(s, l)] = t


@pytest.mark.parametrize("expr", EXPRS)
def test_states_are_contiguous_from_zero(expr):
    dfa = compile_dfa(expr)
    states = {0} | {s for s, _, t in dfa.table()} | {t for s, _, t in dfa.table()}
    assert states == set(range(dfa.n_states)) or states <= set(range(dfa.n_states))
    assert dfa.start == 0
    assert all(0 <= s < dfa.n_states for s in dfa.finals)


@pytest.mark.parametrize("expr", EXPRS)
def test_alphabet_is_subset_of_labels(expr):
    dfa = compile_dfa(expr)
    assert dfa.labels() <= parse_regex(expr).labels()


def test_equivalent_regexes_same_language():
    pairs = [
        ("a . (b | c)", "(a . b) | (a . c)"),
        ("(a)+", "a . a*"),
        ("(a | b)*", "(a* . b*)*"),
    ]
    for e1, e2 in pairs:
        d1, d2 = compile_dfa(e1), compile_dfa(e2)
        for n in range(0, 5):
            for word in itertools.product(["a", "b", "c"], repeat=n):
                assert d1.accepts(list(word)) == d2.accepts(list(word)), (e1, e2, word)

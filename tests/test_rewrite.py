"""Transformation rules (§5.4): rewritten plans must be *equivalent* —
same snapshots at every sampled time, checked against the same oracle SQL
generated from the ORIGINAL plan."""
import pytest

from repro.core import model
from repro.core.algebra import Filter, Path, Pattern, Union, Wscan, evaluate
from repro.core.duck_oracle import sga_snapshot_sql
from repro.core.rewrite import (
    nullable,
    path_alternation_to_union,
    path_concat_to_pattern,
    plan_variants_linear,
    plan_variants_q4,
    push_filter_below_union,
)
from repro.core.regex import parse_regex
from repro.core.sgq_parser import rpq_plan
from repro.oracle import assert_equivalent
from repro.streams import random_stream
from tests.util import sources_by_label

W = 10
TIMES = [4, 9, 15, 21]


@pytest.fixture(scope="module")
def pdf():
    return random_stream(n_edges=80, n_vertices=9, t_span=24, seed=13)


@pytest.fixture(scope="module")
def sources(spark_small, pdf):
    return sources_by_label(spark_small, pdf)


def check_equivalent_plans(spark, original, rewritten, pdf, sources, times=TIMES):
    out = evaluate(rewritten, sources).localCheckpoint(eager=True)
    for t in times:
        assert_equivalent(
            model.snapshot(out, t), sga_snapshot_sql(original, t), stream=pdf
        )


@pytest.mark.parametrize(
    "expr",
    ["a | b", "(a . b) | c", "a+ | b", "(a . b)+ | (c | a)"],
)
def test_alternation_rule_equivalence(spark_small, pdf, sources, expr):
    original = rpq_plan(expr, W)
    rewritten = path_alternation_to_union(original)
    assert isinstance(rewritten, Union)
    check_equivalent_plans(spark_small, original, rewritten, pdf, sources)


@pytest.mark.parametrize(
    "expr",
    ["a . b", "a . b*", "a . (b . c)", "a* . b", "(a | b) . c", "a+ . b+"],
)
def test_concat_rule_equivalence(spark_small, pdf, sources, expr):
    original = rpq_plan(expr, W)
    rewritten = path_concat_to_pattern(original)
    assert rewritten is not None
    check_equivalent_plans(spark_small, original, rewritten, pdf, sources)


def test_rules_do_not_apply_to_plus_root():
    plan = rpq_plan("(a . b)+", W)
    assert path_alternation_to_union(plan) is None
    assert path_concat_to_pattern(plan) is None


@pytest.mark.parametrize(
    "expr,expected",
    [("a", False), ("a*", True), ("a+", False), ("a . b*", False), ("a* . b*", True),
     ("a | b*", True), ("(a*)+", True)],
)
def test_nullable(expr, expected):
    assert nullable(parse_regex(expr)) is expected


def test_q4_plan_variants_all_equivalent(spark_small, pdf, sources):
    variants = plan_variants_q4(W)
    assert set(variants) == {"SGA", "P1", "P2", "P3"}
    # All four must produce identical snapshots; oracle from P1 (pure regex).
    oracle_plan = variants["P1"]
    for name, plan in variants.items():
        out = evaluate(plan, sources).localCheckpoint(eager=True)
        for t in [4, 15]:
            assert_equivalent(
                model.snapshot(out, t),
                sga_snapshot_sql(oracle_plan, t),
                stream=pdf,
            )


def test_linear_variants(spark_small, pdf, sources):
    plans = plan_variants_linear("a . b*", W)
    assert set(plans) == {"default", "rewritten"}


def test_filter_pushdown_equivalence(spark_small, pdf, sources):
    original = Filter(Union([Wscan("a", W), Wscan("b", W)]), "src > 2")
    rewritten = push_filter_below_union(original)
    assert isinstance(rewritten, Union)
    assert all(isinstance(c, Filter) for c in rewritten.children)
    check_equivalent_plans(spark_small, original, rewritten, pdf, sources, [4, 15])

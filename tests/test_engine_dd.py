"""Negative-tuple (DD baseline) engine vs the DuckDB oracle.

The baseline must be *correct* (it computes the same answers as the
direct approach — the paper compares their cost, not their results), so
the same per-slide oracle checks apply.
"""
import pytest

from repro.core.rq import parse_rq
from repro.core.sgq_parser import build_sga, rpq_plan
from repro.streams import random_stream, so_stream
from tests.test_engine_sga import W, BETA, run_checked


@pytest.fixture(scope="module")
def pdf():
    return random_stream(n_edges=70, n_vertices=8, t_span=18, seed=21)


def test_dd_union_filter(spark_small, pdf):
    from repro.core.algebra import Filter, Union, Wscan

    plan = Filter(
        Union([Wscan("a", W, BETA), Wscan("b", W, BETA)], label="d"), "src <> trg"
    )
    run_checked(spark_small, plan, pdf, mode="dd")


def test_dd_pattern_two_way(spark_small, pdf):
    plan = build_sga(parse_rq("Ans(x, y) <- a(x, z), b(z, y)"), W, BETA)
    run_checked(spark_small, plan, pdf, mode="dd")


def test_dd_pattern_triangle(spark_small, pdf):
    plan = build_sga(parse_rq("Ans(x, y) <- a(x, m), b(x, y), c(y, m)"), W, BETA)
    run_checked(spark_small, plan, pdf, mode="dd")


def test_dd_path_aplus(spark_small, pdf):
    run_checked(spark_small, rpq_plan("a+", W, BETA), pdf, mode="dd")


def test_dd_path_concat_star(spark_small, pdf):
    run_checked(spark_small, rpq_plan("a . b*", W, BETA), pdf, mode="dd")


def test_dd_path_abc_plus(spark_small, pdf):
    run_checked(spark_small, rpq_plan("(a . b . c)+", W, BETA), pdf, mode="dd")


def test_dd_q6(spark_small, pdf):
    plan = build_sga(
        parse_rq("Ans(x, y) <- a+(x, y), b(x, m), c(m, y)"), W, BETA
    )
    run_checked(spark_small, plan, pdf, mode="dd")


def test_dd_q8(spark_small, pdf):
    plan = build_sga(
        parse_rq("P(x, y) <- a(x, z), a(y, z); Ans(x, y) <- P+(x, y)"), W, BETA
    )
    run_checked(spark_small, plan, pdf, mode="dd")


def test_dd_q7_nested(spark_small):
    pdf = random_stream(n_edges=40, n_vertices=7, t_span=12, seed=33)
    plan = build_sga(
        parse_rq(
            """
            RL(x, y) <- a+(x, y), b(x, m), c(m, y)
            Ans(x, m) <- RL+(x, y), c(m, y)
            """
        ),
        W,
        BETA,
    )
    run_checked(spark_small, plan, pdf, mode="dd")


def test_dd_on_cyclic_so(spark_small):
    # Many alternative derivations per pair — DRed's worst case; must stay correct.
    pdf = so_stream(n_edges=90, n_vertices=10, t_span=18, seed=2)
    run_checked(spark_small, rpq_plan("a2q+", W, BETA), pdf, mode="dd")

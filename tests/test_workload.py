"""Table 1 workload definitions: all 8 queries must bind and plan for both
datasets, with the expected plan shapes."""
import pytest

from repro.core.algebra import Path, Pattern, Union, Wscan, explain_sga
from repro.queries.workload import (
    BINDINGS,
    DATASETS,
    QUERIES,
    all_queries,
    get_query,
    table1_text,
)


def test_eight_queries_two_datasets():
    assert list(QUERIES) == [f"Q{i}" for i in range(1, 9)]
    assert set(DATASETS) == {"so", "ldbc"}


@pytest.mark.parametrize("dataset", DATASETS)
@pytest.mark.parametrize("qname", list(QUERIES))
def test_every_query_plans(dataset, qname):
    wq = get_query(qname, dataset)
    plan = wq.plan(window=30, slide=1)
    text = explain_sga(plan)
    assert "WSCAN" in text


@pytest.mark.parametrize("dataset", DATASETS)
def test_rpq_queries_are_single_path(dataset):
    for qname in ("Q1", "Q2", "Q3", "Q4"):
        plan = get_query(qname, dataset).plan(30)
        assert isinstance(plan, Path)


def test_q5_is_pure_pattern():
    plan = get_query("Q5", "so").plan(30)
    assert isinstance(plan, Pattern)
    assert len(plan.children) == 4
    assert all(isinstance(c, Wscan) for c in plan.children)


def test_q6_is_pattern_over_path():
    plan = get_query("Q6", "ldbc").plan(30)
    assert isinstance(plan, Pattern)
    assert any(isinstance(c, Path) for c in plan.children)


def test_q7_is_path_over_pattern_over_path():
    plan = get_query("Q7", "so").plan(30)
    assert isinstance(plan, Pattern)
    outer = plan.children[0]
    assert isinstance(outer, Path)
    inner = outer.children[0]
    assert isinstance(inner, Pattern)
    assert any(isinstance(c, Path) for c in inner.children)


def test_q8_is_path_over_pattern():
    plan = get_query("Q8", "ldbc").plan(30)
    assert isinstance(plan, (Path, Union))


def test_so_bindings_use_so_labels():
    for q in QUERIES:
        assert set(BINDINGS["so"][q].values()) <= {"a2q", "c2q", "c2a"}


def test_ldbc_q1_is_tree_shaped_replyof():
    # The paper's DD-favourable case: single-derivation replyOf trees.
    assert get_query("Q1", "ldbc").text == "replyOf+"


def test_ldbc_bindings_are_valid_labels():
    valid = {"knows", "likes", "hasCreator", "replyOf"}
    for q in QUERIES:
        assert set(BINDINGS["ldbc"][q].values()) <= valid


def test_binding_substitution_does_not_touch_variables():
    # Variables x, y, m, z, m1, m2 must survive label substitution.
    wq = get_query("Q5", "ldbc")
    assert "m1" in wq.text and "m2" in wq.text
    assert "knows(x, y)" in wq.text


def test_table1_text_mentions_everything():
    text = table1_text()
    for q in QUERIES:
        assert q in text
    for ds in DATASETS:
        assert f"bindings[{ds}]" in text


def test_all_queries_helper():
    assert [q.name for q in all_queries("so")] == list(QUERIES)

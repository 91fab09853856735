"""Coalesce primitive (Defs. 10–11) and Pareto-interval pruning tests."""
import pandas as pd
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import model
from repro.core.coalesce import coalesce_sgts, pareto_intervals


def rows_of(df):
    return sorted(
        (r.src, r.trg, r.label, r.ts, r.exp) for r in df.collect()
    )


def test_overlapping_merge(spark_small):
    # Example 5 of the paper: (u,RL,v,[29,31)) and (u,RL,v,[30,31)) coalesce.
    df = model.sgt_df(spark_small, [(1, 2, "RL", 29, 31), (1, 2, "RL", 30, 31)])
    assert rows_of(coalesce_sgts(df)) == [(1, 2, "RL", 29, 31)]


def test_adjacent_merge(spark_small):
    df = model.sgt_df(spark_small, [(1, 2, "a", 0, 5), (1, 2, "a", 5, 9)])
    assert rows_of(coalesce_sgts(df)) == [(1, 2, "a", 0, 9)]


def test_disjoint_not_merged(spark_small):
    df = model.sgt_df(spark_small, [(1, 2, "a", 0, 5), (1, 2, "a", 6, 9)])
    assert rows_of(coalesce_sgts(df)) == [(1, 2, "a", 0, 5), (1, 2, "a", 6, 9)]


def test_different_keys_not_merged(spark_small):
    df = model.sgt_df(
        spark_small,
        [(1, 2, "a", 0, 5), (1, 2, "b", 0, 5), (1, 3, "a", 0, 5), (2, 2, "a", 0, 5)],
    )
    assert coalesce_sgts(df).count() == 4


def test_chain_of_overlaps(spark_small):
    df = model.sgt_df(
        spark_small,
        [(1, 2, "a", 0, 4), (1, 2, "a", 3, 7), (1, 2, "a", 6, 10), (1, 2, "a", 20, 22)],
    )
    assert rows_of(coalesce_sgts(df)) == [(1, 2, "a", 0, 10), (1, 2, "a", 20, 22)]


def test_contained_interval_absorbed(spark_small):
    df = model.sgt_df(spark_small, [(1, 2, "a", 0, 10), (1, 2, "a", 2, 5)])
    assert rows_of(coalesce_sgts(df)) == [(1, 2, "a", 0, 10)]


def test_payload_keeps_max_exp_witness(spark_small):
    df = model.sgt_df(
        spark_small,
        [
            (1, 2, "a", 0, 5, [(1, 9, "x")]),
            (1, 2, "a", 3, 9, [(9, 2, "y")]),
        ],
    )
    row = coalesce_sgts(df).collect()[0]
    assert (row.ts, row.exp) == (0, 9)
    assert [tuple(e) for e in row.path] == [(9, 2, "y")]


@settings(max_examples=40, deadline=None)
@given(
    st.lists(
        st.tuples(st.integers(0, 20), st.integers(1, 10)), min_size=1, max_size=8
    )
)
def test_coalesce_covers_same_instants(spark_small, intervals):
    """Property: coalescing preserves exactly the set of valid instants and
    produces pairwise-disjoint, non-adjacent intervals."""
    rows = [(1, 2, "a", ts, ts + d) for ts, d in intervals]
    out = [
        (r.ts, r.exp)
        for r in coalesce_sgts(model.sgt_df(spark_small, rows)).collect()
    ]
    covered = {t for ts, d in intervals for t in range(ts, ts + d)}
    covered_out = {t for ts, exp in out for t in range(ts, exp)}
    assert covered == covered_out
    out.sort()
    for (ts1, e1), (ts2, _) in zip(out, out[1:]):
        assert e1 < ts2  # disjoint and non-adjacent


def test_pareto_drops_dominated(spark_small):
    pdf = pd.DataFrame(
        {
            "x": [1, 1, 1, 1],
            "v": [2, 2, 2, 2],
            "state": [0, 0, 0, 0],
            "ts": [0, 2, 0, 5],
            "exp": [10, 8, 10, 12],
        }
    )
    df = spark_small.createDataFrame(pdf)
    out = sorted((r.ts, r.exp) for r in pareto_intervals(df, ["x", "v", "state"]).collect())
    # (2,8) dominated by (0,10); duplicate (0,10) removed; (5,12) survives.
    assert out == [(0, 10), (5, 12)]


def test_pareto_keeps_incomparable(spark_small):
    pdf = pd.DataFrame(
        {"k": [1, 1, 1], "ts": [0, 3, 6], "exp": [5, 8, 11]}
    )
    out = pareto_intervals(spark_small.createDataFrame(pdf), ["k"])
    assert out.count() == 3


@settings(max_examples=30, deadline=None)
@given(
    st.lists(
        st.tuples(st.integers(0, 15), st.integers(1, 8)), min_size=1, max_size=8
    )
)
def test_pareto_preserves_coverage(spark_small, intervals):
    """Pruned set must cover exactly the same time instants (domination
    never removes coverage) and contain no dominated pair."""
    pdf = pd.DataFrame(
        {"k": 1, "ts": [a for a, _ in intervals], "exp": [a + d for a, d in intervals]}
    )
    out = [(r.ts, r.exp) for r in pareto_intervals(spark_small.createDataFrame(pdf), ["k"]).collect()]
    cov_in = {t for a, d in intervals for t in range(a, a + d)}
    cov_out = {t for a, b in out for t in range(a, b)}
    assert cov_in == cov_out
    for i, (a1, b1) in enumerate(out):
        for j, (a2, b2) in enumerate(out):
            if i != j:
                assert not (a1 <= a2 and b1 >= b2), (out, "dominated pair survived")

"""Unit tests for individual physical operators (both approaches)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core import model
from repro.dataflow.negtuple import (
    DDDistinctOp,
    DDSourceOp,
    DDUnionOp,
    _consolidate,
    _empty_dd,
)
from repro.dataflow.operators import ResultState, SourceOp, UnionOp, prune_valid


def batch(rows):
    return pd.DataFrame(rows, columns=["src", "trg", "label", "ts"])


class Feed:
    """Test stub: a child op that replays scripted deltas."""

    def __init__(self, deltas_by_t):
        self.deltas_by_t = deltas_by_t

    def process(self, t_now):
        return self.deltas_by_t[t_now]


def test_source_op_applies_wscan(spark_small):
    op = SourceOp(spark_small, "a", size=5, slide=2)
    op.pending = batch([(1, 2, "a", 3)])
    out = op.process(3).collect()
    assert len(out) == 1
    assert (out[0].ts, out[0].exp) == (3, 2 + 5)  # floor(3/2)*2+5


def test_source_op_empty_batch(spark_small):
    op = SourceOp(spark_small, "a", size=5, slide=1)
    op.pending = None
    assert op.process(0).count() == 0


def test_process_caches_per_slide(spark_small):
    op = SourceOp(spark_small, "a", size=5, slide=1)
    op.pending = batch([(1, 2, "a", 0)])
    first = op.process(0)
    again = op.process(0)  # second pull in the same slide (shared sub-plan)
    assert again is first
    assert again.count() == 1


def test_union_op_relabels(spark_small):
    a = model.sgt_df(spark_small, [(1, 2, "a", 0, 5)])
    b = model.sgt_df(spark_small, [(3, 4, "b", 0, 5)])
    op = UnionOp(spark_small, [Feed({0: a}), Feed({0: b})], label="u")
    out = op.process(0)
    assert {r.label for r in out.collect()} == {"u"}
    assert out.count() == 2


def test_prune_valid(spark_small):
    df = model.sgt_df(spark_small, [(1, 2, "a", 0, 5), (1, 3, "a", 0, 9)])
    assert prune_valid(df, 5).count() == 1


def test_result_state_accumulates_and_expires(spark_small):
    rs = ResultState(spark_small)
    n = rs.update(model.sgt_df(spark_small, [(1, 2, "a", 0, 5)]), t_now=0)
    assert n == 1 and rs.current_pairs(0) == [(1, 2)]
    rs.update(model.sgt_df(spark_small, [(3, 4, "a", 4, 9)]), t_now=4)
    assert sorted(rs.current_pairs(4)) == [(1, 2), (3, 4)]
    rs.update(model.empty_sgt(spark_small), t_now=6)
    assert rs.current_pairs(6) == [(3, 4)]
    assert rs.emitted == 2


def test_dd_source_emits_negative_tuples(spark_small):
    op = DDSourceOp(spark_small, "a", size=4, slide=2)
    op.pending = batch([(1, 2, "a", 0)])
    out0 = {(r.src, r.trg, r.w) for r in op.process(1).collect()}
    assert out0 == {(1, 2, 1)}
    # exp = floor(0/2)*2+4 = 4 → negative tuple once t_now >= 4
    op.pending = None
    out1 = {(r.src, r.trg, r.w) for r in op.process(5).collect()}
    assert out1 == {(1, 2, -1)}


def test_dd_distinct_set_semantics(spark_small):
    def dd_rows(rows):
        return spark_small.createDataFrame(rows, ["src", "trg", "label", "w"])

    feed = Feed(
        {
            0: dd_rows([(1, 2, "a", 1), (1, 2, "a", 1)]),  # multiplicity 2
            1: dd_rows([(1, 2, "a", -1)]),  # 2 → 1: still present
            2: dd_rows([(1, 2, "a", -1)]),  # 1 → 0: retraction emitted
        }
    )
    op = DDDistinctOp(spark_small, feed)
    assert {(r.src, r.trg, r.w) for r in op.process(0).collect()} == {(1, 2, 1)}
    assert op.process(1).count() == 0
    assert {(r.src, r.trg, r.w) for r in op.process(2).collect()} == {(1, 2, -1)}
    assert op.current_keys().count() == 0


def test_dd_union_consolidates(spark_small):
    def dd_rows(rows):
        return spark_small.createDataFrame(rows, ["src", "trg", "label", "w"])

    a = Feed({0: dd_rows([(1, 2, "x", 1)])})
    b = Feed({0: dd_rows([(1, 2, "x", -1), (3, 4, "y", 1)])})
    op = DDUnionOp(spark_small, [a, b], label=None)
    out = {(r.src, r.trg, r.label, r.w) for r in op.process(0).collect()}
    assert out == {(3, 4, "y", 1)}  # +1 and −1 cancel


def test_consolidate_drops_zero_weights(spark_small):
    df = spark_small.createDataFrame(
        [(1, 2, "a", 1), (1, 2, "a", -1), (5, 6, "b", 2)],
        ["src", "trg", "label", "w"],
    )
    out = {(r.src, r.trg, r.w) for r in _consolidate(df).collect()}
    assert out == {(5, 6, 2)}


def test_empty_dd_schema(spark_small):
    assert _empty_dd(spark_small).columns == ["src", "trg", "label", "w"]

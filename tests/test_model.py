"""Streaming graph model tests (paper §3): WSCAN intervals, snapshots."""
import pytest

from repro.core import model


@pytest.fixture(scope="module")
def tiny_stream(spark_small):
    # Fig. 2-style excerpt: likes/follows/posts interactions.
    return model.sge_df(
        spark_small,
        [
            (1, 10, "likes", 13),
            (1, 2, "follows", 5),
            (2, 10, "posts", 4),
            (2, 11, "posts", 29),
            (3, 11, "likes", 30),
        ],
    )


def test_wscan_interval_beta1(tiny_stream):
    out = model.wscan(tiny_stream, size=24).orderBy("ts").collect()
    assert [r.exp - r.ts for r in out] == [24] * 5
    first = out[0]
    assert (first.ts, first.exp) == (4, 28)


def test_wscan_interval_with_slide(tiny_stream):
    # exp = floor(ts/beta)*beta + T  (Def. 16)
    out = {r.ts: r.exp for r in model.wscan(tiny_stream, size=24, slide=10).collect()}
    assert out[13] == 10 + 24
    assert out[5] == 0 + 24
    assert out[29] == 20 + 24
    assert out[30] == 30 + 24


def test_wscan_payload_is_own_edge(tiny_stream):
    row = (
        model.wscan(tiny_stream, size=24)
        .filter("src = 1 AND label = 'likes'")
        .collect()[0]
    )
    assert [tuple(e) for e in row.path] == [(1, 10, "likes")]


def test_wscan_rejects_bad_params(tiny_stream):
    with pytest.raises(ValueError):
        model.wscan(tiny_stream, size=0)
    with pytest.raises(ValueError):
        model.wscan(tiny_stream, size=5, slide=-1)


def test_snapshot_contents(tiny_stream):
    sgts = model.wscan(tiny_stream, size=24)
    snap = {(r.src, r.trg, r.label) for r in model.snapshot(sgts, 13).collect()}
    # valid at t=13: ts<=13 < ts+24 → edges with ts in (13-24, 13]
    assert snap == {(1, 10, "likes"), (1, 2, "follows"), (2, 10, "posts")}
    snap30 = {(r.src, r.trg, r.label) for r in model.snapshot(sgts, 30).collect()}
    assert snap30 == {(1, 10, "likes"), (2, 11, "posts"), (3, 11, "likes")}


def test_snapshot_set_semantics(spark_small):
    # Two value-equivalent sgts valid at the same instant appear once.
    sgts = model.sgt_df(
        spark_small, [(1, 2, "a", 0, 10), (1, 2, "a", 5, 12), (3, 4, "a", 0, 3)]
    )
    snap = model.snapshot(sgts, 6).collect()
    assert len(snap) == 1 and (snap[0].src, snap[0].trg) == (1, 2)


def test_snapshot_pairs(spark_small):
    sgts = model.sgt_df(spark_small, [(1, 2, "a", 0, 10), (1, 2, "b", 0, 10)])
    assert model.snapshot_pairs(sgts, 5).count() == 1


def test_interval_boundaries_half_open(spark_small):
    sgts = model.sgt_df(spark_small, [(1, 2, "a", 5, 10)])
    assert model.snapshot(sgts, 4).count() == 0  # before ts
    assert model.snapshot(sgts, 5).count() == 1  # inclusive start
    assert model.snapshot(sgts, 9).count() == 1  # last valid instant
    assert model.snapshot(sgts, 10).count() == 0  # exclusive end


def test_sgt_df_default_payload(spark_small):
    row = model.sgt_df(spark_small, [(7, 8, "x", 1, 2)]).collect()[0]
    assert [tuple(e) for e in row.path] == [(7, 8, "x")]


def test_empty_sgt_schema(spark_small):
    df = model.empty_sgt(spark_small)
    assert df.columns == model.SGT_COLS
    assert df.count() == 0

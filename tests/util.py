"""Shared helpers for snapshot-reducibility testing.

``check_plan`` is the workhorse: it evaluates an SGA expression with the
batch (reference) evaluator over a bounded stream, then asserts — via
the DuckDB oracle — that the snapshot of the result at each sampled time
equals the one-time query over the window snapshot (Def. 13).
"""
from __future__ import annotations

from typing import Iterable, Sequence

import pandas as pd

from repro.core import model
from repro.core.algebra import SGANode, evaluate
from repro.core.duck_oracle import sga_snapshot_sql
from repro.oracle import assert_equivalent


def sources_by_label(spark, pdf: pd.DataFrame) -> dict:
    """Logical partitioning (Def. 9): one input stream per label."""
    return {
        l: model.sge_df(spark, pdf[pdf.label == l].reset_index(drop=True))
        for l in pdf.label.unique()
    }


def check_plan(
    spark,
    plan: SGANode,
    pdf: pd.DataFrame,
    times: Sequence[int],
    out=None,
) -> None:
    if out is None:
        out = evaluate(plan, sources_by_label(spark, pdf))
    out = out.localCheckpoint(eager=True)
    for t in times:
        assert_equivalent(
            model.snapshot(out, t),
            sga_snapshot_sql(plan, t),
            stream=pdf,
        )


def check_result_set(result_pairs: Iterable, sql: str, pdf: pd.DataFrame) -> None:
    """Compare a collected set of (src, trg) pairs against a DuckDB query
    (used by the incremental-engine tests, where the result is plain data)."""
    import duckdb

    con = duckdb.connect()
    try:
        con.register("stream", pdf)
        expected = {tuple(r) for r in con.execute(sql).fetchall()}
    finally:
        con.close()
    got = {tuple(p) for p in result_pairs}
    assert got == expected, (
        f"result mismatch: extra={sorted(got - expected)[:10]} "
        f"missing={sorted(expected - got)[:10]}"
    )

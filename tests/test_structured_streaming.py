"""Structured Streaming embodiment: the non-recursive SGA fragment running
on Spark's real streaming runtime, checked against the DuckDB oracle."""
import json
import os

import pytest

from repro.oracle import assert_equivalent
from repro.streaming.structured import (
    filter_union_stream,
    pattern_stream,
    read_sge_stream,
    run_to_memory,
)
from repro.streams import random_stream


@pytest.fixture()
def stream_dir(tmp_path):
    """Input stream as JSON files, two slides' worth."""
    pdf = random_stream(n_edges=60, n_vertices=8, t_span=20, seed=17)
    for i, part in enumerate((pdf[pdf.ts < 10], pdf[pdf.ts >= 10])):
        with open(tmp_path / f"batch_{i}.json", "w") as f:
            for row in part.itertuples(index=False):
                f.write(json.dumps(row._asdict()) + "\n")
    return str(tmp_path), pdf


def _drain(handle):
    try:
        handle.processAllAvailable()
    finally:
        handle.stop()


def test_streaming_pattern_matches_oracle(spark_small, stream_dir):
    path, pdf = stream_dir
    edges = read_sge_stream(spark_small, path)
    out = pattern_stream(edges, window=8, label_a="a", label_b="b", out_label="d")
    handle = run_to_memory(out, "pat_sink")
    _drain(handle)
    got = spark_small.sql(
        "SELECT DISTINCT src, trg, ts, exp FROM pat_sink"
    )
    # Batch counterpart in DuckDB: join with interval intersection (Def. 19).
    assert_equivalent(
        got,
        """
        WITH w AS (
          SELECT src, trg, label, ts, ts + 8 AS exp FROM stream
        )
        SELECT DISTINCT a.src AS src, b.trg AS trg,
               greatest(a.ts, b.ts) AS ts, least(a.exp, b.exp) AS exp
        FROM w a JOIN w b ON a.trg = b.src
        WHERE a.label = 'a' AND b.label = 'b'
          AND greatest(a.ts, b.ts) < least(a.exp, b.exp)
        """,
        stream=pdf,
    )


def test_streaming_filter_union_matches_oracle(spark_small, stream_dir):
    path, pdf = stream_dir
    edges = read_sge_stream(spark_small, path)
    out = filter_union_stream(
        edges, window=8, labels=("a", "c"), predicate="src <> 3", out_label="u"
    )
    handle = run_to_memory(out, "fu_sink")
    _drain(handle)
    got = spark_small.sql("SELECT DISTINCT src, trg, ts FROM fu_sink")
    assert_equivalent(
        got,
        """
        SELECT DISTINCT src, trg, ts FROM stream
        WHERE label IN ('a', 'c') AND src <> 3
        """,
        stream=pdf,
    )


def test_streaming_processes_incrementally(spark_small, stream_dir):
    """The second file must produce additional join results (true streaming,
    not a one-shot batch)."""
    path, pdf = stream_dir
    edges = read_sge_stream(spark_small, path, max_files_per_trigger=1)
    out = pattern_stream(edges, window=8, label_a="a", label_b="a", out_label="d")
    handle = (
        out.writeStream.format("memory").queryName("inc_sink").outputMode("append").start()
    )
    try:
        handle.processAllAvailable()
        progress = handle.recentProgress
    finally:
        handle.stop()
    batches_with_rows = [p for p in progress if p["numInputRows"] > 0]
    assert len(batches_with_rows) >= 2, "expected at least two non-empty micro-batches"

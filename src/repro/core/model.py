"""Streaming graph data model (paper §3).

A *streaming graph edge* (sge, Def. 3) is ``(src, trg, label, ts)``; a
*streaming graph tuple* (sgt, Def. 7) is ``(src, trg, label, [ts, exp),
D)`` where ``[ts, exp)`` is the validity interval and the payload ``D``
is the sequence of edges that produced the tuple (paths as first-class
citizens, Def. 6).

Spark representation:

* sge DataFrame: ``src:long, trg:long, label:string, ts:long``
* sgt DataFrame: ``src:long, trg:long, label:string, ts:long, exp:long,
  path:array<struct<src:long, trg:long, label:string>>``

The payload edge struct carries only the distinguished attributes, as in
the paper's examples (e.g. Fig. 3: a PATTERN result's payload is the
derived edge, a PATH result's payload is the sequence of traversed
edges).
"""
from __future__ import annotations

from typing import Iterable, Sequence

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.types import (
    ArrayType,
    LongType,
    StringType,
    StructField,
    StructType,
)

#: Schema of a payload edge (an element of the payload sequence D).
PATH_EDGE_TYPE = StructType(
    [
        StructField("src", LongType(), False),
        StructField("trg", LongType(), False),
        StructField("label", StringType(), False),
    ]
)

#: Schema of an input graph stream (Def. 4).
SGE_SCHEMA = StructType(
    [
        StructField("src", LongType(), False),
        StructField("trg", LongType(), False),
        StructField("label", StringType(), False),
        StructField("ts", LongType(), False),
    ]
)

#: Schema of a streaming graph (sequence of sgts, Def. 8).
SGT_SCHEMA = StructType(
    [
        StructField("src", LongType(), False),
        StructField("trg", LongType(), False),
        StructField("label", StringType(), False),
        StructField("ts", LongType(), False),
        StructField("exp", LongType(), False),
        StructField("path", ArrayType(PATH_EDGE_TYPE), True),
    ]
)

#: Column order of the distinguished + temporal attributes of an sgt.
SGT_COLS = ["src", "trg", "label", "ts", "exp", "path"]


def sge_df(spark: SparkSession, rows: Iterable[Sequence] | pd.DataFrame) -> DataFrame:
    """Build an input-graph-stream DataFrame from ``(src, trg, label, ts)`` rows."""
    if isinstance(rows, pd.DataFrame):
        pdf = rows[["src", "trg", "label", "ts"]]
        return spark.createDataFrame(pdf, schema=SGE_SCHEMA)
    return spark.createDataFrame(list(rows), schema=SGE_SCHEMA)


def sgt_df(spark: SparkSession, rows: Iterable[Sequence]) -> DataFrame:
    """Build an sgt DataFrame from ``(src, trg, label, ts, exp[, path])`` rows.

    When ``path`` is omitted the payload defaults to the tuple's own edge,
    matching Def. 7 for input edges.
    """
    out = []
    for r in rows:
        r = list(r)
        if len(r) == 5:
            r.append([(r[0], r[1], r[2])])
        out.append(tuple(r))
    return spark.createDataFrame(out, schema=SGT_SCHEMA)


def empty_sgt(spark: SparkSession) -> DataFrame:
    """An empty streaming graph."""
    return spark.createDataFrame([], schema=SGT_SCHEMA)


def wscan(edges: DataFrame, size: int, slide: int = 1) -> DataFrame:
    """WSCAN windowing operator (Def. 16).

    Turns an input graph stream into a streaming graph by assigning each
    sge the validity interval ``[t, floor(t/beta)*beta + T)``; the payload
    is the edge itself. ``slide`` (β) defaults to 1, i.e. a window that
    slides every time instant.
    """
    if size <= 0 or slide <= 0:
        raise ValueError("window size and slide must be positive")
    return edges.select(
        "src",
        "trg",
        "label",
        "ts",
        (F.floor(F.col("ts") / slide) * slide + size).cast("long").alias("exp"),
        F.array(F.struct("src", "trg", "label")).alias("path"),
    )


def snapshot(sgts: DataFrame, t: int) -> DataFrame:
    """Snapshot graph at time ``t`` (Def. 12): distinct edges valid at ``t``.

    Returns the distinguished attributes only — snapshots have set
    semantics, so value-equivalent sgts collapse to one edge.
    """
    return (
        sgts.filter((F.col("ts") <= F.lit(t)) & (F.col("exp") > F.lit(t)))
        .select("src", "trg", "label")
        .distinct()
    )


def snapshot_pairs(sgts: DataFrame, t: int) -> DataFrame:
    """Snapshot projected to ``(src, trg)`` pairs — the result-set view used
    when comparing query answers (output streams carry a single label)."""
    return (
        sgts.filter((F.col("ts") <= F.lit(t)) & (F.col("exp") > F.lit(t)))
        .select("src", "trg")
        .distinct()
    )


def to_pandas_window(sgts: DataFrame) -> pd.DataFrame:
    """Collect the distinguished + temporal attributes for the DuckDB oracle."""
    return sgts.select("src", "trg", "label", "ts", "exp").toPandas()

"""Coalesce primitive and interval utilities (paper Defs. 10–11).

Value-equivalent sgts (same ``src, trg, label``) with overlapping or
adjacent validity intervals are merged into one sgt spanning
``[min ts, max exp)``; the payload aggregation keeps the payload of the
constituent that expires furthest in the future (the ``max``-expiry
aggregation S-PATH relies on, §6.2 fn. 11).

``pareto_intervals`` keeps, per key, only intervals not *dominated* by
another (``ts' <= ts`` and ``exp' >= exp``) — the pruning that makes the
batch PATH fixpoint terminate on cyclic graphs.
"""
from __future__ import annotations

from typing import Sequence

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

_KEYS = ("src", "trg", "label")


def coalesce_sgts(df: DataFrame, keys: Sequence[str] = _KEYS) -> DataFrame:
    """Temporal coalescing: merge overlapping/adjacent intervals per key.

    Classic gaps-and-islands with window functions: within a key group
    ordered by ``ts``, a row starts a new island iff its ``ts`` is strictly
    greater than the running maximum ``exp`` of all earlier rows (equality
    means adjacency ``[a,b) + [b,c)``, which coalesces). Islands collapse to
    ``[min ts, max exp)`` and the payload of the max-``exp`` row survives.
    """
    keys = list(keys)
    w_prev = Window.partitionBy(*keys).orderBy("ts", "exp").rowsBetween(
        Window.unboundedPreceding, -1
    )
    w_run = Window.partitionBy(*keys).orderBy("ts", "exp").rowsBetween(
        Window.unboundedPreceding, 0
    )
    has_path = "path" in df.columns
    island = (
        df.withColumn("_prev_max", F.max("exp").over(w_prev))
        .withColumn(
            "_new",
            F.when(
                F.col("_prev_max").isNull() | (F.col("ts") > F.col("_prev_max")), 1
            ).otherwise(0),
        )
        .withColumn("_island", F.sum("_new").over(w_run))
    )
    aggs = [F.min("ts").alias("ts"), F.max("exp").alias("exp")]
    if has_path:
        aggs.append(F.max_by("path", "exp").alias("path"))
    out = island.groupBy(*keys, "_island").agg(*aggs).drop("_island")
    cols = keys + ["ts", "exp"] + (["path"] if has_path else [])
    return out.select(*cols)


def pareto_intervals(df: DataFrame, keys: Sequence[str]) -> DataFrame:
    """Keep only non-dominated intervals per key group.

    Ordering a group by ``(ts asc, exp desc)``, a row is dominated iff some
    earlier row's ``exp`` is >= its own (that row has ``ts' <= ts`` by the
    sort, and exact duplicates sort earlier). A strict running-max check
    over the preceding frame keeps exactly the Pareto frontier.
    """
    keys = list(keys)
    w = Window.partitionBy(*keys).orderBy(
        F.col("ts").asc(), F.col("exp").desc()
    ).rowsBetween(Window.unboundedPreceding, -1)
    return (
        df.withColumn("_prev_max_exp", F.max("exp").over(w))
        .filter(
            F.col("_prev_max_exp").isNull()
            | (F.col("exp") > F.col("_prev_max_exp"))
        )
        .drop("_prev_max_exp")
    )


def interval_overlap_cond(ts_cols: Sequence, exp_cols: Sequence):
    """Boolean column: the intersection of all ``[ts_i, exp_i)`` is non-empty."""
    return F.greatest(*ts_cols) < F.least(*exp_cols)

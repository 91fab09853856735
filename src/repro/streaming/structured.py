"""SGA's non-recursive fragment as genuine Spark Structured Streaming.

The repro maps the paper's dataflow onto streaming Spark: WSCAN, FILTER,
UNION and (binary) PATTERN are expressible as a Structured Streaming
query — a file-source edge stream, validity intervals from Def. 16, and
a watermarked stream-stream interval join whose time-range condition is
exactly the validity-interval overlap of Def. 19.

PATH (recursion / fixed point) is *not* expressible in Structured
Streaming — there is no iterate operator — which is why the full SGQ
engine (``repro.dataflow``) drives incremental operators from a
micro-batch loop instead (see DESIGN.md §3). This module demonstrates
that the stateless/join fragment of SGA runs unmodified on a real
streaming runtime with watermark-driven state cleanup.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.model import SGE_SCHEMA


def read_sge_stream(
    spark: SparkSession, input_dir: str, max_files_per_trigger: int = 1
) -> DataFrame:
    """File-source input graph stream: JSON files of sges (src, trg, label,
    ts). One file ≈ one slide's batch; ``ts`` (integer time instants)
    doubles as the event time."""
    return (
        spark.readStream.schema(SGE_SCHEMA)
        .option("maxFilesPerTrigger", max_files_per_trigger)
        .json(input_dir)
        .withColumn("event_time", F.timestamp_seconds(F.col("ts")))
    )


def wscan_stream(edges: DataFrame, size: int, slide: int = 1) -> DataFrame:
    """WSCAN on a streaming DataFrame — identical interval assignment to the
    batch operator (Def. 16)."""
    return edges.withColumn(
        "exp", (F.floor(F.col("ts") / slide) * slide + size).cast("long")
    )


def pattern_stream(
    stream: DataFrame,
    window: int,
    label_a: str,
    label_b: str,
    out_label: str,
    slide: int = 1,
    watermark_delay: str = "10 seconds",
) -> DataFrame:
    """Streaming binary PATTERN  ⋈[trg₁=src₂]^(src₁,trg₂,d)(S_a, S_b).

    Implemented as a watermarked stream-stream inner join. The join's
    event-time range condition is the validity-interval overlap
    ``max(ts) < min(exp)`` of Def. 19 — which is also precisely the
    bound Spark needs to age out join state.
    """
    w = wscan_stream(stream, window, slide)
    a = (
        w.filter(F.col("label") == label_a)
        .withWatermark("event_time", watermark_delay)
        .select(
            F.col("src").alias("a_src"),
            F.col("trg").alias("a_trg"),
            F.col("ts").alias("a_ts"),
            F.col("exp").alias("a_exp"),
            F.col("event_time").alias("a_time"),
        )
    )
    b = (
        w.filter(F.col("label") == label_b)
        .withWatermark("event_time", watermark_delay)
        .select(
            F.col("src").alias("b_src"),
            F.col("trg").alias("b_trg"),
            F.col("ts").alias("b_ts"),
            F.col("exp").alias("b_exp"),
            F.col("event_time").alias("b_time"),
        )
    )
    joined = a.join(
        b,
        (F.col("a_trg") == F.col("b_src"))
        & (F.greatest("a_ts", "b_ts") < F.least("a_exp", "b_exp")),
        "inner",
    )
    return joined.select(
        F.col("a_src").alias("src"),
        F.col("b_trg").alias("trg"),
        F.lit(out_label).alias("label"),
        F.greatest("a_ts", "b_ts").alias("ts"),
        F.least("a_exp", "b_exp").alias("exp"),
    )


def filter_union_stream(
    stream: DataFrame,
    window: int,
    labels: tuple,
    predicate: str,
    out_label: str,
    slide: int = 1,
) -> DataFrame:
    """σ[predicate](∪^d(S_l1, …, S_ln)) as a Structured Streaming query."""
    w = wscan_stream(stream, window, slide)
    return (
        w.filter(F.col("label").isin(list(labels)))
        .filter(predicate)
        .select(
            "src", "trg", F.lit(out_label).alias("label"), "ts", "exp"
        )
    )


def run_to_memory(query_df: DataFrame, name: str):
    """Start ``query_df`` into an in-memory sink and return the handle.
    Callers ``processAllAvailable()`` then read ``SELECT * FROM <name>``."""
    return (
        query_df.writeStream.format("memory")
        .queryName(name)
        .outputMode("append")
        .start()
    )

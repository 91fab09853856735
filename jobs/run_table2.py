"""Table 2: throughput + tail latency of SGA vs DD for Q1–Q8 on SO and LDBC.

Usage:
    spark-submit jobs/run_table2.py [--scale bench|test] [--datasets so,ldbc]
                                    [--queries Q1,...,Q8] [--systems SGA,DD]
                                    [--out results.json]

Writes the measured table (and the paper's numbers alongside) as markdown
to stdout and optionally as JSON to ``--out``.
"""
import argparse
import json
import sys

from pyspark.sql import SparkSession

from repro.queries.table2 import render_markdown, run_table2


def build_spark() -> SparkSession:
    return (
        SparkSession.builder.appName("repro-table2")
        .config("spark.sql.shuffle.partitions", "4")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )


def main(argv=None) -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", default="bench", choices=["bench", "test"])
    ap.add_argument("--datasets", default="so,ldbc")
    ap.add_argument("--queries", default="Q1,Q2,Q3,Q4,Q5,Q6,Q7,Q8")
    ap.add_argument("--systems", default="SGA,DD")
    ap.add_argument("--out", default=None)
    args = ap.parse_args(argv)

    spark = build_spark()
    try:
        rows = run_table2(
            spark,
            datasets=args.datasets.split(","),
            queries=args.queries.split(","),
            systems=args.systems.split(","),
            scale=args.scale,
        )
    finally:
        spark.stop()

    print("\n" + render_markdown(rows))
    if args.out:
        with open(args.out, "w") as f:
            json.dump(rows, f, indent=2)
        print(f"\nwrote {args.out}", file=sys.stderr)


if __name__ == "__main__":
    main()

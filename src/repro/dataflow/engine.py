"""Micro-batch dataflow engine — the Timely Dataflow substitute (§7.1.1).

The paper's prototype compiles the canonical SGA expression into a
tree-shaped dataflow of physical operators with WSCANs at the sources
and a sink that pushes results incrementally. This engine does the same
over Spark DataFrames:

* ``compile_plan`` maps each logical SGA node to its physical operator —
  the *direct*-approach operators (mode ``"sga"``: symmetric hash join,
  S-PATH) or the *negative-tuple* baseline (mode ``"dd"``: weighted
  deltas + DRed), §6 / §7.2.2;
* ``MicroBatchEngine.run`` replays an input graph stream slide by slide
  (slide interval β = input batch size, as in §7.1.2), timing each
  window movement end-to-end — arriving sgts, expirations, and result
  production — to report throughput and tail latency like the paper's
  Table 2.

Timely's progress tracking is replaced by the driver's watermark
``t_now``: a slide's batch is fully delivered to every source before the
root is pulled, so operators never see out-of-order data.
"""
from __future__ import annotations

import time
from typing import Callable, Dict, List, Optional, Tuple

import pandas as pd
from pyspark.sql import SparkSession

from repro.core.algebra import Filter, Path, Pattern, SGANode, Union, Wscan
from repro.dataflow import negtuple as dd
from repro.dataflow.metrics import RunMetrics
from repro.dataflow.operators import (
    FilterOp,
    PhysOp,
    ResultState,
    SourceOp,
    UnionOp,
)
from repro.dataflow.spath import SPathOp
from repro.dataflow.sym_join import MultiJoinOp

MODES = ("sga", "dd")


def compile_plan(
    spark: SparkSession, node: SGANode, mode: str
) -> Tuple[PhysOp, List[PhysOp]]:
    """Compile an SGA expression into a physical dataflow.

    Returns the root operator and the list of source operators. Shared
    sub-expressions (SGQParser reuses nodes) compile to shared operator
    instances; per-slide output caching in ``PhysOp.process`` keeps the
    DAG single-evaluation.
    """
    if mode not in MODES:
        raise ValueError(f"mode must be one of {MODES}")
    sources: List[PhysOp] = []
    memo: Dict[int, PhysOp] = {}

    def build(n: SGANode) -> PhysOp:
        if id(n) in memo:
            return memo[id(n)]
        if isinstance(n, Wscan):
            if mode == "sga":
                op: PhysOp = SourceOp(spark, n.source, n.size, n.slide)
                sources.append(op)
            else:
                src = dd.DDSourceOp(spark, n.source, n.size, n.slide)
                sources.append(src)
                op = dd.DDDistinctOp(spark, src)
        elif isinstance(n, Filter):
            child = build(n.child)
            op = (
                FilterOp(spark, child, n.predicate)
                if mode == "sga"
                else dd.DDFilterOp(spark, child, n.predicate)
            )
        elif isinstance(n, Union):
            children = [build(c) for c in n.children]
            if mode == "sga":
                op = UnionOp(spark, children, n.label)
            else:
                op = dd.DDDistinctOp(
                    spark, dd.DDUnionOp(spark, children, n.label)
                )
        elif isinstance(n, Pattern):
            children = [build(c) for c in n.children]
            if mode == "sga":
                op = MultiJoinOp(
                    spark, children, n.phi, n.src_sel, n.trg_sel, n.label
                )
            else:
                op = dd.DDDistinctOp(
                    spark,
                    dd.DDJoinOp(
                        spark, children, n.phi, n.src_sel, n.trg_sel, n.label
                    ),
                )
        elif isinstance(n, Path):
            children = [build(c) for c in n.children]
            if mode == "sga":
                op = SPathOp(spark, children, n.regex, n.label)
            else:
                op = dd.DDDistinctOp(
                    spark, dd.DDPathOp(spark, children, n.regex, n.label)
                )
        else:
            raise TypeError(f"unknown SGA node {n!r}")
        memo[id(n)] = op
        return op

    return build(node), sources


def _plan_window(node: SGANode) -> Tuple[int, int]:
    """Extract the (window, slide) spec from the plan's WSCANs."""
    specs = set()

    def walk(n: SGANode) -> None:
        if isinstance(n, Wscan):
            specs.add((n.size, n.slide))
        for c in n.children_nodes():
            walk(c)

    walk(node)
    if len(specs) != 1:
        raise ValueError(f"plan must have exactly one window spec, got {specs}")
    return specs.pop()


def _plan_labels(node: SGANode) -> set:
    labels = set()

    def walk(n: SGANode) -> None:
        if isinstance(n, Wscan):
            labels.add(n.source)
        for c in n.children_nodes():
            walk(c)

    walk(node)
    return labels


class MicroBatchEngine:
    """Persistent-query driver: replays a stream through a compiled plan."""

    def __init__(
        self,
        spark: SparkSession,
        plan: SGANode,
        mode: str = "sga",
        shuffle_partitions: int = 4,
    ):
        self.spark = spark
        self.plan = plan
        self.mode = mode
        self.shuffle_partitions = shuffle_partitions
        self.window, self.slide = _plan_window(plan)
        self.labels = _plan_labels(plan)
        self.root, self.sources = compile_plan(spark, plan, mode)
        if mode == "sga":
            self.result = ResultState(spark)
        else:
            self.result_counts = dd.DDDistinctOp(spark, self.root)
        self.t_now: Optional[int] = None

    # -- result access -----------------------------------------------------
    def current_pairs(self) -> List[tuple]:
        """The current answer set of the persistent query (what a user of
        the system observes after the last window movement)."""
        if self.mode == "sga":
            return self.result.current_pairs(self.t_now)
        return [
            (r.src, r.trg) for r in self.result_counts.current_keys().collect()
        ]

    # -- driving -----------------------------------------------------------
    def run(
        self,
        stream: pd.DataFrame,
        on_slide: Optional[Callable[["MicroBatchEngine", int], None]] = None,
        metrics: Optional[RunMetrics] = None,
        until: Optional[int] = None,
    ) -> RunMetrics:
        """Process the whole stream in slides of β time units.

        After the batch for boundary ``B`` is processed, the engine's time
        is ``t_now = B − 1`` (the last instant for which all input has
        arrived); expirations are evaluated against it. ``until`` keeps
        the window sliding (with empty batches) past the last arrival so
        pure-expiration slides are observable. ``on_slide`` runs after
        each slide (used by tests for oracle checks) and is *not*
        included in the timed section.
        """
        if metrics is None:
            metrics = RunMetrics(system=self.mode, query="?", dataset="?")
        stream = stream[stream.label.isin(self.labels)].reset_index(drop=True)
        if len(stream) == 0:
            return metrics
        old_parts = self.spark.conf.get("spark.sql.shuffle.partitions")
        self.spark.conf.set(
            "spark.sql.shuffle.partitions", str(self.shuffle_partitions)
        )
        try:
            beta = self.slide
            t_max = int(stream.ts.max())
            if until is not None:
                t_max = max(t_max, until - beta)
            boundary = beta
            while boundary <= t_max + beta:
                batch = stream[
                    (stream.ts >= boundary - beta) & (stream.ts < boundary)
                ]
                t_now = boundary - 1
                start = time.perf_counter()
                for s in self.sources:
                    s.pending = batch[batch.label == s.label]
                delta = self.root.process(t_now)
                if self.mode == "sga":
                    n = self.result.update(delta, t_now)
                else:
                    n = self.result_counts.process(t_now).count()
                elapsed = time.perf_counter() - start
                self.t_now = t_now
                metrics.slide_seconds.append(elapsed)
                metrics.slide_edges.append(int(len(batch)))
                metrics.n_results += int(n)
                if on_slide is not None:
                    on_slide(self, t_now)
                boundary += beta
        finally:
            self.spark.conf.set("spark.sql.shuffle.partitions", old_parts)
        return metrics

"""Negative-tuple baseline — the paper's DD comparator (§7.2.2).

Differential Dataflow evaluates an SGQ by keeping each sliding window as
an *evolving collection*: a window movement triggers insertions of new
sgts and **explicit deletions** of expired ones, which flow through the
dataflow as weighted (±1) deltas. This module reimplements that
evaluation strategy over Spark DataFrames:

* linear operators (source, filter, union, join, distinct) are weighted
  z-set operators — a deletion is a tuple with weight −1;
* recursion (PATH) is maintained with the classical **DRed** algorithm
  [Gupta et al. '93], which the paper identifies as the negative-tuple
  strategy for recursive views: on deletion, over-delete everything
  derivable from the deleted tuples, then re-derive what still has an
  alternative derivation. On cyclic graphs the over-deletion is large —
  the cost the paper's *direct* S-PATH avoids.

Collections carry no validity intervals: window membership is entirely
managed by the source's insert/delete pairs (CQL SEQ-WINDOW style).

Delta schema: ``src:long, trg:long, label:string, w:long``.
"""
from __future__ import annotations

from typing import List, Optional, Sequence, Tuple

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.types import LongType, StringType, StructField, StructType

from repro.core import model
from repro.core.algebra import Pos
from repro.core.regex import compile_dfa
from repro.dataflow.operators import PhysOp

DD_SCHEMA = StructType(
    [
        StructField("src", LongType(), False),
        StructField("trg", LongType(), False),
        StructField("label", StringType(), False),
        StructField("w", LongType(), False),
    ]
)

_KEY = ["src", "trg", "label"]

_FACT_SCHEMA = StructType(
    [
        StructField("x", LongType(), False),
        StructField("v", LongType(), False),
        StructField("state", LongType(), False),
    ]
)


def _empty_dd(spark: SparkSession) -> DataFrame:
    return spark.createDataFrame([], DD_SCHEMA)


def _consolidate(df: DataFrame) -> DataFrame:
    return (
        df.groupBy(*_KEY).agg(F.sum("w").alias("w")).filter(F.col("w") != 0)
    )


class DDSourceOp(PhysOp):
    """Windowed source: emits +1 for arriving sges and −1 *negative tuples*
    for sges expiring from the time-based sliding window (the WSCAN
    extension the paper describes for the DD baseline)."""

    def __init__(self, spark: SparkSession, label: str, size: int, slide: int):
        super().__init__(spark)
        self.label = label
        self.size = size
        self.slide = slide
        self.pending: Optional[pd.DataFrame] = None
        self.window: DataFrame = model.empty_sgt(spark)

    def _on_slide(self, t_now: int) -> DataFrame:
        batch = self.pending
        self.pending = None
        if batch is not None and len(batch):
            arriving = model.wscan(
                model.sge_df(self.spark, batch), self.size, self.slide
            )
        else:
            arriving = model.empty_sgt(self.spark)
        expiring = self.window.filter(F.col("exp") <= F.lit(t_now))
        self.window = (
            self.window.filter(F.col("exp") > F.lit(t_now))
            .unionByName(arriving)
            .coalesce(4)
            .localCheckpoint(eager=True)
        )
        out = arriving.select(*_KEY, F.lit(1).alias("w")).unionByName(
            expiring.select(*_KEY, F.lit(-1).alias("w"))
        )
        return _consolidate(out)


class DDDistinctOp(PhysOp):
    """DD's ``distinct``: maintains multiplicities and emits set-level
    changes (+1 on 0→>0, −1 on >0→0)."""

    def __init__(self, spark: SparkSession, child: PhysOp):
        super().__init__(spark)
        self.child = child
        self.counts: DataFrame = _empty_dd(spark)  # w = multiplicity > 0

    def _on_slide(self, t_now: int) -> DataFrame:
        delta = self.child.process(t_now)
        merged = (
            self.counts.unionByName(delta)
            .groupBy(*_KEY)
            .agg(F.sum("w").alias("w"))
        ).localCheckpoint(eager=True)
        old = self.counts.select(*_KEY).withColumn("_old", F.lit(1))
        now = merged.filter(F.col("w") > 0).select(*_KEY).withColumn("_now", F.lit(1))
        diff = old.join(now, on=_KEY, how="full_outer")
        out = (
            diff.filter(F.col("_old").isNull() | F.col("_now").isNull())
            .select(
                *_KEY,
                F.when(F.col("_old").isNull(), F.lit(1)).otherwise(F.lit(-1)).alias("w"),
            )
        )
        out = out.localCheckpoint(eager=True)
        self.counts = merged.filter(F.col("w") > 0).localCheckpoint(eager=True)
        return out

    def current_keys(self) -> DataFrame:
        return self.counts.select(*_KEY)


class DDFilterOp(PhysOp):
    def __init__(self, spark: SparkSession, child: PhysOp, predicate: str):
        super().__init__(spark)
        self.child = child
        self.predicate = predicate

    def _on_slide(self, t_now: int) -> DataFrame:
        return self.child.process(t_now).filter(self.predicate)


class DDUnionOp(PhysOp):
    def __init__(
        self, spark: SparkSession, children: Sequence[PhysOp], label: Optional[str]
    ):
        super().__init__(spark)
        self.children = list(children)
        self.label = label

    def _on_slide(self, t_now: int) -> DataFrame:
        out = self.children[0].process(t_now)
        for c in self.children[1:]:
            out = out.unionByName(c.process(t_now))
        if self.label:
            out = out.withColumn("label", F.lit(self.label))
        return _consolidate(out)


class DDJoinOp(PhysOp):
    """Weighted n-way join (PATTERN as a series of joins). Deltas are
    propagated bilinearly with the telescoping expansion, so a deletion on
    any input retracts exactly the matches it participated in."""

    def __init__(
        self,
        spark: SparkSession,
        children: Sequence[PhysOp],
        phi: List[Tuple[Pos, Pos]],
        src_sel: Pos,
        trg_sel: Pos,
        label: str,
    ):
        super().__init__(spark)
        self.children = list(children)
        self.phi = phi
        self.src_sel = src_sel
        self.trg_sel = trg_sel
        self.label = label
        self.states: List[DataFrame] = [_empty_dd(spark) for _ in self.children]

    def _renamed(self, df: DataFrame, i: int) -> DataFrame:
        return df.select(
            F.col("src").alias(f"src{i}"),
            F.col("trg").alias(f"trg{i}"),
            F.col("label").alias(f"label{i}"),
            F.col("w").alias(f"w{i}"),
        )

    def _join(self, inputs: List[DataFrame]) -> DataFrame:
        n = len(inputs)
        applied = [False] * len(self.phi)
        acc = self._renamed(inputs[0], 0)
        joined = {0}
        for i in range(1, n):
            joined.add(i)
            conds = []
            for k, ((a, pa), (b, pb)) in enumerate(self.phi):
                if not applied[k] and a in joined and b in joined and (
                    a == i or b == i
                ):
                    conds.append(F.col(f"{pa}{a}") == F.col(f"{pb}{b}"))
                    applied[k] = True
            nxt = self._renamed(inputs[i], i)
            if conds:
                cond = conds[0]
                for c in conds[1:]:
                    cond = cond & c
                acc = acc.join(nxt, on=cond, how="inner")
            else:
                acc = acc.crossJoin(nxt)
        w = F.col("w0")
        for i in range(1, n):
            w = w * F.col(f"w{i}")
        si, sp = self.src_sel
        ti, tp = self.trg_sel
        return acc.select(
            F.col(f"{sp}{si}").alias("src"),
            F.col(f"{tp}{ti}").alias("trg"),
            F.lit(self.label).alias("label"),
            w.alias("w"),
        )

    def _on_slide(self, t_now: int) -> DataFrame:
        n = len(self.children)
        deltas = [
            c.process(t_now).localCheckpoint(eager=True) for c in self.children
        ]
        empty = [d.isEmpty() for d in deltas]
        old = self.states
        new = [
            old[i] if empty[i] else _consolidate(old[i].unionByName(deltas[i]))
            for i in range(n)
        ]
        out = _empty_dd(self.spark)
        for i in range(n):
            if empty[i]:
                continue
            inputs = [
                new[j] if j < i else (deltas[j] if j == i else old[j])
                for j in range(n)
            ]
            out = out.unionByName(self._join(inputs))
        self.states = [s.localCheckpoint(eager=True) for s in new]
        return _consolidate(out)


class DDPathOp(PhysOp):
    """DRed-maintained PATH over the (vertex × DFA-state) product graph.

    Children must deliver set-semantic deltas (w ∈ {+1, −1}); the output
    is the fact-level change of accepting product-graph facts, projected
    to ``(src, trg)`` (a downstream ``DDDistinctOp`` collapses multiple
    accepting states).
    """

    def __init__(
        self,
        spark: SparkSession,
        children: Sequence[PhysOp],
        regex: str,
        label: str,
        max_iters: int = 200,
    ):
        super().__init__(spark)
        self.children = list(children)
        self.label = label
        self.max_iters = max_iters
        self.dfa = compile_dfa(regex)
        self.trans = spark.createDataFrame(
            self.dfa.table() or [(0, "\x00none", 0)], ["s", "l", "t"]
        )
        self.edges: DataFrame = spark.createDataFrame(
            [], StructType([f for f in DD_SCHEMA.fields if f.name != "w"])
        )
        self.facts: DataFrame = spark.createDataFrame([], _FACT_SCHEMA)

    def _steps(self, edges: DataFrame) -> DataFrame:
        return edges.join(
            F.broadcast(self.trans), F.col("label") == F.col("l")
        ).select(
            F.col("s").alias("e_s"),
            F.col("t").alias("e_t"),
            F.col("src").alias("e_src"),
            F.col("trg").alias("e_trg"),
        )

    @staticmethod
    def _one_step(facts: DataFrame, steps: DataFrame) -> DataFrame:
        return (
            facts.join(
                steps,
                (F.col("v") == F.col("e_src")) & (F.col("state") == F.col("e_s")),
            )
            .select("x", F.col("e_trg").alias("v"), F.col("e_t").alias("state"))
            .distinct()
        )

    def _base(self, steps: DataFrame) -> DataFrame:
        return (
            steps.filter(F.col("e_s") == self.dfa.start)
            .select(
                F.col("e_src").alias("x"),
                F.col("e_trg").alias("v"),
                F.col("e_t").alias("state"),
            )
            .distinct()
        )

    def _fix_add(self, facts: DataFrame, delta: DataFrame, steps: DataFrame) -> DataFrame:
        """Semi-naive insertion fixpoint: add everything reachable from delta."""
        fkeys = ["x", "v", "state"]
        for _ in range(self.max_iters):
            if delta.isEmpty():
                return facts
            facts = (
                facts.unionByName(delta).coalesce(4).localCheckpoint(eager=True)
            )
            delta = (
                self._one_step(delta, steps)
                .join(facts, on=fkeys, how="left_anti")
                .localCheckpoint(eager=True)
            )
        raise RuntimeError("DRed insertion fixpoint did not converge")

    def _on_slide(self, t_now: int) -> DataFrame:
        delta = self.children[0].process(t_now)
        for c in self.children[1:]:
            delta = delta.unionByName(c.process(t_now))
        labels = [str(l) for l in self.dfa.labels()]
        delta = _consolidate(delta.filter(F.col("label").isin(labels)))
        delta = delta.localCheckpoint(eager=True)
        adds = delta.filter(F.col("w") > 0).select(*_KEY)
        dels = delta.filter(F.col("w") < 0).select(*_KEY)
        fkeys = ["x", "v", "state"]
        finals = [int(s) for s in self.dfa.finals]
        f_old = self.facts
        old_out = f_old.filter(F.col("state").isin(finals)).localCheckpoint(eager=True)

        facts = f_old
        edges = self.edges
        if not dels.isEmpty():
            # --- over-deletion (w.r.t. the pre-deletion database) ---
            steps_old = self._steps(edges).localCheckpoint(eager=True)
            steps_del = self._steps(dels).localCheckpoint(eager=True)
            od = (
                self._base(steps_del)
                .unionByName(self._one_step(facts, steps_del))
                .join(facts, on=fkeys, how="left_semi")
                .distinct()
                .localCheckpoint(eager=True)
            )
            frontier = od
            for _ in range(self.max_iters):
                if frontier.isEmpty():
                    break
                frontier = (
                    self._one_step(frontier, steps_old)
                    .join(facts, on=fkeys, how="left_semi")
                    .join(od, on=fkeys, how="left_anti")
                    .localCheckpoint(eager=True)
                )
                od = od.unionByName(frontier).coalesce(4).localCheckpoint(eager=True)
            else:
                raise RuntimeError("DRed over-deletion did not converge")

            facts = facts.join(od, on=fkeys, how="left_anti").localCheckpoint(eager=True)
            edges = edges.join(dels, on=_KEY, how="left_anti").localCheckpoint(eager=True)

            # --- re-derivation from surviving facts/edges ---
            steps_new = self._steps(edges).localCheckpoint(eager=True)
            redelta = (
                self._base(steps_new)
                .unionByName(self._one_step(facts, steps_new))
                .join(od, on=fkeys, how="left_semi")
                .join(facts, on=fkeys, how="left_anti")
                .distinct()
                .localCheckpoint(eager=True)
            )
            facts = self._fix_add(facts, redelta, steps_new)

        if not adds.isEmpty():
            edges = (
                edges.unionByName(adds).distinct().coalesce(4).localCheckpoint(eager=True)
            )
            steps_new = self._steps(edges).localCheckpoint(eager=True)
            steps_add = self._steps(adds).localCheckpoint(eager=True)
            delta_f = (
                self._base(steps_add)
                .unionByName(self._one_step(facts, steps_add))
                .join(facts, on=fkeys, how="left_anti")
                .distinct()
                .localCheckpoint(eager=True)
            )
            facts = self._fix_add(facts, delta_f, steps_new)

        self.facts = facts.localCheckpoint(eager=True)
        self.edges = edges

        new_out = facts.filter(F.col("state").isin(finals))
        added = new_out.join(old_out, on=fkeys, how="left_anti")
        removed = old_out.join(new_out, on=fkeys, how="left_anti")
        out = added.select(
            F.col("x").alias("src"),
            F.col("v").alias("trg"),
            F.lit(self.label).alias("label"),
            F.lit(1).alias("w"),
        ).unionByName(
            removed.select(
                F.col("x").alias("src"),
                F.col("v").alias("trg"),
                F.lit(self.label).alias("label"),
                F.lit(-1).alias("w"),
            )
        )
        return _consolidate(out)

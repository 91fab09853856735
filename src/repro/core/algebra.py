"""Streaming Graph Algebra — logical operators and batch evaluation (§5).

The SGA expression tree has five operators (Defs. 16–20): WSCAN, FILTER,
UNION, PATTERN, PATH. ``evaluate`` runs an expression over *bounded*
input graph streams and produces the full output streaming graph (all
result sgts with their validity intervals). By snapshot reducibility
(Def. 13) this is the reference semantics: the snapshot of the output at
any time ``t`` must equal the one-time query over the input snapshot at
``t`` — which is exactly what the tests check against DuckDB.

The incremental physical operators live in ``repro.dataflow``; this
module is the ground truth they are validated against.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Dict, List, Optional, Sequence, Tuple

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core import model
from repro.core.coalesce import coalesce_sgts, pareto_intervals
from repro.core.regex import DFA, compile_dfa

#: A position inside a PATTERN: (input index, "src" | "trg").
Pos = Tuple[int, str]


# ---------------------------------------------------------------------------
# Expression tree
# ---------------------------------------------------------------------------
class SGANode:
    """Base class of SGA expression-tree nodes."""

    def out_label(self) -> Optional[str]:
        raise NotImplementedError

    def children_nodes(self) -> Sequence["SGANode"]:
        return ()


@dataclass
class Wscan(SGANode):
    """WSCAN (Def. 16): window an input graph stream ``source``."""

    source: str
    size: int
    slide: int = 1

    def out_label(self) -> Optional[str]:
        return self.source

    def __str__(self) -> str:
        return f"W[{self.size},{self.slide}]({self.source})"


@dataclass
class Filter(SGANode):
    """FILTER (Def. 17): ``predicate`` is a SQL boolean expression over
    the distinguished attributes ``src``, ``trg``, ``label``."""

    child: SGANode
    predicate: str

    def out_label(self) -> Optional[str]:
        return self.child.out_label()

    def children_nodes(self) -> Sequence[SGANode]:
        return (self.child,)

    def __str__(self) -> str:
        return f"σ[{self.predicate}]({self.child})"


@dataclass
class Union(SGANode):
    """UNION (Def. 18) with optional output relabeling."""

    children: List[SGANode]
    label: Optional[str] = None

    def out_label(self) -> Optional[str]:
        if self.label:
            return self.label
        labels = {c.out_label() for c in self.children}
        return labels.pop() if len(labels) == 1 else None

    def children_nodes(self) -> Sequence[SGANode]:
        return tuple(self.children)

    def __str__(self) -> str:
        body = ", ".join(str(c) for c in self.children)
        tag = f"^{self.label}" if self.label else ""
        return f"∪{tag}({body})"


@dataclass
class Pattern(SGANode):
    """PATTERN (Def. 19): n-way join on src/trg equalities ``phi``.

    ``phi`` is a list of equality terms between positions; ``src_sel`` and
    ``trg_sel`` pick the output endpoints; the result label is ``label``.
    """

    children: List[SGANode]
    phi: List[Tuple[Pos, Pos]]
    src_sel: Pos
    trg_sel: Pos
    label: str

    def out_label(self) -> Optional[str]:
        return self.label

    def children_nodes(self) -> Sequence[SGANode]:
        return tuple(self.children)

    def __str__(self) -> str:
        terms = " ∧ ".join(f"{a[1]}{a[0]}={b[1]}{b[0]}" for a, b in self.phi)
        body = ", ".join(str(c) for c in self.children)
        return (
            f"⋈[{terms}]^({self.src_sel[1]}{self.src_sel[0]},"
            f"{self.trg_sel[1]}{self.trg_sel[0]},{self.label})({body})"
        )


@dataclass
class Path(SGANode):
    """PATH (Def. 20): regular-expression path navigation with output
    label ``label``. Children provide the label streams of the regex
    alphabet. Per Def. 2, result paths have length >= 1."""

    children: List[SGANode]
    regex: str
    label: str
    _dfa: Optional[DFA] = field(default=None, repr=False, compare=False)

    def dfa(self) -> DFA:
        if self._dfa is None:
            self._dfa = compile_dfa(self.regex)
        return self._dfa

    def out_label(self) -> Optional[str]:
        return self.label

    def children_nodes(self) -> Sequence[SGANode]:
        return tuple(self.children)

    def __str__(self) -> str:
        body = ", ".join(str(c) for c in self.children)
        return f"P[{self.regex}]^{self.label}({body})"


def explain_sga(node: SGANode, indent: int = 0) -> str:
    """Multi-line plan rendering for jobs/tests."""
    pad = "  " * indent
    head = {
        Wscan: lambda n: f"WSCAN {n.source} T={n.size} β={n.slide}",
        Filter: lambda n: f"FILTER {n.predicate}",
        Union: lambda n: f"UNION -> {n.out_label()}",
        Pattern: lambda n: f"PATTERN -> {n.label}",
        Path: lambda n: f"PATH {n.regex} -> {n.label}",
    }[type(node)](node)
    lines = [pad + head]
    for c in node.children_nodes():
        lines.append(explain_sga(c, indent + 1))
    return "\n".join(lines)


# ---------------------------------------------------------------------------
# Batch evaluation (reference semantics)
# ---------------------------------------------------------------------------
def _renamed(df: DataFrame, i: int) -> DataFrame:
    return df.select(
        F.col("src").alias(f"src{i}"),
        F.col("trg").alias(f"trg{i}"),
        F.col("label").alias(f"label{i}"),
        F.col("ts").alias(f"ts{i}"),
        F.col("exp").alias(f"exp{i}"),
        F.col("path").alias(f"path{i}"),
    )


def join_pattern(
    dfs: Sequence[DataFrame],
    phi: Sequence[Tuple[Pos, Pos]],
    src_sel: Pos,
    trg_sel: Pos,
    label: str,
    do_coalesce: bool = True,
) -> DataFrame:
    """n-way PATTERN join over sgt DataFrames — shared by the batch operator
    and the incremental symmetric join (which calls it on delta/state mixes).

    Builds a left-deep join tree, attaching each equality term as soon as
    both of its inputs are joined; the validity-interval intersection
    (Def. 19) is enforced at the end. The payload of a result is the
    derived edge itself, as in the paper's Fig. 3a.
    """
    n = len(dfs)
    renamed = [_renamed(df, i) for i, df in enumerate(dfs)]
    applied = [False] * len(phi)

    def terms_for(joined: set, must_touch: int):
        conds = []
        for k, ((i, pi), (j, pj)) in enumerate(phi):
            if applied[k]:
                continue
            if i in joined and j in joined and (i == must_touch or j == must_touch):
                conds.append(F.col(f"{pi}{i}") == F.col(f"{pj}{j}"))
                applied[k] = True
        return conds

    acc = renamed[0]
    joined = {0}
    for i in range(1, n):
        joined.add(i)
        conds = terms_for(joined, i)
        if conds:
            cond = conds[0]
            for c in conds[1:]:
                cond = cond & c
            acc = acc.join(renamed[i], on=cond, how="inner")
        else:
            acc = acc.crossJoin(renamed[i])
    # Any term whose endpoints were both present before either table was
    # the "new" one (cannot happen with the loop above, but keep it safe).
    for k, ((i, pi), (j, pj)) in enumerate(phi):
        if not applied[k]:
            acc = acc.filter(F.col(f"{pi}{i}") == F.col(f"{pj}{j}"))

    ts_cols = [F.col(f"ts{i}") for i in range(n)]
    exp_cols = [F.col(f"exp{i}") for i in range(n)]
    src_c = F.col(f"{src_sel[1]}{src_sel[0]}")
    trg_c = F.col(f"{trg_sel[1]}{trg_sel[0]}")
    out = (
        acc.withColumn("ts", F.greatest(*ts_cols) if n > 1 else ts_cols[0])
        .withColumn("exp", F.least(*exp_cols) if n > 1 else exp_cols[0])
        .filter(F.col("ts") < F.col("exp"))
        .select(
            src_c.alias("src"),
            trg_c.alias("trg"),
            F.lit(label).alias("label"),
            "ts",
            "exp",
            F.array(
                F.struct(
                    src_c.alias("src"), trg_c.alias("trg"), F.lit(label).alias("label")
                )
            ).alias("path"),
        )
    )
    return coalesce_sgts(out) if do_coalesce else out


def path_fixpoint(
    edges: DataFrame,
    dfa: DFA,
    label: str,
    max_iters: int = 64,
) -> DataFrame:
    """Batch PATH: interval-aware semi-naive fixpoint over the product graph.

    A derived fact is ``(x, v, state, [ts, exp))``: a path from ``x`` to
    ``v`` whose label drives the DFA from the start state to ``state``,
    valid throughout ``[ts, exp)`` (the intersection of its edges'
    intervals, Def. 20). Dominated intervals are pruned per (x, v, state)
    so the loop terminates on cyclic graphs; dominated facts cannot
    contribute any snapshot a dominating fact does not already cover.
    """
    spark = SparkSession.getActiveSession()
    trans = spark.createDataFrame(dfa.table(), ["s", "l", "t"])
    keys = ["x", "v", "state"]

    steps = (
        edges.join(F.broadcast(trans), F.col("label") == F.col("l"))
        .select(
            F.col("s").alias("e_s"),
            F.col("t").alias("e_t"),
            F.col("src").alias("e_src"),
            F.col("trg").alias("e_trg"),
            F.col("ts").alias("e_ts"),
            F.col("exp").alias("e_exp"),
            F.array(F.struct("src", "trg", "label")).alias("e_path"),
        )
        .localCheckpoint(eager=True)
    )

    base = (
        steps.filter(F.col("e_s") == dfa.start)
        .select(
            F.col("e_src").alias("x"),
            F.col("e_trg").alias("v"),
            F.col("e_t").alias("state"),
            F.col("e_ts").alias("ts"),
            F.col("e_exp").alias("exp"),
            F.col("e_path").alias("path"),
        )
    )
    base = pareto_intervals(base, keys).localCheckpoint(eager=True)
    acc, delta = base, base

    for it in range(max_iters):
        if delta.isEmpty():
            break
        new = (
            delta.join(
                steps,
                (F.col("v") == F.col("e_src")) & (F.col("state") == F.col("e_s")),
            )
            .select(
                "x",
                F.col("e_trg").alias("v2"),
                F.col("e_t").alias("state2"),
                F.greatest("ts", "e_ts").alias("ts2"),
                F.least("exp", "e_exp").alias("exp2"),
                F.concat("path", "e_path").alias("path2"),
            )
            .filter(F.col("ts2") < F.col("exp2"))
            .select(
                "x",
                F.col("v2").alias("v"),
                F.col("state2").alias("state"),
                F.col("ts2").alias("ts"),
                F.col("exp2").alias("exp"),
                F.col("path2").alias("path"),
            )
        )
        new = pareto_intervals(new, keys)
        dom = acc.select(
            F.col("x").alias("d_x"),
            F.col("v").alias("d_v"),
            F.col("state").alias("d_state"),
            F.col("ts").alias("d_ts"),
            F.col("exp").alias("d_exp"),
        )
        new = new.join(
            dom,
            (F.col("x") == F.col("d_x"))
            & (F.col("v") == F.col("d_v"))
            & (F.col("state") == F.col("d_state"))
            & (F.col("d_ts") <= F.col("ts"))
            & (F.col("d_exp") >= F.col("exp")),
            how="left_anti",
        ).localCheckpoint(eager=True)
        acc = pareto_intervals(acc.unionByName(new), keys).localCheckpoint(eager=True)
        delta = new
    else:
        raise RuntimeError(f"PATH fixpoint did not converge in {max_iters} iterations")

    finals = [int(s) for s in dfa.finals]
    out = acc.filter(F.col("state").isin(finals)).select(
        F.col("x").alias("src"),
        F.col("v").alias("trg"),
        F.lit(label).alias("label"),
        "ts",
        "exp",
        "path",
    )
    return coalesce_sgts(out)


def evaluate(node: SGANode, sources: Dict[str, DataFrame]) -> DataFrame:
    """Evaluate an SGA expression over bounded input graph streams.

    ``sources`` maps each EDB label to its input graph stream (sge schema).
    Returns the output streaming graph (sgt schema).
    """
    if isinstance(node, Wscan):
        if node.source not in sources:
            raise KeyError(f"no input stream for label {node.source!r}")
        return model.wscan(sources[node.source], node.size, node.slide)
    if isinstance(node, Filter):
        return evaluate(node.child, sources).filter(node.predicate)
    if isinstance(node, Union):
        dfs = [evaluate(c, sources) for c in node.children]
        out = dfs[0]
        for d in dfs[1:]:
            out = out.unionByName(d)
        if node.label:
            out = out.withColumn("label", F.lit(node.label))
        return coalesce_sgts(out)
    if isinstance(node, Pattern):
        dfs = [evaluate(c, sources) for c in node.children]
        return join_pattern(dfs, node.phi, node.src_sel, node.trg_sel, node.label)
    if isinstance(node, Path):
        dfs = [evaluate(c, sources) for c in node.children]
        edges = dfs[0]
        for d in dfs[1:]:
            edges = edges.unionByName(d)
        needed = node.dfa().labels() or set()
        edges = edges.filter(F.col("label").isin([str(l) for l in needed]))
        return path_fixpoint(edges, node.dfa(), node.label)
    raise TypeError(f"unknown SGA node {node!r}")

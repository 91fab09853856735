"""DuckDB oracle SQL generation for SGA expressions.

Snapshot reducibility (Def. 13) *is* the semantics of SGA: the snapshot
of a streaming result at time ``t`` must equal the one-time query over
the window snapshot of the input at ``t``. This module generates, for an
arbitrary SGA expression tree, a DuckDB SQL query implementing that
one-time counterpart:

* WSCAN → snapshot selection over the raw input stream table (the
  oracle recomputes ``exp = floor(ts/β)·β + T`` itself, so it does not
  share the Spark WSCAN code);
* FILTER/UNION/PATTERN → plain SQL;
* PATH → a recursive CTE over the (vertex × DFA-state) product graph,
  built from the compiled DFA's transition table.

The generated query returns ``DISTINCT (src, trg, label)`` — the
snapshot graph has set semantics (Def. 12). Tests feed it to
``repro.oracle.assert_equivalent`` against the Spark result's snapshot.
"""
from __future__ import annotations

from typing import List, Tuple

from repro.core.algebra import Filter, Path, Pattern, SGANode, Union, Wscan
from repro.core.rq import RQ
from repro.core.sgq_parser import build_sga


def sga_snapshot_sql(node: SGANode, t: int, stream_table: str = "stream") -> str:
    """SQL for the one-time counterpart of ``node`` over the snapshot at ``t``.

    ``stream_table`` must contain the whole input graph stream with columns
    ``src, trg, label, ts``.
    """
    ctes: List[Tuple[str, str]] = []
    counter = [0]

    def fresh(prefix: str) -> str:
        counter[0] += 1
        return f"{prefix}_{counter[0]}"

    def emit(n: SGANode) -> str:
        if isinstance(n, Wscan):
            name = fresh("scan")
            ctes.append(
                (
                    name,
                    f"SELECT DISTINCT src, trg, label FROM {stream_table} "
                    f"WHERE label = '{n.source}' AND ts <= {t} "
                    f"AND CAST(floor(ts / {n.slide}) AS BIGINT) * {n.slide} "
                    f"+ {n.size} > {t}",
                )
            )
            return name
        if isinstance(n, Filter):
            child = emit(n.child)
            name = fresh("filt")
            ctes.append(
                (name, f"SELECT src, trg, label FROM {child} WHERE {n.predicate}")
            )
            return name
        if isinstance(n, Union):
            children = [emit(c) for c in n.children]
            name = fresh("uni")
            body = " UNION ".join(f"SELECT src, trg, label FROM {c}" for c in children)
            if n.label:
                body = (
                    f"SELECT DISTINCT src, trg, '{n.label}' AS label FROM ({body})"
                )
            ctes.append((name, body))
            return name
        if isinstance(n, Pattern):
            children = [emit(c) for c in n.children]
            name = fresh("pat")
            froms = ", ".join(f"{c} b{i}" for i, c in enumerate(children))
            conds = [
                f"b{i}.{pi} = b{j}.{pj}" for (i, pi), (j, pj) in n.phi
            ] or ["TRUE"]
            si, sp = n.src_sel
            ti, tp = n.trg_sel
            ctes.append(
                (
                    name,
                    f"SELECT DISTINCT b{si}.{sp} AS src, b{ti}.{tp} AS trg, "
                    f"'{n.label}' AS label FROM {froms} WHERE "
                    + " AND ".join(conds),
                )
            )
            return name
        if isinstance(n, Path):
            children = [emit(c) for c in n.children]
            edges = fresh("edges")
            body = " UNION ".join(
                f"SELECT src, trg, label FROM {c}" for c in children
            )
            ctes.append((edges, body))
            dfa = n.dfa()
            dfa_name = fresh("dfa")
            rows = ", ".join(f"({s}, '{l}', {q})" for s, l, q in dfa.table())
            if not rows:  # empty language (no transitions survive pruning)
                rows = "(0, '\x00impossible', 0)"
            ctes.append((f"{dfa_name}(s, l, t)", f"VALUES {rows}"))
            prod = fresh("prod")
            finals = ", ".join(str(int(s)) for s in sorted(dfa.finals)) or "-1"
            ctes.append(
                (
                    f"{prod}(x, v, s)",
                    f"SELECT e.src, e.trg, d.t FROM {edges} e "
                    f"JOIN {dfa_name} d ON d.s = {dfa.start} AND d.l = e.label "
                    f"UNION "
                    f"SELECT p.x, e.trg, d.t FROM {prod} p "
                    f"JOIN {edges} e ON e.src = p.v "
                    f"JOIN {dfa_name} d ON d.s = p.s AND d.l = e.label",
                )
            )
            name = fresh("path")
            ctes.append(
                (
                    name,
                    f"SELECT DISTINCT x AS src, v AS trg, '{n.label}' AS label "
                    f"FROM {prod} WHERE s IN ({finals})",
                )
            )
            return name
        raise TypeError(f"unknown SGA node {n!r}")

    root = emit(node)
    with_clause = ",\n".join(f"{name} AS ({sql})" for name, sql in ctes)
    return (
        f"WITH RECURSIVE\n{with_clause}\n"
        f"SELECT DISTINCT src, trg, label FROM {root}"
    )


def rq_snapshot_sql(
    rq: RQ, t: int, window: int, slide: int = 1, stream_table: str = "stream"
) -> str:
    """One-time counterpart of a full SGQ (RQ + window spec) at time ``t``."""
    return sga_snapshot_sql(build_sga(rq, window, slide), t, stream_table)

"""Table 1 workload: queries Q1–Q8 with per-dataset label bindings.

The paper's Table 1 defines eight graph patterns of increasing
expressivity: Q1–Q4 are RPQs from real-world query logs, Q5/Q6 are
(C)RPQ patterns of LDBC SNB IS7/IC7, and Q7/Q8 are RQ-based complex
patterns (Examples 1 and 2: real-time notification, contact tracing).

``a, b, c`` are edge predicates instantiated per dataset (§7.1.3):

* **SO** (single vertex type): a=a2q, b=c2q, c=c2a;
* **LDBC**: typed bindings chosen per query so compositions are
  type-correct (e.g. Q6/Q7: a=knows, b=likes, c=hasCreator — "recent
  likers of a person's messages connected by a path of friends").

Each entry yields an SGA plan via ``build_plan`` — Q1–Q4 through
``rpq_plan`` (pure PATH), Q5–Q8 through the full SGQParser.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, Optional, Tuple

from repro.core.algebra import SGANode
from repro.core.rq import parse_rq
from repro.core.sgq_parser import build_sga, rpq_plan

#: Table 1, generic form. Q1–Q4: regexes; Q5–Q8: Datalog (RQ) programs.
QUERIES: Dict[str, Tuple[str, str]] = {
    "Q1": ("rpq", "a+"),  # a* in the paper; paths have length >= 1 (Def. 2)
    "Q2": ("rpq", "a . b*"),
    "Q3": ("rpq", "a . b* . c*"),
    "Q4": ("rpq", "(a . b . c)+"),
    "Q5": ("rq", "Ans(m1, m2) <- a(x, y), b(m1, x), b(m2, y), c(m2, m1)"),
    "Q6": ("rq", "Ans(x, y) <- a+(x, y), b(x, m), c(m, y)"),
    "Q7": (
        "rq",
        """
        RL(x, y) <- a+(x, y), b(x, m), c(m, y)
        Ans(x, m) <- RL+(x, y), c(m, y)
        """,
    ),
    "Q8": ("rq", "P(x, y) <- a(x, z), a(y, z); Ans(x, y) <- P+(x, y)"),
}

#: Per-dataset bindings of the edge predicates a, b, c.
BINDINGS: Dict[str, Dict[str, Dict[str, str]]] = {
    "so": {q: {"a": "a2q", "b": "c2q", "c": "c2a"} for q in QUERIES},
    "ldbc": {
        "Q1": {"a": "replyOf"},  # tree-shaped: DD's favourable case
        "Q2": {"a": "likes", "b": "replyOf"},
        "Q3": {"a": "likes", "b": "replyOf", "c": "hasCreator"},
        "Q4": {"a": "knows", "b": "likes", "c": "hasCreator"},
        # IS7-like: x knows y; m1, m2 their messages; m2 replies to m1.
        "Q5": {"a": "knows", "b": "hasCreator", "c": "replyOf"},
        # IC7-like: x likes a message created by y, knows-path x→y.
        "Q6": {"a": "knows", "b": "likes", "c": "hasCreator"},
        "Q7": {"a": "knows", "b": "likes", "c": "hasCreator"},
        "Q8": {"a": "likes"},
    },
}

DATASETS = tuple(BINDINGS)


@dataclass(frozen=True)
class WorkloadQuery:
    name: str
    kind: str  # "rpq" | "rq"
    text: str  # bound regex or RQ program

    def plan(self, window: int, slide: int = 1) -> SGANode:
        if self.kind == "rpq":
            return rpq_plan(self.text, window, slide)
        return build_sga(parse_rq(self.text), window, slide)


def _bind(text: str, binding: Dict[str, str]) -> str:
    """Replace single-letter edge predicates with dataset labels.

    Longest-name-first would be needed for overlapping names; with the
    fixed alphabet {a, b, c} a guarded replace is enough.
    """
    import re

    def sub(m):
        tok = m.group(0)
        return binding.get(tok, tok)

    return re.sub(r"\b[abc]\b", sub, text)


def get_query(name: str, dataset: str) -> WorkloadQuery:
    """A Table 1 query instantiated for a dataset."""
    kind, text = QUERIES[name]
    binding = BINDINGS[dataset][name]
    return WorkloadQuery(name, kind, _bind(text, binding))


def all_queries(dataset: str):
    return [get_query(q, dataset) for q in QUERIES]


def table1_text() -> str:
    """Render Table 1 (generic form) for jobs/run_table1.py."""
    lines = ["Table 1 — streaming graph query workload (generic form):", ""]
    for name, (kind, text) in QUERIES.items():
        body = " ".join(text.split())
        lines.append(f"  {name} [{kind:>3}]  {body}")
    lines.append("")
    for ds in DATASETS:
        lines.append(f"  bindings[{ds}]:")
        for q in QUERIES:
            lines.append(f"    {q}: {BINDINGS[ds][q]}")
    return "\n".join(lines)

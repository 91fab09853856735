"""Regular Queries (paper Def. 14) — representation and parser.

An RQ is a non-recursive Datalog program over binary predicates,
extended with transitive closure of body predicates. Example (the
real-time notification query of Example 3, with one-letter labels)::

    RL(x, y) <- a+(x, y), b(x, m), c(m, y)
    Ans(x, m) <- RL+(x, y), c(m, y)

Body atoms are ``label(u, v)`` optionally closed with ``+`` or ``*``
(``a*`` is evaluated as ``a+`` because paths have length >= 1, Def. 2 —
see ``repro.core.regex``). Head predicates are IDBs; labels that never
appear in a head are EDBs (input graph streams). The reserved head
``Ans`` is the query answer.
"""
from __future__ import annotations

import re as _re
from dataclasses import dataclass, field
from typing import Dict, List, Set, Tuple

ANSWER = "Ans"

_ATOM = _re.compile(
    r"\s*([A-Za-z_][A-Za-z0-9_]*)(\+|\*)?\s*\(\s*([A-Za-z_][A-Za-z0-9_]*)\s*,"
    r"\s*([A-Za-z_][A-Za-z0-9_]*)\s*\)\s*"
)


@dataclass(frozen=True)
class Atom:
    """A body atom ``label(src, trg)``, optionally transitively closed."""

    label: str
    src: str
    trg: str
    closure: str | None = None  # None, "+" or "*"

    def __str__(self) -> str:
        return f"{self.label}{self.closure or ''}({self.src}, {self.trg})"


@dataclass(frozen=True)
class Rule:
    """``head(head_src, head_trg) <- body``."""

    head: str
    head_src: str
    head_trg: str
    body: Tuple[Atom, ...]

    def __str__(self) -> str:
        return (
            f"{self.head}({self.head_src}, {self.head_trg}) <- "
            + ", ".join(str(a) for a in self.body)
        )


@dataclass
class RQ:
    """A Regular Query: a list of rules with reserved answer head ``Ans``."""

    rules: List[Rule] = field(default_factory=list)

    def heads(self) -> Set[str]:
        return {r.head for r in self.rules}

    def edb_labels(self) -> Set[str]:
        """Labels of the extensional schema — body labels never derived."""
        heads = self.heads()
        return {a.label for r in self.rules for a in r.body if a.label not in heads}

    def rules_for(self, head: str) -> List[Rule]:
        return [r for r in self.rules if r.head == head]

    def dependency_order(self) -> List[str]:
        """Topological order of IDB predicates (Def. 14 requires the
        dependency graph to be acyclic)."""
        heads = self.heads()
        deps: Dict[str, Set[str]] = {h: set() for h in heads}
        for r in self.rules:
            for a in r.body:
                if a.label in heads and a.label != r.head:
                    deps[r.head].add(a.label)
                elif a.label == r.head:
                    raise ValueError(f"recursive rule not allowed in RQ: {r}")
        order: List[str] = []
        seen: Set[str] = set()
        visiting: Set[str] = set()

        def visit(h: str) -> None:
            if h in seen:
                return
            if h in visiting:
                raise ValueError("cyclic dependency graph — not a Regular Query")
            visiting.add(h)
            for d in sorted(deps[h]):
                visit(d)
            visiting.remove(h)
            seen.add(h)
            order.append(h)

        for h in sorted(heads):
            visit(h)
        return order

    def __str__(self) -> str:
        return "\n".join(str(r) for r in self.rules)


def parse_rq(text: str) -> RQ:
    """Parse an RQ from its textual form (one rule per line or ``;``)."""
    rules: List[Rule] = []
    for raw in _re.split(r"[;\n]", text):
        line = raw.strip()
        if not line or line.startswith("#"):
            continue
        if "<-" not in line:
            raise ValueError(f"rule missing '<-': {line!r}")
        head_txt, body_txt = line.split("<-", 1)
        m = _ATOM.fullmatch(head_txt)
        if not m or m.group(2):
            raise ValueError(f"bad rule head: {head_txt!r}")
        head, _, hsrc, htrg = m.groups()
        body: List[Atom] = []
        pos = 0
        while pos < len(body_txt):
            m = _ATOM.match(body_txt, pos)
            if not m:
                raise ValueError(f"bad body atom near: {body_txt[pos:]!r}")
            label, closure, src, trg = m.groups()
            body.append(Atom(label, src, trg, closure))
            pos = m.end()
            if pos < len(body_txt):
                if body_txt[pos] != ",":
                    raise ValueError(f"expected ',' near: {body_txt[pos:]!r}")
                pos += 1
        if not body:
            raise ValueError(f"empty rule body: {line!r}")
        rules.append(Rule(head, hsrc, htrg, tuple(body)))
    if not rules:
        raise ValueError("empty RQ program")
    rq = RQ(rules)
    if ANSWER not in rq.heads():
        raise ValueError(f"RQ must define the reserved predicate {ANSWER!r}")
    rq.dependency_order()  # validates acyclicity / non-recursion
    return rq

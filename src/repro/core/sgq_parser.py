"""Algorithm SGQParser (paper §5.2): SGQ → canonical SGA expression.

Processes the predicates of an RQ in dependency order and builds the SGA
tree bottom-up:

* each EDB label ``l`` → ``WSCAN(S_l)`` with the query's window spec;
* each transitively closed body atom ``l+``/``l*`` → ``PATH`` over the
  expression of ``l``;
* each rule body → ``PATTERN`` with predicates generated from shared
  variables (GenPred);
* multiple rules with the same head → ``UNION``.

``rpq_plan`` is the degenerate case of a single regular-path query
(Table 1's Q1–Q4), which compiles to a single PATH over WSCANs.
"""
from __future__ import annotations

from typing import Dict, List, Tuple

from repro.core.algebra import Path, Pattern, Pos, SGANode, Union, Wscan
from repro.core.regex import parse_regex
from repro.core.rq import ANSWER, RQ, Atom, Rule


def _gen_pred(body: Tuple[Atom, ...]) -> Tuple[List[Tuple[Pos, Pos]], Dict[str, Pos]]:
    """GenPred: equality terms between positions bound to the same variable,
    plus a map from variable → its first position (for head projection)."""
    first: Dict[str, Pos] = {}
    phi: List[Tuple[Pos, Pos]] = []
    last: Dict[str, Pos] = {}
    for i, atom in enumerate(body):
        for pos_name, var in (("src", atom.src), ("trg", atom.trg)):
            pos: Pos = (i, pos_name)
            if var in last:
                phi.append((last[var], pos))
            else:
                first[var] = pos
            last[var] = pos
    return phi, first


def build_sga(rq: RQ, window: int, slide: int = 1) -> SGANode:
    """Construct the canonical SGA expression for ``Q(S, W_T)``."""
    exp: Dict[str, SGANode] = {}
    for l in sorted(rq.edb_labels()):
        exp[l] = Wscan(l, window, slide)

    tc_count = 0
    for head in rq.dependency_order():
        rule_exprs: List[SGANode] = []
        for rule in rq.rules_for(head):
            body_exprs: List[SGANode] = []
            body_atoms: List[Atom] = []
            for atom in rule.body:
                if atom.label not in exp:
                    raise KeyError(
                        f"predicate {atom.label!r} used before definition in {rule}"
                    )
                child = exp[atom.label]
                if atom.closure:
                    tc_count += 1
                    d = f"_{atom.label}_tc{tc_count}"
                    # a* is evaluated as a+ — paths have length >= 1 (Def. 2).
                    child = Path([child], f"{atom.label}+", d)
                    body_atoms.append(Atom(d, atom.src, atom.trg))
                else:
                    body_atoms.append(atom)
                body_exprs.append(child)

            phi, first = _gen_pred(tuple(body_atoms))
            for v in (rule.head_src, rule.head_trg):
                if v not in first:
                    raise ValueError(f"head variable {v!r} unbound in {rule}")
            if (
                len(body_atoms) == 1
                and rule.head_src == body_atoms[0].src
                and rule.head_trg == body_atoms[0].trg
            ):
                # Single directly-oriented atom: a pure relabel.
                rule_exprs.append(Union([body_exprs[0]], label=head))
            else:
                rule_exprs.append(
                    Pattern(
                        body_exprs,
                        phi,
                        src_sel=first[rule.head_src],
                        trg_sel=first[rule.head_trg],
                        label=head,
                    )
                )
        exp[head] = rule_exprs[0] if len(rule_exprs) == 1 else Union(rule_exprs, label=head)

    return exp[ANSWER]


def rpq_plan(regex: str, window: int, slide: int = 1, label: str = ANSWER) -> Path:
    """Plan for a plain RPQ: PATH over one WSCAN per alphabet label."""
    labels = sorted(parse_regex(regex).labels())
    return Path([Wscan(l, window, slide) for l in labels], regex, label)

"""SGA transformation rules (paper §5.4).

Closedness of SGA makes query rewriting possible; the paper highlights:

* WSCAN commutes with FILTER and UNION (these don't alter intervals):
  ``W(σ(S)) = σ(W(S))`` and ``W(S1 ∪ S2) = W(S1) ∪ W(S2)``;
* PATH alternation:   ``P[a|b](Sa, Sb)   = ∪^d(Sa, Sb)``;
* PATH concatenation: ``P[a·b](Sa, Sb)   = ⋈[trg1=src2](Sa, Sb)``.

The concatenation rule as applied to *composite* sub-expressions must
account for nullability: under the paths-have-length-≥1 semantics,
``P[A·B]`` where B accepts ε also contains every A-path on its own, so
the rewrite emits a UNION of the join with the non-concatenated side(s).

``plan_variants_q4`` builds the §7.4 micro-benchmark plans for
``Q4 = (a·b·c)+``: the canonical loop-caching plan and the rewritten
plans P1–P3 obtained via these rules.
"""
from __future__ import annotations

from typing import Optional

from repro.core.algebra import Filter, Path, Pattern, SGANode, Union, Wscan
from repro.core.regex import Alt, Concat, Label, Plus, Regex, Star, parse_regex


def nullable(ast: Regex) -> bool:
    """Does the regex accept the empty word?"""
    if isinstance(ast, Label):
        return False
    if isinstance(ast, Concat):
        return nullable(ast.left) and nullable(ast.right)
    if isinstance(ast, Alt):
        return nullable(ast.left) or nullable(ast.right)
    if isinstance(ast, Star):
        return True
    if isinstance(ast, Plus):
        return nullable(ast.inner)
    raise TypeError(ast)


def push_filter_below_union(node: SGANode) -> SGANode:
    """σ(∪(S1, S2)) → ∪(σ(S1), σ(S2)) applied recursively."""
    if isinstance(node, Filter) and isinstance(node.child, Union):
        u = node.child
        return Union(
            [push_filter_below_union(Filter(c, node.predicate)) for c in u.children],
            label=u.label,
        )
    if isinstance(node, Filter):
        return Filter(push_filter_below_union(node.child), node.predicate)
    if isinstance(node, Union):
        return Union(
            [push_filter_below_union(c) for c in node.children], label=node.label
        )
    if isinstance(node, Pattern):
        return Pattern(
            [push_filter_below_union(c) for c in node.children],
            node.phi,
            node.src_sel,
            node.trg_sel,
            node.label,
        )
    if isinstance(node, Path):
        return Path(
            [push_filter_below_union(c) for c in node.children], node.regex, node.label
        )
    return node


def _child_for_label(node: Path, label: str) -> SGANode:
    for c in node.children:
        if c.out_label() == label:
            return c
    raise KeyError(f"PATH has no input stream labeled {label!r}")


def _subplan(node: Path, sub: Regex, out_label: str) -> SGANode:
    """Plan for a sub-regex: a bare label is its input stream; anything else
    is a nested PATH over the streams it needs."""
    if isinstance(sub, Label):
        return _child_for_label(node, sub.name)
    children = [_child_for_label(node, l) for l in sorted(sub.labels())]
    return Path(children, str(sub), out_label)


def path_alternation_to_union(node: Path) -> Optional[Union]:
    """``P[A|B]^d → ∪^d(plan(A), plan(B))`` when the regex root is an
    alternation. Returns None if the rule does not apply."""
    ast = parse_regex(node.regex)
    if not isinstance(ast, Alt):
        return None
    left = _subplan(node, ast.left, f"_{node.label}_l")
    right = _subplan(node, ast.right, f"_{node.label}_r")
    return Union([left, right], label=node.label)


def path_concat_to_pattern(node: Path) -> Optional[SGANode]:
    """``P[A·B]^d`` rewrite when the regex root is a concatenation.

    The core is the equi-join ``⋈[trg1=src2]^(src1,trg2,d)``; when a side
    is nullable the other side's paths alone are also answers, so those
    are UNIONed in. Returns None if the rule does not apply.
    """
    ast = parse_regex(node.regex)
    if not isinstance(ast, Concat):
        return None
    left = _subplan(node, ast.left, f"_{node.label}_l")
    right = _subplan(node, ast.right, f"_{node.label}_r")
    join = Pattern(
        [left, right],
        phi=[((0, "trg"), (1, "src"))],
        src_sel=(0, "src"),
        trg_sel=(1, "trg"),
        label=node.label,
    )
    parts: list[SGANode] = [join]
    if nullable(ast.right):
        parts.append(left)
    if nullable(ast.left):
        parts.append(right)
    if len(parts) == 1:
        return join
    return Union(parts, label=node.label)


def plan_variants_q4(window: int, slide: int = 1, labels=("a", "b", "c")) -> dict:
    """§7.4 plan space for Q4 = (a·b·c)+.

    * ``SGA``: canonical loop-caching plan  P[d+](⋈(a, b, c))
    * ``P1``:  single PATH                  P[(a·b·c)+](a, b, c)
    * ``P2``:  P[(a·d)+](a, ⋈(b, c))
    * ``P3``:  P[(d·c)+](⋈(a, b), c)
    """
    a, b, c = labels

    def w(l):
        return Wscan(l, window, slide)

    def pat(x, y, out):
        return Pattern(
            [x, y],
            phi=[((0, "trg"), (1, "src"))],
            src_sel=(0, "src"),
            trg_sel=(1, "trg"),
            label=out,
        )

    abc = Pattern(
        [w(a), w(b), w(c)],
        phi=[((0, "trg"), (1, "src")), ((1, "trg"), (2, "src"))],
        src_sel=(0, "src"),
        trg_sel=(2, "trg"),
        label="d",
    )
    return {
        "SGA": Path([abc], "d+", "Ans"),
        "P1": Path([w(a), w(b), w(c)], f"({a} . {b} . {c})+", "Ans"),
        "P2": Path([w(a), pat(w(b), w(c), "d")], f"({a} . d)+", "Ans"),
        "P3": Path([pat(w(a), w(b), "d"), w(c)], f"(d . {c})+", "Ans"),
    }


def plan_variants_linear(regex: str, window: int, slide: int = 1) -> dict:
    """Default vs concat-rewritten plan for linear path queries (Q2/Q3)."""
    from repro.core.sgq_parser import rpq_plan

    default = rpq_plan(regex, window, slide)
    alt = path_concat_to_pattern(default)
    plans: dict = {"default": default}
    if alt is not None:
        plans["rewritten"] = alt
    return plans

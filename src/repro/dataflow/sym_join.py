"""Incremental PATTERN: n-way symmetric hash join, *direct* approach (§6.1).

A hash table (here: a state DataFrame) is kept per input stream; when a
slide delivers new sgts on input *i*, they are joined against the other
inputs' states to produce exactly the new matches. The standard
telescoping expansion counts each match once:

    Δout = Σ_i  (S₁ⁿᵉʷ … Sᵢ₋₁ⁿᵉʷ) ⋈ ΔSᵢ ⋈ (Sᵢ₊₁ᵒˡᵈ … Sₙᵒˡᵈ)

Expirations need no processing at all: every result sgt carries
``exp = min`` of its constituents' expiries (Def. 19), so results
expire by themselves — the *internal window* behaviour the paper
describes, with external-window eviction available by timestamp.
"""
from __future__ import annotations

from typing import List, Sequence, Tuple

from pyspark.sql import DataFrame, SparkSession

from repro.core import model
from repro.core.algebra import Pos, join_pattern
from repro.core.coalesce import coalesce_sgts
from repro.dataflow.operators import PhysOp, prune_valid


class MultiJoinOp(PhysOp):
    """Symmetric-hash-join implementation of PATTERN (direct approach)."""

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
        self.states: List[DataFrame] = [
            model.empty_sgt(spark) for _ in self.children
        ]

    def _on_slide(self, t_now: int) -> DataFrame:
        n = len(self.children)
        deltas = [
            c.process(t_now).localCheckpoint(eager=True) for c in self.children
        ]
        empty = [d.isEmpty() for d in deltas]
        old = [prune_valid(s, t_now) for s in self.states]
        new = [
            o if empty[i] else o.unionByName(deltas[i]) for i, o in enumerate(old)
        ]

        out = model.empty_sgt(self.spark)
        for i in range(n):
            if empty[i]:
                continue
            inputs = [
                new[j] if j < i else (deltas[j] if j == i else old[j])
                for j in range(n)
            ]
            term = join_pattern(
                inputs,
                self.phi,
                self.src_sel,
                self.trg_sel,
                self.label,
                do_coalesce=False,
            )
            out = out.unionByName(term)

        # Persist the updated hash tables; coalesce keeps them set-semantic.
        self.states = [
            coalesce_sgts(s).localCheckpoint(eager=True) for s in new
        ]
        return coalesce_sgts(out)

"""Synthetic StackOverflow-like streaming graph (paper §7.1.3).

The real SO dataset (63M interactions, 2.2M users, 3 edge labels) is not
available offline; this generator reproduces the *structural properties*
the paper's analysis relies on:

* a single vertex type (users) and exactly 3 edge labels
  (``a2q`` answer-to-question, ``c2q`` comment-to-question, ``c2a``
  comment-to-answer);
* **dense and highly cyclic**: endpoints are drawn from a Zipf-skewed
  vertex distribution, so hub users create many alternative paths
  between vertex pairs — the case where S-PATH's direct window
  maintenance beats negative-tuple re-derivation;
* timestamps non-decreasing over a configurable span (Def. 4).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

SO_LABELS = ("a2q", "c2q", "c2a")


def so_stream(
    *,
    n_edges: int,
    n_vertices: int | None = None,
    t_span: int = 60,
    seed: int = 7,
    zipf_alpha: float = 1.05,
    label_weights: tuple = (0.5, 0.25, 0.25),
) -> pd.DataFrame:
    """Generate an SO-like input graph stream as a pandas DataFrame with
    columns ``src, trg, label, ts`` sorted by ``ts``."""
    if n_vertices is None:
        # Dense: |V| ~ O(sqrt(|E|)) keeps average degree high and cycles common.
        n_vertices = max(4, int(np.sqrt(n_edges) * 2))
    g = np.random.default_rng(seed)
    ranks = np.arange(1, n_vertices + 1)
    w = 1.0 / ranks**zipf_alpha
    w /= w.sum()
    src = g.choice(ranks, size=n_edges, p=w)
    trg = g.choice(ranks, size=n_edges, p=w)
    # avoid self loops (re-draw collisions once; leftovers shifted by 1)
    mask = src == trg
    trg[mask] = (trg[mask] % n_vertices) + 1
    labels = g.choice(SO_LABELS, size=n_edges, p=list(label_weights))
    ts = np.sort(g.integers(0, t_span, size=n_edges))
    return pd.DataFrame(
        {
            "src": src.astype("int64"),
            "trg": trg.astype("int64"),
            "label": labels,
            "ts": ts.astype("int64"),
        }
    )

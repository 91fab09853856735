"""Uniform random streaming graphs — small inputs for correctness tests."""
from __future__ import annotations

from typing import Sequence

import numpy as np
import pandas as pd


def random_stream(
    *,
    n_edges: int,
    n_vertices: int,
    labels: Sequence[str] = ("a", "b", "c"),
    t_span: int = 40,
    seed: int = 0,
) -> pd.DataFrame:
    """Uniform random input graph stream (``src, trg, label, ts`` sorted by ts)."""
    g = np.random.default_rng(seed)
    src = g.integers(1, n_vertices + 1, n_edges)
    trg = g.integers(1, n_vertices + 1, n_edges)
    mask = src == trg
    trg[mask] = trg[mask] % n_vertices + 1
    return pd.DataFrame(
        {
            "src": src.astype("int64"),
            "trg": trg.astype("int64"),
            "label": g.choice(list(labels), n_edges),
            "ts": np.sort(g.integers(0, t_span, n_edges)).astype("int64"),
        }
    )

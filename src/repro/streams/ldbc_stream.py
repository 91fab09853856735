"""Synthetic LDBC SNB-like update stream (paper §7.1.3).

The paper extracts the LDBC SNB update stream (SF10) and uses the edge
types ``knows`` (person–person), ``likes`` (person→message),
``hasCreator`` (message→person) and ``replyOf`` (message→message).

This generator reproduces the structural properties the paper's
comparative analysis depends on:

* ``replyOf`` edges form a strict **forest** (every non-root message
  replies to exactly one earlier message), so there is at most one
  ``replyOf``-path between any message pair — the "tree-shaped
  structure" the paper cites to explain why the DD baseline wins linear
  path queries Q1–Q4 on LDBC (S-PATH's max-expiry coalescing has nothing
  to coalesce);
* ``hasCreator`` assigns exactly one creator per message;
* events arrive in non-decreasing timestamp order, with a message's
  ``hasCreator``/``replyOf`` emitted at its creation time and ``likes``
  afterwards.

Person IDs are ``1..n_persons``; message IDs follow in a disjoint range.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

LDBC_LABELS = ("knows", "likes", "hasCreator", "replyOf")


def ldbc_stream(
    *,
    n_persons: int,
    n_messages: int,
    n_knows: int | None = None,
    likes_per_message: float = 1.5,
    reply_fraction: float = 0.7,
    t_span: int = 60,
    seed: int = 11,
) -> pd.DataFrame:
    """Generate an LDBC-like input graph stream (``src, trg, label, ts``,
    sorted by ``ts``)."""
    g = np.random.default_rng(seed)
    if n_knows is None:
        n_knows = n_persons * 3

    rows = []  # (src, trg, label, ts)

    # knows: person-person, mildly skewed, spread over the whole span.
    p_ranks = np.arange(1, n_persons + 1)
    pw = 1.0 / p_ranks**0.8
    pw /= pw.sum()
    for _ in range(n_knows):
        a = int(g.choice(p_ranks, p=pw))
        b = int(g.choice(p_ranks, p=pw))
        if a == b:
            b = a % n_persons + 1
        rows.append((a, b, "knows", int(g.integers(0, t_span))))

    # messages: created in timestamp order; reply targets are earlier messages.
    msg_base = n_persons
    creation_ts = np.sort(g.integers(0, t_span, size=n_messages))
    creators = g.choice(p_ranks, size=n_messages, p=pw)
    for i in range(n_messages):
        mid = msg_base + i + 1
        t = int(creation_ts[i])
        rows.append((mid, int(creators[i]), "hasCreator", t))
        if i > 0 and g.random() < reply_fraction:
            # Reply to a recent earlier message → deep, strictly tree-shaped threads.
            lo = max(0, i - 20)
            parent = msg_base + int(g.integers(lo, i)) + 1
            rows.append((mid, parent, "replyOf", t))

    # likes: person → existing message, after its creation.
    n_likes = int(n_messages * likes_per_message)
    for _ in range(n_likes):
        i = int(g.integers(0, n_messages))
        mid = msg_base + i + 1
        t0 = int(creation_ts[i])
        t = int(g.integers(t0, min(t0 + 10, t_span) + 1))
        rows.append((int(g.choice(p_ranks, p=pw)), mid, "likes", min(t, t_span - 1)))

    df = pd.DataFrame(rows, columns=["src", "trg", "label", "ts"])
    df = df.sort_values("ts", kind="stable").reset_index(drop=True)
    df["src"] = df["src"].astype("int64")
    df["trg"] = df["trg"].astype("int64")
    df["ts"] = df["ts"].astype("int64")
    return df

"""Run metrics: per-slide latencies → throughput + tail latency (§7.1.2).

The paper reports, per (query, system, dataset) configuration, the
aggregate throughput (edges/s) and the tail latency of a window slide
(the 99th-percentile time to process all arriving and expired sgts of a
window movement and produce new results). ``RunMetrics`` mirrors that.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import List

import numpy as np


@dataclass
class RunMetrics:
    """Collected by the micro-batch engine during a run."""

    system: str
    query: str
    dataset: str
    slide_seconds: List[float] = field(default_factory=list)
    slide_edges: List[int] = field(default_factory=list)
    n_results: int = 0

    @property
    def total_edges(self) -> int:
        return int(sum(self.slide_edges))

    @property
    def total_seconds(self) -> float:
        return float(sum(self.slide_seconds))

    @property
    def throughput(self) -> float:
        """Edges processed per second of processing time."""
        return self.total_edges / self.total_seconds if self.total_seconds else 0.0

    @property
    def tail_latency(self) -> float:
        """p99 of per-slide processing time (≈ max for short runs)."""
        if not self.slide_seconds:
            return 0.0
        return float(np.percentile(self.slide_seconds, 99))

    def row(self) -> dict:
        return {
            "dataset": self.dataset,
            "system": self.system,
            "query": self.query,
            "throughput_eps": round(self.throughput, 1),
            "tail_latency_s": round(self.tail_latency, 3),
            "slides": len(self.slide_seconds),
            "edges": self.total_edges,
            "results": self.n_results,
        }

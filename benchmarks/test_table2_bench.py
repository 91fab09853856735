"""Table 2 benchmark: one pytest-benchmark entry per (dataset, query,
system) cell. Each cell replays the dataset stream through the compiled
plan once (``pedantic(rounds=1)`` — a cell is itself an aggregate over
~10 window slides, matching how the paper reports one number per
configuration). Measured rows are persisted to
``benchmarks/results/table2.json`` for EXPERIMENTS.md.
"""
import pytest

from repro.queries.table2 import PAPER_TABLE2, run_config
from repro.queries.workload import QUERIES

CONFIGS = [
    (ds, q, system)
    for ds in ("so", "ldbc")
    for q in QUERIES
    for system in ("SGA", "DD")
]


@pytest.mark.parametrize(
    "dataset,query,system",
    CONFIGS,
    ids=[f"{d}-{q}-{s}" for d, q, s in CONFIGS],
)
def test_table2_cell(benchmark, spark_small, table2_rows, dataset, query, system):
    metrics_box = {}

    def once():
        metrics_box["m"] = run_config(spark_small, dataset, query, system, "bench")

    benchmark.pedantic(once, rounds=1, iterations=1)
    m = metrics_box["m"]
    row = m.row()
    paper = PAPER_TABLE2.get((dataset, system, query))
    if paper:
        row["paper_tput"], row["paper_tl"] = paper
    table2_rows.add(row)
    benchmark.extra_info.update(row)
    assert m.total_edges > 0
    assert m.throughput > 0

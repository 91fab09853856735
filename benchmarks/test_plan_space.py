"""§7.4 plan-space micro-benchmark (the transformation-rule payoff):
Q4 = (a·b·c)+ under the canonical loop-caching plan vs rewritten plans
P1–P3, on the SO stream. (Figures 8–9 are figures — out of scope — but
the plan-space exploration is a core claim of the algebra, so the
numbers are produced here and recorded in EXPERIMENTS.md.)"""
import pytest

from repro.core.rewrite import plan_variants_q4
from repro.dataflow.engine import MicroBatchEngine
from repro.dataflow.metrics import RunMetrics
from repro.queries.table2 import SCALES, dataset_stream
from repro.queries.workload import BINDINGS

VARIANTS = ["SGA", "P1", "P2", "P3"]


@pytest.mark.parametrize("variant", VARIANTS)
def test_plan_space_q4_so(benchmark, spark_small, plan_space_rows, variant):
    p = SCALES["bench"]
    b = BINDINGS["so"]["Q4"]
    plan = plan_variants_q4(p["window"], p["beta"], (b["a"], b["b"], b["c"]))[variant]
    stream = dataset_stream("so", "bench")
    box = {}

    def once():
        engine = MicroBatchEngine(spark_small, plan)
        box["m"] = engine.run(
            stream, metrics=RunMetrics(system=f"plan:{variant}", query="Q4", dataset="so")
        )

    benchmark.pedantic(once, rounds=1, iterations=1)
    row = box["m"].row()
    plan_space_rows.add(row)
    benchmark.extra_info.update(row)
    assert box["m"].throughput > 0

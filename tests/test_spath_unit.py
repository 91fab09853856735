"""Unit tests for the S-PATH operator — including the paper's Example 9
scenario (Fig. 5): interval extension via Propagate, direct expiry."""
import pandas as pd

from repro.core.sgq_parser import rpq_plan
from repro.dataflow.engine import MicroBatchEngine


def make_stream(rows):
    return pd.DataFrame(rows, columns=["src", "trg", "label", "ts"])


# Vertex ids for readability (paper uses letters).
X, Y, U, V, S, Z, T = 1, 2, 3, 4, 5, 6, 7


def run_engine(spark, pdf, window, beta, regex="RL+", until=None):
    engine = MicroBatchEngine(spark, rpq_plan(regex, window, beta))
    states = []

    def on_slide(eng, t_now):
        states.append((t_now, sorted(eng.current_pairs())))

    engine.run(pdf, on_slide=on_slide, until=until)
    return engine, dict(states)


def test_example9_propagate_extends_expiry(spark_small):
    """Fig. 5: x→z→t→u exists; a later y→u edge with larger expiry must
    extend (via Propagate) the reachability of u's subtree, so results
    survive the expiry of the old path."""
    W, BETA = 9, 1
    pdf = make_stream(
        [
            (X, Z, "RL", 13),  # old branch x→z ... (exp 22)
            (Z, T, "RL", 14),  # (exp 23)
            (T, U, "RL", 15),  # ... reaching u, path valid [15, 22)
            (X, Y, "RL", 19),  # (exp 28)
            (Y, U, "RL", 20),  # larger-expiry path to u, valid [20, 28)
            (U, V, "RL", 21),  # (exp 30)
            (U, S, "RL", 21),
        ]
    )
    engine, states = run_engine(spark_small, pdf, W, BETA, until=32)
    # Before anything expires, both branches are visible.
    assert {(X, T), (X, U)} <= set(states[21])
    # At t=25 the old branch (exp <= 23) is gone; x still reaches u, v, s
    # through y — only possible if Propagate extended the segments.
    assert {(X, U), (X, V), (X, S)} <= set(states[25])
    assert (X, T) not in states[25]  # expired, located directly
    assert (X, Z) not in states[25]
    # All intervals end by exp=30 → the result set drains.
    assert states[30] == []


def test_direct_expiry_no_ghost_results(spark_small):
    W, BETA = 4, 2
    pdf = make_stream([(1, 2, "RL", 0), (2, 3, "RL", 1)])
    engine, states = run_engine(spark_small, pdf, W, BETA, until=8)
    # Both edges share exp = 4 → valid at t=1 and t=3, gone at t=5.
    assert (1, 3) in states[1] and (1, 3) in states[3]
    assert states[5] == [] and states[7] == []


def test_cycle_termination(spark_small):
    """Cyclic graph + Kleene plus must converge (Δ-PATH keeps one entry per
    (root, vertex, state))."""
    W, BETA = 8, 2
    pdf = make_stream(
        [(1, 2, "RL", 0), (2, 3, "RL", 1), (3, 1, "RL", 2), (1, 2, "RL", 3)]
    )
    engine, states = run_engine(spark_small, pdf, W, BETA)
    # After all edges arrived (t=3): everything reaches everything.
    assert set(states[3]) == {(i, j) for i in (1, 2, 3) for j in (1, 2, 3)}


def test_path_payload_returned_from_engine(spark_small):
    """R3: the engine's result sgts carry the materialized path."""
    W, BETA = 6, 3
    pdf = make_stream([(1, 2, "RL", 0), (2, 3, "RL", 1)])
    engine = MicroBatchEngine(spark_small, rpq_plan("RL+", W, BETA))
    engine.run(pdf)
    rows = engine.result.df.collect()
    by_pair = {(r.src, r.trg): [tuple(e) for e in r.path] for r in rows}
    assert by_pair[(1, 3)] == [(1, 2, "RL"), (2, 3, "RL")]
    assert by_pair[(1, 2)] == [(1, 2, "RL")]


def test_multi_label_regex_engine(spark_small):
    W, BETA = 6, 3
    pdf = make_stream([(1, 2, "a", 0), (2, 3, "b", 1), (3, 4, "b", 2)])
    engine, states = run_engine(spark_small, pdf, W, BETA, regex="a . b*")
    assert set(states[2]) == {(1, 2), (1, 3), (1, 4)}


def test_spath_ignores_irrelevant_labels(spark_small):
    W, BETA = 6, 3
    pdf = make_stream([(1, 2, "zzz", 0), (1, 2, "RL", 1)])
    engine, states = run_engine(spark_small, pdf, W, BETA)
    assert states[2] == [(1, 2)]


def test_result_interval_is_constituent_intersection(spark_small):
    """Def. 20: a path result's interval is the intersection of its edges'."""
    W, BETA = 10, 5
    pdf = make_stream([(1, 2, "RL", 1), (2, 3, "RL", 8)])
    engine = MicroBatchEngine(spark_small, rpq_plan("RL+", W, BETA))
    engine.run(pdf)
    rows = {(r.src, r.trg): (r.ts, r.exp) for r in engine.result.df.collect()}
    # edge1: [1, 10); edge2: [8, 15) → path (1,3): [8, 10)
    assert rows[(1, 3)] == (8, 10)

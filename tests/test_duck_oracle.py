"""Oracle SQL generator self-tests: the generated DuckDB queries must be
valid and implement the one-time semantics on hand-computed examples."""
import duckdb
import pandas as pd
import pytest

from repro.core.algebra import Filter, Path, Pattern, Union, Wscan
from repro.core.duck_oracle import rq_snapshot_sql, sga_snapshot_sql
from repro.core.rq import parse_rq


def run_sql(sql: str, stream: pd.DataFrame):
    con = duckdb.connect()
    try:
        con.register("stream", stream)
        return {tuple(r) for r in con.execute(sql).fetchall()}
    finally:
        con.close()


@pytest.fixture()
def stream():
    return pd.DataFrame(
        {
            "src": [1, 2, 3, 1, 4],
            "trg": [2, 3, 4, 4, 1],
            "label": ["a", "a", "b", "b", "a"],
            "ts": [0, 1, 2, 3, 9],
        }
    )


def test_wscan_snapshot_window(stream):
    got = run_sql(sga_snapshot_sql(Wscan("a", 5), t=4), stream)
    # valid at 4: ts in (−1, 4] with exp = ts+5 > 4 → ts 0,1 valid; ts 9 not arrived
    assert got == {(1, 2, "a"), (2, 3, "a")}


def test_wscan_snapshot_slide(stream):
    # β=2: exp = floor(ts/2)*2+3
    got = run_sql(sga_snapshot_sql(Wscan("a", 3, slide=2), t=3), stream)
    # ts=0 → exp 3 (expired at 3); ts=1 → exp 3 (expired); nothing valid
    assert got == set()


def test_filter_union(stream):
    plan = Filter(Union([Wscan("a", 20), Wscan("b", 20)], label="u"), "src < 3")
    got = run_sql(sga_snapshot_sql(plan, t=9), stream)
    assert got == {(1, 2, "u"), (2, 3, "u"), (1, 4, "u")}


def test_pattern_join(stream):
    plan = Pattern(
        [Wscan("a", 20), Wscan("b", 20)],
        phi=[((0, "trg"), (1, "src"))],
        src_sel=(0, "src"),
        trg_sel=(1, "trg"),
        label="d",
    )
    got = run_sql(sga_snapshot_sql(plan, t=9), stream)
    # a-edges: 1→2, 2→3, 4→1 ; b-edges: 3→4, 1→4 → (2,4) via 3, (4,4) via 1
    assert got == {(2, 4, "d"), (4, 4, "d")}


def test_path_recursive_cte(stream):
    got = run_sql(sga_snapshot_sql(Path([Wscan("a", 20)], "a+", "p"), t=9), stream)
    pairs = {(s, t) for s, t, _ in got}
    # a-graph at t=9: 1→2→3, 4→1 → closure
    assert pairs == {
        (1, 2), (2, 3), (1, 3), (4, 1), (4, 2), (4, 3),
    }


def test_path_respects_window_expiry(stream):
    got = run_sql(sga_snapshot_sql(Path([Wscan("a", 5)], "a+", "p"), t=10), stream)
    # only the ts=9 edge (4→1) is valid at t=10
    assert {(s, t) for s, t, _ in got} == {(4, 1)}


def test_path_empty_language():
    plan = Path([Wscan("zzz", 5)], "zzz+", "p")
    stream = pd.DataFrame({"src": [1], "trg": [2], "label": ["other"], "ts": [0]})
    assert run_sql(sga_snapshot_sql(plan, t=1), stream) == set()


def test_rq_snapshot_sql(stream):
    rq = parse_rq("Ans(x, y) <- a+(x, y)")
    got = run_sql(rq_snapshot_sql(rq, t=9, window=20), stream)
    assert (1, 3, "Ans") in got


def test_nested_path_over_pattern(stream):
    # d = a⋈b (2,4),(4,4); d+ closure: (2,4),(4,4) — 4→4 self loop stays itself.
    inner = Pattern(
        [Wscan("a", 20), Wscan("b", 20)],
        phi=[((0, "trg"), (1, "src"))],
        src_sel=(0, "src"),
        trg_sel=(1, "trg"),
        label="d",
    )
    plan = Path([inner], "d+", "p")
    got = run_sql(sga_snapshot_sql(plan, t=9), stream)
    assert {(s, t) for s, t, _ in got} == {(2, 4), (4, 4)}

"""RunMetrics unit tests (throughput / tail-latency accounting, §7.1.2)."""
import pytest

from repro.dataflow.metrics import RunMetrics


def test_throughput_is_edges_per_processing_second():
    m = RunMetrics("SGA", "Q1", "so")
    m.slide_seconds = [1.0, 1.0]
    m.slide_edges = [100, 300]
    assert m.total_edges == 400
    assert m.total_seconds == 2.0
    assert m.throughput == 200.0


def test_tail_latency_p99_close_to_max():
    m = RunMetrics("DD", "Q2", "ldbc")
    m.slide_seconds = [0.1] * 9 + [5.0]
    assert 4.0 < m.tail_latency <= 5.0


def test_empty_metrics_are_zero():
    m = RunMetrics("SGA", "Q1", "so")
    assert m.throughput == 0.0
    assert m.tail_latency == 0.0
    assert m.total_edges == 0


def test_row_shape():
    m = RunMetrics("SGA", "Q3", "so")
    m.slide_seconds = [0.5]
    m.slide_edges = [50]
    m.n_results = 7
    row = m.row()
    assert row == {
        "dataset": "so",
        "system": "SGA",
        "query": "Q3",
        "throughput_eps": 100.0,
        "tail_latency_s": 0.5,
        "slides": 1,
        "edges": 50,
        "results": 7,
    }


@pytest.mark.parametrize("n", [1, 3, 10])
def test_slide_counts(n):
    m = RunMetrics("SGA", "Q1", "so")
    m.slide_seconds = [0.1] * n
    m.slide_edges = [1] * n
    assert m.row()["slides"] == n

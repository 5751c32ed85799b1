"""Tests for the measurement harness (curves, qps@recall)."""
import numpy as np
import pytest

from repro.eval.harness import (dists_at_recall, max_recall, qps_at_recall,
                                recall_of, run_curve)
from repro.eval.workloads import RangeQuery


def test_recall_of():
    assert recall_of(np.array([1, 2, 3]), np.array([2, 3, 9])) == 2 / 3
    assert recall_of(np.array([]), np.array([1])) == 0.0
    assert recall_of(np.array([5]), np.array([], dtype=int)) == 1.0


def _rows(points):
    return [
        {"beam": 10 * (i + 1), "recall": r, "qps": q, "dists": d}
        for i, (r, q, d) in enumerate(points)
    ]


def test_qps_at_recall_interpolates():
    rows = _rows([(0.8, 1000.0, 100.0), (1.0, 100.0, 1000.0)])
    mid = qps_at_recall(rows, 0.9)
    assert 100 < mid < 1000
    # log-interpolation at the midpoint of the recall span
    assert mid == pytest.approx(np.sqrt(1000 * 100), rel=1e-6)


def test_qps_at_recall_exact_point():
    rows = _rows([(0.85, 500.0, 1.0), (0.9, 300.0, 2.0)])
    assert qps_at_recall(rows, 0.9) == pytest.approx(300.0)


def test_qps_at_recall_unreachable_returns_none():
    rows = _rows([(0.5, 900.0, 1.0), (0.7, 400.0, 2.0)])
    assert qps_at_recall(rows, 0.9) is None
    assert dists_at_recall(rows, 0.9) is None


def test_qps_at_recall_first_point_already_above():
    rows = _rows([(0.95, 800.0, 3.0)])
    assert qps_at_recall(rows, 0.9) == 800.0


def test_dists_at_recall_interpolates():
    rows = _rows([(0.8, 1000.0, 100.0), (1.0, 100.0, 400.0)])
    assert dists_at_recall(rows, 0.9) == pytest.approx(200.0, rel=1e-6)


def test_max_recall():
    assert max_recall(_rows([(0.3, 1, 1), (0.8, 1, 1)])) == 0.8
    assert max_recall([]) == 0.0


def test_run_curve_end_to_end():
    """run_curve against an exact brute-force 'method': recall 1.0."""
    g = np.random.default_rng(0)
    X = g.normal(size=(64, 4)).astype(np.float32)
    Q = g.normal(size=(4, 4)).astype(np.float32)
    queries = [RangeQuery(i, 1, 64) for i in range(4)]
    from repro.eval.ground_truth import exact_rfann_np

    gt = {q.qid: exact_rfann_np(X, Q[q.qid], q.lo, q.hi, 5)[0]
          for q in queries}

    def exact(qv, q, beam, k, counter):
        ranks, _ = exact_rfann_np(X, qv, q.lo, q.hi, k)
        if counter is not None:
            counter.add(q.hi - q.lo + 1)
        return ranks

    rows = run_curve(exact, queries, Q, gt, k=5, beams=(10, 20))
    assert len(rows) == 2
    for row in rows:
        assert row["recall"] == 1.0
        assert row["qps"] > 0
        assert row["dists"] == 64

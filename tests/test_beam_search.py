"""Tests for the shared greedy beam-search kernel."""
import numpy as np

from repro.core.beam_search import beam_search, top_k
from repro.core.neighbors import DistanceCounter


def _complete_graph(n):
    def nbrs(u):
        return np.array([v for v in range(n) if v != u])

    return nbrs


def test_exact_on_complete_graph():
    g = np.random.default_rng(0)
    x = g.normal(size=(50, 4)).astype(np.float32)
    q = g.normal(size=4).astype(np.float32)
    ids, dists = beam_search(q, x, _complete_graph(50), [0], beam=50)
    res = top_k(ids, dists, 5)
    ref = np.argsort(((x - q) ** 2).sum(axis=1))[:5]
    np.testing.assert_array_equal(np.sort(res), np.sort(ref))


def test_counter_counts_every_scored_node():
    g = np.random.default_rng(1)
    x = g.normal(size=(30, 3)).astype(np.float32)
    c = DistanceCounter()
    ids, _ = beam_search(x[0], x, _complete_graph(30), [0], beam=30, counter=c)
    assert c.count == len(ids) == 30  # complete graph: everything scored


def test_beam_limits_exploration():
    g = np.random.default_rng(2)
    x = g.normal(size=(200, 8)).astype(np.float32)
    # Ring graph: small beam must stop early.
    def ring(u):
        return np.array([(u - 1) % 200, (u + 1) % 200])

    c_small, c_big = DistanceCounter(), DistanceCounter()
    beam_search(x[0], x, ring, [100], beam=2, counter=c_small)
    beam_search(x[0], x, ring, [100], beam=50, counter=c_big)
    assert c_small.count < c_big.count


def test_visit_filter_blocks_scoring_and_expansion():
    g = np.random.default_rng(3)
    x = g.normal(size=(40, 4)).astype(np.float32)
    allowed = set(range(0, 40, 2))
    ids, _ = beam_search(
        x[1], x, _complete_graph(40), [0], beam=40,
        visit_filter=lambda u: u in allowed,
    )
    assert set(ids.tolist()) <= allowed


def test_entry_points_failing_filter_are_skipped():
    x = np.eye(4, dtype=np.float32)
    ids, _ = beam_search(
        x[0], x, _complete_graph(4), [1, 2], beam=4,
        visit_filter=lambda u: u != 1,
    )
    assert 1 not in ids.tolist()
    assert len(ids) > 0


def test_empty_when_all_entries_filtered():
    x = np.eye(3, dtype=np.float32)
    ids, dists = beam_search(
        x[0], x, _complete_graph(3), [0], beam=3, visit_filter=lambda u: False
    )
    assert len(ids) == 0 and len(dists) == 0


def test_duplicate_entry_points_scored_once():
    x = np.eye(3, dtype=np.float32)
    ids, _ = beam_search(x[0], x, _complete_graph(3), [0, 0, 0], beam=3)
    assert sorted(ids.tolist()) == [0, 1, 2]


def test_top_k_result_filter_and_order():
    ids = np.array([4, 2, 9, 7])
    dists = np.array([0.4, 0.1, 0.9, 0.2])
    res = top_k(ids, dists, 2, keep=lambda i: i != 2)
    np.testing.assert_array_equal(res, [7, 4])


def test_top_k_empty_input():
    assert len(top_k(np.empty(0, int), np.empty(0), 3)) == 0


def test_top_k_all_filtered():
    res = top_k(np.array([1, 2]), np.array([0.1, 0.2]), 3,
                keep=lambda i: np.zeros(len(i), dtype=bool))
    assert len(res) == 0

"""Tests for the SeRF-style segment graph (2DSegmentGraph stand-in)."""
import numpy as np
import pytest

from repro.baselines.serf_like import SerfLikeIndex
from repro.core.hnsw import build_hnsw
from repro.eval.ground_truth import exact_rfann_np


@pytest.fixture(scope="module")
def serf(med_data):
    return SerfLikeIndex(med_data[0], m=8, ef=50)


def test_prefix_reconstruction_is_lossless(med_data):
    """The core SeRF property: the segment graph filtered at prefix R
    equals the HNSW built from scratch on ranks 1..R with the same
    insertion order — compression is lossless for half-bounded ranges."""
    X, _ = med_data
    serf = SerfLikeIndex(X, m=8, ef=50)
    for prefix in (64, 200, 512):
        direct = build_hnsw(
            X[:prefix], m=8, ef_construction=50, order=np.arange(prefix)
        )
        for u in range(prefix):
            got = np.sort(serf.neighbors_at(u, prefix))
            ref = np.sort(direct.adj[u][direct.adj[u] >= 0])
            np.testing.assert_array_equal(got, ref, err_msg=f"u={u} R={prefix}")


def test_half_bounded_recall_matches_hnsw_quality(serf, med_data):
    """On [1, R] queries SeRF searches the exact HNSW => high recall."""
    X, Q = med_data
    hits = tot = 0
    for q in Q:
        gt, _ = exact_rfann_np(X, q, 1, 300, 10)
        res = serf.search(q, 1, 300, beam=80, k=10)
        hits += len(set(res.tolist()) & set(gt.tolist()))
        tot += len(gt)
    assert hits / tot >= 0.9


def test_results_in_range(serf, med_data):
    _, Q = med_data
    res = serf.search(Q[0], 200, 450, beam=40, k=10)
    assert np.all((res >= 200) & (res <= 450))


def test_small_general_range_degrades(serf, med_data):
    """The reported 2DSegmentGraph failure shape: for a small range far
    from the left boundary, post-filtering on the [1, R] graph at a
    moderate beam recovers few in-range results."""
    X, Q = med_data
    hits = tot = 0
    for q in Q:
        gt, _ = exact_rfann_np(X, q, 430, 460, 10)
        res = serf.search(q, 430, 460, beam=20, k=10)
        hits += len(set(res.tolist()) & set(gt.tolist()))
        tot += len(gt)
    assert hits / tot < 0.9  # cannot match dedicated-graph quality


def test_empty_and_clamped_ranges(serf, med_data):
    _, Q = med_data
    assert len(serf.search(Q[0], 10, 2, beam=10, k=5)) == 0
    res = serf.search(Q[0], -3, 10_000, beam=40, k=5)
    assert len(res) == 5


def test_memory_accounts_edge_intervals(serf):
    mb = serf.memory_bytes()
    assert mb["index"] > 0
    # 12 bytes per recorded edge interval.
    assert mb["index"] == len(serf._dst) * 12

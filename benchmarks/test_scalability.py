"""Scalability benchmark (Section 5.2.3 stand-in): iRangeGraph build and
search cost at two dataset sizes — the build should grow roughly
n log n, the per-query cost sub-linearly.
"""
import numpy as np
import pytest

from repro.core.irange_build import build_irange_index_local
from repro.core.neighbors import DistanceCounter
from tests.conftest import make_clustered


@pytest.mark.parametrize("n", [512, 2048])
def test_scalability_build(benchmark, n):
    X, _ = make_clustered(n, 32, n_clusters=24, seed=13)
    idx = benchmark.pedantic(
        lambda: build_irange_index_local(X, m=16, ef=100, leaf_size=64),
        rounds=1, iterations=1,
    )
    benchmark.extra_info["n"] = n
    benchmark.extra_info["layers"] = idx.tree.num_layers


@pytest.mark.parametrize("n", [512, 2048])
def test_scalability_search(benchmark, n):
    X, Q = make_clustered(n, 32, n_clusters=24, seed=13)
    idx = build_irange_index_local(X, m=16, ef=100, leaf_size=64)
    lo, hi = n // 8, 7 * n // 8

    def run():
        c = DistanceCounter()
        for q in Q:
            idx.search(q, lo, hi, beam=80, k=10, counter=c)
        return c.count / len(Q)

    dists = benchmark.pedantic(run, rounds=3, iterations=1)
    benchmark.extra_info["n"] = n
    benchmark.extra_info["dists_per_query"] = round(dists, 1)


def test_scalability_search_cost_sublinear():
    """4x the data must cost far less than 4x the distances per query."""
    d = {}
    for n in (512, 2048):
        X, Q = make_clustered(n, 16, seed=14)
        idx = build_irange_index_local(X, m=8, ef=50, leaf_size=64)
        c = DistanceCounter()
        for q in Q:
            idx.search(q, n // 8, 7 * n // 8, beam=60, k=10, counter=c)
        d[n] = c.count / len(Q)
    assert d[2048] < 3 * d[512]

"""Tests for the distributed index builders (Spark dataflows)."""
import numpy as np
import pandas as pd
import pytest

from repro.baselines._spark_build import build_subset_graphs
from repro.core.irange_build import (build_irange_index,
                                     build_irange_index_local)
from tests.conftest import make_clustered


@pytest.fixture(scope="module")
def vec_df(spark):
    X, _ = make_clustered(256, 16, seed=21)
    pdf = pd.DataFrame(
        {"rank": np.arange(1, 257), "vector": [v.tolist() for v in X]}
    )
    return X, spark.createDataFrame(pdf)


def test_spark_build_equals_local(spark, vec_df):
    """The distributed bottom-up build is deterministic and identical to
    the driver-side reference implementation."""
    X, df = vec_df
    idx_s = build_irange_index(spark, df, m=8, ef=40, leaf_size=32)
    idx_l = build_irange_index_local(X, m=8, ef=40, leaf_size=32)
    assert len(idx_s.layer_adj) == len(idx_l.layer_adj)
    for a, b in zip(idx_s.layer_adj, idx_l.layer_adj):
        np.testing.assert_array_equal(a, b)
    np.testing.assert_allclose(idx_s.vectors, X)


def test_spark_build_searches_well(spark, vec_df):
    X, df = vec_df
    idx = build_irange_index(spark, df, m=8, ef=40, leaf_size=32)
    _, Q = make_clustered(256, 16, seed=21)
    from repro.eval.ground_truth import exact_rfann_np

    hits = tot = 0
    for q in Q[:8]:
        gt, _ = exact_rfann_np(X, q, 40, 220, 10)
        res = idx.search(q, 40, 220, beam=60, k=10)
        hits += len(set(res.tolist()) & set(gt.tolist()))
        tot += len(gt)
    assert hits / tot >= 0.85


def test_subset_graphs_spark_equals_driver(spark):
    X, _ = make_clustered(192, 8, seed=22)
    subsets = {
        0: np.arange(1, 65), 1: np.arange(65, 129), 2: np.arange(129, 193)
    }
    via_spark = build_subset_graphs(spark, X, subsets, m=6, ef=30, seed=5)
    via_driver = build_subset_graphs(None, X, subsets, m=6, ef=30, seed=5)
    assert via_spark.keys() == via_driver.keys()
    for gid in subsets:
        np.testing.assert_array_equal(
            via_spark[gid].ranks, via_driver[gid].ranks
        )
        np.testing.assert_array_equal(
            via_spark[gid].graph.adj, via_driver[gid].graph.adj
        )
        assert via_spark[gid].graph.entry == via_driver[gid].graph.entry


def test_subset_graph_search_global_ranks(spark):
    X, Q = make_clustered(128, 8, seed=23)
    subsets = {0: np.arange(33, 97)}
    graphs = build_subset_graphs(None, X, subsets, m=6, ef=30)
    res = graphs[0].search(Q[0], beam=40, k=5)
    assert np.all((res >= 33) & (res <= 96))
    # Range restriction (post-filter semantics).
    res2 = graphs[0].search(Q[0], beam=40, k=5, rank_range=(50, 60))
    assert np.all((res2 >= 50) & (res2 <= 60))

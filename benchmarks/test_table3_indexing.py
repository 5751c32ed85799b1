"""Table 3 benchmark: indexing time per method.

Each benchmark times one method's index build at bench scale (rounds=1:
builds are expensive and deterministic). The suite fixture's recorded
build times are attached for cross-checking.
"""
import numpy as np
import pytest

from repro.baselines.basic_strategies import PrefilterIndex, WholeGraphIndex
from repro.baselines.filtered_diskann import StitchedVamanaIndex
from repro.baselines.milvus_like import MilvusLikeIndex
from repro.baselines.serf_like import SerfLikeIndex
from repro.baselines.superpostfilter import SuperPostfilterIndex
from repro.core.irange_build import build_irange_index_local

M, EF = 16, 100


@pytest.fixture(scope="module")
def X(bench_ds):
    return bench_ds.vectors


def test_table3_build_irange_local(benchmark, X):
    benchmark.pedantic(
        lambda: build_irange_index_local(X, m=M, ef=EF, leaf_size=64),
        rounds=1, iterations=1,
    )


def test_table3_build_hnsw_reference(benchmark, X):
    benchmark.pedantic(
        lambda: WholeGraphIndex(X, m=M, ef=EF), rounds=1, iterations=1
    )


def test_table3_build_superpostfiltering(benchmark, X):
    benchmark.pedantic(
        lambda: SuperPostfilterIndex(X, m=M, ef=EF, min_window=64),
        rounds=1, iterations=1,
    )


def test_table3_build_serf(benchmark, X):
    benchmark.pedantic(
        lambda: SerfLikeIndex(X, m=M, ef=EF), rounds=1, iterations=1
    )


def test_table3_build_milvus(benchmark, X):
    benchmark.pedantic(
        lambda: MilvusLikeIndex(X, n_buckets=10, m=M, ef=EF),
        rounds=1, iterations=1,
    )


def test_table3_build_stitched_vamana(benchmark, X):
    benchmark.pedantic(
        lambda: StitchedVamanaIndex(X, n_labels=10, m=M, ef=EF),
        rounds=1, iterations=1,
    )


def test_table3_build_prefilter(benchmark, X):
    benchmark.pedantic(lambda: PrefilterIndex(X), rounds=3, iterations=1)


def test_table3_shape_prefilter_is_cheapest(bench_suite):
    """Paper Table 3: Pre-filtering builds in ~no time; graph builds
    dominate; iRangeGraph costs a small multiple of one HNSW."""
    s = bench_suite.build_seconds
    assert s["Pre-filtering"] < 0.1
    assert s["Pre-filtering"] < min(
        v for k, v in s.items() if k != "Pre-filtering"
    )


def test_table3_suite_recorded_times(bench_suite):
    assert set(bench_suite.build_seconds) == {
        "iRangeGraph", "SuperPostfiltering", "Milvus", "Pre-filtering",
        "2DSegmentGraph", "FilteredVamana", "StitchedVamana",
    }
    assert bench_suite.hnsw_build_seconds > 0
    assert all(np.isfinite(v) for v in bench_suite.build_seconds.values())

"""Figure 2 benchmark: single-attribute RFANN search per method.

One benchmark per method times a full pass over the mixed workload at a
fixed beam; recall and distance computations ride along in extra_info.
Shape assertions encode the paper's Figure-2 conclusions in terms of
distance computations (the hardware-independent cost — Python wall
clock compresses inter-method gaps, see DESIGN.md).
"""
import numpy as np
import pytest

from repro.core.neighbors import DistanceCounter
from repro.eval.harness import recall_of

BEAM = 80
K = 10

METHOD_NAMES = [
    "iRangeGraph", "SuperPostfiltering", "Milvus", "Pre-filtering",
    "2DSegmentGraph", "FilteredVamana", "StitchedVamana",
]


def _run_workload(index, ds, wl, gt, *, beam=BEAM):
    counter = DistanceCounter()
    recalls = []
    for q in wl:
        qv = ds.queries[q.qid % len(ds.queries)]
        res = index.search(qv, q.lo, q.hi, beam=beam, k=K, counter=counter)
        recalls.append(recall_of(np.asarray(res), gt[q.qid]))
    return float(np.mean(recalls)), counter.count / len(wl)


@pytest.mark.parametrize("name", METHOD_NAMES)
def test_fig2_mixed_workload(benchmark, bench_suite, bench_ds, mixed_wl,
                             name):
    wl, gt = mixed_wl
    index = bench_suite.indexes[name]
    recall, dists = benchmark.pedantic(
        lambda: _run_workload(index, bench_ds, wl, gt),
        rounds=3, iterations=1,
    )
    benchmark.extra_info["recall"] = round(recall, 4)
    benchmark.extra_info["dists_per_query"] = round(dists, 1)
    benchmark.extra_info["beam"] = BEAM


def test_fig2_shape_irange_beats_baselines_on_distances(
    bench_suite, bench_ds, mixed_wl
):
    """Paper §5.2.1: iRangeGraph gives the best cost at matched recall
    on the mixed workload. At a fixed beam its distance count must be
    the lowest among the graph baselines while keeping recall >= 0.9."""
    wl, gt = mixed_wl
    results = {
        name: _run_workload(bench_suite.indexes[name], bench_ds, wl, gt)
        for name in METHOD_NAMES
    }
    r_ir, d_ir = results["iRangeGraph"]
    assert r_ir >= 0.9
    for name in ("SuperPostfiltering", "Milvus", "Pre-filtering",
                 "2DSegmentGraph"):
        assert d_ir < results[name][1], (name, results[name], (r_ir, d_ir))


def test_fig2_shape_prefilter_wins_small_fraction(
    spark, bench_suite, bench_ds
):
    """Paper: for small range fractions Pre-filtering is optimal — every
    method's cost degenerates to (at best) the range length."""
    from .conftest import BENCH_NQ, workload_with_gt

    wl, gt = workload_with_gt(spark, bench_ds, "small", nq=BENCH_NQ)
    r_pre, d_pre = _run_workload(
        bench_suite.indexes["Pre-filtering"], bench_ds, wl, gt
    )
    assert r_pre == 1.0
    length = max(1, bench_ds.n >> 8)
    assert d_pre == pytest.approx(length, rel=0.01)


def test_fig2_shape_serf_fails_generic_small_ranges(
    spark, bench_suite, bench_ds
):
    """Paper: 2DSegmentGraph cannot reach high recall on small fractions
    (lossy for general [L, R]); in our stand-in its cost at matched
    recall explodes instead — it must scan from rank 1 up to R."""
    from .conftest import BENCH_NQ, workload_with_gt

    wl, gt = workload_with_gt(spark, bench_ds, "small", nq=BENCH_NQ)
    _, d_serf = _run_workload(
        bench_suite.indexes["2DSegmentGraph"], bench_ds, wl, gt, beam=160
    )
    _, d_ir = _run_workload(
        bench_suite.indexes["iRangeGraph"], bench_ds, wl, gt, beam=160
    )
    assert d_serf > 2 * d_ir

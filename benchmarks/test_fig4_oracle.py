"""Figure 4 benchmark: iRangeGraph vs Oracle-HNSW.

Oracle-HNSW materializes a dedicated HNSW per distinct query range —
the impractical ideal. Paper claim: the oracle beats iRangeGraph by
LESS than 2x at 0.9 recall; we assert the distance-computation gap at a
matched beam stays under 2x (with slack for graph-quality noise).
"""
import numpy as np
import pytest

from repro.baselines.oracle_hnsw import OracleHnswIndex
from repro.core.neighbors import DistanceCounter
from repro.eval.ground_truth import ground_truth_spark
from repro.eval.harness import recall_of
from repro.eval.workloads import shared_range_workload

from .conftest import BENCH_NQ

BEAM, K = 80, 10


@pytest.fixture(scope="module")
def oracle_setup(spark, bench_ds, bench_suite):
    wl = shared_range_workload(bench_ds.n, BENCH_NQ, n_ranges=8, seed=5)
    gt = ground_truth_spark(spark, bench_ds.vectors, wl, bench_ds.queries,
                            k=K)
    cfg = bench_suite.config
    oracle = OracleHnswIndex(
        bench_ds.vectors, [(q.lo, q.hi) for q in wl],
        m=cfg["m"], ef=cfg["ef"], spark=spark,
    )
    return wl, gt, oracle


def _run(index, ds, wl, gt):
    c = DistanceCounter()
    recalls = []
    for q in wl:
        qv = ds.queries[q.qid % len(ds.queries)]
        res = index.search(qv, q.lo, q.hi, beam=BEAM, k=K, counter=c)
        recalls.append(recall_of(np.asarray(res), gt[q.qid]))
    return float(np.mean(recalls)), c.count / len(wl)


def test_fig4_irange_search(benchmark, bench_suite, bench_ds, oracle_setup):
    wl, gt, _ = oracle_setup
    recall, dists = benchmark.pedantic(
        lambda: _run(bench_suite.indexes["iRangeGraph"], bench_ds, wl, gt),
        rounds=3, iterations=1,
    )
    benchmark.extra_info.update(recall=round(recall, 4),
                                dists_per_query=round(dists, 1))


def test_fig4_oracle_search(benchmark, bench_ds, oracle_setup):
    wl, gt, oracle = oracle_setup
    recall, dists = benchmark.pedantic(
        lambda: _run(oracle, bench_ds, wl, gt), rounds=3, iterations=1
    )
    benchmark.extra_info.update(recall=round(recall, 4),
                                dists_per_query=round(dists, 1))


def test_fig4_shape_gap_under_2x(bench_suite, bench_ds, oracle_setup):
    wl, gt, oracle = oracle_setup
    r_ir, d_ir = _run(bench_suite.indexes["iRangeGraph"], bench_ds, wl, gt)
    r_or, d_or = _run(oracle, bench_ds, wl, gt)
    assert r_ir >= 0.9 and r_or >= 0.9
    # Improvised dedicated graphs cost at most ~2x the ideal's distances.
    assert d_ir <= 2.5 * d_or


def test_fig4_shape_oracle_memory_impractical(bench_suite, oracle_setup):
    """Even for 8 materialized ranges the oracle's edge storage rivals
    iRangeGraph's whole log-layer index — per *possible* range it is
    O(n^3 m) and hopeless (the paper's point)."""
    _, _, oracle = oracle_setup
    ir_mb = bench_suite.indexes["iRangeGraph"].memory_bytes()["index"]
    or_mb = oracle.memory_bytes()["index"]
    assert or_mb > 0.2 * ir_mb

"""Figure 5 benchmark: multi-attribute (conjunctive) RFANN.

iRangeGraph+ (probabilistic out-of-range visits, p = exp(-t)) vs plain
iRangeGraph (Post-filtering on attribute 2) vs the extendable baselines.
Shape assertions: both satisfy the conjunction, and iRangeGraph+ needs
no more distance computations than plain Post-filtering at matched beam
(the paper reports a ~70% qps gain at 0.9 recall).
"""
import numpy as np
import pytest

from repro.baselines.multi_attr_baselines import (ConjunctivePostFilter,
                                                  ConjunctivePrefilter)
from repro.core.irange_build import build_irange_index_local
from repro.core.multi_attr import MultiAttrIndex
from repro.core.neighbors import DistanceCounter
from repro.eval.ground_truth import ground_truth_spark
from repro.eval.harness import recall_of
from repro.eval.workloads import multiattr_workload

from .conftest import BENCH_NQ

BEAM, K = 80, 10


@pytest.fixture(scope="module")
def fig5_setup(spark, bench_multi_ds):
    ds = bench_multi_ds
    wl = multiattr_workload(ds.n, BENCH_NQ, frac_exp=2, seed=5)
    gt = ground_truth_spark(
        spark, ds.vectors, wl, ds.queries, k=K, attr2_rank=ds.attr2_rank
    )
    idx = build_irange_index_local(ds.vectors, m=16, ef=100, leaf_size=64)
    multi = MultiAttrIndex(idx, ds.attr2_rank)
    pre = ConjunctivePrefilter(ds.vectors, ds.attr2_rank)
    return ds, wl, gt, multi, pre


def _run(fn, ds, wl, gt):
    c = DistanceCounter()
    recalls = []
    for q in wl:
        qv = ds.queries[q.qid % len(ds.queries)]
        res = fn(qv, q, c)
        recalls.append(recall_of(np.asarray(res), gt[q.qid]))
    return float(np.mean(recalls)), c.count / len(wl)


def _mode_fn(multi, mode):
    return lambda qv, q, c: multi.search(
        qv, (q.lo, q.hi), (q.lo2, q.hi2), beam=BEAM, k=K, mode=mode,
        counter=c, seed=q.qid,
    )


@pytest.mark.parametrize("mode,label", [("prob", "iRangeGraph+"),
                                        ("post", "iRangeGraph")])
def test_fig5_irange_modes(benchmark, fig5_setup, mode, label):
    ds, wl, gt, multi, _ = fig5_setup
    recall, dists = benchmark.pedantic(
        lambda: _run(_mode_fn(multi, mode), ds, wl, gt),
        rounds=3, iterations=1,
    )
    benchmark.extra_info.update(method=label, recall=round(recall, 4),
                                dists_per_query=round(dists, 1))


def test_fig5_prefilter(benchmark, fig5_setup):
    ds, wl, gt, _, pre = fig5_setup
    fn = lambda qv, q, c: pre.search(  # noqa: E731
        qv, (q.lo, q.hi), (q.lo2, q.hi2), k=K, counter=c
    )
    recall, dists = benchmark.pedantic(
        lambda: _run(fn, ds, wl, gt), rounds=3, iterations=1
    )
    assert recall == 1.0
    benchmark.extra_info.update(dists_per_query=round(dists, 1))


def test_fig5_shape_results_satisfy_conjunction(fig5_setup):
    ds, wl, _, multi, _ = fig5_setup
    for q in wl[:8]:
        res = multi.search(
            ds.queries[q.qid % len(ds.queries)], (q.lo, q.hi),
            (q.lo2, q.hi2), beam=BEAM, k=K, mode="prob", seed=q.qid,
        )
        assert np.all((res >= q.lo) & (res <= q.hi))
        a2 = ds.attr2_rank[res - 1]
        assert np.all((a2 >= q.lo2) & (a2 <= q.hi2))


def test_fig5_shape_prob_cheaper_than_post(fig5_setup):
    """iRangeGraph+ prunes out-of-range excursions: at matched beam its
    distance count must not exceed plain Post-filtering's, with recall
    in the same band (the paper's 70% qps gain comes from exactly
    this)."""
    ds, wl, gt, multi, _ = fig5_setup
    r_prob, d_prob = _run(_mode_fn(multi, "prob"), ds, wl, gt)
    r_post, d_post = _run(_mode_fn(multi, "post"), ds, wl, gt)
    assert d_prob <= d_post
    assert r_prob >= r_post - 0.1


def test_fig5_shape_graph_avoids_scanning_attr1_range(fig5_setup):
    """The mechanism behind the paper's 5x-35x gain over Pre-filtering:
    the dedicated graph scores a beam-bounded set instead of the whole
    attribute-1 slice. (The absolute crossover vs the conjunctive scan
    is n-dependent; at 1M objects it is decisively in the graph's
    favor — see EXPERIMENTS.md.)"""
    ds, wl, gt, multi, _ = fig5_setup
    _, d_graph = _run(_mode_fn(multi, "prob"), ds, wl, gt)
    attr1_len = float(np.mean([q.hi - q.lo + 1 for q in wl]))
    assert d_graph < attr1_len

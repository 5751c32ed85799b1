"""Figure 3 benchmark: ablation of the core search algorithm.

iRangeGraph (layer skipping) vs iRangeGraph- (no skipping) vs
BasicSearch (decompose + independent searches). Shape: BasicSearch
costs a small multiple of iRangeGraph in distance computations (the
paper reports 2x-4x at matched recall).
"""
import numpy as np
import pytest

from repro.core.irange_graph import BasicSearchIndex
from repro.core.neighbors import DistanceCounter
from repro.eval.harness import recall_of

BEAM, K = 80, 10


def _run(fn, ds, wl, gt):
    c = DistanceCounter()
    recalls = []
    for q in wl:
        qv = ds.queries[q.qid % len(ds.queries)]
        res = fn(qv, q, c)
        recalls.append(recall_of(np.asarray(res), gt[q.qid]))
    return float(np.mean(recalls)), c.count / len(wl)


@pytest.fixture(scope="module")
def variants(bench_suite):
    ir = bench_suite.indexes["iRangeGraph"]
    basic = BasicSearchIndex(ir)
    return {
        "iRangeGraph": lambda qv, q, c: ir.search(
            qv, q.lo, q.hi, beam=BEAM, k=K, counter=c
        ),
        "iRangeGraph-": lambda qv, q, c: ir.search(
            qv, q.lo, q.hi, beam=BEAM, k=K, counter=c, skip_layers=False
        ),
        "BasicSearch": lambda qv, q, c: basic.search(
            qv, q.lo, q.hi, beam=BEAM, k=K, counter=c
        ),
    }


@pytest.mark.parametrize("name", ["iRangeGraph", "iRangeGraph-",
                                  "BasicSearch"])
def test_fig3_variant(benchmark, variants, bench_ds, mixed_wl, name):
    wl, gt = mixed_wl
    recall, dists = benchmark.pedantic(
        lambda: _run(variants[name], bench_ds, wl, gt),
        rounds=3, iterations=1,
    )
    benchmark.extra_info["recall"] = round(recall, 4)
    benchmark.extra_info["dists_per_query"] = round(dists, 1)


def test_fig3_shape_basicsearch_costs_more(variants, bench_ds, mixed_wl):
    wl, gt = mixed_wl
    r_ir, d_ir = _run(variants["iRangeGraph"], bench_ds, wl, gt)
    r_bs, d_bs = _run(variants["BasicSearch"], bench_ds, wl, gt)
    assert r_ir >= 0.9 and r_bs >= 0.85
    assert d_bs > 1.5 * d_ir  # paper: 2x-4x gap at matched recall


def test_fig3_shape_skipping_not_worse(variants, bench_ds, mixed_wl):
    """Layer skipping reduces edge-selection work without hurting
    search quality (recall within noise of the no-skip variant)."""
    wl, gt = mixed_wl
    r_skip, _ = _run(variants["iRangeGraph"], bench_ds, wl, gt)
    r_noskip, _ = _run(variants["iRangeGraph-"], bench_ds, wl, gt)
    assert r_skip >= r_noskip - 0.05

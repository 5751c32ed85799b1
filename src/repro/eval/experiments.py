"""Experiment drivers behind every table/figure reproduction.

One function per paper artifact (Tables 1–3, Figures 2–5, scalability),
shared by the ``jobs/`` spark-submit entrypoints and the
``benchmarks/`` pytest-benchmark suite. Everything returns plain dicts /
lists so results can be dumped to ``results/*.json`` and rendered into
EXPERIMENTS.md.

Method registry: the keys below are the method names used in every
table, matching the paper's Figure-2 lineup.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.baselines.basic_strategies import PrefilterIndex, WholeGraphIndex
from repro.baselines.filtered_diskann import (FilteredVamanaIndex,
                                              StitchedVamanaIndex)
from repro.baselines.milvus_like import MilvusLikeIndex
from repro.baselines.multi_attr_baselines import (ConjunctivePostFilter,
                                                  ConjunctivePrefilter)
from repro.baselines.oracle_hnsw import OracleHnswIndex
from repro.baselines.serf_like import SerfLikeIndex
from repro.baselines.superpostfilter import SuperPostfilterIndex
from repro.core.irange_build import build_irange_index
from repro.core.irange_graph import BasicSearchIndex, IRangeGraphIndex
from repro.core.multi_attr import MultiAttrIndex
from repro.eval.datasets import RFDataset
from repro.eval.ground_truth import ground_truth_spark
from repro.eval.harness import (DEFAULT_BEAMS, dists_at_recall, max_recall,
                                qps_at_recall, run_curve)
from repro.eval.workloads import (RangeQuery, fixed_workload, mixed_workload,
                                  multiattr_workload, shared_range_workload)

METHODS = (
    "iRangeGraph",
    "SuperPostfiltering",
    "Milvus",
    "Pre-filtering",
    "2DSegmentGraph",
    "FilteredVamana",
    "StitchedVamana",
)

# Workloads of Figure 2: name -> range-fraction exponent (None = mixed).
FIG2_WORKLOADS = {"mixed": None, "large": 2, "moderate": 5, "small": 8}


@dataclass
class BuiltSuite:
    """All single-attribute indexes for one dataset + build bookkeeping."""

    dataset: RFDataset
    indexes: dict[str, object]
    build_seconds: dict[str, float]
    hnsw_build_seconds: float  # reference cost (Theorem 3.1 check)
    config: dict = field(default_factory=dict)
    # Driver-local iRangeGraph build time (no Spark job overhead) — the
    # clean numerator for the paper's "<= 3x HNSW" indexing-time claim.
    irange_local_seconds: float | None = None


def default_config(n: int) -> dict:
    """Paper parameters scaled to reproduction size (see DESIGN.md)."""
    return {
        "m": 16,
        "ef": 100,
        "leaf_size": 64,
        "n_buckets": 10,
        "min_window": 64,
        "n_labels": 10,
        "k": 10,
        "beams": list(DEFAULT_BEAMS),
        "n": n,
    }


def build_suite(
    spark, ds: RFDataset, cfg: dict | None = None,
    *, time_local_irange: bool = False,
) -> BuiltSuite:
    """Build every Figure-2 method's index, timing each build.

    ``time_local_irange`` additionally times a driver-only iRangeGraph
    build (identical output; no per-layer Spark job latency) so the
    Theorem-3.1 build-cost ratio is not inflated by scheduler overhead.
    """
    cfg = cfg or default_config(ds.n)
    m, ef = cfg["m"], cfg["ef"]
    X = ds.vectors
    times: dict[str, float] = {}
    idx: dict[str, object] = {}

    def timed(name, fn):
        t0 = time.perf_counter()
        out = fn()
        times[name] = time.perf_counter() - t0
        return out

    vec_df = None
    if spark is not None:
        pdf = pd.DataFrame(
            {"rank": np.arange(1, ds.n + 1), "vector": [v.tolist() for v in X]}
        )
        vec_df = spark.createDataFrame(pdf)

    if vec_df is not None:
        idx["iRangeGraph"] = timed(
            "iRangeGraph",
            lambda: build_irange_index(
                spark, vec_df, m=m, ef=ef, leaf_size=cfg["leaf_size"]
            ),
        )
    else:
        from repro.core.irange_build import build_irange_index_local

        idx["iRangeGraph"] = timed(
            "iRangeGraph",
            lambda: build_irange_index_local(
                X, m=m, ef=ef, leaf_size=cfg["leaf_size"]
            ),
        )
    idx["SuperPostfiltering"] = timed(
        "SuperPostfiltering",
        lambda: SuperPostfilterIndex(
            X, m=m, ef=ef, min_window=cfg["min_window"], spark=spark
        ),
    )
    idx["Milvus"] = timed(
        "Milvus",
        lambda: MilvusLikeIndex(
            X, n_buckets=cfg["n_buckets"], m=m, ef=ef, spark=spark
        ),
    )
    idx["Pre-filtering"] = timed("Pre-filtering", lambda: PrefilterIndex(X))
    idx["2DSegmentGraph"] = timed(
        "2DSegmentGraph", lambda: SerfLikeIndex(X, m=m, ef=ef)
    )
    idx["FilteredVamana"] = timed(
        "FilteredVamana",
        lambda: FilteredVamanaIndex(X, n_labels=cfg["n_labels"], m=m, ef=ef),
    )
    idx["StitchedVamana"] = timed(
        "StitchedVamana",
        lambda: StitchedVamanaIndex(
            X, n_labels=cfg["n_labels"], m=m, ef=ef, spark=spark
        ),
    )
    # Reference: a single whole-dataset HNSW (for the <= 3x claim).
    t0 = time.perf_counter()
    WholeGraphIndex(X, m=m, ef=ef)
    hnsw_s = time.perf_counter() - t0
    local_s = None
    if time_local_irange:
        from repro.core.irange_build import build_irange_index_local

        t0 = time.perf_counter()
        build_irange_index_local(X, m=m, ef=ef, leaf_size=cfg["leaf_size"])
        local_s = time.perf_counter() - t0
    return BuiltSuite(
        dataset=ds, indexes=idx, build_seconds=times,
        hnsw_build_seconds=hnsw_s, config=cfg,
        irange_local_seconds=local_s,
    )


def search_fn(index) -> callable:
    """Adapt an index to the harness signature (qv, query, beam, k, c)."""

    def fn(qv: np.ndarray, q: RangeQuery, beam: int, k: int, counter):
        return index.search(qv, q.lo, q.hi, beam=beam, k=k, counter=counter)

    return fn


def make_workload(name: str, n: int, nq: int, *, seed: int = 0,
                  max_exp: int = 8) -> list[RangeQuery]:
    exp = FIG2_WORKLOADS[name]
    if exp is None:
        return mixed_workload(n, nq, max_exp=max_exp, seed=seed)
    return fixed_workload(n, nq, exp, seed=seed)


# ------------------------------------------------------------------ figure 2
def run_fig2(
    spark, suite: BuiltSuite, *, nq: int = 40, seed: int = 0
) -> dict:
    """qps-recall curves for every method on the 4 Figure-2 workloads."""
    ds, cfg = suite.dataset, suite.config
    k, beams = cfg["k"], tuple(cfg["beams"])
    out: dict = {"dataset": ds.name, "workloads": {}}
    for wname in FIG2_WORKLOADS:
        wl = make_workload(wname, ds.n, nq, seed=seed)
        gt = ground_truth_spark(spark, ds.vectors, wl, ds.queries, k=k)
        per_method = {}
        for mname, index in suite.indexes.items():
            rows = run_curve(
                search_fn(index), wl, ds.queries, gt, k=k, beams=beams
            )
            per_method[mname] = {
                "curve": rows,
                "qps@0.9": qps_at_recall(rows),
                "dists@0.9": dists_at_recall(rows),
                "max_recall": max_recall(rows),
            }
        out["workloads"][wname] = per_method
    return out


# ------------------------------------------------------------------ table 2
def run_table2(suite: BuiltSuite) -> dict:
    """Memory footprint (MiB): vectors + index per method."""
    from repro.eval.memory import footprint_mb

    ds = suite.dataset
    rows = {"raw vectors": ds.vectors.nbytes / (1 << 20)}
    for name, index in suite.indexes.items():
        rows[name] = footprint_mb(index.memory_bytes())
    return {"dataset": ds.name, "footprint_mb": rows}


# ------------------------------------------------------------------ table 3
def run_table3(suite: BuiltSuite) -> dict:
    """Indexing time (s) per method + the HNSW reference build."""
    out = {
        "dataset": suite.dataset.name,
        "seconds": dict(suite.build_seconds),
        "hnsw_reference_seconds": suite.hnsw_build_seconds,
        "irange_over_hnsw": (
            suite.build_seconds["iRangeGraph"] / suite.hnsw_build_seconds
        ),
    }
    if suite.irange_local_seconds is not None:
        out["irange_local_seconds"] = suite.irange_local_seconds
        out["irange_local_over_hnsw"] = (
            suite.irange_local_seconds / suite.hnsw_build_seconds
        )
    return out


# ------------------------------------------------------------------ figure 3
def run_fig3(
    spark, suite: BuiltSuite, *, nq: int = 40, seed: int = 0
) -> dict:
    """Ablation: iRangeGraph vs iRangeGraph- (no skip) vs BasicSearch."""
    ds, cfg = suite.dataset, suite.config
    k, beams = cfg["k"], tuple(cfg["beams"])
    ir: IRangeGraphIndex = suite.indexes["iRangeGraph"]
    wl = mixed_workload(ds.n, nq, seed=seed)
    gt = ground_truth_spark(spark, ds.vectors, wl, ds.queries, k=k)

    def noskip_fn(qv, q, beam, k, counter):
        return ir.search(
            qv, q.lo, q.hi, beam=beam, k=k, counter=counter, skip_layers=False
        )

    variants = {
        "iRangeGraph": search_fn(ir),
        "iRangeGraph-": noskip_fn,
        "BasicSearch": search_fn(BasicSearchIndex(ir)),
    }
    out = {"dataset": ds.name, "variants": {}}
    for name, fn in variants.items():
        rows = run_curve(fn, wl, ds.queries, gt, k=k, beams=beams)
        out["variants"][name] = {
            "curve": rows,
            "qps@0.9": qps_at_recall(rows),
            "dists@0.9": dists_at_recall(rows),
        }
    return out


# ------------------------------------------------------------------ figure 4
def run_fig4(
    spark, suite: BuiltSuite, *, nq: int = 40, n_ranges: int = 10,
    seed: int = 0
) -> dict:
    """Gap to Oracle-HNSW on a shared-range mixed workload."""
    ds, cfg = suite.dataset, suite.config
    k, beams = cfg["k"], tuple(cfg["beams"])
    wl = shared_range_workload(ds.n, nq, n_ranges=n_ranges, seed=seed)
    gt = ground_truth_spark(spark, ds.vectors, wl, ds.queries, k=k)
    t0 = time.perf_counter()
    oracle = OracleHnswIndex(
        ds.vectors, [(q.lo, q.hi) for q in wl], m=cfg["m"], ef=cfg["ef"],
        spark=spark,
    )
    oracle_build_s = time.perf_counter() - t0
    out = {"dataset": ds.name, "oracle_build_seconds": oracle_build_s,
           "methods": {}}
    for name, index in (
        ("iRangeGraph", suite.indexes["iRangeGraph"]),
        ("Oracle-HNSW", oracle),
    ):
        rows = run_curve(search_fn(index), wl, ds.queries, gt, k=k,
                         beams=beams)
        out["methods"][name] = {
            "curve": rows,
            "qps@0.9": qps_at_recall(rows),
            "dists@0.9": dists_at_recall(rows),
        }
    return out


# ------------------------------------------------------------------ figure 5
def run_fig5(
    spark, suite: BuiltSuite, *, nq: int = 40, frac_exp: int = 2,
    seed: int = 0
) -> dict:
    """Multi-attribute RFANN: iRangeGraph(+) vs the extendable baselines."""
    ds, cfg = suite.dataset, suite.config
    assert ds.attr2_rank is not None, f"{ds.name} has no second attribute"
    k, beams = cfg["k"], tuple(cfg["beams"])
    wl = multiattr_workload(ds.n, nq, frac_exp=frac_exp, seed=seed)
    gt = ground_truth_spark(
        spark, ds.vectors, wl, ds.queries, k=k, attr2_rank=ds.attr2_rank
    )
    multi = MultiAttrIndex(suite.indexes["iRangeGraph"], ds.attr2_rank)

    def multi_fn(mode):
        def fn(qv, q, beam, k, counter):
            return multi.search(
                qv, (q.lo, q.hi), (q.lo2, q.hi2), beam=beam, k=k,
                mode=mode, counter=counter, seed=q.qid,
            )

        return fn

    def conj_fn(index):
        def fn(qv, q, beam, k, counter):
            return index.search(
                qv, (q.lo, q.hi), (q.lo2, q.hi2), beam=beam, k=k,
                counter=counter,
            )

        return fn

    methods = {
        "iRangeGraph+": multi_fn("prob"),
        "iRangeGraph": multi_fn("post"),
        "2DSegmentGraph": conj_fn(
            ConjunctivePostFilter(suite.indexes["2DSegmentGraph"],
                                  ds.attr2_rank)
        ),
        "Milvus": conj_fn(
            ConjunctivePostFilter(suite.indexes["Milvus"], ds.attr2_rank)
        ),
        "Pre-filtering": conj_fn(
            ConjunctivePrefilter(ds.vectors, ds.attr2_rank)
        ),
    }
    out = {"dataset": ds.name, "methods": {}}
    for name, fn in methods.items():
        rows = run_curve(fn, wl, ds.queries, gt, k=k, beams=beams)
        out["methods"][name] = {
            "curve": rows,
            "qps@0.9": qps_at_recall(rows),
            "dists@0.9": dists_at_recall(rows),
            "max_recall": max_recall(rows),
        }
    return out


# --------------------------------------------------------------- scalability
def run_scalability(
    spark, name: str, sizes: list[int], *, nq: int = 20, seed: int = 7
) -> list[dict]:
    """Section 5.2.3 stand-in: index cost & search cost vs dataset size."""
    from repro.eval.datasets import load_dataset
    from repro.eval.memory import footprint_mb

    out = []
    for n in sizes:
        ds = load_dataset(spark, name, n=n, nq=nq, seed=seed)
        cfg = default_config(n)
        pdf = pd.DataFrame(
            {
                "rank": np.arange(1, n + 1),
                "vector": [v.tolist() for v in ds.vectors],
            }
        )
        t0 = time.perf_counter()
        idx = build_irange_index(
            spark, spark.createDataFrame(pdf), m=cfg["m"], ef=cfg["ef"],
            leaf_size=cfg["leaf_size"],
        )
        build_s = time.perf_counter() - t0
        wl = mixed_workload(n, nq, seed=seed)
        gt = ground_truth_spark(spark, ds.vectors, wl, ds.queries, k=10)
        rows = run_curve(search_fn(idx), wl, ds.queries, gt, k=10,
                         beams=(20, 80, 320))
        out.append(
            {
                "n": n,
                "build_seconds": build_s,
                "footprint_mb": footprint_mb(idx.memory_bytes()),
                "qps@0.9": qps_at_recall(rows),
                "dists@0.9": dists_at_recall(rows),
            }
        )
    return out

"""Benchmark fixtures: one bench-scale dataset + the full index suite.

Benchmarks run at n=2048 (quarter of the jobs' n=4096) so the whole
``pytest benchmarks/ --benchmark-only`` pass stays in single-digit
minutes; index builds happen once per session in fixtures, and the
benchmark functions time the operations each table/figure is about.

Override the scale with BENCH_N / BENCH_NQ env vars.
"""
from __future__ import annotations

import os

import pytest

BENCH_N = int(os.environ.get("BENCH_N", "2048"))
BENCH_NQ = int(os.environ.get("BENCH_NQ", "24"))
BENCH_DATASET = os.environ.get("BENCH_DATASET", "redcaps_lite")


@pytest.fixture(scope="session")
def bench_ds(spark):
    from repro.eval.datasets import load_dataset

    return load_dataset(spark, BENCH_DATASET, n=BENCH_N, nq=BENCH_NQ, seed=7)


@pytest.fixture(scope="session")
def bench_suite(spark, bench_ds):
    from repro.eval.experiments import build_suite, default_config

    return build_suite(spark, bench_ds, default_config(bench_ds.n))


@pytest.fixture(scope="session")
def bench_multi_ds(spark):
    """Two-attribute dataset for the Figure-5 benchmark."""
    from repro.eval.datasets import load_dataset

    return load_dataset(spark, "ytaudio_lite", n=BENCH_N, nq=BENCH_NQ, seed=7)


def workload_with_gt(spark, ds, kind: str, *, nq: int, k: int = 10):
    """Build a workload + its exact ground truth (shared helper)."""
    from repro.eval.experiments import make_workload
    from repro.eval.ground_truth import ground_truth_spark

    wl = make_workload(kind, ds.n, nq, seed=3)
    gt = ground_truth_spark(spark, ds.vectors, wl, ds.queries, k=k)
    return wl, gt


@pytest.fixture(scope="session")
def mixed_wl(spark, bench_ds):
    return workload_with_gt(spark, bench_ds, "mixed", nq=BENCH_NQ)

"""Tests for exact RFANN ground truth: numpy vs Spark vs DuckDB oracle."""
import numpy as np
import pandas as pd
import pytest

from repro.eval.ground_truth import (exact_rfann_np, ground_truth_spark,
                                     queries_to_pdf)
from repro.eval.workloads import RangeQuery, mixed_workload
from repro.oracle import assert_equivalent


def test_exact_rfann_np_basic(small_data):
    X, Q = small_data
    ranks, dists = exact_rfann_np(X, Q[0], 10, 50, 5)
    assert len(ranks) == 5
    assert np.all((ranks >= 10) & (ranks <= 50))
    assert np.all(np.diff(dists) >= 0)
    # Brute-force cross-check on the slice.
    sl = X[9:50]
    ref = np.argsort(((sl - Q[0]) ** 2).sum(axis=1))[:5] + 10
    np.testing.assert_array_equal(ranks, ref)


def test_exact_rfann_np_short_range(small_data):
    X, Q = small_data
    ranks, _ = exact_rfann_np(X, Q[0], 100, 102, 10)
    assert sorted(ranks.tolist()) == [100, 101, 102]


def test_exact_rfann_np_empty(small_data):
    X, Q = small_data
    ranks, dists = exact_rfann_np(X, Q[0], 50, 40, 5)
    assert len(ranks) == 0 and len(dists) == 0


def test_exact_rfann_np_attr2_filter(small_data):
    X, Q = small_data
    a2 = np.arange(1, len(X) + 1)[::-1].copy()  # reversed ranks
    ranks, _ = exact_rfann_np(X, Q[0], 1, 256, 5, attr2_rank=a2,
                              range2=(1, 20))
    assert np.all(a2[ranks - 1] <= 20)


def test_ground_truth_spark_matches_np(spark, small_data):
    X, Q = small_data
    wl = mixed_workload(len(X), 12, max_exp=4, seed=0)
    gt = ground_truth_spark(spark, X, wl, Q, k=7)
    for q in wl:
        ref, _ = exact_rfann_np(X, Q[q.qid % len(Q)], q.lo, q.hi, 7)
        np.testing.assert_array_equal(gt[q.qid], ref)


def test_ground_truth_spark_multiattr(spark, small_data):
    X, Q = small_data
    a2 = np.random.default_rng(1).permutation(len(X)) + 1
    wl = [RangeQuery(0, 20, 200, 30, 180), RangeQuery(1, 1, 256, 1, 64)]
    gt = ground_truth_spark(spark, X, wl, Q, k=5, attr2_rank=a2)
    for q in wl:
        ref, _ = exact_rfann_np(
            X, Q[q.qid], q.lo, q.hi, 5, attr2_rank=a2, range2=(q.lo2, q.hi2)
        )
        np.testing.assert_array_equal(gt[q.qid], ref)


def test_rfann_answer_matches_duckdb_argmin(spark, small_data):
    """Full relational cross-check: materialize the (query, object,
    distance) table, let DuckDB pick the in-range argmin per query, and
    compare with the Spark-side top-1 from the same base table."""
    from pyspark.sql import Window
    from pyspark.sql import functions as F

    X, Q = small_data
    wl = [RangeQuery(i, 30 + 10 * i, 200 + 5 * i) for i in range(4)]
    rows = []
    for q in wl:
        d = ((X - Q[q.qid]) ** 2).sum(axis=1)
        for rank in range(1, len(X) + 1):
            rows.append(
                {"qid": q.qid, "rank": rank, "dist": float(d[rank - 1]),
                 "lo": q.lo, "hi": q.hi}
            )
    dist_pdf = pd.DataFrame(rows)
    sdf = spark.createDataFrame(dist_pdf)
    w = Window.partitionBy("qid").orderBy("dist", "rank")
    got = (
        sdf.where((F.col("rank") >= F.col("lo")) & (F.col("rank") <= F.col("hi")))
        .withColumn("rn", F.row_number().over(w))
        .where(F.col("rn") == 1)
        .select("qid", F.col("rank").alias("nn_rank"))
    )
    assert_equivalent(
        got,
        """
        SELECT qid, ARG_MIN(rank, dist) AS nn_rank
        FROM dist WHERE rank BETWEEN lo AND hi GROUP BY qid
        """,
        dist=dist_pdf,
    )
    # ... and the numpy kernel agrees with both engines.
    for q in wl:
        ranks, _ = exact_rfann_np(X, Q[q.qid], q.lo, q.hi, 1)
        row = got.where(F.col("qid") == q.qid).collect()[0]
        assert int(row.nn_rank) == int(ranks[0])


def test_queries_to_pdf_encoding(small_data):
    _, Q = small_data
    wl = [RangeQuery(0, 1, 10), RangeQuery(1, 5, 9, 2, 8)]
    pdf = queries_to_pdf(wl, Q)
    assert pdf.loc[0, "lo2"] == -1  # single-attribute sentinel
    assert pdf.loc[1, "lo2"] == 2 and pdf.loc[1, "hi2"] == 8
    assert len(pdf.loc[0, "qvec"]) == Q.shape[1]

"""Tests for the Oracle-HNSW upper-bound baseline (Section 5.2.4)."""
import numpy as np
import pytest

from repro.baselines.oracle_hnsw import OracleHnswIndex
from repro.eval.ground_truth import exact_rfann_np


@pytest.fixture(scope="module")
def oracle(med_data):
    ranges = [(1, 512), (100, 400), (200, 260), (450, 512)]
    return OracleHnswIndex(med_data[0], ranges, m=8, ef=50)


def test_high_recall_on_materialized_ranges(oracle, med_data):
    X, Q = med_data
    for lo, hi in oracle.ranges:
        hits = tot = 0
        for q in Q:
            gt, _ = exact_rfann_np(X, q, lo, hi, 10)
            res = oracle.search(q, lo, hi, beam=80, k=10)
            hits += len(set(res.tolist()) & set(gt.tolist()))
            tot += len(gt)
        assert hits / tot >= 0.9, (lo, hi)


def test_results_in_range(oracle, med_data):
    res = oracle.search(med_data[1][0], 200, 260, beam=40, k=10)
    assert np.all((res >= 200) & (res <= 260))


def test_unmaterialized_range_raises(oracle, med_data):
    with pytest.raises(KeyError):
        oracle.search(med_data[1][0], 5, 10, beam=10, k=5)


def test_duplicate_ranges_collapsed(med_data):
    idx = OracleHnswIndex(med_data[0], [(1, 64), (1, 64)], m=8, ef=40)
    assert len(idx.graphs) == 1


def test_memory_scales_with_range_count(med_data):
    small = OracleHnswIndex(med_data[0], [(1, 128)], m=8, ef=40)
    big = OracleHnswIndex(
        med_data[0], [(1, 128), (1, 256), (1, 512)], m=8, ef=40
    )
    assert big.memory_bytes()["index"] > small.memory_bytes()["index"]

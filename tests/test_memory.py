"""Tests for memory accounting (Table 2 bookkeeping)."""
import numpy as np

from repro.eval.memory import footprint_mb, index_mb, raw_vector_bytes


def test_raw_vector_bytes():
    assert raw_vector_bytes(1000, 64) == 1000 * 64 * 4


def test_footprint_mb():
    mem = {"vectors": 1 << 20, "index": 1 << 20}
    assert footprint_mb(mem) == 2.0
    assert index_mb(mem) == 1.0


def test_footprint_missing_keys():
    assert footprint_mb({}) == 0.0


def test_method_accounting_consistency(irange_index, whole_graph):
    """iRangeGraph stores log-many layers; one flat graph stores one —
    index bytes must reflect that ordering (Table 2's shape)."""
    ir = irange_index.memory_bytes()
    wg = whole_graph.memory_bytes()
    assert ir["vectors"] == wg["vectors"]
    assert ir["index"] == irange_index.tree.num_layers * wg["index"]

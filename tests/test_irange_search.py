"""End-to-end RFANN search quality of iRangeGraph (paper Section 3.3)."""
import numpy as np
import pytest

from repro.core.irange_graph import BasicSearchIndex
from repro.core.neighbors import DistanceCounter


@pytest.mark.parametrize("frac_exp", [0, 1, 2, 3, 4])
def test_recall_across_fractions(irange_index, small_data, gt10, frac_exp):
    """>= 0.85 recall@10 with beam 60 for fractions 2^0 .. 2^-4."""
    X, Q = small_data
    n = irange_index.n
    g = np.random.default_rng(frac_exp)
    hits = tot = 0
    for qi in range(len(Q)):
        length = max(10, n >> frac_exp)
        lo = int(g.integers(1, n - length + 2))
        hi = lo + length - 1
        gt = gt10(qi, lo, hi)
        res = irange_index.search(Q[qi], lo, hi, beam=60, k=10)
        hits += len(set(res.tolist()) & set(gt.tolist()))
        tot += len(gt)
    assert hits / tot >= 0.85


def test_results_always_in_range(irange_index, small_data):
    X, Q = small_data
    g = np.random.default_rng(3)
    for qi in range(len(Q)):
        lo = int(g.integers(1, 200))
        hi = int(g.integers(lo, 257))
        res = irange_index.search(Q[qi], lo, hi, beam=30, k=10)
        assert np.all((res >= lo) & (res <= hi))


def test_empty_range_returns_empty(irange_index, small_data):
    _, Q = small_data
    assert len(irange_index.search(Q[0], 10, 5, beam=20, k=10)) == 0


def test_range_clamped_to_dataset(irange_index, small_data):
    _, Q = small_data
    res = irange_index.search(Q[0], -5, 10_000, beam=30, k=5)
    assert len(res) == 5
    assert np.all((res >= 1) & (res <= irange_index.n))


def test_beam_monotone_distance_cost(irange_index, small_data):
    _, Q = small_data
    c1, c2 = DistanceCounter(), DistanceCounter()
    irange_index.search(Q[0], 20, 230, beam=10, k=10, counter=c1)
    irange_index.search(Q[0], 20, 230, beam=120, k=10, counter=c2)
    assert c1.count < c2.count


def test_tiny_range_exhaustive(irange_index, small_data, gt10):
    """A range barely larger than k must still be solved (the dedicated
    graph has almost no edges; entry + expansion covers it)."""
    X, Q = small_data
    res = irange_index.search(Q[1], 100, 115, beam=30, k=10)
    gt = gt10(1, 100, 115)
    assert len(set(res.tolist()) & set(gt.tolist())) >= 8


class TestBasicSearch:
    def test_recall_reasonable(self, irange_index, small_data, gt10):
        X, Q = small_data
        bs = BasicSearchIndex(irange_index)
        hits = tot = 0
        for qi in range(len(Q)):
            gt = gt10(qi, 33, 240)
            res = bs.search(Q[qi], 33, 240, beam=40, k=10)
            hits += len(set(res.tolist()) & set(gt.tolist()))
            tot += len(gt)
        assert hits / tot >= 0.85

    def test_costs_more_than_irange(self, irange_index, small_data):
        """The paper's ablation: BasicSearch does one search per
        decomposition segment, costing ~2-4x more distances."""
        _, Q = small_data
        bs = BasicSearchIndex(irange_index)
        c_ir, c_bs = DistanceCounter(), DistanceCounter()
        for qi in range(len(Q)):
            irange_index.search(Q[qi], 33, 240, beam=30, k=10, counter=c_ir)
            bs.search(Q[qi], 33, 240, beam=30, k=10, counter=c_bs)
        assert c_bs.count > c_ir.count

    def test_results_in_range(self, irange_index, small_data):
        _, Q = small_data
        bs = BasicSearchIndex(irange_index)
        res = bs.search(Q[2], 5, 77, beam=30, k=10)
        assert np.all((res >= 5) & (res <= 77))

    def test_empty_range(self, irange_index, small_data):
        _, Q = small_data
        bs = BasicSearchIndex(irange_index)
        assert len(bs.search(Q[0], 8, 3, beam=10, k=5)) == 0

"""Tests for the Milvus-like and SuperPostfiltering baselines."""
import numpy as np
import pytest

from repro.baselines.milvus_like import MilvusLikeIndex
from repro.baselines.superpostfilter import (SuperPostfilterIndex,
                                             window_layout)
from repro.core.neighbors import DistanceCounter


@pytest.fixture(scope="module")
def milvus(med_data):
    return MilvusLikeIndex(med_data[0], n_buckets=8, m=8, ef=50)


@pytest.fixture(scope="module")
def superpost(med_data):
    return SuperPostfilterIndex(med_data[0], m=8, ef=50, min_window=64)


class TestMilvusLike:
    def test_bucket_selection(self, milvus):
        # n=512, 8 buckets of 64: range [1, 64] hits exactly bucket 0.
        assert milvus._buckets_for(1, 64) == [0]
        assert milvus._buckets_for(65, 128) == [1]
        assert len(milvus._buckets_for(1, 512)) == 8
        assert milvus._buckets_for(60, 70) == [0, 1]

    def test_results_in_range(self, milvus, med_data):
        _, Q = med_data
        res = milvus.search(Q[0], 100, 400, beam=40, k=10)
        assert np.all((res >= 100) & (res <= 400))

    def test_recall(self, milvus, med_data):
        from repro.eval.ground_truth import exact_rfann_np

        X, Q = med_data
        hits = tot = 0
        for q in Q:
            gt, _ = exact_rfann_np(X, q, 50, 470, 10)
            res = milvus.search(q, 50, 470, beam=60, k=10)
            hits += len(set(res.tolist()) & set(gt.tolist()))
            tot += len(gt)
        assert hits / tot >= 0.9

    def test_cost_grows_with_bucket_count(self, milvus, med_data):
        """Searching many buckets costs more — the paper's reason Milvus
        trails dedicated-graph search on long ranges."""
        _, Q = med_data
        c1, c8 = DistanceCounter(), DistanceCounter()
        milvus.search(Q[1], 1, 64, beam=30, k=10, counter=c1)
        milvus.search(Q[1], 1, 512, beam=30, k=10, counter=c8)
        assert c8.count > c1.count

    def test_empty_range(self, milvus, med_data):
        assert len(milvus.search(med_data[1][0], 20, 10, beam=10, k=5)) == 0

    def test_memory_accounting(self, milvus, med_data):
        mb = milvus.memory_bytes()
        assert mb["vectors"] == med_data[0].nbytes
        assert mb["index"] > 0


class TestWindowLayout:
    @pytest.mark.parametrize("n,minw", [(512, 64), (1024, 64), (4096, 64)])
    def test_every_range_has_cover_at_most_4x(self, n, minw):
        wins = window_layout(n, minw)
        g = np.random.default_rng(n)
        for _ in range(100):
            lo = int(g.integers(1, n + 1))
            hi = int(g.integers(lo, n + 1))
            cover = [w for w in wins if w[0] <= lo and hi <= w[1]]
            assert cover, f"no window covers [{lo}, {hi}]"
            best = min(c[1] - c[0] + 1 for c in cover)
            s = hi - lo + 1
            # β=2 half-overlap guarantee: smallest cover <= max(4s, minw)
            assert best <= max(4 * s, 2 * minw)

    def test_full_window_present(self):
        assert (1, 512) in window_layout(512, 64)

    def test_total_window_mass_is_2x_per_level(self):
        wins = window_layout(1024, 64)
        total = sum(hi - lo + 1 for lo, hi in wins)
        # levels: 1024 (1x) + 512..64 at ~2x each => ~2x n per level.
        n_levels = 5
        assert total <= 1024 * (1 + 2 * n_levels)


class TestSuperPostfilter:
    def test_covering_window_is_smallest(self, superpost):
        i = superpost.covering_window(10, 40)
        wlo, whi = superpost.windows[i]
        assert wlo <= 10 and 40 <= whi
        assert whi - wlo + 1 <= 128  # 31-length query -> window <= 4s + slack

    def test_results_in_range(self, superpost, med_data):
        _, Q = med_data
        res = superpost.search(Q[0], 90, 333, beam=40, k=10)
        assert np.all((res >= 90) & (res <= 333))

    def test_recall(self, superpost, med_data):
        from repro.eval.ground_truth import exact_rfann_np

        X, Q = med_data
        hits = tot = 0
        for q in Q:
            gt, _ = exact_rfann_np(X, q, 130, 380, 10)
            res = superpost.search(q, 130, 380, beam=80, k=10)
            hits += len(set(res.tolist()) & set(gt.tolist()))
            tot += len(gt)
        assert hits / tot >= 0.85

    def test_memory_exceeds_single_graph(self, superpost, med_data):
        """Overlapping windows => index is larger than one whole-dataset
        graph (matches Table 2: SuperPostfiltering > others)."""
        mb = superpost.memory_bytes()
        one_graph = 512 * 8 * 4
        assert mb["index"] > 2 * one_graph

    def test_empty_range(self, superpost, med_data):
        assert len(superpost.search(med_data[1][0], 5, 4, beam=10, k=5)) == 0

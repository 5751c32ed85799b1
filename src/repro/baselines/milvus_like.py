"""Milvus-style baseline (paper Sections 2.2 / 5.1).

Milvus partitions the dataset into consecutive-attribute subsets, builds
an HNSW per subset, and answers an RFANN query by searching every subset
that intersects the query range (applying the range predicate as a
bitset during search, i.e., unconstrained traversal + filtered results)
and merging the per-subset top-k. Fully covered subsets need no filter;
boundary subsets post-filter on the range.
"""
from __future__ import annotations

import numpy as np

from repro.baselines._spark_build import SubsetGraph, build_subset_graphs
from repro.core.neighbors import DistanceCounter


class MilvusLikeIndex:
    """``n_buckets`` consecutive rank partitions, one HNSW-lite each."""

    def __init__(
        self,
        vectors: np.ndarray,
        *,
        n_buckets: int = 10,
        m: int = 16,
        ef: int = 100,
        spark=None,
        seed: int = 0,
    ) -> None:
        n = len(vectors)
        self.n = n
        bounds = np.linspace(0, n, n_buckets + 1, dtype=np.int64)
        self.bounds = bounds  # bucket b covers ranks (bounds[b], bounds[b+1]]
        subsets = {
            b: np.arange(bounds[b] + 1, bounds[b + 1] + 1, dtype=np.int64)
            for b in range(n_buckets)
            if bounds[b + 1] > bounds[b]
        }
        self.graphs: dict[int, SubsetGraph] = build_subset_graphs(
            spark, vectors, subsets, m=m, ef=ef, seed=seed
        )
        self.vector_bytes = int(
            np.ascontiguousarray(vectors, dtype=np.float32).nbytes
        )

    def _buckets_for(self, lo: int, hi: int) -> list[int]:
        return [
            b
            for b in self.graphs
            if self.bounds[b] + 1 <= hi and self.bounds[b + 1] >= lo
        ]

    def search(
        self,
        query: np.ndarray,
        lo: int,
        hi: int,
        *,
        beam: int,
        k: int,
        counter: DistanceCounter | None = None,
    ) -> np.ndarray:
        lo = max(1, lo)
        hi = min(self.n, hi)
        if lo > hi:
            return np.empty(0, dtype=np.int64)
        merged: list[tuple[float, int]] = []
        for b in self._buckets_for(lo, hi):
            g = self.graphs[b]
            fully = lo <= self.bounds[b] + 1 and self.bounds[b + 1] <= hi
            res = g.search(
                query,
                beam=beam,
                k=k,
                counter=counter,
                rank_range=None if fully else (lo, hi),
            )
            for r in res:
                d = self._dist(query, r)
                merged.append((d, int(r)))
        merged.sort()
        return np.asarray([r for _, r in merged[:k]], dtype=np.int64)

    def _dist(self, query: np.ndarray, rank: int) -> float:
        # Merge step re-reads the result distance; cached per subset in a
        # real system, so not charged to the distance counter.
        b = int(np.searchsorted(self.bounds, rank, side="left")) - 1
        g = self.graphs[b]
        v = g.graph.vectors[int(np.searchsorted(g.ranks, rank))]
        d = v - query
        return float(np.dot(d, d))

    def memory_bytes(self) -> dict[str, int]:
        return {
            "vectors": self.vector_bytes,
            "index": int(sum(g.memory_bytes() for g in self.graphs.values())),
        }

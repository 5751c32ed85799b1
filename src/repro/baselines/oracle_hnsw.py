"""Oracle-HNSW (paper Section 5.2.4).

For every *distinct* query range in the workload, materialize an HNSW on
exactly the in-range objects — the "ideal" dedicated index whose space
cost (``O(n^3 m)`` over all possible ranges) makes it impractical. The
paper uses it to quantify the gap between iRangeGraph's improvised
dedicated graphs and graphs built from scratch: Oracle-HNSW should win,
but by less than 2x qps at 0.9 recall.

Graph builds run through the shared Spark subset builder (one group per
distinct range), so a 10-range Figure-4 workload builds in parallel.
"""
from __future__ import annotations

import numpy as np

from repro.baselines._spark_build import SubsetGraph, build_subset_graphs
from repro.core.neighbors import DistanceCounter


class OracleHnswIndex:
    """One from-scratch HNSW per distinct query range."""

    def __init__(
        self,
        vectors: np.ndarray,
        ranges: list[tuple[int, int]],
        *,
        m: int = 16,
        ef: int = 100,
        spark=None,
        seed: int = 0,
    ) -> None:
        self.n = len(vectors)
        self.ranges = sorted({(int(lo), int(hi)) for lo, hi in ranges})
        subsets = {
            i: np.arange(lo, hi + 1, dtype=np.int64)
            for i, (lo, hi) in enumerate(self.ranges)
        }
        self.graphs: dict[int, SubsetGraph] = build_subset_graphs(
            spark, vectors, subsets, m=m, ef=ef, seed=seed
        )
        self._by_range = {r: i for i, r in enumerate(self.ranges)}
        self.vector_bytes = int(
            np.ascontiguousarray(vectors, dtype=np.float32).nbytes
        )

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
        key = (int(lo), int(hi))
        if key not in self._by_range:
            raise KeyError(
                f"Oracle-HNSW has no graph for range {key}; it only serves "
                "the ranges it was materialized for"
            )
        g = self.graphs[self._by_range[key]]
        return g.search(query, beam=beam, k=k, counter=counter)

    def memory_bytes(self) -> dict[str, int]:
        return {
            "vectors": self.vector_bytes,
            "index": int(sum(g.memory_bytes() for g in self.graphs.values())),
        }

"""SeRF-style segment graph — the 2DSegmentGraph stand-in (see DESIGN.md).

SeRF's 1-D segment graph compresses the ``n`` HNSW graphs of all prefix
ranges ``[1, R]`` into one structure: insert objects in attribute-rank
order and record each directed edge's [birth, death) insertion window.
Filtering edges by ``birth < R <= death`` reconstructs — losslessly —
the exact HNSW state after inserting ranks ``1..R`` (a unit test checks
this against a graph built from scratch on the prefix).

A general query ``[L, R]`` is answered on the reconstructed ``[1, R]``
graph with post-filtering on ``L``. This substitutes for the paper's
2DSegmentGraph/MaxLeap comparator while preserving its reported
behaviour: exact on half-bounded ranges, increasingly lossy as the query
becomes more selective on the left bound (up to ``R - L`` out-of-range
objects pollute the search), with the recall collapse on small fractions
that Figure 2 shows.
"""
from __future__ import annotations

import numpy as np

from repro.core.beam_search import beam_search, top_k
from repro.core.hnsw import build_hnsw
from repro.core.neighbors import DistanceCounter


class SerfLikeIndex:
    """Incremental-HNSW edge history = all prefix graphs, compressed."""

    def __init__(
        self, vectors: np.ndarray, *, m: int = 16, ef: int = 100
    ) -> None:
        self.vectors = np.ascontiguousarray(vectors, dtype=np.float32)
        n = len(self.vectors)
        g = build_hnsw(
            self.vectors,
            m=m,
            ef_construction=ef,
            order=np.arange(n),  # attribute-rank insertion order
            record_history=True,
        )
        # Per-source CSR of (dst, birth, death), sorted by dst for
        # deterministic traversal order.
        order = np.lexsort((g.edge_dst, g.edge_src))
        src = g.edge_src[order]
        self._dst = g.edge_dst[order].astype(np.int64)
        self._birth = g.edge_birth[order]
        self._death = g.edge_death[order]
        self._start = np.searchsorted(src, np.arange(n + 1))
        self.entry = g.entry  # rank-1 object: in every prefix graph

    def neighbors_at(self, u: int, prefix: int) -> np.ndarray:
        """0-based out-neighbors of ``u`` in the ``[1, prefix]`` graph."""
        s, e = self._start[u], self._start[u + 1]
        dst = self._dst[s:e]
        alive = (self._birth[s:e] < prefix) & (prefix <= self._death[s:e])
        return dst[alive]

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
        n = len(self.vectors)
        lo = max(1, lo)
        hi = min(n, hi)
        if lo > hi:
            return np.empty(0, dtype=np.int64)
        prefix = hi  # reconstructed graph holds ranks 1..hi exactly
        lo0 = lo - 1
        ids, dists = beam_search(
            query,
            self.vectors,
            lambda u: self.neighbors_at(u, prefix),
            [self.entry],
            beam=beam,
            counter=counter,
        )
        return top_k(ids, dists, k, keep=lambda i: i >= lo0) + 1

    def memory_bytes(self) -> dict[str, int]:
        # 4 bytes each for dst/birth/death per recorded edge interval.
        return {
            "vectors": int(self.vectors.nbytes),
            "index": int(
                self._dst.astype(np.int32).nbytes
                + self._birth.nbytes
                + self._death.nbytes
            ),
        }

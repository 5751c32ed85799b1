"""iRangeGraph: the query-phase index (paper Sections 3.3–3.4).

The index holds, for every segment-tree layer, the padded adjacency of
that layer's elemental graphs (all segments of a layer are disjoint, so
one ``(n, m)`` array per layer suffices; node ``u``'s row in layer ``i``
is its out-edges inside the unique layer-``i`` segment containing it).

Query phase: for a range ``[L, R]`` we *improvise* the range-dedicated
graph — Algorithm 1 selects up to ``m`` edges for a node from its
``O(log n)`` elemental graphs, prioritizing upper layers (larger
intersection with the query range ⇒ edges more robust against RNG
pruning) and *skipping* any layer whose intersection with the query range
equals its child's (the ``O(m + log n)`` amortized trick). The greedy
beam search runs on this lazily-constructed graph, memoizing edge
selections per query.

Also implemented here, for the Figure-3 ablation:

* ``variant="noskip"`` — iRangeGraph−: edge selection without layer
  skipping (``O(m log n)`` per node).
* :class:`BasicSearchIndex` — the classical segment-tree answer:
  decompose ``[L, R]`` into canonical segments, run one independent ANN
  search per segment's elemental graph, merge results.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.core.beam_search import beam_search, top_k
from repro.core.neighbors import DistanceCounter, adjacency_bytes
from repro.core.segment_tree import SegmentTree


@dataclass
class IRangeGraphIndex:
    """Materialized elemental graphs + on-the-fly dedicated-graph search.

    ``vectors`` is in ascending attribute-rank order (row ``i`` = rank
    ``i+1``). ``layer_adj[i]`` is the 0-based padded adjacency of layer
    ``i``; rows of nodes whose leaf lies above layer ``i`` are all
    padding.
    """

    vectors: np.ndarray
    tree: SegmentTree
    layer_adj: list[np.ndarray]
    m: int

    @property
    def n(self) -> int:
        return len(self.vectors)

    # ---------------------------------------------------------- edges
    def select_edges(
        self, u: int, lo: int, hi: int, *, skip_layers: bool = True
    ) -> np.ndarray:
        """Algorithm 1: select up to ``m`` edges for 0-based node ``u``
        restricted to the 1-based query range ``[lo, hi]``.

        With ``skip_layers`` (the paper's efficient variant) a layer is
        skipped whenever the child segment containing ``u`` has the same
        intersection with the query range as the current segment.
        """
        rank = u + 1
        tree = self.tree
        seg = tree.root()
        selected: list[int] = []
        seen: set[int] = set()
        lo0, hi0 = lo - 1, hi - 1  # 0-based node-id bounds

        while len(selected) < self.m:
            if skip_layers and not tree.is_leaf(seg):
                child = tree.child_containing(seg, rank)
                if child.intersection(lo, hi) == seg.intersection(lo, hi):
                    seg = child
                    continue
            row = self.layer_adj[seg.layer][u]
            for v in row:
                if v < 0:
                    break
                if lo0 <= v <= hi0 and v not in seen:
                    seen.add(int(v))
                    selected.append(int(v))
                    if len(selected) >= self.m:
                        break
            if seg.covered_by(lo, hi) or tree.is_leaf(seg):
                break
            seg = tree.child_containing(seg, rank)
        return np.asarray(selected[: self.m], dtype=np.int64)

    # --------------------------------------------------------- search
    def search(
        self,
        query: np.ndarray,
        lo: int,
        hi: int,
        *,
        beam: int,
        k: int,
        counter: DistanceCounter | None = None,
        skip_layers: bool = True,
        visit_filter=None,
        result_keep=None,
        rng=None,
    ) -> np.ndarray:
        """RFANN search on the improvised dedicated graph for ``[lo, hi]``.

        Returns up to ``k`` 1-based ranks, nearest first. ``visit_filter``
        / ``result_keep`` hook in the multi-attribute strategies (they see
        0-based node ids). ``rng`` is unused here but accepted for API
        uniformity with probabilistic variants.
        """
        if lo > hi:
            return np.empty(0, dtype=np.int64)
        lo = max(1, lo)
        hi = min(self.n, hi)
        if hi - lo + 1 <= beam:
            # Scanning the whole slice scores no more vectors than a
            # beam-``beam`` search would; for ranges this small the
            # improvised graph can be disconnected, the scan cannot.
            ids = np.arange(lo - 1, hi, dtype=np.int64)
            d = self.vectors[ids] - query
            dists = np.einsum("ij,ij->i", d, d)
            if counter is not None:
                counter.add(len(ids))
            return top_k(ids, dists, k, keep=result_keep) + 1
        memo: dict[int, np.ndarray] = {}

        def get_neighbors(u: int) -> np.ndarray:
            nbrs = memo.get(u)
            if nbrs is None:
                nbrs = self.select_edges(u, lo, hi, skip_layers=skip_layers)
                memo[u] = nbrs
            return nbrs

        # Seed from a few ranks spread over the range: robust against a
        # sparse improvised graph splitting into components.
        entries = np.unique(np.linspace(lo - 1, hi - 1, num=4, dtype=np.int64))
        ids, dists = beam_search(
            query,
            self.vectors,
            get_neighbors,
            [int(e) for e in entries],
            beam=beam,
            counter=counter,
            visit_filter=visit_filter,
        )
        return top_k(ids, dists, k, keep=result_keep) + 1

    # --------------------------------------------------------- memory
    def memory_bytes(self) -> dict[str, int]:
        """Memory accounting for Table 2: vectors vs index (edges)."""
        return {
            "vectors": int(self.vectors.nbytes),
            "index": int(sum(adjacency_bytes(a) for a in self.layer_adj)),
        }


class BasicSearchIndex:
    """Ablation baseline: canonical decomposition + independent searches.

    Uses the very same elemental graphs as iRangeGraph but the classical
    segment-tree query pattern: split ``[L, R]`` into ``O(log n)``
    canonical segments, beam-search each segment's elemental graph
    separately, and merge the top-k — no dedicated graph is improvised.
    """

    def __init__(self, index: IRangeGraphIndex) -> None:
        self.index = index

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
        if lo > hi:
            return np.empty(0, dtype=np.int64)
        idx = self.index
        lo = max(1, lo)
        hi = min(idx.n, hi)
        all_ids: list[np.ndarray] = []
        all_d: list[np.ndarray] = []
        lo0, hi0 = lo - 1, hi - 1
        for seg in idx.tree.decompose(lo, hi):
            adj = idx.layer_adj[seg.layer]
            entry = (seg.lo + seg.hi) // 2 - 1
            ids, dists = beam_search(
                query,
                idx.vectors,
                lambda u, adj=adj: adj[u][adj[u] >= 0],
                [entry],
                beam=beam,
                counter=counter,
            )
            # Boundary leaves may cover out-of-range ranks; filter here.
            keep = (ids >= lo0) & (ids <= hi0)
            all_ids.append(ids[keep])
            all_d.append(dists[keep])
        ids = np.concatenate(all_ids) if all_ids else np.empty(0, dtype=np.int64)
        dists = np.concatenate(all_d) if all_d else np.empty(0)
        # A node can be scored by several segment searches only if it sits
        # in overlapping boundary leaves — dedupe before ranking.
        ids, uniq = np.unique(ids, return_index=True)
        return top_k(ids, dists[uniq], k) + 1

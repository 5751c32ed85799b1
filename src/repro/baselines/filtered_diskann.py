"""Filtered-DiskANN baselines adapted to range filtering (paper §5.1).

Following the paper's adaptation protocol: the full rank range ``[1, n]``
is evenly divided into 10 consecutive buckets, each bucket is a *label*;
a query's label set is the buckets intersecting its range, and results
are post-filtered to the exact range.

* **StitchedVamana** — build one graph per label and stitch (union) them;
  with disjoint single-label points the stitched graph is the disjoint
  union, re-pruned to the degree cap. Query: filtered greedy search that
  visits only query-label nodes, seeded from each query label's medoid.
* **FilteredVamana** — a single graph built incrementally where each
  insertion's candidates come from a label-constrained search (plus the
  label medoids for connectivity), mirroring FilteredRobustPrune's
  "candidates share a label with u" constraint (with one label per point
  this keeps edges label-internal, as in the original when label sets
  are disjoint).

Both inherit the failure mode the paper reports: bucket length is fixed
at index time, so small query ranges drown in same-label out-of-range
objects and recall stalls below 0.8 for small/mixed workloads.
"""
from __future__ import annotations

import numpy as np

from repro.baselines._spark_build import SubsetGraph, build_subset_graphs
from repro.core.beam_search import beam_search, top_k
from repro.core.neighbors import DistanceCounter


class _LabelIndexBase:
    """Shared label layout + query path for the two Vamana adaptations."""

    def __init__(self, vectors: np.ndarray, n_labels: int) -> None:
        self.vectors = np.ascontiguousarray(vectors, dtype=np.float32)
        n = len(vectors)
        self.n = n
        self.bounds = np.linspace(0, n, n_labels + 1, dtype=np.int64)
        # label of 0-based node u
        self.label = (
            np.searchsorted(self.bounds, np.arange(1, n + 1), side="left") - 1
        )
        # medoid (here: central rank) per label, used as search seeds
        self.medoids = [
            int((self.bounds[b] + self.bounds[b + 1] + 1) // 2 - 1)
            for b in range(n_labels)
            if self.bounds[b + 1] > self.bounds[b]
        ]

    def _query_labels(self, lo: int, hi: int) -> np.ndarray:
        labs = np.unique(self.label[lo - 1 : hi])
        return labs

    def _filtered_search(
        self,
        adj: np.ndarray,
        query: np.ndarray,
        lo: int,
        hi: int,
        *,
        beam: int,
        k: int,
        counter: DistanceCounter | None,
    ) -> np.ndarray:
        labs = set(self._query_labels(lo, hi).tolist())
        entries = [self.medoids[b] for b in sorted(labs)]
        label = self.label
        lo0, hi0 = lo - 1, hi - 1
        ids, dists = beam_search(
            query,
            self.vectors,
            lambda u: adj[u][adj[u] >= 0],
            entries,
            beam=beam,
            counter=counter,
            visit_filter=lambda u: label[u] in labs,
        )
        res = top_k(ids, dists, k, keep=lambda i: (i >= lo0) & (i <= hi0))
        return res + 1

    def memory_bytes(self) -> dict[str, int]:
        return {
            "vectors": int(self.vectors.nbytes),
            "index": int(self.adj.nbytes + self.label.nbytes),
        }


class StitchedVamanaIndex(_LabelIndexBase):
    """Per-label HNSW graphs stitched into one adjacency."""

    def __init__(
        self,
        vectors: np.ndarray,
        *,
        n_labels: int = 10,
        m: int = 16,
        ef: int = 100,
        spark=None,
        seed: int = 0,
    ) -> None:
        super().__init__(vectors, n_labels)
        subsets = {
            b: np.arange(self.bounds[b] + 1, self.bounds[b + 1] + 1,
                         dtype=np.int64)
            for b in range(n_labels)
            if self.bounds[b + 1] > self.bounds[b]
        }
        graphs: dict[int, SubsetGraph] = build_subset_graphs(
            spark, vectors, subsets, m=m, ef=ef, seed=seed
        )
        self.adj = np.full((self.n, m), -1, dtype=np.int32)
        for g in graphs.values():
            for i, rank in enumerate(g.ranks):
                row = g.graph.adj[i]
                nb = row[row >= 0]
                self.adj[rank - 1, : len(nb)] = (g.ranks[nb] - 1).astype(
                    np.int32
                )

    def search(self, query, lo, hi, *, beam, k, counter=None):
        lo, hi = max(1, lo), min(self.n, hi)
        if lo > hi:
            return np.empty(0, dtype=np.int64)
        return self._filtered_search(
            self.adj, query, lo, hi, beam=beam, k=k, counter=counter
        )


class FilteredVamanaIndex(_LabelIndexBase):
    """Single incrementally built graph with label-constrained candidates."""

    def __init__(
        self,
        vectors: np.ndarray,
        *,
        n_labels: int = 10,
        m: int = 16,
        ef: int = 100,
        seed: int = 0,
    ) -> None:
        from repro.core.rng_prune import rng_prune

        super().__init__(vectors, n_labels)
        n = self.n
        g = np.random.default_rng(seed)
        order = g.permutation(n)
        adj_lists: list[list[int]] = [[] for _ in range(n)]
        label = self.label
        seen_first: dict[int, int] = {}  # label -> first inserted node

        def nbrs(u: int) -> np.ndarray:
            return np.asarray(adj_lists[u], dtype=np.int64)

        for u in order:
            u = int(u)
            b = int(label[u])
            if b not in seen_first:
                seen_first[b] = u
                continue
            # Label-constrained candidate search from the label's seed.
            ids, dists = beam_search(
                self.vectors[u],
                self.vectors,
                nbrs,
                [seen_first[b]],
                beam=ef,
                visit_filter=lambda v: label[v] == b,
            )
            cand = ids[np.argsort(dists, kind="stable")[:ef]]
            kept = rng_prune(self.vectors[u], cand, self.vectors[cand], m)
            adj_lists[u] = [int(v) for v in kept]
            for v in adj_lists[u]:
                lst = adj_lists[v]
                lst.append(u)
                if len(lst) > m:
                    cv = np.asarray(lst, dtype=np.int64)
                    kept_v = rng_prune(
                        self.vectors[v], cv, self.vectors[cv], m
                    )
                    adj_lists[v] = [int(x) for x in kept_v]
        self.adj = np.full((n, m), -1, dtype=np.int32)
        for u, lst in enumerate(adj_lists):
            self.adj[u, : len(lst)] = lst[:m]
        # Keep the actual seeds as medoids for the query path.
        for b, u in seen_first.items():
            self.medoids[b] = u

    def search(self, query, lo, hi, *, beam, k, counter=None):
        lo, hi = max(1, lo), min(self.n, hi)
        if lo > hi:
            return np.empty(0, dtype=np.int64)
        return self._filtered_search(
            self.adj, query, lo, hi, beam=beam, k=k, counter=counter
        )

"""Shared Spark builder: one HNSW-lite graph per subset of the dataset.

Milvus-like partitions, SuperPostfiltering windows and StitchedVamana
label buckets all need "a proximity graph per rank subset". This helper
expresses that as one Spark job: explode ``(group, rank, vector)`` rows,
``groupBy(group).applyInPandas`` builds each subset's graph in parallel,
and the driver reassembles searchable :class:`SubsetGraph` objects.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.core.hnsw import FlatGraph, build_hnsw
from repro.core.neighbors import DistanceCounter, adjacency_bytes


@dataclass
class SubsetGraph:
    """An HNSW-lite over a subset of ranks, searchable in global terms."""

    ranks: np.ndarray  # sorted 1-based global ranks (local id -> rank)
    graph: FlatGraph

    def search(
        self,
        query: np.ndarray,
        *,
        beam: int,
        k: int,
        counter: DistanceCounter | None = None,
        rank_range: tuple[int, int] | None = None,
        in_search_filter: bool = False,
    ) -> np.ndarray:
        """Top-k global ranks; optionally constrain to ``rank_range``.

        ``in_search_filter=False`` post-filters results (traversal is
        unconstrained); ``True`` applies the range during traversal
        (In-filtering semantics).
        """
        ranks = self.ranks
        keep = visit = None
        if rank_range is not None:
            lo, hi = rank_range

            def keep(ids: np.ndarray) -> np.ndarray:
                r = ranks[ids]
                return (r >= lo) & (r <= hi)

            if in_search_filter:
                def visit(u: int) -> bool:
                    return lo <= ranks[u] <= hi

        local = self.graph.search(
            query, beam=beam, k=k, counter=counter,
            visit_filter=visit, result_keep=keep,
        )
        return ranks[local]

    def memory_bytes(self) -> int:
        return adjacency_bytes(self.graph.adj)


def build_subset_graphs(
    spark,
    vectors: np.ndarray,
    subsets: dict[int, np.ndarray],
    *,
    m: int,
    ef: int,
    seed: int = 0,
) -> dict[int, SubsetGraph]:
    """Build one HNSW-lite per subset (``gid -> sorted 1-based ranks``).

    Runs distributed when a SparkSession is given; ``spark=None`` falls
    back to a driver loop (used by tests for equivalence checks).
    Deterministic: each subset's insertion order comes from a seeded
    permutation keyed by ``(seed, gid)``.
    """
    vectors = np.ascontiguousarray(vectors, dtype=np.float32)

    def build_one(gid: int, ranks: np.ndarray) -> SubsetGraph:
        ranks = np.sort(np.asarray(ranks, dtype=np.int64))
        sub = vectors[ranks - 1]
        order = np.random.default_rng((seed, gid)).permutation(len(ranks))
        g = build_hnsw(sub, m=m, ef_construction=ef, order=order)
        return SubsetGraph(ranks=ranks, graph=g)

    if spark is None:
        return {gid: build_one(gid, r) for gid, r in subsets.items()}

    rows = []
    for gid, ranks in subsets.items():
        for r in np.sort(np.asarray(ranks, dtype=np.int64)):
            rows.append(
                {"gid": int(gid), "rank": int(r),
                 "vector": vectors[r - 1].tolist()}
            )
    pdf = pd.DataFrame(rows)

    def build_group(g: pd.DataFrame) -> pd.DataFrame:
        g = g.sort_values("rank").reset_index(drop=True)
        gid = int(g["gid"].iloc[0])
        ranks = g["rank"].to_numpy(dtype=np.int64)
        sub = np.ascontiguousarray(
            np.stack([np.asarray(v, dtype=np.float32) for v in g["vector"]])
        )
        order = np.random.default_rng((seed, gid)).permutation(len(ranks))
        graph = build_hnsw(sub, m=m, ef_construction=ef, order=order)
        return pd.DataFrame(
            {
                "gid": gid,
                "rank": ranks,
                "nbrs": [row[row >= 0].tolist() for row in graph.adj],
                "entry": int(graph.entry),
            }
        )

    out = (
        spark.createDataFrame(pdf)
        .groupBy("gid")
        .applyInPandas(
            build_group, "gid int, rank long, nbrs array<int>, entry int"
        )
        .toPandas()
    )
    result: dict[int, SubsetGraph] = {}
    for gid, grp in out.groupby("gid"):
        grp = grp.sort_values("rank").reset_index(drop=True)
        ranks = grp["rank"].to_numpy(dtype=np.int64)
        mcap = m
        adj = np.full((len(ranks), mcap), -1, dtype=np.int32)
        for i, nb in enumerate(grp["nbrs"]):
            nb = np.asarray(nb, dtype=np.int32)[:mcap]
            adj[i, : len(nb)] = nb
        graph = FlatGraph(
            vectors=vectors[ranks - 1], adj=adj, entry=int(grp["entry"].iloc[0])
        )
        result[int(gid)] = SubsetGraph(ranks=ranks, graph=graph)
    return result

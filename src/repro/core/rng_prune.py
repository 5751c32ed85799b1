"""The RNG pruning rule (paper Definition 2.1) and its DiskANN-style
``alpha`` generalization.

Given a node ``u`` and a candidate set, candidates are examined in order
of increasing distance to ``u``; a candidate ``c`` is *pruned* if some
already-retained candidate ``s`` satisfies ``alpha * d(s, c) < d(u, c)``
(``alpha = 1`` is exactly the RNG rule: ``s`` is closer to both ``u`` and
``c`` than they are to each other). At most ``m`` candidates are retained.

This single routine is the edge selector used by every graph builder in
the reproduction: leaf elemental graphs, bottom-up parent graphs,
HNSW-lite insertion and neighbor-list repair, SeRF-like incremental
builds, and the Vamana-style baselines.
"""
from __future__ import annotations

import numpy as np

from repro.core.neighbors import pairwise_sq


def rng_prune(
    u_vec: np.ndarray,
    cand_ids: np.ndarray,
    cand_vecs: np.ndarray,
    m: int,
    *,
    alpha: float = 1.0,
) -> np.ndarray:
    """Prune ``cand_ids`` down to at most ``m`` RNG-retained neighbors.

    ``cand_vecs[i]`` is the vector of ``cand_ids[i]``. Duplicate ids are
    collapsed (first occurrence wins). Returns retained ids in order of
    increasing distance to ``u``.
    """
    if len(cand_ids) == 0:
        return np.empty(0, dtype=np.int64)
    cand_ids = np.asarray(cand_ids)
    # Collapse duplicates, keeping the first occurrence.
    _, first = np.unique(cand_ids, return_index=True)
    first.sort()
    cand_ids = cand_ids[first]
    cand_vecs = cand_vecs[first]

    diff = cand_vecs - u_vec
    d_u = np.einsum("ij,ij->i", diff, diff)
    order = np.argsort(d_u, kind="stable")

    kept_idx: list[int] = []
    kept_vecs: list[np.ndarray] = []
    for idx in order:
        if len(kept_idx) >= m:
            break
        c = cand_vecs[idx]
        if kept_idx:
            kv = np.asarray(kept_vecs)
            dd = kv - c
            d_sc = np.einsum("ij,ij->i", dd, dd)
            if np.any(alpha * alpha * d_sc < d_u[idx]):
                continue
        kept_idx.append(int(idx))
        kept_vecs.append(c)
    return cand_ids[kept_idx]


def brute_force_rng(
    vecs: np.ndarray, m: int, *, alpha: float = 1.0
) -> list[np.ndarray]:
    """Exact approximate-RNG over a small point set (leaf graphs).

    For every node, all other nodes are candidates; the RNG rule with a
    degree cap of ``m`` selects the out-edges. O(n^2) distances + O(n m)
    prune checks per node — only used for segment-tree leaves (<= ~64
    points) and tests.
    """
    n = len(vecs)
    d = pairwise_sq(vecs)
    out: list[np.ndarray] = []
    ids = np.arange(n)
    for u in range(n):
        cand = ids[ids != u]
        order = cand[np.argsort(d[u, cand], kind="stable")]
        kept: list[int] = []
        for c in order:
            if len(kept) >= m:
                break
            if any(alpha * alpha * d[s, c] < d[u, c] for s in kept):
                continue
            kept.append(int(c))
        out.append(np.asarray(kept, dtype=np.int64))
    return out

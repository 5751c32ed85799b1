"""Multi-attribute adaptations of the baselines (paper Section 5.2.5).

The paper's Figure-5 comparison keeps only the baselines that extend to
conjunctive predicates: 2DSegmentGraph and Milvus index one attribute and
Post-filter the other (as does iRangeGraph's plain extension), and
Pre-filtering scans the conjunctively-in-range objects. The generic
:class:`ConjunctivePostFilter` wraps any single-attribute index: it asks
the underlying index for its ``beam`` best attribute-1-in-range results
(the scored frontier) and keeps those passing the attribute-2 range.
"""
from __future__ import annotations

import numpy as np

from repro.core.neighbors import DistanceCounter
from repro.eval.ground_truth import exact_rfann_np


class ConjunctivePostFilter:
    """Attribute-2 Post-filtering over any single-attribute index."""

    def __init__(self, index, attr2_rank: np.ndarray) -> None:
        self.index = index
        self.attr2_rank = np.asarray(attr2_rank, dtype=np.int64)

    def search(
        self,
        query: np.ndarray,
        range1: tuple[int, int],
        range2: tuple[int, int],
        *,
        beam: int,
        k: int,
        counter: DistanceCounter | None = None,
        seed: int = 0,
    ) -> np.ndarray:
        res = self.index.search(
            query, range1[0], range1[1], beam=beam, k=beam, counter=counter
        )
        if len(res) == 0:
            return res
        a2 = self.attr2_rank[res - 1]
        keep = (a2 >= range2[0]) & (a2 <= range2[1])
        return res[keep][:k]

    def memory_bytes(self) -> dict[str, int]:
        mb = self.index.memory_bytes()
        mb["index"] += int(self.attr2_rank.nbytes)
        return mb


class ConjunctivePrefilter:
    """Exact scan over objects satisfying both range predicates."""

    def __init__(self, vectors: np.ndarray, attr2_rank: np.ndarray) -> None:
        self.vectors = np.ascontiguousarray(vectors, dtype=np.float32)
        self.attr2_rank = np.asarray(attr2_rank, dtype=np.int64)

    def search(
        self,
        query: np.ndarray,
        range1: tuple[int, int],
        range2: tuple[int, int],
        *,
        beam: int = 0,
        k: int,
        counter: DistanceCounter | None = None,
        seed: int = 0,
    ) -> np.ndarray:
        lo, hi = max(1, range1[0]), min(len(self.vectors), range1[1])
        if lo > hi:
            return np.empty(0, dtype=np.int64)
        if counter is not None:
            a2 = self.attr2_rank[lo - 1 : hi]
            counter.add(int(((a2 >= range2[0]) & (a2 <= range2[1])).sum()))
        ranks, _ = exact_rfann_np(
            self.vectors, query, lo, hi, k,
            attr2_rank=self.attr2_rank, range2=range2,
        )
        return ranks

    def memory_bytes(self) -> dict[str, int]:
        return {
            "vectors": int(self.vectors.nbytes),
            "index": int(self.attr2_rank.nbytes),
        }

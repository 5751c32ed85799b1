"""Measurement harness: qps-recall curves and qps@recall interpolation.

For each method and workload the harness sweeps the beam size (the only
query-time knob, as in the paper) and records, per beam:

* mean recall (``|G ∩ S| / |G|`` with ``|G| = min(k, in-range count)``),
* wall-clock qps (single-threaded driver loop — the paper's search
  protocol is single-threaded too),
* mean distance computations per query (the hardware-independent cost;
  our Python qps compresses inter-method gaps, the counter does not).

``qps_at_recall`` interpolates the curve at a target recall (0.9 in the
paper's headline claims) and returns ``None`` when the method never
reaches it — the paper renders such methods as missing curves.
"""
from __future__ import annotations

import time
from typing import Callable

import numpy as np

from repro.core.neighbors import DistanceCounter
from repro.eval.workloads import RangeQuery

DEFAULT_BEAMS = (10, 20, 40, 80, 160, 320)

# search_fn(qvec, query, beam, k, counter) -> 1-based ranks
SearchFn = Callable[..., np.ndarray]


def recall_of(result: np.ndarray, gt: np.ndarray) -> float:
    if len(gt) == 0:
        return 1.0
    return len(set(result.tolist()) & set(gt.tolist())) / len(gt)


def run_curve(
    search_fn: SearchFn,
    queries: list[RangeQuery],
    qvecs: np.ndarray,
    gt: dict[int, np.ndarray],
    *,
    k: int = 10,
    beams: tuple[int, ...] = DEFAULT_BEAMS,
) -> list[dict]:
    """Sweep beam sizes; one row per beam with recall/qps/dist counts."""
    rows = []
    for beam in beams:
        counter = DistanceCounter()
        recalls = []
        t0 = time.perf_counter()
        for q in queries:
            qv = qvecs[q.qid % len(qvecs)]
            res = search_fn(qv, q, beam, k, counter)
            recalls.append(recall_of(np.asarray(res), gt[q.qid]))
        elapsed = time.perf_counter() - t0
        rows.append(
            {
                "beam": beam,
                "recall": float(np.mean(recalls)),
                "qps": len(queries) / elapsed if elapsed > 0 else float("inf"),
                "dists": counter.count / len(queries),
            }
        )
    return rows


def qps_at_recall(rows: list[dict], target: float = 0.9) -> float | None:
    """Interpolate qps at a target recall (log-qps linear in recall).

    Points are sorted by recall; returns ``None`` if the curve never
    reaches ``target`` (the paper's "fails to achieve" case).
    """
    return _metric_at_recall(rows, "qps", target)


def dists_at_recall(rows: list[dict], target: float = 0.9) -> float | None:
    """Interpolated distance computations per query at a target recall."""
    return _metric_at_recall(rows, "dists", target)


def _metric_at_recall(
    rows: list[dict], key: str, target: float
) -> float | None:
    pts = sorted(rows, key=lambda r: r["recall"])
    if not pts or pts[-1]["recall"] < target:
        return None
    prev = None
    for row in pts:
        if row["recall"] >= target:
            if prev is None or row["recall"] == prev["recall"]:
                return float(row[key])
            w = (target - prev["recall"]) / (row["recall"] - prev["recall"])
            a, b = np.log(max(prev[key], 1e-12)), np.log(max(row[key], 1e-12))
            return float(np.exp(a + w * (b - a)))
        prev = row
    return None


def max_recall(rows: list[dict]) -> float:
    return max((r["recall"] for r in rows), default=0.0)

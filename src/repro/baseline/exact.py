"""Exhaustive exact KNN — ground truth for recall measurements."""
from __future__ import annotations

import numpy as np

from repro.ivf.kmeans import pairwise_sq_l2


def exact_knn(
    base: np.ndarray, queries: np.ndarray, k: int
) -> tuple[np.ndarray, np.ndarray]:
    """Brute-force top-``k``: ``(ids, dists)`` shape ``(Q, k)``,
    distance-ascending."""
    d2 = pairwise_sq_l2(
        np.asarray(queries, np.float32), np.asarray(base, np.float32)
    ).astype(np.float64)
    k = min(k, base.shape[0])
    part = np.argpartition(d2, k - 1, axis=1)[:, :k]
    rows = np.arange(len(queries))[:, None]
    order = np.argsort(d2[rows, part], axis=1, kind="stable")
    ids = part[rows, order].astype(np.int64)
    return ids, d2[rows, ids]


def recall_at_k(found_ids: np.ndarray, true_ids: np.ndarray) -> float:
    """Mean fraction of the true top-k recovered (Recall@k)."""
    hits = 0
    for f, t in zip(found_ids, true_ids):
        hits += len(set(f[f >= 0]) & set(t))
    return hits / float(true_ids.size)

"""Seeded k-means for IVF training (the paper's "Train" stage, Fig. 10).

All methods in the paper's evaluation share one clustering ("all methods
adopt the same clustering algorithm and number of clusters as Faiss",
§6.1), so this module is the single source of centroids for faiss_lite and
every Harmony mode. Deterministic in ``seed``; trains on a capped sample
like Faiss does.
"""
from __future__ import annotations

import numpy as np

#: Max training points — Faiss-style sampling cap (per-centroid budget).
_TRAIN_CAP_PER_CENTROID = 256


def _kpp_init(x: np.ndarray, k: int, g: np.random.Generator) -> np.ndarray:
    """k-means++ seeding: spread initial centroids by D² sampling."""
    n = x.shape[0]
    centroids = np.empty((k, x.shape[1]), dtype=np.float32)
    centroids[0] = x[g.integers(n)]
    d2 = ((x - centroids[0]) ** 2).sum(axis=1)
    for i in range(1, k):
        tot = d2.sum()
        if tot <= 0:  # all points identical to chosen centroids
            centroids[i] = x[g.integers(n)]
            continue
        centroids[i] = x[g.choice(n, p=d2 / tot)]
        d2 = np.minimum(d2, ((x - centroids[i]) ** 2).sum(axis=1))
    return centroids


def pairwise_sq_l2(a: np.ndarray, b: np.ndarray) -> np.ndarray:
    """Squared L2 distances, shape ``(len(a), len(b))`` (BLAS-backed)."""
    a = np.ascontiguousarray(a, dtype=np.float32)
    b = np.ascontiguousarray(b, dtype=np.float32)
    d2 = (
        (a * a).sum(axis=1)[:, None]
        + (b * b).sum(axis=1)[None, :]
        - 2.0 * (a @ b.T)
    )
    np.maximum(d2, 0.0, out=d2)
    return d2


def kmeans(
    x: np.ndarray, k: int, seed: int = 0, n_iter: int = 15
) -> np.ndarray:
    """Lloyd's algorithm with k-means++ init; returns ``(k, dim)`` float32.

    ``k`` is clamped to ``len(x)``. Empty clusters are re-seeded from the
    farthest points so exactly ``k`` non-degenerate centroids come back.
    """
    x = np.ascontiguousarray(x, dtype=np.float32)
    k = min(k, len(x))
    g = np.random.default_rng(seed)
    train = x
    cap = _TRAIN_CAP_PER_CENTROID * k
    if len(x) > cap:
        train = x[g.choice(len(x), size=cap, replace=False)]
    c = _kpp_init(train, k, g)
    for _ in range(n_iter):
        d2 = pairwise_sq_l2(train, c)
        assign = d2.argmin(axis=1)
        new_c = c.copy()
        for j in range(k):
            members = train[assign == j]
            if len(members):
                new_c[j] = members.mean(axis=0)
            else:  # re-seed empty cluster at the current farthest point
                new_c[j] = train[d2.min(axis=1).argmax()]
        if np.allclose(new_c, c, atol=1e-6):
            c = new_c
            break
        c = new_c
    return c.astype(np.float32)

"""Plain NumPy k-means and the paper's grow-until-bounded partitioning.

Sections 3.2.1 / 5.1 partition points by increasing the number of clusters
until every point is within ``eps`` of its cluster centroid (Eq. 7/8, and
Alg. 3 line 1 with eps_s). We realise the "q increases until satisfied"
loop as bisecting splits of violating clusters, which terminates (a
singleton always satisfies any eps >= 0) and matches Lemma 1's
O(q*m*N*l) shape: each round splits every violating cluster once.
"""
from __future__ import annotations

import numpy as np


def kmeans(
    pts: np.ndarray, k: int, *, seed: int = 0, iters: int = 10
) -> tuple[np.ndarray, np.ndarray]:
    """Lloyd's k-means. Returns (labels, centroids); k is clamped to n.

    Init is greedy farthest-point (deterministic given ``seed`` for the
    first pick), which avoids empty clusters on well-separated data.
    """
    pts = np.asarray(pts, dtype=np.float64)
    if pts.ndim == 1:
        pts = pts[:, None]
    n = len(pts)
    k = max(1, min(k, n))
    if k == 1:
        c = pts.mean(axis=0, keepdims=True)
        return np.zeros(n, dtype=np.int64), c
    g = np.random.default_rng(seed)
    centroids = np.empty((k, pts.shape[1]))
    centroids[0] = pts[g.integers(0, n)]
    d2 = ((pts - centroids[0]) ** 2).sum(axis=1)
    for j in range(1, k):
        centroids[j] = pts[int(np.argmax(d2))]
        d2 = np.minimum(d2, ((pts - centroids[j]) ** 2).sum(axis=1))
    labels = np.zeros(n, dtype=np.int64)
    for _ in range(iters):
        dists = ((pts[:, None, :] - centroids[None, :, :]) ** 2).sum(axis=2)
        new_labels = dists.argmin(axis=1)
        if np.array_equal(new_labels, labels) and _ > 0:
            break
        labels = new_labels
        for j in range(k):
            m = labels == j
            if m.any():
                centroids[j] = pts[m].mean(axis=0)
    return labels, centroids


def _split_two(pts: np.ndarray, seed: int) -> np.ndarray:
    """Split points into two non-empty groups, guaranteed to make progress.

    Uses k-means(2) seeded by the farthest pair; falls back to a median
    split along the widest axis when k-means degenerates (e.g. heavy
    duplicates), so the grow loop always terminates.
    """
    labels, _ = kmeans(pts, 2, seed=seed, iters=8)
    if labels.min() == labels.max():
        axis = int(np.argmax(pts.max(axis=0) - pts.min(axis=0)))
        med = np.median(pts[:, axis])
        labels = (pts[:, axis] > med).astype(np.int64)
        if labels.min() == labels.max():  # all identical values
            labels = np.zeros(len(pts), dtype=np.int64)
            labels[: len(pts) // 2] = 1
    return labels


def grow_partition(
    pts: np.ndarray, eps: float, *, seed: int = 0
) -> tuple[np.ndarray, np.ndarray, int]:
    """Partition ``pts`` so every point is within ``eps`` of its centroid.

    Returns ``(labels, centroids, rounds)`` where ``rounds`` counts the
    split rounds (the paper's m in Lemma 1).
    """
    pts = np.asarray(pts, dtype=np.float64)
    if pts.ndim == 1:
        pts = pts[:, None]
    n = len(pts)
    labels = np.zeros(n, dtype=np.int64)
    rounds = 0
    while True:
        centroids = _centroids_of(pts, labels)
        viol = _violating_clusters(pts, labels, centroids, eps)
        if not viol:
            return labels, centroids, rounds
        rounds += 1
        next_label = int(labels.max()) + 1
        for j in viol:
            m = labels == j
            if m.sum() <= 1:
                continue
            sub = _split_two(pts[m], seed + rounds + j)
            idx = np.flatnonzero(m)
            labels[idx[sub == 1]] = next_label
            next_label += 1


def _centroids_of(pts: np.ndarray, labels: np.ndarray) -> np.ndarray:
    k = int(labels.max()) + 1
    centroids = np.zeros((k, pts.shape[1]))
    for j in range(k):
        m = labels == j
        if m.any():
            centroids[j] = pts[m].mean(axis=0)
    return centroids


def _violating_clusters(
    pts: np.ndarray, labels: np.ndarray, centroids: np.ndarray, eps: float
) -> list[int]:
    out = []
    for j in range(len(centroids)):
        m = labels == j
        if not m.any():
            continue
        d = np.sqrt(((pts[m] - centroids[j]) ** 2).sum(axis=1))
        if d.max() > eps and m.sum() > 1:
            out.append(j)
    return out


def max_dist_to_centroid(pts: np.ndarray, centroid: np.ndarray) -> float:
    """Max Euclidean distance from any point to ``centroid``."""
    pts = np.asarray(pts, dtype=np.float64)
    if pts.ndim == 1:
        pts = pts[:, None]
    return float(np.sqrt(((pts - centroid) ** 2).sum(axis=1)).max())

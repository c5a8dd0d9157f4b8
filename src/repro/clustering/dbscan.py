"""DBSCAN (Ester et al., KDD'96) in numpy.

O(n^2) pairwise distances with BFS cluster expansion — per-window point
counts in SAQL are the number of *groups* in a window (dozens to a few
thousand), so the quadratic neighbour search is the right tradeoff for
a from-scratch, dependency-free implementation.
"""
from __future__ import annotations

from collections import deque

import numpy as np

NOISE = -1


def dbscan(points: np.ndarray, eps: float, min_pts: int) -> np.ndarray:
    """Cluster ``points`` (n x d) and return integer labels (n,).

    Labels are 0..k-1 for cluster members and ``NOISE`` (-1) for
    outliers. ``min_pts`` counts the point itself, matching the
    classical definition (a core point has >= min_pts points within
    eps, inclusive).
    """
    pts = np.asarray(points, dtype="float64")
    if pts.ndim == 1:
        pts = pts.reshape(-1, 1)
    n = len(pts)
    if n == 0:
        return np.empty(0, dtype="int64")
    # Pairwise Euclidean distances; (a-b)^2 expansion avoids the n x n x d
    # intermediate for d > 1.
    sq = np.sum(pts**2, axis=1)
    d2 = sq[:, None] + sq[None, :] - 2.0 * (pts @ pts.T)
    np.maximum(d2, 0.0, out=d2)
    within = d2 <= float(eps) ** 2
    n_neighbors = within.sum(axis=1)
    core = n_neighbors >= int(min_pts)

    labels = np.full(n, NOISE, dtype="int64")
    cluster = 0
    for i in range(n):
        if labels[i] != NOISE or not core[i]:
            continue
        labels[i] = cluster
        queue = deque(np.flatnonzero(within[i]))
        while queue:
            j = queue.popleft()
            if labels[j] == NOISE:
                labels[j] = cluster
                if core[j]:
                    queue.extend(np.flatnonzero(within[j] & (labels == NOISE)))
        cluster += 1
    return labels


def outlier_mask(points: np.ndarray, eps: float, min_pts: int) -> np.ndarray:
    """Boolean mask of DBSCAN noise points (SAQL's ``cluster.outlier``)."""
    return dbscan(points, eps, min_pts) == NOISE

"""Minimal K-means (Lloyd's algorithm with k-means++ seeding).

scikit-learn is not available offline, and the paper's discovery step
(Section V) only needs a plain K-means over factor-matrix rows, so this
NumPy implementation is the substrate.
"""
from __future__ import annotations

import numpy as np


def _kmeanspp_init(x: np.ndarray, k: int, g: np.random.Generator) -> np.ndarray:
    """k-means++ seeding: spread initial centers by D² sampling."""
    n = len(x)
    centers = np.empty((k, x.shape[1]))
    centers[0] = x[g.integers(n)]
    d2 = np.sum((x - centers[0]) ** 2, axis=1)
    for c in range(1, k):
        probs = d2 / d2.sum() if d2.sum() > 0 else np.full(n, 1.0 / n)
        centers[c] = x[g.choice(n, p=probs)]
        d2 = np.minimum(d2, np.sum((x - centers[c]) ** 2, axis=1))
    return centers


def kmeans(
    x: np.ndarray,
    k: int,
    *,
    max_iters: int = 100,
    n_init: int = 5,
    seed: int = 0,
) -> tuple[np.ndarray, np.ndarray, float]:
    """Cluster rows of ``x`` into ``k`` groups.

    Returns (labels (n,), centers (k,d), inertia). Best of ``n_init``
    k-means++ restarts, as standard implementations do.
    """
    if k < 1 or k > len(x):
        raise ValueError("k must be in [1, n_rows]")
    g = np.random.default_rng(seed)
    best: tuple[np.ndarray, np.ndarray, float] | None = None
    for _ in range(n_init):
        centers = _kmeanspp_init(x, k, g)
        labels = np.zeros(len(x), dtype=np.int64)
        for _it in range(max_iters):
            d2 = ((x[:, None, :] - centers[None, :, :]) ** 2).sum(axis=2)
            new_labels = d2.argmin(axis=1)
            if _it > 0 and np.array_equal(new_labels, labels):
                break
            labels = new_labels
            for c in range(k):
                sel = labels == c
                if sel.any():
                    centers[c] = x[sel].mean(axis=0)
                else:  # re-seed an empty cluster at the farthest point
                    centers[c] = x[d2.min(axis=1).argmax()]
        inertia = float(((x - centers[labels]) ** 2).sum())
        if best is None or inertia < best[2]:
            best = (labels.copy(), centers.copy(), inertia)
    return best


def cluster_purity(labels: np.ndarray, truth: np.ndarray) -> float:
    """Fraction of points whose cluster's majority truth-label matches theirs."""
    correct = 0
    for c in np.unique(labels):
        sel = labels == c
        _, counts = np.unique(truth[sel], return_counts=True)
        correct += counts.max()
    return correct / len(labels)

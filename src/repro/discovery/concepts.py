"""Concept discovery (paper Section V, Table V).

"Each row of a factor matrix represents latent features of the row"
— so K-means over the rows of the movie-mode factor matrix groups
movies into latent concepts (genres). On the planted MovieLens-like
tensor we can score the discovered clusters against the ground-truth
genre of each movie (purity), which is the checkable analogue of the
paper's qualitative Table V.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.discovery.kmeans import cluster_purity, kmeans


@dataclass(frozen=True)
class ConceptReport:
    """Discovered concepts for one mode's factor matrix."""

    labels: np.ndarray  # (I_mode,) cluster id per row
    purity: float  # vs. planted ground truth (1.0 = perfect)
    exemplars: list[list[int]]  # top rows (by factor-row norm) per cluster


def discover_concepts(
    factor: np.ndarray,
    k: int,
    *,
    truth: np.ndarray | None = None,
    n_exemplars: int = 3,
    seed: int = 0,
) -> ConceptReport:
    """Cluster factor rows into ``k`` concepts; score against truth if given.

    Rows are L2-normalized first so clustering captures the *direction*
    of the latent profile rather than row magnitude (popular movies have
    larger rows purely from their rating counts).
    """
    norms = np.linalg.norm(factor, axis=1, keepdims=True)
    safe = np.where(norms > 1e-12, norms, 1.0)
    x = factor / safe
    labels, _, _ = kmeans(x, k, seed=seed)
    purity = (
        cluster_purity(labels, truth) if truth is not None else float("nan")
    )
    exemplars = []
    row_norm = np.linalg.norm(factor, axis=1)
    for c in range(k):
        members = np.nonzero(labels == c)[0]
        top = members[np.argsort(row_norm[members])[::-1][:n_exemplars]]
        exemplars.append(top.tolist())
    return ConceptReport(labels=labels, purity=purity, exemplars=exemplars)

"""Relation discovery (paper Section V, Table VI).

A core entry (j_1, ..., j_N) couples column j_n of every factor matrix
with strength G_{(j_1,...,j_N)}; the largest |G| entries therefore name
the strongest cross-mode relations. For each such entry we decode the
participating columns back to concrete attribute indices by taking each
column's top-weighted rows — e.g. (drama-movies, 2015, 2pm).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


@dataclass(frozen=True)
class Relation:
    """One discovered relation: a top core entry and its decoded attributes."""

    core_index: tuple[int, ...]
    strength: float
    top_attributes: list[list[int]]  # per mode: row indices with largest weight


def top_relations(
    core: np.ndarray,
    factors: list[np.ndarray],
    *,
    n_relations: int = 3,
    n_attributes: int = 5,
    modes: list[int] | None = None,
) -> list[Relation]:
    """The ``n_relations`` largest-|value| core entries, decoded.

    Args:
        modes: if given, restrict attribute decoding to these modes
            (the paper reads movie/year/hour, skipping the user mode).
    """
    flat = np.abs(core).ravel()
    order = np.argsort(flat)[::-1][:n_relations]
    out: list[Relation] = []
    use_modes = modes if modes is not None else list(range(core.ndim))
    for f in order:
        beta = np.unravel_index(f, core.shape)
        tops = []
        for n in use_modes:
            col = factors[n][:, beta[n]]
            tops.append(np.argsort(np.abs(col))[::-1][:n_attributes].tolist())
        out.append(
            Relation(
                core_index=tuple(int(b) for b in beta),
                strength=float(core[beta]),
                top_attributes=tops,
            )
        )
    return out


def relation_hit_rate(
    relations: list[Relation],
    mode_pos: int,
    planted_sets: list[np.ndarray],
    genre_of_top_movie: np.ndarray | None = None,
    movie_mode_pos: int | None = None,
) -> float:
    """Fraction of relations whose decoded attributes for one mode overlap
    the planted peak set of the genre its movie column points at.

    For each relation, the genre is taken from the majority planted genre
    of its top movie attributes; the decoded attribute set for
    ``mode_pos`` "hits" if it intersects that genre's planted peaks.
    """
    if not relations:
        return 0.0
    hits = 0
    for r in relations:
        if genre_of_top_movie is not None and movie_mode_pos is not None:
            movie_tops = r.top_attributes[movie_mode_pos]
            genres = genre_of_top_movie[movie_tops]
            genre = np.bincount(genres).argmax()
        else:
            genre = 0
        planted = set(planted_sets[genre].tolist())
        decoded = set(r.top_attributes[mode_pos])
        if planted & decoded:
            hits += 1
    return hits / len(relations)

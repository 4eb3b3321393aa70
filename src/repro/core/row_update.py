"""Row-wise ALS update kernel (Eq. 10-12) over a batch of entries.

This is the per-partition work unit shared by the sequential reference
engine and the Spark engines: given every observed entry whose mode-n
index falls in this partition, accumulate B_{i_n} and c_{i_n} per row via
segment reductions and solve the J×J regularized systems in a batch.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.core import delta as delta_mod
from repro.tensor.linalg import solve_rows_batched


@dataclass(frozen=True)
class RowUpdateResult:
    """Updated rows for one partition: ``rows[k]`` is the new a^(n)_{indices[k]}."""

    indices: np.ndarray  # (R,) int64 mode-n indices present in this batch
    rows: np.ndarray  # (R, J_n) updated factor rows


def _segments(sorted_keys: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """Unique keys and segment start offsets of a sorted key array."""
    uniq, starts = np.unique(sorted_keys, return_index=True)
    return uniq, starts


def accumulate_b_c(
    delta: np.ndarray, vals: np.ndarray, seg_starts: np.ndarray
) -> tuple[np.ndarray, np.ndarray]:
    """Segment-sum B = Σ δδᵀ (Eq. 11) and c = Σ X_α δ (Eq. 12).

    ``delta``/``vals`` must already be sorted by the grouping key;
    ``seg_starts`` are the segment offsets. Returns (R,J,J) and (R,J).
    """
    e, j = delta.shape
    outer = (delta[:, :, None] * delta[:, None, :]).reshape(e, j * j)
    b = np.add.reduceat(outer, seg_starts, axis=0).reshape(-1, j, j)
    c = np.add.reduceat(vals[:, None] * delta, seg_starts, axis=0)
    return b, c


def update_rows(
    idx: np.ndarray,
    vals: np.ndarray,
    core: np.ndarray,
    factors: list[np.ndarray],
    mode: int,
    lam: float,
    core_coo: tuple[np.ndarray, np.ndarray] | None = None,
    pres: np.ndarray | None = None,
) -> RowUpdateResult:
    """Update every factor row of mode ``mode`` observed in this batch.

    Args:
        idx, vals: observed entries (complete row groups for this mode).
        core: dense core tensor (used directly, or as shape metadata).
        factors: current factor matrices.
        mode: mode being updated.
        lam: L2 regularization λ.
        core_coo: optional (core_idx, core_vals) — use the sparse-core δ
            path (P-Tucker-Approx).
        pres: optional (E, |G|) cache table aligned with ``idx`` — use the
            divide-out δ path (P-Tucker-Cache).
    """
    if len(vals) == 0:
        j = core.shape[mode]
        return RowUpdateResult(np.zeros(0, np.int64), np.zeros((0, j)))
    order = np.argsort(idx[:, mode], kind="stable")
    s_idx, s_vals = idx[order], vals[order]
    if pres is not None:
        d = delta_mod.delta_from_pres(pres[order], core, factors, s_idx, mode)
    elif core_coo is not None:
        c_idx, c_vals = core_coo
        d = delta_mod.delta_sparse(
            c_idx, c_vals, core.shape[mode], factors, s_idx, mode
        )
    else:
        d = delta_mod.delta_dense(core, factors, s_idx, mode)
    uniq, starts = _segments(s_idx[:, mode])
    b, c = accumulate_b_c(d, s_vals, starts)
    new_rows = solve_rows_batched(b, c, lam)
    return RowUpdateResult(uniq.astype(np.int64), new_rows)


def sse_partial(
    idx: np.ndarray,
    vals: np.ndarray,
    core: np.ndarray,
    factors: list[np.ndarray],
    core_coo: tuple[np.ndarray, np.ndarray] | None = None,
) -> tuple[float, int]:
    """Partial sum of squared residuals over a batch (Eq. 6 inner sum)."""
    if len(vals) == 0:
        return 0.0, 0
    if core_coo is not None:
        c_idx, c_vals = core_coo
        pred = delta_mod.predictions_sparse_core(
            c_idx, c_vals, core.shape, factors, idx
        )
    else:
        pred = delta_mod.predictions(core, factors, idx)
    r = vals - pred
    return float(np.dot(r, r)), len(vals)


def rerror_partial(
    idx: np.ndarray,
    vals: np.ndarray,
    core_idx: np.ndarray,
    core_vals: np.ndarray,
    ranks: tuple[int, ...],
    factors: list[np.ndarray],
) -> np.ndarray:
    """Partial R(β) vector (Eq. 14) over a batch of entries.

    With t_{αβ} = G_β Π_n a^(n)_{i_n β_n} and S_α = Σ_γ t_{αγ} (the full
    prediction), Eq. 14 reduces to R(β) = Σ_α t_{αβ}(2(S_α − X_α) − t_{αβ}).
    Returns a length-|G| array aligned with ``core_vals``.

    The (E_chunk × |G|) t-matrix is built either by one progressive
    Kronecker block over the full core grid (cheap while the core is
    still mostly dense) or per-column COO products (cheap once heavily
    truncated); S comes from the same t, so no extra prediction pass.
    """
    g_total = len(core_vals)
    out = np.zeros(g_total, dtype=np.float64)
    if len(vals) == 0 or g_total == 0:
        return out
    n_modes = len(ranks)
    full = int(np.prod(ranks))
    flat_pos = np.ravel_multi_index(tuple(core_idx.T), ranks)
    dense_path = g_total >= full / (n_modes + 1)
    width = full if dense_path else g_total
    e_chunk = max(1, 4_000_000 // max(1, width))
    for es in range(0, len(vals), e_chunk):
        e = slice(es, min(es + e_chunk, len(vals)))
        if dense_path:
            block = delta_mod.full_product_block(factors, idx[e], ranks)
            t = block[:, flat_pos] * core_vals[None, :]
        else:
            t = np.broadcast_to(
                core_vals, (e.stop - e.start, g_total)
            ).copy()
            for k in range(n_modes):
                t *= factors[k][idx[e, k][:, None], core_idx[None, :, k]]
        s = t.sum(axis=1)  # Eq. 5 prediction against the current core
        resid2 = 2.0 * (s - vals[e])
        out += (t * (resid2[:, None] - t)).sum(axis=0)
    return out

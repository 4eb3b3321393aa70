"""Tucker-wOPT-like baseline (Filipović & Jukić, 2015).

The accuracy-focused competitor: minimizes the *observed-only* loss
‖W ∘ (X − G ×_1 A^(1) … ×_N A^(N))‖² with a nonlinear gradient method
(here: steepest descent with Armijo backtracking, a simplification of
wOPT's nonlinear conjugate gradients that preserves its two defining
traits). Those traits are what the paper measures:

* accuracy ✓ — it optimizes over observed entries only, like P-Tucker;
* scale ✗  — it works on the *dense* tensor (X, W, and the residual all
  materialized as I^N arrays, gradients via dense n-mode products with
  O(I^{N-1}·J) intermediates), so memory explodes with order and
  dimensionality. The paper sees O.O.M. at N≥5 (I=100) and I≥10^4
  (N=3) on a 512 GB box; the ``mem_budget`` guard reproduces that
  pattern deterministically at our scaled-down budget.

Runs on the driver by construction — the dense representation *is* the
algorithm; the sparse input is collected from the Spark DataFrame.
"""
from __future__ import annotations

import time

import numpy as np

from repro.baselines.common import ensure_budget
from repro.core.config import PTuckerResult, converged
from repro.tensor.coo import CooTensor
from repro.tensor.linalg import init_factors
from repro.tensor.ops import multi_mode_product, unfold


def _dense_footprint_bytes(shape: tuple[int, ...], ranks: tuple[int, ...]) -> int:
    """Bytes of the dense working set: X, W, residual, one gradient scratch
    tensor, plus the largest n-mode-product intermediate O(I^{N-1}·J)."""
    full = int(np.prod(shape))
    inter = 0
    for n in range(len(shape)):
        rest = int(np.prod([shape[k] for k in range(len(shape)) if k != n]))
        inter = max(inter, rest * ranks[n])
    return (4 * full + inter) * 8


def _loss_and_grads(
    x: np.ndarray,
    w: np.ndarray,
    core: np.ndarray,
    factors: list[np.ndarray],
) -> tuple[float, np.ndarray, list[np.ndarray]]:
    recon = multi_mode_product(core, list(factors))
    e = w * (recon - x)
    loss = float(np.sum(e * e))
    g_core = multi_mode_product(e, [a.T for a in factors])
    g_factors = []
    for n in range(len(factors)):
        t = e
        for k in range(len(factors)):
            if k != n:
                t = multi_mode_product(t, [None] * k + [factors[k].T] + [None] * (len(factors) - k - 1))
        g_factors.append(2.0 * unfold(t, n) @ unfold(core, n).T)
    return loss, 2.0 * g_core, g_factors


def factorize_wopt(
    tensor: CooTensor,
    ranks: tuple[int, ...],
    *,
    max_iters: int = 20,
    tol: float = 1e-4,
    seed: int = 0,
    mem_budget: int | None = None,
    step0: float = 1e-2,
    inner_steps: int = 10,
) -> PTuckerResult:
    """Run the dense observed-weighted gradient method on a COO tensor.

    One recorded "iteration" performs ``inner_steps`` line-searched
    descent steps: wOPT's nonlinear-CG iterations do substantially more
    work (and progress) per iteration than a single steepest-descent
    step, and the paper's per-iteration timings reflect that.
    """
    ensure_budget(
        _dense_footprint_bytes(tensor.shape, tuple(ranks)),
        mem_budget,
        "Tucker-wOPT dense working set",
    )
    x = tensor.to_dense()
    w = tensor.mask_dense()
    factors, core = init_factors(tensor.shape, tuple(ranks), seed)
    result = PTuckerResult(factors=factors, core=core)
    step = step0
    loss, g_core, g_factors = _loss_and_grads(x, w, core, factors)
    for _ in range(max_iters):
        t0 = time.perf_counter()
        for _inner in range(inner_steps):
            # Armijo backtracking on a joint steepest-descent step.
            for _try in range(30):
                new_core = core - step * g_core
                new_factors = [a - step * g for a, g in zip(factors, g_factors)]
                new_loss, n_gc, n_gf = _loss_and_grads(
                    x, w, new_core, new_factors
                )
                if new_loss < loss:
                    core, factors = new_core, new_factors
                    loss, g_core, g_factors = new_loss, n_gc, n_gf
                    step *= 1.5  # expand while progress is easy
                    break
                step *= 0.5
        result.errors.append(float(np.sqrt(loss)))
        result.core_nnz_history.append(core.size)
        result.iter_times.append(time.perf_counter() - t0)
        if converged(result.errors, tol):
            result.converged = True
            break
    result.factors, result.core = factors, core
    return result

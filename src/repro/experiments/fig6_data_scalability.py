"""Figure 6: data scalability of P-Tucker vs competitors.

Four sweeps over synthetic random tensors (Section IV-B1), each
reporting average seconds/iteration per method, with O.O.M. where a
method's simulated-memory budget is exceeded:

  (a) order N          — paper: N=3..10,  I=100,  |Ω|=10^3, J=3
  (b) dimensionality I — paper: 10^2..10^7, |Ω|=10·I, J=10
  (c) non-zeros |Ω|    — paper: 10^3..10^7, I=10^7, J=10
  (d) rank J           — paper: 3..11 step 2, I=10^6, |Ω|=10^7

Scaled grids (DESIGN.md substitutions) keep the same geometry ~10-100×
smaller; the wOPT budget is scaled with them so its O.O.M. point lands
at the same *relative* position (paper: N≥5 and I≥10^4 on 512 GB).
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.baselines import (
    factorize_csf,
    factorize_shot,
    factorize_wopt,
)
from repro.core.config import PTuckerConfig
from repro.core.ptucker import factorize as factorize_ptucker
from repro.experiments.harness import OOM, mean_iter_time_or_oom, run_timed
from repro.synth_data import sparse_tensor_uniform
from repro.tensor.spark_tensor import ModePartitionedTensor

# Scaled-down analogue of the paper's 512 GB box for the dense baseline.
WOPT_BUDGET = 4 * 10**9

METHODS = ("P-Tucker", "S-HOT", "Tucker-CSF", "Tucker-wOPT")


def _run_point(
    spark: SparkSession,
    tensor,
    ranks: tuple[int, ...],
    iters: int,
    wopt_budget: int | None = None,
    methods: tuple[str, ...] = METHODS,
) -> dict:
    """Time every method on one sweep point; returns {method: s/iter}."""
    out: dict = {}
    if wopt_budget is None:
        wopt_budget = WOPT_BUDGET
    mpt = ModePartitionedTensor(tensor.to_spark(spark), tensor.shape)
    try:
        if "P-Tucker" in methods:
            cfg = PTuckerConfig(ranks=ranks, max_iters=iters, tol=0.0, seed=0)
            res, _ = run_timed(
                lambda: factorize_ptucker(spark, mpt, tensor.shape, cfg)
            )
            out["P-Tucker"] = mean_iter_time_or_oom(res)
        if "S-HOT" in methods:
            res, t = run_timed(
                lambda: factorize_shot(
                    spark, mpt, tensor.shape, ranks, max_iters=iters, tol=0.0
                )
            )
            out["S-HOT"] = mean_iter_time_or_oom(res) if t != OOM else OOM
        if "Tucker-CSF" in methods:
            res, t = run_timed(
                lambda: factorize_csf(
                    spark, mpt, tensor.shape, ranks, max_iters=iters, tol=0.0
                )
            )
            out["Tucker-CSF"] = mean_iter_time_or_oom(res) if t != OOM else OOM
        if "Tucker-wOPT" in methods:
            res, t = run_timed(
                lambda: factorize_wopt(
                    tensor,
                    ranks,
                    max_iters=iters,
                    tol=0.0,
                    mem_budget=wopt_budget,
                )
            )
            out["Tucker-wOPT"] = mean_iter_time_or_oom(res) if t != OOM else OOM
    finally:
        mpt.unpersist()
    return out


def order_sweep(
    spark: SparkSession,
    orders: tuple[int, ...] = (3, 4, 5, 6),
    i_dim: int = 100,
    nnz: int = 1000,
    rank: int = 3,
    iters: int = 3,
    wopt_budget: int | None = None,
) -> list[dict]:
    """Fig 6(a): vary tensor order N. Paper point: wOPT OOM at N≥5."""
    rows = []
    for n in orders:
        t = sparse_tensor_uniform(shape=(i_dim,) * n, nnz=nnz, seed=n)
        point = _run_point(spark, t, (rank,) * n, iters, wopt_budget)
        rows.append({"order": n} | point)
    return rows


def dim_sweep(
    spark: SparkSession,
    dims: tuple[int, ...] = (100, 1_000, 10_000, 100_000),
    nnz_per_dim: int = 10,
    rank: int = 10,
    iters: int = 3,
    wopt_budget: int | None = None,
) -> list[dict]:
    """Fig 6(b): vary dimensionality I (N=3, |Ω|=10·I). wOPT OOMs early."""
    rows = []
    for i_dim in dims:
        t = sparse_tensor_uniform(
            shape=(i_dim,) * 3, nnz=nnz_per_dim * i_dim, seed=i_dim
        )
        point = _run_point(spark, t, (rank,) * 3, iters, wopt_budget)
        rows.append({"dim": i_dim} | point)
    return rows


def nnz_sweep(
    spark: SparkSession,
    nnzs: tuple[int, ...] = (1_000, 10_000, 100_000, 1_000_000),
    i_dim: int = 100_000,
    rank: int = 10,
    iters: int = 3,
    wopt_budget: int | None = None,
) -> list[dict]:
    """Fig 6(c): vary |Ω| (N=3, fixed I). P-Tucker scales ~linearly."""
    rows = []
    for nnz in nnzs:
        t = sparse_tensor_uniform(shape=(i_dim,) * 3, nnz=nnz, seed=nnz % 997)
        point = _run_point(spark, t, (rank,) * 3, iters, wopt_budget)
        rows.append({"nnz": nnz} | point)
    return rows


def rank_sweep(
    spark: SparkSession,
    ranks: tuple[int, ...] = (3, 5, 7, 9, 11),
    i_dim: int = 10_000,
    nnz: int = 100_000,
    iters: int = 3,
    wopt_budget: int | None = None,
) -> list[dict]:
    """Fig 6(d): vary core rank J (N=3)."""
    rows = []
    t = sparse_tensor_uniform(shape=(i_dim,) * 3, nnz=nnz, seed=42)
    for j in ranks:
        point = _run_point(spark, t, (j,) * 3, iters, wopt_budget)
        rows.append({"rank": j} | point)
    return rows

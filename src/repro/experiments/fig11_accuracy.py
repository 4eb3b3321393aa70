"""Figure 11: accuracy on (stand-in) real-world tensors.

Protocol from Section IV-A1/IV-E: 90% of observed entries train, 10%
test; metrics are the training reconstruction error (Eq. 6) and the test
RMSE of Eq. 5 predictions. The paper's shape: P-Tucker (and Approx,
which is similar-or-better on test RMSE) beat the zero-filling HOOI
family by 1.4-4.8× on both metrics; wOPT is accurate where it fits in
memory and O.O.M. on the large tensors.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.baselines import factorize_csf, factorize_shot, factorize_wopt
from repro.core.config import PTuckerConfig
from repro.core.metrics import reconstruction_error, rmse
from repro.core.ptucker import factorize as factorize_ptucker
from repro.experiments.fig7_realworld import WOPT_BUDGET, datasets
from repro.experiments.harness import OOM, run_timed
from repro.tensor.spark_tensor import ModePartitionedTensor


def accuracy_eval(
    spark: SparkSession,
    iters: int = 10,
    scale: float = 1.0,
    test_frac: float = 0.1,
) -> list[dict]:
    """Train recon error + test RMSE per method per stand-in dataset."""
    rows = []
    for name, tensor, ranks in datasets(scale):
        train, test = tensor.split(test_frac, seed=1234)
        mpt = ModePartitionedTensor(train.to_spark(spark), train.shape)
        try:
            for label, variant in (
                ("P-Tucker", "default"),
                ("P-Tucker-Approx", "approx"),
            ):
                cfg = PTuckerConfig(
                    ranks=ranks, max_iters=iters, tol=1e-4, variant=variant
                )
                res = factorize_ptucker(spark, mpt, train.shape, cfg)
                rows.append(
                    {
                        "dataset": name,
                        "method": label,
                        "recon error": reconstruction_error(
                            train, res.core, res.factors
                        ),
                        "test RMSE": rmse(test, res.core, res.factors),
                    }
                )
            for label, fn in (
                ("S-HOT", factorize_shot),
                ("Tucker-CSF", factorize_csf),
            ):
                res, t = run_timed(
                    lambda: fn(
                        spark,
                        mpt,
                        train.shape,
                        ranks,
                        max_iters=iters,
                        tol=1e-4,
                    )
                )
                rows.append(
                    {
                        "dataset": name,
                        "method": label,
                        "recon error": OOM
                        if t == OOM
                        else reconstruction_error(train, res.core, res.factors),
                        "test RMSE": OOM
                        if t == OOM
                        else rmse(test, res.core, res.factors),
                    }
                )
            res, t = run_timed(
                lambda: factorize_wopt(
                    train,
                    ranks,
                    max_iters=iters,
                    tol=1e-4,
                    mem_budget=WOPT_BUDGET,
                )
            )
            rows.append(
                {
                    "dataset": name,
                    "method": "Tucker-wOPT",
                    "recon error": OOM
                    if t == OOM
                    else reconstruction_error(train, res.core, res.factors),
                    "test RMSE": OOM
                    if t == OOM
                    else rmse(test, res.core, res.factors),
                }
            )
        finally:
            mpt.unpersist()
    return rows

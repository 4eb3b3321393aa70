"""Evaluation metrics: reconstruction error (Eq. 6), fit, and test RMSE.

The paper evaluates with (a) reconstruction error over the training
(observed) entries and (b) RMSE over a held-out 10% of the observed
entries, predicted via Eq. 5. Both NumPy (driver) and Spark paths are
provided; the Spark path is a single ``mapInPandas`` sweep emitting
per-partition partials (paper Section III-D, "Section 3" parallelism).
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

from repro.core import delta as delta_mod
from repro.tensor.coo import CooTensor
from repro.tensor.spark_tensor import entry_columns


def predict(core: np.ndarray, factors: list[np.ndarray], idx: np.ndarray) -> np.ndarray:
    """Eq. 5 predictions for arbitrary (possibly unobserved) indices."""
    return delta_mod.predictions(core, factors, idx)


def reconstruction_error(
    tensor: CooTensor, core: np.ndarray, factors: list[np.ndarray]
) -> float:
    """Eq. 6: sqrt of the sum of squared residuals over observed entries."""
    pred = predict(core, factors, tensor.idx)
    r = tensor.vals - pred
    return float(np.sqrt(np.dot(r, r)))


def fit(tensor: CooTensor, core: np.ndarray, factors: list[np.ndarray]) -> float:
    """fit = 1 − ‖X − X'‖ / ‖X‖ over observed entries (Section IV-C)."""
    return 1.0 - reconstruction_error(tensor, core, factors) / tensor.norm()


def rmse(tensor: CooTensor, core: np.ndarray, factors: list[np.ndarray]) -> float:
    """Root-mean-square error of Eq. 5 predictions on ``tensor``'s entries."""
    pred = predict(core, factors, tensor.idx)
    r = tensor.vals - pred
    return float(np.sqrt(np.mean(r * r)))


def spark_reconstruction_error(
    entries: DataFrame,
    shape: tuple[int, ...],
    core: np.ndarray,
    factors: list[np.ndarray],
) -> float:
    """Distributed Eq. 6 over an entries DataFrame."""
    order = len(shape)
    sc = entries.sparkSession.sparkContext
    bc = sc.broadcast((core, factors))

    def run(pdfs: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        frames = list(pdfs)
        if not frames:
            yield pd.DataFrame({"sse": [0.0]})
            return
        pdf = pd.concat(frames, ignore_index=True)
        idx = np.stack(
            [pdf[c].to_numpy(np.int64) for c in entry_columns(order)], axis=1
        )
        c, f = bc.value
        pred = delta_mod.predictions(c, f, idx)
        r = pdf["val"].to_numpy(np.float64) - pred
        yield pd.DataFrame({"sse": [float(np.dot(r, r))]})

    parts = entries.mapInPandas(run, schema="sse double").toPandas()
    bc.unpersist()
    return float(np.sqrt(parts["sse"].sum()))

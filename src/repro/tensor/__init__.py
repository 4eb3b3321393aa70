"""Sparse-tensor substrate: COO representation, tensor ops, Spark bridge."""
from repro.tensor.coo import CooTensor
from repro.tensor.ops import (
    kron_rows,
    matricization_col_index,
    mode_n_product,
    reconstruct_dense,
    ttmc_dense,
)

__all__ = [
    "CooTensor",
    "kron_rows",
    "matricization_col_index",
    "mode_n_product",
    "reconstruct_dense",
    "ttmc_dense",
]

"""Table IV: the dataset inventory, paper vs this reproduction.

Each paper dataset is matched by a synthetic stand-in (DESIGN.md). The
rows report the paper's (order, dimensionality, |Ω|, rank) next to the
stand-in actually generated here, so the scale-down is explicit.
"""
from __future__ import annotations

from repro.experiments.fig7_realworld import datasets

PAPER = [
    ("Yahoo-music", 4, "(1M, 625K, 133, 24)", "252M", 10),
    ("MovieLens", 4, "(138K, 27K, 21, 24)", "20M", 10),
    ("Video (Wave)", 4, "(112, 160, 3, 32)", "160K", 3),
    ("Image (Lena)", 3, "(256, 256, 3)", "20K", 3),
]


def dataset_table(scale: float = 1.0) -> list[dict]:
    """Paper spec vs generated stand-in spec."""
    rows = []
    for (name, order, dims, nnz, rank), (sname, tensor, ranks) in zip(
        PAPER, datasets(scale)
    ):
        rows.append(
            {
                "Paper dataset": name,
                "Paper order": order,
                "Paper dims": dims,
                "Paper nnz": nnz,
                "Paper rank": rank,
                "Stand-in": sname,
                "Stand-in dims": str(tensor.shape),
                "Stand-in nnz": tensor.nnz,
                "Stand-in rank": max(ranks),
            }
        )
    return rows

"""Competitor Tucker-factorization baselines (Section IV-A2)."""
from repro.baselines.common import SimulatedOOM
from repro.baselines.hooi import factorize_hooi
from repro.baselines.shot_scan import factorize_shot
from repro.baselines.tucker_csf import factorize_csf
from repro.baselines.tucker_wopt import factorize_wopt

__all__ = [
    "SimulatedOOM",
    "factorize_hooi",
    "factorize_shot",
    "factorize_csf",
    "factorize_wopt",
]

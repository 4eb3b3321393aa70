"""Shared experiment harness: method registry, timing, table rendering.

Every experiment module produces a list of row dicts; ``format_table``
renders them as GitHub markdown so jobs can be pasted straight into
EXPERIMENTS.md. Methods that exceed their simulated-memory budget are
recorded as ``O.O.M.`` — the same presentation the paper uses.
"""
from __future__ import annotations

import time
from typing import Any, Callable

from repro.baselines.common import SimulatedOOM

OOM = "O.O.M."


def run_timed(fn: Callable[[], Any]) -> tuple[Any, float | str]:
    """Run ``fn``; return (result, wall seconds) or (None, "O.O.M.")."""
    t0 = time.perf_counter()
    try:
        out = fn()
    except SimulatedOOM:
        return None, OOM
    return out, time.perf_counter() - t0


def mean_iter_time_or_oom(result_or_none) -> float | str:
    """Paper speed metric: average elapsed seconds per iteration."""
    if result_or_none is None:
        return OOM
    return result_or_none.mean_iter_time


def fmt(v: Any) -> str:
    """Human formatting: seconds/floats to 4 sig figs, pass-through strings."""
    if isinstance(v, float):
        if v == 0:
            return "0"
        return f"{v:.4g}"
    return str(v)


def format_table(title: str, rows: list[dict], columns: list[str] | None = None) -> str:
    """Render rows as a titled GitHub-markdown table."""
    if not rows:
        return f"### {title}\n\n(no rows)\n"
    cols = columns or list(rows[0].keys())
    lines = [f"### {title}", "", "| " + " | ".join(cols) + " |"]
    lines.append("|" + "|".join("---" for _ in cols) + "|")
    for r in rows:
        lines.append("| " + " | ".join(fmt(r.get(c, "")) for c in cols) + " |")
    return "\n".join(lines) + "\n"


def speedup_over(rows: list[dict], time_col: str, base: float) -> None:
    """Annotate rows in place with a speed-up column relative to ``base``."""
    for r in rows:
        t = r.get(time_col)
        r["speedup"] = base / t if isinstance(t, float) and t > 0 else ""

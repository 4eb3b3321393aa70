"""One-off re-measurement of the pieces improved after the first full run:

* Fig 7 — with the hybrid dense/sparse-core kernels for P-Tucker-Approx;
* Fig 10 — at |Ω|=10^6 so per-task compute dominates the fixed overhead;
* Table III — kernel-only |Ω| scaling slope.
"""
from _session import get_session

from repro.experiments.fig7_realworld import realworld_speed
from repro.experiments.fig10_threads import thread_scalability
from repro.experiments.harness import format_table
from repro.experiments.table3_complexity import kernel_nnz_scaling


def main() -> None:
    spark = get_session("rerun-followups")

    rows = realworld_speed(spark)
    print(format_table("Fig 7 — time/iter (s) on real-world stand-ins", rows), flush=True)

    rows = thread_scalability(spark, nnz=1_000_000, iters=2)
    print(format_table("Fig 10 — speed-up and memory vs T (|Omega|=10^6)", rows), flush=True)

    k_rows, k_slope = kernel_nnz_scaling()
    print(format_table("Table III — kernel-only |Omega| scaling", k_rows))
    print(f"kernel log-log slope: {k_slope:.3f} (theory ~1)", flush=True)

    spark.stop()


if __name__ == "__main__":
    main()

"""Run every experiment except Fig 6 in one session, reusing shared rows.

Tables I and III both need the Fig 6(c) nnz sweep and Fig 11 accuracy
rows; running everything in one session avoids re-measuring them. The
per-table jobs remain for regenerating any single table. Fig 6 has its
own entrypoint because it is by far the longest sweep.

Usage: python jobs/run_all.py [--fig6]   (--fig6 also re-runs the sweeps)
"""
import sys

from _session import get_session

from repro.experiments.fig6_data_scalability import nnz_sweep
from repro.experiments.fig7_realworld import realworld_speed
from repro.experiments.fig8_cache import cache_tradeoff
from repro.experiments.fig9_approx import approx_tradeoff
from repro.experiments.fig10_threads import thread_scalability
from repro.experiments.fig11_accuracy import accuracy_eval
from repro.experiments.harness import format_table
from repro.experiments.table1_summary import derive_summary
from repro.experiments.table3_complexity import (
    memory_class_table,
    nnz_scaling_exponent,
)
from repro.experiments.table5_concepts import concept_discovery
from repro.experiments.table6_relations import relation_discovery


def main() -> None:
    spark = get_session("run-all-experiments")
    threads = spark.sparkContext.defaultParallelism

    rows = realworld_speed(spark)
    print(format_table("Fig 7 — time/iter (s) on real-world stand-ins", rows), flush=True)

    rows = cache_tradeoff(spark)
    print(format_table("Fig 8 — cache time/memory trade-off", rows), flush=True)

    rows = approx_tradeoff(spark)
    print(format_table("Fig 9 — approx time/fit per iteration", rows), flush=True)

    rows = thread_scalability(spark)
    print(format_table("Fig 10 — speed-up and memory vs T", rows), flush=True)

    acc_rows = accuracy_eval(spark)
    print(format_table("Fig 11 — recon error + test RMSE", acc_rows), flush=True)

    t5_rows, purity = concept_discovery(spark)
    print(format_table("Table V — concept exemplars (planted MovieLens)", t5_rows))
    print(f"cluster purity vs planted genres: {purity:.3f}\n", flush=True)

    t6_rows, hits = relation_discovery(spark)
    print(format_table("Table VI — top core-tensor relations", t6_rows))
    print(
        f"hit rate vs planted peaks: year={hits['year']:.2f} hour={hits['hour']:.2f}\n",
        flush=True,
    )

    nnz_rows = nnz_sweep(spark)
    print(format_table("Fig 6(c) rerun for Tables I/III", nnz_rows), flush=True)

    slope = nnz_scaling_exponent(nnz_rows)
    print(f"Table III — P-Tucker time vs |Omega| log-log slope: {slope:.3f} (theory ~1)\n")
    rows = memory_class_table(
        nnz=1_000_000, i_dim=100_000, rank=10, order=3, threads=threads
    )
    print(format_table("Table III — intermediate-memory classes @ point", rows), flush=True)

    rows = derive_summary(
        nnz_rows, acc_rows, i_dim=100_000, rank=10, order=3, threads=threads
    )
    print(format_table("Table I — derived scalability summary", rows), flush=True)

    spark.stop()


if __name__ == "__main__":
    main()

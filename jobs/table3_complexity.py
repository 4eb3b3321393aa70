"""spark-submit entrypoint for Table III (complexity validation)."""
from _session import get_session

from repro.experiments.fig6_data_scalability import nnz_sweep
from repro.experiments.harness import format_table
from repro.experiments.table3_complexity import (
    kernel_nnz_scaling,
    memory_class_table,
    nnz_scaling_exponent,
)


def main() -> None:
    spark = get_session("table3-complexity")
    nnz_rows = nnz_sweep(spark)
    slope = nnz_scaling_exponent(nnz_rows)
    print(f"P-Tucker time vs |Omega| log-log slope: {slope:.3f} (theory ~1)\n")
    k_rows, k_slope = kernel_nnz_scaling()
    print(format_table("Table III — kernel-only |Omega| scaling", k_rows))
    print(f"kernel log-log slope: {k_slope:.3f} (theory ~1)\n")
    rows = memory_class_table(
        nnz=1_000_000,
        i_dim=100_000,
        rank=10,
        order=3,
        threads=spark.sparkContext.defaultParallelism,
    )
    print(format_table("Table III — intermediate-memory classes @ point", rows))
    spark.stop()


if __name__ == "__main__":
    main()

"""spark-submit entrypoint for Table I (derived scalability summary)."""
from _session import get_session

from repro.experiments.fig6_data_scalability import nnz_sweep
from repro.experiments.fig11_accuracy import accuracy_eval
from repro.experiments.harness import format_table
from repro.experiments.table1_summary import derive_summary


def main() -> None:
    spark = get_session("table1-summary")
    nnz_rows = nnz_sweep(spark)
    acc_rows = accuracy_eval(spark, iters=5, scale=0.3)
    rows = derive_summary(
        nnz_rows,
        acc_rows,
        i_dim=100_000,
        rank=10,
        order=3,
        threads=spark.sparkContext.defaultParallelism,
    )
    print(format_table("Table I — derived scalability summary", rows))
    spark.stop()


if __name__ == "__main__":
    main()

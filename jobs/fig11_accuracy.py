"""spark-submit entrypoint for Figure 11 (real-world accuracy)."""
from _session import get_session

from repro.experiments.fig11_accuracy import accuracy_eval
from repro.experiments.harness import format_table


def main() -> None:
    spark = get_session("fig11-accuracy")
    rows = accuracy_eval(spark)
    print(format_table("Fig 11 — recon error + test RMSE", rows))
    spark.stop()


if __name__ == "__main__":
    main()

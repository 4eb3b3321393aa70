"""spark-submit entrypoint for Figure 9 (P-Tucker vs P-Tucker-Approx)."""
from _session import get_session

from repro.experiments.fig9_approx import approx_tradeoff
from repro.experiments.harness import format_table


def main() -> None:
    spark = get_session("fig9-approx-tradeoff")
    rows = approx_tradeoff(spark)
    print(format_table("Fig 9 — approx time/fit per iteration", rows))
    spark.stop()


if __name__ == "__main__":
    main()

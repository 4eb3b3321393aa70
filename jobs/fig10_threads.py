"""spark-submit entrypoint for Figure 10 (thread/partition scalability)."""
from _session import get_session

from repro.experiments.fig10_threads import thread_scalability
from repro.experiments.harness import format_table


def main() -> None:
    spark = get_session("fig10-thread-scalability")
    rows = thread_scalability(spark)
    print(format_table("Fig 10 — speed-up and memory vs T", rows))
    spark.stop()


if __name__ == "__main__":
    main()

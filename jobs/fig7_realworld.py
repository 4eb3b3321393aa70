"""spark-submit entrypoint for Figure 7 (real-world speed, stand-ins)."""
from _session import get_session

from repro.experiments.fig7_realworld import realworld_speed
from repro.experiments.harness import format_table


def main() -> None:
    spark = get_session("fig7-realworld-speed")
    rows = realworld_speed(spark)
    print(format_table("Fig 7 — time/iter (s) on real-world stand-ins", rows))
    spark.stop()


if __name__ == "__main__":
    main()

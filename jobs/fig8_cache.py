"""spark-submit entrypoint for Figure 8 (P-Tucker vs P-Tucker-Cache)."""
from _session import get_session

from repro.experiments.fig8_cache import cache_tradeoff
from repro.experiments.harness import format_table


def main() -> None:
    spark = get_session("fig8-cache-tradeoff")
    rows = cache_tradeoff(spark)
    print(format_table("Fig 8 — cache time/memory trade-off", rows))
    spark.stop()


if __name__ == "__main__":
    main()

"""spark-submit entrypoint for Table V (concept discovery)."""
from _session import get_session

from repro.experiments.harness import format_table
from repro.experiments.table5_concepts import concept_discovery


def main() -> None:
    spark = get_session("table5-concepts")
    rows, purity = concept_discovery(spark)
    print(format_table("Table V — concept exemplars (planted MovieLens)", rows))
    print(f"cluster purity vs planted genres: {purity:.3f}")
    spark.stop()


if __name__ == "__main__":
    main()

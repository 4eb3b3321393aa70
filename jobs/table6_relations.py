"""spark-submit entrypoint for Table VI (relation discovery)."""
from _session import get_session

from repro.experiments.harness import format_table
from repro.experiments.table6_relations import relation_discovery


def main() -> None:
    spark = get_session("table6-relations")
    rows, hits = relation_discovery(spark)
    print(format_table("Table VI — top core-tensor relations", rows))
    print(f"hit rate vs planted peaks: year={hits['year']:.2f} hour={hits['hour']:.2f}")
    spark.stop()


if __name__ == "__main__":
    main()

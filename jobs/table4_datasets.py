"""Entrypoint for Table IV (dataset inventory, paper vs stand-ins)."""
from repro.experiments.harness import format_table
from repro.experiments.table4_datasets import dataset_table


def main() -> None:
    print(format_table("Table IV — datasets, paper vs stand-ins", dataset_table()))


if __name__ == "__main__":
    main()

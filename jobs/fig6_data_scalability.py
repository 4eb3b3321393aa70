"""spark-submit entrypoint for Figure 6 (data scalability sweeps a-d)."""
from _session import get_session

from repro.experiments.fig6_data_scalability import (
    dim_sweep,
    nnz_sweep,
    order_sweep,
    rank_sweep,
)
from repro.experiments.harness import format_table


def main() -> None:
    spark = get_session("fig6-data-scalability")
    print(format_table("Fig 6(a) — time/iter (s) vs order N", order_sweep(spark)))
    print(format_table("Fig 6(b) — time/iter (s) vs dimensionality I", dim_sweep(spark)))
    print(format_table("Fig 6(c) — time/iter (s) vs |Omega|", nnz_sweep(spark)))
    print(format_table("Fig 6(d) — time/iter (s) vs rank J", rank_sweep(spark)))
    spark.stop()


if __name__ == "__main__":
    main()

"""Pruning ablation — the runtime numbers behind the paper's Figs. 6-7.

Figures are out of scope for this reproduction; this job prints the
NoPrune / Apriori / Trans / All runtimes and speedups the figures plot.
"""
from _common import emit, get_spark

from repro import tables


def main() -> None:
    spark = get_spark("ablation")
    df = tables.pruning_ablation(spark)
    emit(
        "ablation_pruning",
        tables.format_table(df, "Pruning ablation (Figs. 6-7 data)"),
    )


if __name__ == "__main__":
    main()

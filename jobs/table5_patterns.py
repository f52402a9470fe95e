"""Table V — number of extracted patterns over the (sigma, delta) grid."""
from _common import emit, get_spark

from repro import tables


def main() -> None:
    spark = get_spark("table5")
    df = tables.table5(spark)
    emit("table5", tables.format_table(df, "Table V — extracted pattern counts (lite vs paper)"))


if __name__ == "__main__":
    main()

"""Table VII — runtime comparison of all 8 methods over the grid."""
from _common import emit, get_spark

from repro import tables


def main() -> None:
    spark = get_spark("table7")
    df = tables.table7(spark)
    emit("table7", tables.format_table(df, "Table VII — runtime comparison, seconds (lite vs paper)"))


if __name__ == "__main__":
    main()

"""Table VIII — peak-memory comparison of all 8 methods over the grid."""
from _common import emit, get_spark

from repro import tables


def main() -> None:
    spark = get_spark("table8")
    df = tables.table8(spark)
    emit("table8", tables.format_table(df, "Table VIII — peak memory, MiB (lite vs paper MB)"))


if __name__ == "__main__":
    main()

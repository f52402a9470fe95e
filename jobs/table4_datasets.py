"""Table IV — dataset characteristics of the lite synthetic datasets."""
from _common import emit, get_spark

from repro import tables


def main() -> None:
    spark = get_spark("table4")
    df = tables.table4(spark)
    emit("table4", tables.format_table(df, "Table IV — dataset characteristics (lite vs paper)"))


if __name__ == "__main__":
    main()

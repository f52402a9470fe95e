"""Table IX — accuracy of A-HTPGM vs E-HTPGM over mu and the grid."""
from _common import emit, get_spark

from repro import tables


def main() -> None:
    spark = get_spark("table9")
    df = tables.table9(spark)
    emit("table9", tables.format_table(df, "Table IX — A-HTPGM accuracy % (lite vs paper)"))


if __name__ == "__main__":
    main()

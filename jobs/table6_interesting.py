"""Table VI — qualitative sample of interesting mined patterns."""
from _common import emit, get_spark

from repro import tables


def main() -> None:
    spark = get_spark("table6")
    df = tables.table6(spark)
    emit("table6", tables.format_table(df, "Table VI — interesting patterns (lite)"))


if __name__ == "__main__":
    main()

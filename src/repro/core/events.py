"""Temporal event instance extraction (paper Def. 3.4/3.5).

Combines runs of identical consecutive symbols in a symbolic series
into instances ``(var, symbol, start, end)`` with half-open ``[start,
end)`` slot intervals (``end = last slot + 1``, matching Table III
where e.g. K's On slots 10:00–10:10 become the instance
``[10:00, 10:15]`` at 5-minute resolution).

Implemented with window functions: a run boundary is a change of
symbol *or* a gap in ``t`` (missing slots split runs); a cumulative sum
of boundary flags yields a run id; grouping by run id gives the
instance extent.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql.window import Window

#: Schema of an instances DataFrame.
INSTANCES_COLUMNS = ("var", "symbol", "start", "end")


def to_instances(symbols: DataFrame) -> DataFrame:
    """Symbol runs → event instances.

    Input: ``(var, t, symbol)``.  Output: ``(var, symbol, start, end)``
    with one row per maximal run of identical consecutive symbols.
    """
    w = Window.partitionBy("var").orderBy("t")
    prev_sym = F.lag("symbol").over(w)
    prev_t = F.lag("t").over(w)
    boundary = (
        prev_sym.isNull()
        | (prev_sym != F.col("symbol"))
        | (prev_t != F.col("t") - 1)
    ).cast("int")
    with_run = symbols.select(
        "var",
        "t",
        "symbol",
        F.sum(boundary).over(
            w.rowsBetween(Window.unboundedPreceding, Window.currentRow)
        ).alias("run_id"),
    )
    return with_run.groupBy("var", "symbol", "run_id").agg(
        F.min("t").alias("start"),
        (F.max("t") + F.lit(1)).alias("end"),
    ).select("var", "symbol", "start", "end")

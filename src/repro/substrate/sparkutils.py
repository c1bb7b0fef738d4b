"""Spark DataFrame helpers used across the EDA compute pipeline.

These are the fusion primitives: ``melt`` turns "one aggregation per
column" into "one aggregation over a (column, value) long frame" so a
single shuffle serves every column — the Spark analogue of putting all
per-column Dask computations into one graph (paper §5.2).
"""
from __future__ import annotations

from pyspark.sql import Column, DataFrame, Window
from pyspark.sql import functions as F

__all__ = ["melt", "with_row_index", "null_indicators"]


def melt(df: DataFrame, cols: list[str], var_name: str = "column", value_name: str = "value") -> DataFrame:
    """Long-format (column-name, value) frame over ``cols``.

    Values are cast to string-free common type by the caller; this wrapper
    uses Spark's native ``unpivot`` (Catalyst `Unpivot` node) so the melt is
    a zero-shuffle narrow transformation.
    """
    if not cols:
        raise ValueError("melt requires at least one column")
    return df.unpivot([], cols, var_name, value_name)


def with_row_index(df: DataFrame, name: str = "row_index") -> DataFrame:
    """Contiguous 0-based row index without collapsing to one partition.

    ``monotonically_increasing_id`` is not contiguous; a global
    ``row_number`` window is single-partition. Instead: number rows within
    each partition (parallel window over ``spark_partition_id``), count rows
    per partition, and add the driver-computed cumulative offset back via a
    broadcast join — the DataFrame version of ``zipWithIndex``.
    Ordering follows current partition layout, which is what the missing
    spectrum needs (file/row locality, not a semantic order).
    """
    pid = F.spark_partition_id()
    tagged = df.withColumn("__pid", pid).withColumn(
        "__pos",
        F.row_number().over(
            Window.partitionBy("__pid").orderBy(F.monotonically_increasing_id())
        )
        - 1,
    )
    counts = (
        tagged.groupBy("__pid").count().orderBy("__pid").collect()
    )
    offsets, acc = {}, 0
    for row in counts:
        offsets[row["__pid"]] = acc
        acc += row["count"]
    spark = df.sparkSession
    offsets_df = spark.createDataFrame(
        [(int(k), int(v)) for k, v in offsets.items()] or [(0, 0)],
        "___pid INT, __offset BIGINT",
    )
    return (
        tagged.join(
            F.broadcast(offsets_df), tagged["__pid"] == offsets_df["___pid"], "left"
        )
        .withColumn(name, F.coalesce(F.col("__pos") + F.col("__offset"), F.col("__pos")))
        .drop("__pid", "__pos", "___pid", "__offset")
    )


def _is_missing(c: Column) -> Column:
    return c.isNull() | F.isnan(c.cast("double")).eqNullSafe(F.lit(True))


def null_indicators(df: DataFrame, cols: list[str] | None = None, *, nan_is_missing: bool = True) -> DataFrame:
    """0/1 missingness indicator frame with the same column names.

    ``NaN`` in float columns counts as missing when ``nan_is_missing`` —
    matching pandas semantics that Pandas-profiling and Missingno assume.
    Non-castable types (strings) only check ``isNull``.
    """
    cols = cols or df.columns
    out = []
    for c in cols:
        dt = dict(df.dtypes)[c]
        if nan_is_missing and dt in ("double", "float"):
            ind = _is_missing(F.col(c))
        else:
            ind = F.col(c).isNull()
        out.append(ind.cast("int").alias(c))
    return df.select(out)

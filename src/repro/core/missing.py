"""Missing-value analysis — ``plot_missing`` (paper Figure 2, rows 7–9),
after the Missingno library the paper derives its mapping rules from.

* ``plot_missing(df)`` — missing bar chart, missing **spectrum** (per
  row-segment missing rate), **nullity correlation** heatmap, and a
  **dendrogram** of columns clustered by nullity similarity.
* ``plot_missing(df, c1)`` — for every other column, its distribution
  before vs after dropping the rows where ``c1`` is missing (the paper
  notes this is the most expensive task: two frequency distributions per
  column — here both distributions come out of **one** fused melted
  aggregation per type class).
* ``plot_missing(df, c1, c2)`` — histogram, PDF, CDF and box plot of
  ``c2`` before/after dropping ``c1``-missing rows.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core import compute
from repro.core.compute import missing_expr
from repro.core.config import Config
from repro.core.correlation import pearson_matrix
from repro.core.dtypes import EDAType, detect_types
from repro.core.insights import missing_insights
from repro.core.intermediates import EDAResult, Intermediates
from repro.core.render import render
from repro.substrate import numutils
from repro.substrate.cluster import cluster_order, linkage_average
from repro.substrate.sparkutils import null_indicators, with_row_index


def missing_counts_pass(df: DataFrame) -> tuple[int, pd.Series]:
    """(row count, missing count per column) in one fused aggregation."""
    exprs = [F.count(F.lit(1)).alias("\x1fnrows")] + [
        F.sum(missing_expr(df, c)).alias(c) for c in df.columns
    ]
    row = df.agg(*exprs).collect()[0].asDict()
    nrows = int(row.pop("\x1fnrows"))
    return nrows, pd.Series({c: int(v or 0) for c, v in row.items()})


def spectrum_pass(df: DataFrame, bins: int, nrows: int | None = None) -> pd.DataFrame:
    """Missing rate per (row segment, column): the missing spectrum plot.

    Rows are assigned contiguous indices with the partition-offset
    technique (no single-partition collapse), bucketed into ``bins``
    segments, melted, and aggregated in one shuffle for all columns.
    ``nrows`` (when already known from a stats pass) avoids a count job.
    """
    indexed = with_row_index(null_indicators(df).select(df.columns), "__row")
    if nrows is None:
        nrows = indexed.count()
    nrows = max(nrows, 1)
    bucket = F.least(
        F.floor(F.col("__row") * bins / F.lit(nrows)).cast("int"), F.lit(bins - 1)
    )
    out = (
        indexed.withColumn("__bucket", bucket)
        .unpivot(["__bucket"], df.columns, "column", "is_missing")
        .groupBy("__bucket", "column")
        .agg(F.avg("is_missing").alias("missing_rate"), F.count(F.lit(1)).alias("n"))
        .orderBy("__bucket", "column")
        .toPandas()
    )
    return out.rename(columns={"__bucket": "segment"})


def nullity_correlation(df: DataFrame, miss: pd.Series, nrows: int) -> pd.DataFrame:
    """Pearson correlation of missingness indicators (Missingno heatmap).

    Only columns that are partially missing participate — constant
    indicators (never / always missing) have zero variance, exactly as
    Missingno excludes them.
    """
    cols = [c for c in miss.index if 0 < miss[c] < nrows]
    if len(cols) < 2:
        return pd.DataFrame(index=cols, columns=cols, dtype="float64")
    return pearson_matrix(null_indicators(df, cols), cols)


def nullity_dendrogram(corr: pd.DataFrame) -> dict[str, object]:
    """Average-linkage dendrogram over nullity distance 1 − |corr|."""
    cols = list(corr.index)
    m = len(cols)
    if m < 2:
        return {"columns": cols, "linkage": np.zeros((0, 4)), "leaf_order": list(range(m))}
    dist = 1.0 - corr.abs().fillna(0.0).to_numpy()
    np.fill_diagonal(dist, 0.0)
    Z = linkage_average(dist)
    return {"columns": cols, "linkage": Z, "leaf_order": cluster_order(Z, m)}


def compute_missing(df: DataFrame, cfg: Config) -> Intermediates:
    """Intermediates for ``plot_missing(df)``."""
    nrows, miss = missing_counts_pass(df)
    inter = Intermediates(task="missing")
    inter["nrows"] = nrows
    inter["bar"] = miss
    inter["missing_rate"] = (miss / nrows) if nrows else miss.astype("float64")
    inter["spectrum"] = spectrum_pass(df, cfg["spectrum.bins"], nrows)
    corr = nullity_correlation(df, miss, nrows)
    inter["nullity_corr"] = corr
    inter["dendrogram"] = nullity_dendrogram(corr)
    return inter


def _before_after_numeric(
    df: DataFrame,
    num_cols: list[str],
    types,
    minmax,
    dropped: F.Column,
    bins: int,
) -> dict[str, pd.DataFrame]:
    """Histograms of each numeric column before/after dropping, fused.

    One melted shuffle produces, per (column, bin), the count over all rows
    (*before*) and over surviving rows (*after*) — the paper's "two
    frequency distributions per column" at the cost of one.
    """
    usable = [
        c for c in num_cols
        if minmax.get(c, (None, None))[0] is not None and minmax[c][1] is not None
    ]
    out: dict[str, pd.DataFrame] = {}
    if not usable:
        return out
    spark = df.sparkSession
    meta = spark.createDataFrame(
        [(c, float(minmax[c][0]), float(minmax[c][1])) for c in usable],
        "column STRING, mn DOUBLE, mx DOUBLE",
    )
    stacked = (
        df.withColumn("__dropped", dropped.cast("int"))
        .select(
            "__dropped",
            *[
                F.when(
                    F.isnan(F.col(c).cast("double")), None
                ).otherwise(F.col(c).cast("double")).alias(c)
                for c in usable
            ],
        )
        .unpivot(["__dropped"], usable, "column", "value")
        .where(F.col("value").isNotNull())
        .join(F.broadcast(meta), "column")
    )
    width = (F.col("mx") - F.col("mn")) / F.lit(bins)
    bin_expr = F.when(F.col("mx") == F.col("mn"), F.lit(0)).otherwise(
        F.least(F.floor((F.col("value") - F.col("mn")) / width).cast("int"), F.lit(bins - 1))
    )
    agg = (
        stacked.select("column", bin_expr.alias("bin"), "__dropped")
        .groupBy("column", "bin")
        .agg(
            F.count(F.lit(1)).alias("before"),
            F.sum(1 - F.col("__dropped")).alias("after"),
        )
        .toPandas()
    )
    for c in usable:
        mn, mx = float(minmax[c][0]), float(minmax[c][1])
        n_bins = bins if mx > mn else 1
        frame = pd.DataFrame(
            {
                "bin": np.arange(n_bins),
                "before": np.zeros(n_bins, dtype="int64"),
                "after": np.zeros(n_bins, dtype="int64"),
            }
        )
        sub = agg[agg["column"] == c]
        idx = sub["bin"].to_numpy(dtype="int64")
        frame.loc[idx, "before"] = sub["before"].to_numpy(dtype="int64")
        frame.loc[idx, "after"] = sub["after"].to_numpy(dtype="int64")
        frame.attrs["edges"] = (
            np.linspace(mn, mx, bins + 1) if mx > mn else np.array([mn, mn])
        )
        out[c] = frame
    return out


def _before_after_categorical(
    df: DataFrame, cat_cols: list[str], dropped: F.Column, limit: int
) -> dict[str, pd.DataFrame]:
    """Value counts of each categorical column before/after dropping, fused."""
    out: dict[str, pd.DataFrame] = {}
    if not cat_cols:
        return out
    stacked = (
        df.withColumn("__dropped", dropped.cast("int"))
        .select("__dropped", *[F.col(c).cast("string").alias(c) for c in cat_cols])
        .unpivot(["__dropped"], cat_cols, "column", "value")
        .where(F.col("value").isNotNull())
    )
    agg = (
        stacked.groupBy("column", "value")
        .agg(
            F.count(F.lit(1)).alias("before"),
            F.sum(1 - F.col("__dropped")).alias("after"),
        )
    )
    from pyspark.sql import Window

    w = Window.partitionBy("column").orderBy(F.desc("before"), F.asc("value"))
    pdf = agg.withColumn("rn", F.row_number().over(w)).where(F.col("rn") <= limit).toPandas()
    for c in cat_cols:
        sub = (
            pdf[pdf["column"] == c]
            .sort_values(["before", "value"], ascending=[False, True])
            .reset_index(drop=True)[["value", "before", "after"]]
        )
        out[c] = sub
    return out


def compute_missing_col(df: DataFrame, col1: str, cfg: Config) -> Intermediates:
    """``plot_missing(df, c1)`` — impact of dropping ``c1``-missing rows."""
    types = detect_types(df)
    if col1 not in df.columns:
        raise KeyError(col1)
    others = [c for c in df.columns if c != col1]
    num_cols = [c for c in others if types[c] is EDAType.NUMERICAL]
    cat_cols = [c for c in others if types[c] is EDAType.CATEGORICAL]

    stats = compute.basic_stats_pass(df, types)
    nrows = int(stats["__table__"]["nrows"])
    n_missing = int(stats[col1]["nmissing"])
    minmax = {c: (stats[c].get("min"), stats[c].get("max")) for c in num_cols}
    dropped = missing_expr(df, col1).cast("boolean")

    inter = Intermediates(task=f"missing:{col1}")
    inter["col"] = col1
    inter["nrows"] = nrows
    inter["n_dropped"] = n_missing
    inter["numeric"] = _before_after_numeric(
        df, num_cols, types, minmax, dropped, cfg["hist.bins"]
    )
    inter["categorical"] = _before_after_categorical(
        df, cat_cols, dropped, cfg["bar.top_n"] * 10
    )
    # Distribution-shift score per column (KS over binned histograms for
    # numeric, total-variation over value counts for categorical) feeds the
    # 'similar distribution' insight.
    shift: dict[str, float] = {}
    for c, frame in inter["numeric"].items():
        before, after = frame["before"].to_numpy("float64"), frame["after"].to_numpy("float64")
        if before.sum() and after.sum():
            shift[c] = float(
                np.abs(np.cumsum(before) / before.sum() - np.cumsum(after) / after.sum()).max()
            )
    for c, frame in inter["categorical"].items():
        b, a = frame["before"].to_numpy("float64"), frame["after"].to_numpy("float64")
        if b.sum() and a.sum():
            shift[c] = float(0.5 * np.abs(b / b.sum() - a / a.sum()).sum())
    inter["shift"] = shift
    return inter


def compute_missing_pair(df: DataFrame, col1: str, col2: str, cfg: Config) -> Intermediates:
    """``plot_missing(df, c1, c2)`` — impact of dropping on one column."""
    types = detect_types(df)
    dropped = missing_expr(df, col1).cast("boolean")
    inter = Intermediates(task=f"missing:{col1}:{col2}")
    inter["cols"] = (col1, col2)
    t2 = types[col2]
    if t2 is EDAType.NUMERICAL:
        mm_row = df.agg(
            F.min(F.col(col2).cast("double")).alias("mn"),
            F.max(F.col(col2).cast("double")).alias("mx"),
        ).collect()[0]
        minmax = {col2: (mm_row["mn"], mm_row["mx"])}
        hists = _before_after_numeric(df, [col2], types, minmax, dropped, cfg["hist.bins"])
        frame = hists.get(col2, pd.DataFrame(columns=["bin", "before", "after"]))
        inter["hist"] = frame
        b = frame["before"].to_numpy("float64") if len(frame) else np.zeros(0)
        a = frame["after"].to_numpy("float64") if len(frame) else np.zeros(0)
        inter["pdf"] = {
            "before": b / b.sum() if b.sum() else b,
            "after": a / a.sum() if a.sum() else a,
        }
        inter["cdf"] = {
            "before": np.cumsum(inter["pdf"]["before"]),
            "after": np.cumsum(inter["pdf"]["after"]),
        }
        clean2 = F.when(F.isnan(F.col(col2).cast("double")), None).otherwise(
            F.col(col2).cast("double")
        )
        box_row = df.select(
            clean2.alias("y"), dropped.alias("d")
        ).agg(
            F.percentile_approx("y", [0.25, 0.5, 0.75]).alias("q_before"),
            F.percentile_approx(F.when(~F.col("d"), F.col("y")), [0.25, 0.5, 0.75]).alias(
                "q_after"
            ),
        ).collect()[0]
        inter["box"] = {
            "before": dict(zip(("q1", "median", "q3"), box_row["q_before"] or (np.nan,) * 3)),
            "after": dict(zip(("q1", "median", "q3"), box_row["q_after"] or (np.nan,) * 3)),
        }
        if b.sum() and a.sum():
            inter["shift"] = float(np.abs(inter["cdf"]["before"] - inter["cdf"]["after"]).max())
        else:
            inter["shift"] = float("nan")
    elif t2 is EDAType.CATEGORICAL:
        bars = _before_after_categorical(df, [col2], dropped, cfg["bar.top_n"] * 10)
        frame = bars[col2]
        inter["bar"] = frame
        b, a = frame["before"].to_numpy("float64"), frame["after"].to_numpy("float64")
        inter["shift"] = (
            float(0.5 * np.abs(b / b.sum() - a / a.sum()).sum()) if b.sum() and a.sum() else float("nan")
        )
    else:
        raise TypeError("plot_missing on datetime target columns is out of scope")
    return inter


def plot_missing(
    df: DataFrame,
    col1: str | None = None,
    col2: str | None = None,
    config: dict | None = None,
) -> EDAResult:
    """Task-centric missing-value analysis (paper §3.2)."""
    cfg = Config.from_user(config)
    if col1 is None and col2 is not None:
        raise ValueError("col1 must be given when col2 is")
    if col1 is None:
        inter = compute_missing(df, cfg)
    elif col2 is None:
        inter = compute_missing_col(df, col1, cfg)
    else:
        inter = compute_missing_pair(df, col1, col2, cfg)
    insights = missing_insights(inter, cfg)
    return EDAResult(
        task=inter.task, intermediates=inter, insights=insights,
        html=render(inter, insights, cfg),
    )

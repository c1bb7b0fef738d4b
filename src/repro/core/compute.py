"""Fused Compute-module kernels (paper §4.2.2 / §5.2).

The paper's key optimization is expressing *all* computations of a task in
one lazy Dask graph so shared work is computed once. The Spark analogue
implemented here:

* ``basic_stats_pass``   — every per-column aggregate for every column in a
  **single** ``df.agg(...)`` (one scan, one job).
* ``histogram_pass``     — histograms of all numeric columns via one
  ``unpivot → groupBy(column, bin)`` (one shuffle for all columns). Bin
  edges need min/max *before* the job can be built — the Spark analogue of
  the paper's "precompute chunk sizes before constructing the graph".
* ``value_counts_pass``  — value counts of all categorical columns via one
  ``unpivot → groupBy(column, value)``.
* ``quantiles_pass``     — one ``approxQuantile`` call covering all columns.

Each pass reduces the distributed frame to a tiny pandas object; everything
downstream (KDE, Q-Q, box stats, insights) is driver-side pandas/numpy —
the paper's Dask-Computation / Pandas-Computation split.
"""
from __future__ import annotations

import math
from typing import Mapping

import numpy as np
import pandas as pd
from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

from repro.core.dtypes import EDAType

_SEP = "\x1f"  # alias separator: cannot occur in user column names

#: quantile probabilities shared by the stats table, box plot, and Q-Q plot
#: (paper §4.2: "the quantiles are computed once and distributed to each
#: visualization").
STATS_QUANTILES = (0.01, 0.05, 0.25, 0.5, 0.75, 0.95, 0.99)


def _clean(df: DataFrame, col: str, eda_type: EDAType) -> Column:
    """NaN/±inf → null for float columns so moment aggregates stay finite.

    Mirrors pandas semantics (NaN is missing) that Pandas-profiling and
    Missingno assume; infinity is counted separately by the stats pass.
    """
    c = F.col(col)
    if eda_type is EDAType.NUMERICAL:
        dtype = dict(df.dtypes)[col]
        if dtype in ("double", "float"):
            return F.when(F.isnan(c) | c.isin(float("inf"), float("-inf")), None).otherwise(c)
        return c
    return c


def missing_expr(df: DataFrame, col: str) -> Column:
    """1 when the cell is missing (null, or NaN for float columns)."""
    c = F.col(col)
    dtype = dict(df.dtypes)[col]
    if dtype in ("double", "float"):
        return (c.isNull() | F.isnan(c)).cast("long")
    return c.isNull().cast("long")


def _stat_exprs(
    df: DataFrame,
    col: str,
    eda_type: EDAType,
    quantile_probs: tuple[float, ...] | None = None,
) -> list[Column]:
    """All aggregate expressions for one column, aliased ``col<SEP>stat``."""
    c = _clean(df, col, eda_type)

    def a(stat: str, expr: Column) -> Column:
        return expr.alias(f"{col}{_SEP}{stat}")

    exprs = [
        a("count", F.count(c)),
        a("nmissing", F.sum(missing_expr(df, col))),
        # rsd=0.05 (engine default): tighter precisions blow up the HLL++
        # register buffers (~2^18 longs per column) and turn this one-scan
        # agg into minutes on small data. Exact distinct counts for
        # categoricals come from value_counts_pass anyway.
        a("distinct", F.approx_count_distinct(c)),
    ]
    if eda_type is EDAType.NUMERICAL:
        raw = F.col(col).cast("double")
        # Moments come from raw power sums (s1..s4) finished on the driver,
        # not from F.stddev/F.skewness/F.kurtosis: those declarative
        # aggregates expand to huge Welford expression trees, and a few
        # hundred of them in one fused agg exhausts the JVM code cache.
        # Four plain sums per column keep the codegen unit tiny — and the
        # driver-side finishing is exactly the paper's pandas-phase.
        cd = c.cast("double")
        exprs += [
            a("min", F.min(c).cast("double")),
            a("max", F.max(c).cast("double")),
            a("sum", F.sum(cd)),
            a("sum2", F.sum(cd * cd)),
            a("sum3", F.sum(cd * cd * cd)),
            a("sum4", F.sum(cd * cd * cd * cd)),
            a("nzero", F.sum((c == 0).cast("long"))),
            a("nnegative", F.sum((c < 0).cast("long"))),
            a("ninfinite", F.sum(raw.isin(float("inf"), float("-inf")).cast("long"))),
        ]
        if quantile_probs:
            # percentile_approx is an imperative (buffer-based) aggregate:
            # folding the quantile sketch into the same scan is free of the
            # codegen-size issues the declarative moments had, and removes
            # a whole approxQuantile pass (quantiles shared by the stats
            # table, box plot and Q-Q plot — the paper's sharing example).
            exprs.append(a("qsketch", F.percentile_approx(cd, list(quantile_probs), 10_000)))
    elif eda_type is EDAType.CATEGORICAL:
        ln = F.length(F.col(col).cast("string"))
        exprs += [
            a("len_min", F.min(ln).cast("double")),
            a("len_max", F.max(ln).cast("double")),
            a("len_mean", F.mean(ln).cast("double")),
        ]
    elif eda_type is EDAType.DATETIME:
        exprs += [
            a("min_ts", F.date_format(F.min(c), "yyyy-MM-dd HH:mm:ss")),
            a("max_ts", F.date_format(F.max(c), "yyyy-MM-dd HH:mm:ss")),
        ]
    return exprs


def _finish_moments(stats: dict[str, object]) -> None:
    """Derive mean/std/skew/kurt from the power sums, in place.

    Matches Spark semantics: ``std`` is the sample stddev (ddof=1), ``skew``
    is g1 = m3/m2^1.5 (population), ``kurt`` is excess kurtosis m4/m2²−3.
    """
    n = int(stats.get("count") or 0)
    s1, s2, s3, s4 = (stats.pop(k, None) for k in ("sum", "sum2", "sum3", "sum4"))
    stats["sum"] = s1
    if n == 0 or s1 is None:
        stats.update({"mean": None, "std": None, "skew": None, "kurt": None})
        return
    mean = s1 / n
    m2 = max((s2 - n * mean**2) / n, 0.0)
    m3 = (s3 - 3 * mean * s2 + 2 * n * mean**3) / n
    m4 = (s4 - 4 * mean * s3 + 6 * mean**2 * s2 - 3 * n * mean**4) / n
    stats["mean"] = mean
    stats["std"] = math.sqrt(m2 * n / (n - 1)) if n > 1 else None
    stats["skew"] = (m3 / m2**1.5) if m2 > 0 else float("nan")
    stats["kurt"] = (m4 / m2**2 - 3.0) if m2 > 0 else float("nan")


#: Upper bound on aggregate expressions per fused agg job. Above this the
#: generated class gets large enough to stress janino/JIT; chunking keeps
#: the job count at ceil(exprs/cap) — still O(1)-ish scans, never per-column.
_AGG_EXPR_CAP = 256


def _chunked_agg(df: DataFrame, exprs: list[Column]) -> dict[str, object]:
    """``df.agg(*exprs)`` split into bounded-size codegen units."""
    row: dict[str, object] = {}
    for i in range(0, len(exprs), _AGG_EXPR_CAP):
        row.update(df.agg(*exprs[i : i + _AGG_EXPR_CAP]).collect()[0].asDict())
    return row


def basic_stats_pass(
    df: DataFrame,
    types: Mapping[str, EDAType],
    cols: list[str] | None = None,
    quantile_probs: tuple[float, ...] | None = None,
) -> dict[str, dict[str, object]]:
    """One fused ``agg`` computing every basic statistic of every column.

    Returns ``{column: {stat: value}}`` plus the dataset row count under the
    pseudo-column ``__table__``. One Spark job (a couple for very wide
    tables, see ``_AGG_EXPR_CAP``) regardless of the number of columns —
    this is where the 4–20× of Table 2 comes from.
    """
    cols = list(cols) if cols is not None else list(types)
    exprs: list[Column] = [F.count(F.lit(1)).alias(f"__table__{_SEP}nrows")]
    for col in cols:
        exprs += _stat_exprs(df, col, types[col], quantile_probs)
    row = _chunked_agg(df, exprs)
    out: dict[str, dict[str, object]] = {}
    for key, value in row.items():
        col, stat = key.split(_SEP, 1)
        out.setdefault(col, {})[stat] = value
    for col in cols:
        if types[col] is EDAType.NUMERICAL:
            _finish_moments(out[col])
            if quantile_probs:
                sketch = out[col].pop("qsketch", None)
                out[col]["quantiles"] = (
                    {p: q for p, q in zip(quantile_probs, sketch)}
                    if sketch is not None
                    else {p: None for p in quantile_probs}
                )
    return out


def quantiles_pass(
    df: DataFrame,
    num_cols: list[str],
    types: Mapping[str, EDAType],
    probs: tuple[float, ...] = STATS_QUANTILES,
    rel_err: float = 0.001,
) -> dict[str, dict[float, float]]:
    """Approximate quantiles of all numeric columns in one pass.

    Uses the Greenwald–Khanna sketch behind ``approxQuantile``; one job for
    all columns and all probabilities (shared by stats/box/Q-Q — the
    paper's computation-sharing example).
    """
    if not num_cols:
        return {}
    cleaned = df.select(
        [_clean(df, c, types[c]).cast("double").alias(c) for c in num_cols]
    )
    res = cleaned.approxQuantile(num_cols, list(probs), rel_err)
    return {
        c: {p: q for p, q in zip(probs, qs)} for c, qs in zip(num_cols, res)
    }


def histogram_pass(
    df: DataFrame,
    num_cols: list[str],
    types: Mapping[str, EDAType],
    minmax: Mapping[str, tuple[float | None, float | None]],
    bins: int,
) -> dict[str, tuple[np.ndarray, np.ndarray]]:
    """Equi-width histograms of all numeric columns via one melted groupBy.

    ``minmax`` must come from a previous pass (``basic_stats_pass``) — the
    bin edges are needed to *construct* this job, mirroring the paper's
    precompute-chunk-size stage. Returns ``{col: (counts, edges)}`` with
    ``len(edges) == bins + 1``; columns with no finite values map to empty
    counts.
    """
    usable = [
        c for c in num_cols
        if minmax.get(c, (None, None))[0] is not None
        and minmax[c][1] is not None
    ]
    out: dict[str, tuple[np.ndarray, np.ndarray]] = {
        c: (np.zeros(0, dtype="int64"), np.zeros(0, dtype="float64"))
        for c in num_cols if c not in usable
    }
    if not usable:
        return out

    spark = df.sparkSession
    meta = spark.createDataFrame(
        [(c, float(minmax[c][0]), float(minmax[c][1])) for c in usable],
        "column STRING, mn DOUBLE, mx DOUBLE",
    )
    stacked = (
        df.select([_clean(df, c, types[c]).cast("double").alias(c) for c in usable])
        .unpivot([], usable, "column", "value")
        .where(F.col("value").isNotNull())
    )
    width = (F.col("mx") - F.col("mn")) / F.lit(bins)
    bin_expr = F.when(F.col("mx") == F.col("mn"), F.lit(0)).otherwise(
        F.least(
            F.floor((F.col("value") - F.col("mn")) / width).cast("int"),
            F.lit(bins - 1),
        )
    )
    counts_pdf = (
        stacked.join(F.broadcast(meta), "column")
        .select("column", bin_expr.alias("bin"))
        .groupBy("column", "bin")
        .count()
        .toPandas()
    )
    for c in usable:
        mn, mx = float(minmax[c][0]), float(minmax[c][1])
        edges = np.linspace(mn, mx, bins + 1) if mx > mn else np.array([mn, mn])
        n_bins = bins if mx > mn else 1
        counts = np.zeros(n_bins, dtype="int64")
        sub = counts_pdf[counts_pdf["column"] == c]
        idx = sub["bin"].to_numpy(dtype="int64")
        counts[idx] = sub["count"].to_numpy(dtype="int64")
        out[c] = (counts, edges)
    return out


def value_counts_pass(
    df: DataFrame, cat_cols: list[str], limit: int = 1000
) -> dict[str, pd.Series]:
    """Exact value counts of all categorical columns via one melted groupBy.

    Each column's series is capped at ``limit`` values (descending count,
    ascending value tie-break) and carries exact ``n_distinct`` / ``n_total``
    (non-null) in ``series.attrs`` so overview stats stay exact even when
    the head is truncated.
    """
    if not cat_cols:
        return {}
    stacked = (
        df.select([F.col(c).cast("string").alias(c) for c in cat_cols])
        .unpivot([], cat_cols, "column", "value")
        .where(F.col("value").isNotNull())
    )
    counts = stacked.groupBy("column", "value").count()
    counts.persist()
    try:
        from pyspark.sql import Window

        w = Window.partitionBy("column").orderBy(F.desc("count"), F.asc("value"))
        top_pdf = (
            counts.withColumn("rn", F.row_number().over(w))
            .where(F.col("rn") <= limit)
            .toPandas()
        )
        totals_pdf = (
            counts.groupBy("column")
            .agg(
                F.count(F.lit(1)).alias("n_distinct"),
                F.sum("count").alias("n_total"),
            )
            .toPandas()
        )
    finally:
        counts.unpersist()
    totals = totals_pdf.set_index("column")
    out: dict[str, pd.Series] = {}
    for c in cat_cols:
        sub = top_pdf[top_pdf["column"] == c].sort_values(
            ["count", "value"], ascending=[False, True]
        )
        s = pd.Series(
            sub["count"].to_numpy(dtype="int64"),
            index=sub["value"].to_numpy(dtype=object),
            name=c,
        )
        if c in totals.index:
            s.attrs["n_distinct"] = int(totals.loc[c, "n_distinct"])
            s.attrs["n_total"] = int(totals.loc[c, "n_total"])
        else:  # all-null column
            s.attrs["n_distinct"] = 0
            s.attrs["n_total"] = 0
        out[c] = s
    return out


def sample_pass(
    df: DataFrame, cols: list[str], n: int, seed: int, total_rows: int | None = None
) -> pd.DataFrame:
    """Seeded row sample of ``cols``, capped at ``n`` rows, as pandas.

    Used for the driver-side kernels that need raw values (KDE, scatter,
    Kendall). ``total_rows`` (if already known from a stats pass) avoids a
    count job. Oversamples by 10% then truncates, so the cap is respected
    without a second pass.
    """
    if total_rows is None:
        total_rows = df.count()
    proj = df.select(cols)
    if total_rows <= n:
        return proj.toPandas()
    frac = min(1.0, (n / total_rows) * 1.1)
    return proj.sample(fraction=frac, seed=seed).limit(n).toPandas()


def freedman_diaconis_bins(n: int, iqr: float, span: float, default: int) -> int:
    """Freedman–Diaconis bin-count suggestion, clamped to [1, default*4]."""
    if n <= 0 or iqr <= 0 or span <= 0:
        return default
    width = 2 * iqr / (n ** (1 / 3))
    if width <= 0:
        return default
    return int(min(max(1, math.ceil(span / width)), default * 4))

"""Univariate analysis — ``plot(df, col)`` (paper Figure 2, row 2).

Numerical column → column statistics, histogram, KDE plot, normal Q-Q
plot, box plot. Categorical column → column statistics, bar chart, pie
chart, word cloud (word frequencies) and word-frequency table.

All distributed work is funneled through the fused kernels in
``core.compute``; driver-side numpy handles KDE/Q-Q/box from the already
reduced intermediates (§5.2 two-phase split).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core import compute
from repro.core.config import Config
from repro.core.dtypes import EDAType, detect_type
from repro.core.intermediates import Intermediates
from repro.substrate import numutils

#: probabilities of the Q-Q plot are appended to the shared stats quantiles
#: so one ``approxQuantile`` call serves the stats table, box plot and Q-Q
#: plot (paper §4.2: quantiles computed once, distributed to each viz).


def box_plot_stats(q: dict[float, float], whisker: float) -> dict[str, float]:
    """Box-plot geometry from the shared quantile dict (no extra pass)."""
    q1, q2, q3 = q[0.25], q[0.5], q[0.75]
    iqr = q3 - q1
    return {
        "q1": q1,
        "median": q2,
        "q3": q3,
        "iqr": iqr,
        "lower_whisker": q1 - whisker * iqr,
        "upper_whisker": q3 + whisker * iqr,
    }


def compute_numerical(
    df: DataFrame,
    col: str,
    cfg: Config,
    *,
    stats: dict[str, object] | None = None,
    quantiles: dict[float, float] | None = None,
    hist: tuple[np.ndarray, np.ndarray] | None = None,
    sample: pd.Series | None = None,
) -> Intermediates:
    """Intermediates for univariate analysis of a numerical column.

    Precomputed pieces (from a report-level fused pass) can be injected via
    keyword arguments; anything missing is computed here with the same
    fused kernels restricted to one column.
    """
    types = {col: EDAType.NUMERICAL}
    qq_probs = tuple(
        (i + 0.5) / cfg["qq.points"] for i in range(cfg["qq.points"])
    )
    all_probs = tuple(sorted(set(compute.STATS_QUANTILES) | set(qq_probs)))
    if stats is None:
        # quantile sketch rides in the same fused agg as the stats
        stats = dict(compute.basic_stats_pass(df, types, quantile_probs=all_probs)[col])
        if quantiles is None:
            quantiles = stats.pop("quantiles")
        else:
            stats.pop("quantiles", None)
    nrows = int(stats.get("nrows_total") or (int(stats["count"]) + int(stats["nmissing"])))

    if quantiles is None or not all(p in quantiles for p in qq_probs):
        quantiles = compute.quantiles_pass(df, [col], types, probs=all_probs)[col]

    if hist is None:
        hist = compute.histogram_pass(
            df, [col], types, {col: (stats["min"], stats["max"])}, cfg["hist.bins"]
        )[col]
    counts, edges = hist

    if sample is None:
        n_sample = cfg["kde.sample_size"]
        pdf = compute.sample_pass(
            df.where(~compute.missing_expr(df, col).cast("boolean")),
            [col],
            n_sample,
            cfg["compute.seed"],
            total_rows=int(stats["count"]),
        )
        sample = pdf[col].astype("float64")

    # -- driver-side (pandas-phase) kernels ------------------------------
    mn, mx = stats["min"], stats["max"]
    if mn is not None and mx is not None and np.isfinite([mn, mx]).all():
        grid = np.linspace(float(mn), float(mx), cfg["kde.grid_points"])
        kde = numutils.gaussian_kde(sample.to_numpy(), grid)
    else:
        grid = np.zeros(0)
        kde = np.zeros(0)

    mean = stats.get("mean")
    std = stats.get("std")
    theo = numutils.norm_ppf(np.array(qq_probs))
    if mean is not None and std not in (None, 0) and std == std:
        theoretical = float(mean) + float(std) * theo
    else:
        theoretical = np.full(len(qq_probs), np.nan)
    sample_q = np.array([quantiles[p] for p in qq_probs], dtype="float64")

    if all(quantiles.get(p) is not None for p in (0.25, 0.5, 0.75)):
        box = box_plot_stats(quantiles, cfg["box.whisker"])
    else:  # all-null column: no quartiles to build the box from
        box = {k: float("nan") for k in ("q1", "median", "q3", "iqr", "lower_whisker", "upper_whisker")}
    sv = sample.to_numpy()
    n_out = int(((sv < box["lower_whisker"]) | (sv > box["upper_whisker"])).sum())
    # outlier count estimated from the sample, scaled to the column size —
    # keeps univariate analysis at one scan + one sample like the paper's
    # interactive target; the histogram shows exact tail mass anyway.
    scale = max(int(stats["count"]), 1) / max(len(sv), 1)
    box["n_outliers_est"] = int(round(n_out * scale))

    inter = Intermediates(task=f"univariate:{col}")
    inter["col"] = col
    inter["type"] = EDAType.NUMERICAL.value
    inter["nrows"] = nrows
    inter["stats"] = {**stats, "quantiles": {p: quantiles[p] for p in compute.STATS_QUANTILES}}
    inter["hist"] = {"counts": counts, "edges": edges}
    inter["kde"] = {"grid": grid, "density": kde}
    inter["qq"] = {"theoretical": theoretical, "sample": sample_q}
    inter["box"] = box
    return inter


def word_frequency_pass(df: DataFrame, col: str, top_n: int) -> Intermediates:
    """Word tokenization + counts for the word cloud / frequency table.

    Lower-cases, splits on non-alphanumerics, explodes, and aggregates in
    one shuffle; totals are computed from the persisted aggregate so the
    raw column is scanned once.
    """
    words = (
        df.select(
            F.explode(
                F.split(F.lower(F.col(col).cast("string")), r"[^0-9a-zA-Z]+")
            ).alias("word")
        )
        .where(F.col("word") != "")
    )
    counts = words.groupBy("word").count()
    counts.persist()
    try:
        top = (
            counts.orderBy(F.desc("count"), F.asc("word")).limit(top_n).toPandas()
        )
        totals = counts.agg(
            F.count(F.lit(1)).alias("n_distinct_words"),
            F.sum("count").alias("n_words"),
            (F.sum(F.length("word") * F.col("count")) / F.sum("count")).alias(
                "mean_word_length"
            ),
        ).collect()[0]
    finally:
        counts.unpersist()
    inter = Intermediates(task=f"words:{col}")
    inter["word_counts"] = pd.Series(
        top["count"].to_numpy(dtype="int64"), index=top["word"].to_numpy(object)
    )
    inter["n_words"] = int(totals["n_words"] or 0)
    inter["n_distinct_words"] = int(totals["n_distinct_words"] or 0)
    inter["mean_word_length"] = float(totals["mean_word_length"] or 0.0)
    return inter


def compute_categorical(
    df: DataFrame,
    col: str,
    cfg: Config,
    *,
    stats: dict[str, object] | None = None,
    value_counts: pd.Series | None = None,
    with_words: bool = True,
) -> Intermediates:
    """Intermediates for univariate analysis of a categorical column."""
    types = {col: EDAType.CATEGORICAL}
    if stats is None:
        stats = compute.basic_stats_pass(df, types)[col]
    if value_counts is None:
        value_counts = compute.value_counts_pass(df, [col])[col]

    inter = Intermediates(task=f"univariate:{col}")
    inter["col"] = col
    inter["type"] = EDAType.CATEGORICAL.value
    n_total = value_counts.attrs.get("n_total", int(value_counts.sum()))
    inter["stats"] = {
        **stats,
        "n_distinct_exact": value_counts.attrs.get("n_distinct", len(value_counts)),
        "n_total": n_total,
    }
    inter["bar"] = value_counts.head(cfg["bar.top_n"])
    pie = value_counts.head(cfg["pie.top_n"]).astype("float64")
    other = float(n_total - pie.sum())
    if other > 0:
        pie = pd.concat([pie, pd.Series({"(other)": other})])
    inter["pie"] = pie
    if with_words:
        words = word_frequency_pass(df, col, cfg["wordfreq.top_n"])
        inter["words"] = {
            "word_counts": words["word_counts"],
            "n_words": words["n_words"],
            "n_distinct_words": words["n_distinct_words"],
            "mean_word_length": words["mean_word_length"],
        }
    return inter


def compute_univariate(df: DataFrame, col: str, cfg: Config) -> Intermediates:
    """Dispatch on the detected EDA type (paper Figure 2 mapping rules)."""
    t = detect_type(df, col)
    if t is EDAType.NUMERICAL:
        return compute_numerical(df, col, cfg)
    if t is EDAType.CATEGORICAL:
        return compute_categorical(df, col, cfg)
    raise TypeError(
        f"univariate analysis of {t.value} column {col!r} is out of scope "
        "(the paper lists time-series analysis as future work)"
    )

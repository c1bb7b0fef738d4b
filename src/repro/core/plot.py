"""``plot`` — the overview / univariate / bivariate entry point (§3.2).

* ``plot(df)`` — "I want an overview of the dataset"
* ``plot(df, col1)`` — "I want to understand col1"
* ``plot(df, col1, col2)`` — "I want to understand the relationship
  between col1 and col2"
"""
from __future__ import annotations

from pyspark.sql import DataFrame

from repro.core.bivariate import compute_bivariate
from repro.core.config import Config
from repro.core.insights import bivariate_insights, overview_insights, univariate_insights
from repro.core.intermediates import EDAResult
from repro.core.overview import compute_overview
from repro.core.render import render
from repro.core.univariate import compute_univariate


def plot(
    df: DataFrame,
    col1: str | None = None,
    col2: str | None = None,
    config: dict | None = None,
) -> EDAResult:
    """Task-centric EDA in one call; dispatch follows the Figure-2 rules."""
    cfg = Config.from_user(config)
    if col1 is None and col2 is not None:
        raise ValueError("col1 must be given when col2 is")
    if col1 is None:
        inter = compute_overview(df, cfg)
        insights = overview_insights(inter, cfg)
    elif col2 is None:
        if col1 not in df.columns:
            raise KeyError(f"no such column: {col1!r}")
        inter = compute_univariate(df, col1, cfg)
        insights = univariate_insights(inter, cfg)
    else:
        for c in (col1, col2):
            if c not in df.columns:
                raise KeyError(f"no such column: {c!r}")
        inter = compute_bivariate(df, col1, col2, cfg)
        insights = bivariate_insights(inter, cfg)
    return EDAResult(
        task=inter.task, intermediates=inter, insights=insights,
        html=render(inter, insights, cfg),
    )

"""Synthetic stand-ins for the paper's evaluation datasets (§6, Table 2).

The container is offline, so the 15 Kaggle CSVs are replaced by seeded
generators matching each dataset's *shape*: row count, numeric/categorical
column split (Table 2's ``#Rows`` and ``#Cols (N/C)``), plausible
categorical cardinalities, and injected missing values. Report-generation
cost in both compared systems depends on shape, not on the actual Kaggle
values, so relative Table-2 speedups are preserved (substitution
documented in DESIGN.md §4).

Numeric columns draw from a mix of normal / lognormal / uniform / integer
marginals with mild inter-column correlation (so the correlation sections
have structure); categorical columns draw Zipf-ish frequencies over
``cardinality`` string levels.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession


@dataclass(frozen=True)
class DatasetSpec:
    """Shape of one Table-2 dataset."""

    name: str
    nrows: int
    n_num: int
    n_cat: int
    missing_rate: float = 0.05
    max_cardinality: int = 40
    seed: int = 0

    @property
    def ncols(self) -> int:
        return self.n_num + self.n_cat


#: Table 2 of the paper: name, #Rows, #Cols (N/C). Missing rates and
#: cardinalities are plausible defaults (the paper does not report them);
#: chess/adult/conflicts get higher cardinalities to mimic free-text-ish
#: categorical columns.
TABLE2_SPECS: tuple[DatasetSpec, ...] = (
    DatasetSpec("heart", 303, 14, 0, 0.02, 8, 11),
    DatasetSpec("diabetes", 768, 9, 0, 0.03, 8, 12),
    DatasetSpec("automobile", 205, 10, 16, 0.06, 22, 13),
    DatasetSpec("titanic", 891, 7, 5, 0.10, 30, 14),
    DatasetSpec("women", 8_553, 5, 5, 0.05, 60, 15),
    DatasetSpec("credit", 30_000, 25, 0, 0.02, 8, 16),
    DatasetSpec("solar", 33_000, 7, 4, 0.04, 24, 17),
    DatasetSpec("suicide", 28_000, 6, 6, 0.05, 80, 18),
    DatasetSpec("diamonds", 54_000, 8, 3, 0.02, 8, 19),
    DatasetSpec("chess", 20_000, 6, 10, 0.04, 400, 20),
    DatasetSpec("adult", 49_000, 6, 9, 0.05, 42, 21),
    DatasetSpec("basketball", 53_000, 21, 10, 0.06, 49, 22),
    DatasetSpec("conflicts", 34_000, 10, 15, 0.08, 300, 23),
    DatasetSpec("rain", 142_000, 17, 7, 0.10, 49, 24),
    DatasetSpec("hotel", 119_000, 20, 12, 0.05, 180, 25),
)

SPEC_BY_NAME: dict[str, DatasetSpec] = {s.name: s for s in TABLE2_SPECS}


def generate_pandas(spec: DatasetSpec) -> pd.DataFrame:
    """Seeded pandas frame for one spec (driver-side; ≤ ~150K rows)."""
    g = np.random.default_rng(spec.seed)
    n = spec.nrows
    cols: dict[str, object] = {}

    # latent factor gives numeric columns mild mutual correlation
    latent = g.normal(0, 1, n)
    for i in range(spec.n_num):
        kind = i % 4
        noise = g.normal(0, 1, n)
        base = 0.6 * latent + 0.8 * noise
        if kind == 0:
            vals = base * (10 + i) + 50 * i
        elif kind == 1:
            vals = np.exp(base * 0.8 + 2)  # lognormal → skewed insight fodder
        elif kind == 2:
            vals = g.uniform(0, 100 + i, n)  # uniform insight fodder
        else:
            vals = np.round(base * 5 + 20).astype("float64")  # ties for rank code
        mask = g.random(n) < spec.missing_rate * (0.5 + (i % 3))
        vals = vals.astype("float64")
        vals[mask] = np.nan
        cols[f"num_{i}"] = vals

    for j in range(spec.n_cat):
        k = max(2, int(spec.max_cardinality * (0.2 + 0.8 * ((j * 7919) % 97) / 97)))
        ranks = np.arange(1, k + 1)
        weights = 1.0 / ranks ** 1.2
        weights /= weights.sum()
        levels = np.array([f"{spec.name[:3]}_c{j}_v{r}" for r in ranks], dtype=object)
        vals = g.choice(levels, size=n, p=weights).astype(object)
        mask = g.random(n) < spec.missing_rate * (0.3 + (j % 4) * 0.5)
        vals[mask] = None
        cols[f"cat_{j}"] = vals

    pdf = pd.DataFrame(cols)
    # correlated missingness between the first two columns, so the nullity
    # correlation heatmap / dendrogram have signal
    if spec.ncols >= 2 and spec.missing_rate > 0:
        first, second = pdf.columns[0], pdf.columns[1]
        linked = g.random(n) < spec.missing_rate
        pdf.loc[linked, first] = np.nan if first.startswith("num") else None
        pdf.loc[linked, second] = np.nan if second.startswith("num") else None
    return pdf


def load(spark: SparkSession, name: str, *, partitions: int = 8) -> DataFrame:
    """Spark DataFrame for one Table-2 dataset by name."""
    spec = SPEC_BY_NAME[name]
    return spark.createDataFrame(generate_pandas(spec)).repartition(partitions)


def bitcoin_like(spark: SparkSession, *, nrows: int = 100_000, seed: int = 7,
                 partitions: int = 16) -> DataFrame:
    """OHLCV-shaped table standing in for the paper's bitcoin dataset
    (4.7M × 8; §6.2). ``nrows`` scales the Figure-6-style sweeps."""
    g = np.random.default_rng(seed)
    steps = g.normal(0, 1, nrows).cumsum()
    price = 8000 + 50 * steps
    spread = np.abs(g.normal(0, 20, nrows))
    pdf = pd.DataFrame(
        {
            "timestamp": np.arange(nrows, dtype="int64") * 60 + 1_325_317_920,
            "open": price + g.normal(0, 5, nrows),
            "high": price + spread,
            "low": price - spread,
            "close": price + g.normal(0, 5, nrows),
            "volume_btc": np.abs(g.lognormal(0, 1.2, nrows)),
            "volume_currency": np.abs(g.lognormal(8, 1.2, nrows)),
            "weighted_price": price + g.normal(0, 2, nrows),
        }
    )
    miss = g.random(nrows) < 0.03
    pdf.loc[miss, ["volume_btc", "volume_currency", "weighted_price"]] = np.nan
    return spark.createDataFrame(pdf).repartition(partitions)

"""Tests for the Table-2 dataset substrate."""
import numpy as np
import pytest

from repro import datasets


@pytest.mark.parametrize("spec", datasets.TABLE2_SPECS, ids=lambda s: s.name)
def test_spec_shapes_match_table2(spec):
    """The generators must match the published Table 2 shapes."""
    PAPER = {  # name -> (#rows, #numerical, #categorical) from Table 2
        "heart": (303, 14, 0),
        "diabetes": (768, 9, 0),
        "automobile": (205, 10, 16),
        "titanic": (891, 7, 5),
        "women": (8553, 5, 5),
        "credit": (30000, 25, 0),
        "solar": (33000, 7, 4),
        "suicide": (28000, 6, 6),
        "diamonds": (54000, 8, 3),
        "chess": (20000, 6, 10),
        "adult": (49000, 6, 9),
        "basketball": (53000, 21, 10),
        "conflicts": (34000, 10, 15),
        "rain": (142000, 17, 7),
        "hotel": (119000, 20, 12),
    }
    rows, n_num, n_cat = PAPER[spec.name]
    assert spec.nrows == rows
    assert spec.n_num == n_num
    assert spec.n_cat == n_cat


@pytest.mark.parametrize(
    "name", ["heart", "titanic", "automobile"], ids=str
)
def test_generate_pandas_shape_and_missingness(name):
    spec = datasets.SPEC_BY_NAME[name]
    pdf = datasets.generate_pandas(spec)
    assert pdf.shape == (spec.nrows, spec.ncols)
    if spec.missing_rate > 0:
        assert pdf.isna().sum().sum() > 0
        # overall missingness in a sane band around the configured rate
        frac = pdf.isna().sum().sum() / pdf.size
        assert 0 < frac < 4 * spec.missing_rate + 0.05


def test_generator_deterministic():
    a = datasets.generate_pandas(datasets.SPEC_BY_NAME["titanic"])
    b = datasets.generate_pandas(datasets.SPEC_BY_NAME["titanic"])
    assert a.equals(b)


def test_distinct_seeds_distinct_data():
    a = datasets.generate_pandas(datasets.SPEC_BY_NAME["heart"])
    b = datasets.generate_pandas(datasets.SPEC_BY_NAME["diabetes"])
    assert not a.iloc[:200, 0].equals(b.iloc[:200, 0])


def test_numeric_columns_have_variety():
    pdf = datasets.generate_pandas(datasets.SPEC_BY_NAME["credit"])
    skews = pdf.skew(numeric_only=True)
    assert (skews.abs() > 1).any()      # lognormal columns present
    assert (skews.abs() < 0.5).any()    # symmetric columns present


def test_categorical_cardinality_bounded():
    spec = datasets.SPEC_BY_NAME["automobile"]
    pdf = datasets.generate_pandas(spec)
    for j in range(spec.n_cat):
        assert pdf[f"cat_{j}"].nunique() <= spec.max_cardinality


def test_correlated_missingness_between_first_columns():
    pdf = datasets.generate_pandas(datasets.SPEC_BY_NAME["titanic"])
    a, b = pdf.columns[0], pdf.columns[1]
    corr = pdf[[a, b]].isna().astype(int).corr().iloc[0, 1]
    assert corr > 0.3


def test_load_returns_spark_df(spark):
    df = datasets.load(spark, "heart", partitions=3)
    assert df.count() == 303
    assert df.rdd.getNumPartitions() == 3


def test_bitcoin_like_shape(spark):
    df = datasets.bitcoin_like(spark, nrows=5000)
    assert df.count() == 5000
    assert len(df.columns) == 8
    pdf = df.toPandas()
    assert (pdf["high"].dropna() >= pdf["low"].dropna()).all()

"""Unit tests for the Spark substrate helpers."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.substrate.sparkutils import melt, null_indicators, with_row_index


@pytest.fixture(scope="module")
def small(spark):
    pdf = pd.DataFrame(
        {
            "a": [1.0, 2.0, np.nan, 4.0],
            "b": [10.0, None, 30.0, 40.0],
            "c": ["x", "y", None, "x"],
        }
    )
    return spark.createDataFrame(pdf)


def test_melt_long_shape(small):
    out = melt(small.select("a", "b"), ["a", "b"]).toPandas()
    assert set(out.columns) == {"column", "value"}
    assert len(out) == 8
    assert set(out["column"]) == {"a", "b"}


def test_melt_requires_columns(small):
    with pytest.raises(ValueError):
        melt(small, [])


def test_melt_custom_names(small):
    out = melt(small.select("a"), ["a"], var_name="col", value_name="v")
    assert set(out.columns) == {"col", "v"}


def test_with_row_index_contiguous(spark):
    df = spark.range(0, 1000).repartition(7)
    idx = with_row_index(df, "ri").toPandas()["ri"].sort_values().to_numpy()
    assert (idx == np.arange(1000)).all()


def test_with_row_index_preserves_rows(spark):
    df = spark.range(0, 100).withColumn("v", F.col("id") * 2).repartition(5)
    out = with_row_index(df).toPandas()
    assert sorted(out["id"]) == list(range(100))
    assert "row_index" in out.columns
    assert sorted(out["row_index"]) == list(range(100))


def test_with_row_index_single_row(spark):
    out = with_row_index(spark.range(1)).toPandas()
    assert out["row_index"].tolist() == [0]


def test_null_indicators_counts_nan_and_null(small):
    out = null_indicators(small).toPandas()
    assert out["a"].sum() == 1  # the NaN
    assert out["b"].sum() == 1  # the None
    assert out["c"].sum() == 1  # the None string
    assert set(out.columns) == {"a", "b", "c"}


def test_null_indicators_nan_flag_on_true_nan(spark):
    # pandas ingestion converts NaN->NULL, so build a *computed* NaN: only
    # a genuine float NaN distinguishes the two flag settings.
    df = spark.sql(
        "SELECT * FROM VALUES (CAST('NaN' AS DOUBLE)), (1.0), (NULL) AS t(a)"
    )
    with_nan = null_indicators(df, ["a"], nan_is_missing=True).toPandas()
    without = null_indicators(df, ["a"], nan_is_missing=False).toPandas()
    assert with_nan["a"].sum() == 2  # NaN and NULL
    assert without["a"].sum() == 1   # NULL only


def test_null_indicators_subset(small):
    out = null_indicators(small, ["c"]).toPandas()
    assert list(out.columns) == ["c"]
    assert out["c"].tolist() == [0, 0, 1, 0]

"""Tests for correlation analysis — plot_correlation."""
import numpy as np
import pandas as pd
import pytest

from repro.core import plot_correlation
from repro.core.correlation import (
    kendall_matrix,
    pearson_matrix,
    ranked,
    spearman_matrix,
)
from repro.oracle import assert_equivalent
from repro.substrate import numutils


@pytest.fixture(scope="module")
def clean_pdf():
    g = np.random.default_rng(11)
    n = 400
    x = g.normal(0, 1, n)
    return pd.DataFrame(
        {
            "a": x,
            "b": x * 2 + g.normal(0, 0.3, n),      # strongly correlated with a
            "c": g.random(n),                       # independent
            "d": np.round(x * 3),                   # ties
        }
    )


@pytest.fixture(scope="module")
def clean_df(spark, clean_pdf):
    return spark.createDataFrame(clean_pdf)


class TestPearson:
    def test_matrix_vs_oracle(self, spark, clean_df, clean_pdf):
        mat = pearson_matrix(clean_df, ["a", "b", "c"])
        got = spark.createDataFrame(
            pd.DataFrame(
                {
                    "ab": [mat.loc["a", "b"]],
                    "ac": [mat.loc["a", "c"]],
                    "bc": [mat.loc["b", "c"]],
                }
            )
        )
        sql = "SELECT corr(a,b) AS ab, corr(a,c) AS ac, corr(b,c) AS bc FROM t"
        assert_equivalent(got, sql, t=clean_pdf)

    def test_matrix_symmetric_unit_diagonal(self, clean_df):
        mat = pearson_matrix(clean_df, ["a", "b", "c", "d"])
        assert np.allclose(mat.values, mat.values.T, equal_nan=True)
        assert np.allclose(np.diag(mat.values), 1.0)

    def test_pairwise_complete_with_nulls(self, spark):
        pdf = pd.DataFrame(
            {"x": [1.0, 2.0, 3.0, 4.0, np.nan], "y": [2.0, 4.0, 6.0, 8.0, 100.0]}
        )
        mat = pearson_matrix(spark.createDataFrame(pdf), ["x", "y"])
        assert mat.loc["x", "y"] == pytest.approx(1.0)

    def test_empty_and_single(self, clean_df):
        assert pearson_matrix(clean_df, []).empty
        one = pearson_matrix(clean_df, ["a"])
        assert one.loc["a", "a"] == 1.0


class TestSpearman:
    def test_matches_pandas(self, clean_df, clean_pdf):
        mat = spearman_matrix(clean_df, ["a", "b", "c", "d"])
        ref = clean_pdf[["a", "b", "c", "d"]].corr(method="spearman")
        assert np.allclose(mat.values, ref.values, atol=1e-9)

    def test_rank_transform_average_ties(self, spark):
        pdf = pd.DataFrame({"v": [10.0, 20.0, 20.0, 30.0]})
        out = ranked(spark.createDataFrame(pdf), ["v"]).toPandas()["v"]
        assert sorted(out) == [1.0, 2.5, 2.5, 4.0]

    def test_rank_keeps_nulls(self, spark):
        pdf = pd.DataFrame({"v": [10.0, None, 30.0]})
        out = ranked(spark.createDataFrame(pdf), ["v"]).toPandas()["v"]
        assert out.isna().sum() == 1
        assert sorted(out.dropna()) == [1.0, 2.0]

    def test_monotone_nonlinear_is_one(self, spark):
        pdf = pd.DataFrame({"x": np.arange(1.0, 50.0)})
        pdf["y"] = np.exp(pdf["x"] / 10)  # monotone, nonlinear
        mat = spearman_matrix(spark.createDataFrame(pdf), ["x", "y"])
        assert mat.loc["x", "y"] == pytest.approx(1.0)


class TestKendallMatrix:
    def test_matches_pairwise_kernel(self, clean_pdf):
        mat = kendall_matrix(clean_pdf, ["a", "b", "d"])
        for x, y in (("a", "b"), ("a", "d"), ("b", "d")):
            ref = numutils.kendall_tau(clean_pdf[x].to_numpy(), clean_pdf[y].to_numpy())
            assert mat.loc[x, y] == pytest.approx(ref, abs=1e-12)

    def test_fallback_pairwise_under_heavy_missingness(self):
        g = np.random.default_rng(2)
        n = 120
        pdf = pd.DataFrame({"x": g.random(n), "y": g.random(n)})
        # alternating missingness: almost no complete rows
        pdf.loc[::2, "x"] = np.nan
        pdf.loc[1::2, "y"] = np.nan
        pdf.loc[:20, ["x", "y"]] = g.random((21, 2))
        mat = kendall_matrix(pdf, ["x", "y"])
        assert -1 <= mat.loc["x", "y"] <= 1

    def test_perfect_orderings(self):
        pdf = pd.DataFrame({"x": np.arange(30.0), "y": np.arange(30.0) * 2})
        mat = kendall_matrix(pdf, ["x", "y"])
        assert mat.loc["x", "y"] == pytest.approx(1.0)


class TestAPI:
    def test_overview_matrices(self, correlation_result):
        inter = correlation_result.intermediates
        for m in ("pearson", "spearman", "kendall"):
            assert m in inter
            mat = inter[m]
            assert list(mat.index) == inter["columns"]
            assert np.allclose(np.diag(mat.values), 1.0)

    def test_methods_config(self, heart):
        r = plot_correlation(heart, config={"correlation.methods": ("pearson",)})
        inter = r.intermediates
        assert "pearson" in inter and "spearman" not in inter and "kendall" not in inter

    def test_vector_variant(self, heart, heart_pdf):
        r = plot_correlation(heart, "num_0")
        vec = r.intermediates["pearson"]
        assert "num_0" not in vec.index
        ref = heart_pdf.corr(numeric_only=True)["num_0"].drop("num_0")
        for c in vec.index:
            assert vec[c] == pytest.approx(ref[c], abs=1e-6)

    def test_pair_variant_regression(self, spark):
        g = np.random.default_rng(3)
        x = g.random(500) * 10
        pdf = pd.DataFrame({"x": x, "y": 3 * x + 5 + g.normal(0, 0.01, 500)})
        r = plot_correlation(spark.createDataFrame(pdf), "x", "y")
        reg = r.intermediates["regression"]
        assert reg["slope"] == pytest.approx(3.0, abs=0.01)
        assert reg["intercept"] == pytest.approx(5.0, abs=0.05)
        assert r.intermediates["pearson"] == pytest.approx(1.0, abs=1e-4)

    def test_pair_requires_numeric(self, titanic):
        with pytest.raises(TypeError):
            plot_correlation(titanic, "cat_0")
        with pytest.raises(TypeError):
            plot_correlation(titanic, "num_0", "cat_0")

    def test_insight_flags_correlated_pair(self, spark, clean_df):
        r = plot_correlation(clean_df)
        flagged = {i.subject for i in r.insights if i.kind.startswith("correlated")}
        assert any("a" in s and "b" in s for s in flagged)

    def test_html_method_tabs(self, correlation_result):
        for m in ("Pearson", "Spearman", "Kendall"):
            assert m in correlation_result.html

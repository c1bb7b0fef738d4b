"""Tests for bivariate analysis — plot(df, col1, col2)."""
import numpy as np
import pandas as pd
import pytest

from repro.core import plot
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def nn(titanic):
    return plot(titanic, "num_2", "num_3")


@pytest.fixture(scope="module")
def nc(titanic):
    return plot(titanic, "num_2", "cat_1")


@pytest.fixture(scope="module")
def cc(titanic):
    return plot(titanic, "cat_0", "cat_1")


class TestNN:
    def test_mapping_rule(self, nn):
        # Figure 2 row 3(1): scatter, hexbin, binned box plot
        inter = nn.intermediates
        assert inter["kind"] == "NN"
        for key in ("scatter", "hexbin", "binned_box"):
            assert key in inter

    def test_scatter_sample_capped(self, titanic):
        r = plot(titanic, "num_2", "num_3", config={"scatter.sample_size": 50})
        assert len(r.intermediates["scatter"]) <= 50

    def test_hexbin_mass_vs_oracle(self, spark, nn, titanic_pdf):
        hexbin = nn.intermediates["hexbin"]
        total = int(hexbin["count"].sum())
        expected = int(titanic_pdf[["num_2", "num_3"]].dropna().shape[0])
        assert total == expected

    def test_hexbin_grid_bounds(self, nn):
        hexbin = nn.intermediates["hexbin"]
        gs = 20
        assert hexbin["xbin"].between(0, gs - 1).all()
        assert hexbin["ybin"].between(0, gs - 1).all()

    def test_binned_box_ordering(self, nn):
        box = nn.intermediates["binned_box"]
        assert (box["q1"] <= box["median"] + 1e-9).all()
        assert (box["median"] <= box["q3"] + 1e-9).all()
        assert box["xbin"].is_monotonic_increasing


class TestNC:
    def test_mapping_rule(self, nc):
        # Figure 2 row 3(2): categorical box plot, multi-line chart
        inter = nc.intermediates
        assert inter["kind"] == "NC"
        assert "cat_box" in inter and "lines" in inter

    def test_cn_swapped(self, titanic):
        r = plot(titanic, "cat_1", "num_2")
        assert r.intermediates["kind"] == "NC"
        assert r.intermediates["cols"] == ("num_2", "cat_1")

    def test_groups_are_top_categories(self, nc, titanic_pdf):
        groups = nc.intermediates["groups"]
        mask = titanic_pdf["num_2"].notna() & titanic_pdf["cat_1"].notna()
        vc = titanic_pdf[mask]["cat_1"].value_counts()
        assert set(groups) == set(vc.head(len(groups)).index)

    def test_ngroups_config(self, titanic):
        r = plot(titanic, "num_2", "cat_1", config={"line.ngroups": 2})
        assert len(r.intermediates["groups"]) <= 2

    def test_box_median_within_group_range(self, nc, titanic_pdf):
        box = nc.intermediates["cat_box"]
        for _, row in box.iterrows():
            sub = titanic_pdf[titanic_pdf["cat_1"] == row["g"]]["num_2"].dropna()
            assert row["min"] == pytest.approx(sub.min())
            assert row["max"] == pytest.approx(sub.max())
            assert sub.min() <= row["median"] <= sub.max()

    def test_line_mass_per_group(self, nc, titanic_pdf):
        lines = nc.intermediates["lines"]
        for g, counts in lines.items():
            sub = titanic_pdf[
                (titanic_pdf["cat_1"] == g) & titanic_pdf["num_2"].notna()
            ]
            assert counts.sum() == len(sub)


class TestCC:
    def test_mapping_rule(self, cc):
        # Figure 2 row 3(3): nested bar, stacked bar, heat map
        inter = cc.intermediates
        assert inter["kind"] == "CC"
        for key in ("nested_bar", "stacked_bar", "heatmap"):
            assert key in inter

    def test_contingency_vs_oracle(self, spark, titanic, titanic_pdf):
        r = plot(titanic, "cat_0", "cat_1", config={"heatmap.top_n": 10**6})
        heat = r.intermediates["heatmap"]
        long = heat.stack().rename("cnt").reset_index()
        long = long[long["cnt"] > 0]
        got = spark.createDataFrame(long.astype({"cnt": "int64"}))
        sql = """
            SELECT cat_0 AS x, cat_1 AS y, count(*) AS cnt FROM t
            WHERE cat_0 IS NOT NULL AND cat_1 IS NOT NULL GROUP BY 1, 2
        """
        assert_equivalent(got, sql, t=titanic_pdf)

    def test_total_mass(self, cc, titanic_pdf):
        expected = titanic_pdf[["cat_0", "cat_1"]].dropna().shape[0]
        assert cc.intermediates["contingency_total"] == expected

    def test_top_n_limits(self, titanic):
        r = plot(titanic, "cat_0", "cat_1", config={"nested.top_n": 2, "heatmap.top_n": 3})
        inter = r.intermediates
        assert inter["stacked_bar"].shape[0] <= 2
        assert inter["stacked_bar"].shape[1] <= 2
        assert inter["heatmap"].shape[0] <= 3
        assert inter["heatmap"].shape[1] <= 3


def test_nn_on_lineitem_oracle(spark, lineitem, lineitem_pdf):
    """Hexbin mass check on the provided TPC-H-lite generator."""
    r = plot(lineitem, "l_quantity", "l_extendedprice")
    hexbin = r.intermediates["hexbin"]
    assert int(hexbin["count"].sum()) == len(lineitem_pdf)


def test_datetime_pair_rejected(spark):
    pdf = pd.DataFrame(
        {"d": pd.to_datetime(["2020-01-01"]), "x": [1.0]}
    )
    df = spark.createDataFrame(pdf)
    with pytest.raises(TypeError):
        plot(df, "d", "x")

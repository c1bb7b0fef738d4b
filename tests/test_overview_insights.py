"""Tests for the overview task and the auto-insight component."""
import numpy as np
import pandas as pd
import pytest

from repro.core import plot
from repro.core.config import Config
from repro.core.insights import column_insights, dataset_insights
from repro.core.intermediates import Intermediates


class TestOverview:
    def test_dataset_stats(self, overview_result, titanic_pdf):
        ds = overview_result.intermediates["dataset_stats"]
        assert ds["nrows"] == len(titanic_pdf)
        assert ds["ncols"] == titanic_pdf.shape[1]
        assert ds["n_numerical"] == 7
        assert ds["n_categorical"] == 5
        assert ds["n_missing_cells"] == int(titanic_pdf.isna().sum().sum())

    def test_duplicate_rows(self, spark):
        pdf = pd.DataFrame({"a": [1, 1, 2, 2, 3], "b": ["x", "x", "y", "y", "z"]})
        r = plot(spark.createDataFrame(pdf))
        assert r.intermediates["dataset_stats"]["n_duplicate_rows"] == 2

    def test_every_numeric_has_histogram(self, overview_result):
        hists = overview_result.intermediates["hists"]
        assert set(hists) == {f"num_{i}" for i in range(7)}

    def test_every_categorical_has_bar(self, overview_result):
        bars = overview_result.intermediates["bars"]
        assert set(bars) == {f"cat_{i}" for i in range(5)}

    def test_missing_pct_bounds(self, overview_result):
        pct = overview_result.intermediates["dataset_stats"]["missing_pct"]
        assert 0 < pct < 0.5

    def test_html_sections(self, overview_result):
        assert "Stats" in overview_result.html
        assert "num_0 (hist)" in overview_result.html
        assert "cat_0 (bar)" in overview_result.html


class TestColumnInsights:
    CFG = Config.from_user()

    def _stats(self, **kw):
        base = {"count": 100, "nmissing": 0, "distinct": 10}
        base.update(kw)
        return base

    def test_missing_insight_threshold(self):
        out = column_insights("c", self._stats(nmissing=30), self.CFG, nrows=100)
        assert any(i.kind == "missing" for i in out)
        out = column_insights("c", self._stats(nmissing=0), self.CFG, nrows=100)
        assert not any(i.kind == "missing" for i in out)

    def test_missing_threshold_configurable(self):
        cfg = Config.from_user({"insight.missing.threshold": 0.5})
        out = column_insights("c", self._stats(nmissing=30), cfg, nrows=100)
        assert not any(i.kind == "missing" for i in out)

    def test_skew_insight(self):
        out = column_insights("c", self._stats(skew=5.2), self.CFG, nrows=100)
        assert any(i.kind == "skewed" for i in out)
        out = column_insights("c", self._stats(skew=0.1), self.CFG, nrows=100)
        assert not any(i.kind == "skewed" for i in out)

    def test_constant_insight(self):
        out = column_insights("c", self._stats(distinct=1), self.CFG, nrows=100)
        assert any(i.kind == "constant" for i in out)

    def test_zeros_negatives_infinity(self):
        out = column_insights(
            "c", self._stats(nzero=50, nnegative=10, ninfinite=2), self.CFG, nrows=100
        )
        kinds = {i.kind for i in out}
        assert {"zeros", "negatives", "infinity"} <= kinds

    def test_uniform_insight_from_hist(self):
        out = column_insights(
            "c", self._stats(), self.CFG, nrows=100, hist_counts=np.full(10, 50)
        )
        assert any(i.kind == "uniform" for i in out)
        out = column_insights(
            "c", self._stats(), self.CFG, nrows=100,
            hist_counts=np.array([500, 1, 1, 1, 1]),
        )
        assert not any(i.kind == "uniform" for i in out)

    def test_high_cardinality_insight(self):
        vc = pd.Series(np.ones(60), index=[f"v{i}" for i in range(60)])
        vc.attrs["n_distinct"] = 60
        out = column_insights("c", self._stats(), self.CFG, nrows=100, value_counts=vc)
        assert any(i.kind == "high_cardinality" for i in out)

    def test_insight_fields(self):
        out = column_insights("c", self._stats(nmissing=30), self.CFG, nrows=100)
        ins = next(i for i in out if i.kind == "missing")
        assert ins.subject == "c"
        assert ins.value == pytest.approx(0.3)
        assert ins.threshold == self.CFG["insight.missing.threshold"]
        assert "c" in ins.message


class TestDatasetInsights:
    def test_duplicates_insight(self):
        cfg = Config.from_user()
        out = dataset_insights({"nrows": 100, "n_duplicate_rows": 10}, cfg)
        assert any(i.kind == "duplicates" for i in out)
        out = dataset_insights({"nrows": 100, "n_duplicate_rows": 0}, cfg)
        assert out == []


class TestEndToEndInsights:
    def test_overview_insights_cover_engineered_signals(self, spark):
        g = np.random.default_rng(9)
        n = 2000
        pdf = pd.DataFrame(
            {
                "skewed": np.exp(g.normal(0, 1, n)),
                "uniform": g.random(n),
                "holey": np.where(g.random(n) < 0.4, np.nan, g.random(n)),
                "const": np.ones(n),
            }
        )
        r = plot(spark.createDataFrame(pdf))
        kinds = {(i.kind, i.subject) for i in r.insights}
        assert ("skewed", "skewed") in kinds
        assert ("uniform", "uniform") in kinds
        assert ("missing", "holey") in kinds
        assert ("constant", "const") in kinds

    def test_insights_render_highlighted(self, spark):
        pdf = pd.DataFrame({"holey": [1.0, np.nan, 3.0, np.nan]})
        r = plot(spark.createDataFrame(pdf))
        assert 'class="insight"' in r.html

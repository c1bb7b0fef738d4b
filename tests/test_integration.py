"""Integration tests: full pipeline on the provided TPC-H-lite generator
and the measurement harness itself.
"""
import pytest

from repro.core import create_report, plot, plot_correlation, plot_missing
from repro.harness import PAPER_TABLE2, Table2Row, format_table2
from repro.oracle import assert_equivalent


class TestLineitemPipeline:
    """TPC-H-lite lineitem has numeric, categorical and datetime columns
    with no missing values — a schema class the Kaggle-shaped datasets
    don't cover."""

    def test_overview(self, lineitem, lineitem_pdf):
        r = plot(lineitem)
        ds = r.intermediates["dataset_stats"]
        assert ds["nrows"] == len(lineitem_pdf)
        assert ds["n_missing_cells"] == 0
        assert ds["n_datetime"] == 1

    def test_univariate_quantity_stats_vs_oracle(self, spark, lineitem, lineitem_pdf):
        import pandas as pd

        r = plot(lineitem, "l_quantity")
        s = r.intermediates["stats"]
        got = spark.createDataFrame(
            pd.DataFrame({"mn": [s["min"]], "mx": [s["max"]], "mean": [s["mean"]]})
        )
        sql = "SELECT min(l_quantity) AS mn, max(l_quantity) AS mx, avg(l_quantity) AS mean FROM li"
        assert_equivalent(got, sql, li=lineitem_pdf)

    def test_univariate_returnflag(self, lineitem, lineitem_pdf):
        r = plot(lineitem, "l_returnflag")
        bar = r.intermediates["bar"]
        vc = lineitem_pdf["l_returnflag"].value_counts()
        assert bar.to_dict() == vc.head(len(bar)).to_dict()

    def test_correlation_price_discount(self, lineitem, lineitem_pdf):
        r = plot_correlation(lineitem, "l_extendedprice", "l_discount")
        ref = lineitem_pdf["l_extendedprice"].corr(lineitem_pdf["l_discount"])
        assert r.intermediates["pearson"] == pytest.approx(ref, abs=1e-9)

    def test_missing_on_complete_data(self, lineitem):
        r = plot_missing(lineitem)
        assert r.intermediates["bar"].sum() == 0
        assert r.insights == []

    def test_report_runs_end_to_end(self, lineitem):
        r = create_report(lineitem, config={"correlation.methods": ("pearson",)})
        assert set(r.intermediates["variables"]) == set(lineitem.columns)


class TestHarness:
    def test_table2_row_speedup(self):
        row = Table2Row("heart", 303, 14, 14, 0, baseline_s=20.0, dataprep_s=2.0)
        assert row.speedup == pytest.approx(10.0)

    def test_format_table2_contains_paper_numbers(self):
        row = Table2Row("heart", 303, 14, 14, 0, baseline_s=20.0, dataprep_s=2.0)
        md = format_table2([row])
        assert "17.7s" in md and "8.6×" in md and "10.0×" in md

    def test_paper_table_complete(self):
        from repro import datasets

        assert set(PAPER_TABLE2) == {s.name for s in datasets.TABLE2_SPECS}

    @pytest.mark.slow
    def test_run_table2_row_end_to_end(self, spark):
        """One real Table-2 measurement on the smallest dataset: both
        systems complete and the fused pipeline wins."""
        from repro.harness import run_table2_row

        row = run_table2_row(spark, "heart")
        assert row.baseline_s > 0 and row.dataprep_s > 0
        assert row.speedup > 1.0, (
            f"fused pipeline must beat the eager baseline (got {row.speedup:.2f}x)"
        )

"""Figure-5-style self-comparison benchmark (supplementary; figures are
out of scope, but the interactivity claim — fine-grained tasks answer in
seconds — is the paper's central speed argument, so it gets a bench).

Times one representative invocation of each fine-grained task per
dataset-size class. The full per-column/per-pair sweep lives in
``jobs/fig5_self_comparison.py``.
"""
import pytest

from repro.core import plot, plot_correlation, plot_missing
from repro.harness import load_dataset

CASES = ["titanic", "credit", "rain"]  # small / numeric-wide / largest


@pytest.fixture(scope="module")
def loaded(spark):
    cache = {}

    def get(name):
        if name not in cache:
            cache[name] = load_dataset(spark, name)
        return cache[name]

    yield get
    for df in cache.values():
        df.unpersist()


@pytest.mark.parametrize("name", CASES)
def test_plot_overview(benchmark, loaded, name):
    benchmark.group = f"tasks:{name}"
    benchmark.pedantic(plot, args=(loaded(name),), rounds=1, iterations=1)


@pytest.mark.parametrize("name", CASES)
def test_plot_univariate_numeric(benchmark, loaded, name):
    benchmark.group = f"tasks:{name}"
    benchmark.pedantic(plot, args=(loaded(name), "num_0"), rounds=1, iterations=1)


@pytest.mark.parametrize("name", ["titanic", "rain"])
def test_plot_bivariate_nn(benchmark, loaded, name):
    benchmark.group = f"tasks:{name}"
    benchmark.pedantic(plot, args=(loaded(name), "num_0", "num_1"), rounds=1, iterations=1)


@pytest.mark.parametrize("name", CASES)
def test_plot_correlation_overview(benchmark, loaded, name):
    benchmark.group = f"tasks:{name}"
    benchmark.pedantic(plot_correlation, args=(loaded(name),), rounds=1, iterations=1)


@pytest.mark.parametrize("name", CASES)
def test_plot_missing_overview(benchmark, loaded, name):
    benchmark.group = f"tasks:{name}"
    benchmark.pedantic(plot_missing, args=(loaded(name),), rounds=1, iterations=1)


@pytest.mark.parametrize("name", ["titanic", "rain"])
def test_plot_missing_col(benchmark, loaded, name):
    # the paper singles this out as the most computationally intensive task
    benchmark.group = f"tasks:{name}"
    benchmark.pedantic(plot_missing, args=(loaded(name), "num_0"), rounds=1, iterations=1)

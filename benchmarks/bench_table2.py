"""Table 2 reproduction — report generation: eager baseline vs fused.

One pytest-benchmark entry per (dataset, system). Regenerate the full
paper-vs-measured table with::

    pytest benchmarks/bench_table2.py --benchmark-only -q

or, for the consolidated Markdown diff written to stdout::

    python jobs/table2_report.py

Single-round pedantic timing: the experiment measures one end-to-end
report generation per tool, exactly as the paper does.
"""
import pytest

from repro import datasets
from repro.baseline import eager_profile_report
from repro.core import create_report
from repro.harness import load_dataset

DATASETS = [s.name for s in datasets.TABLE2_SPECS]


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


@pytest.mark.parametrize("name", DATASETS)
def test_report_dataprep_fused(benchmark, loaded, name):
    df = loaded(name)
    benchmark.group = f"table2:{name}"
    result = benchmark.pedantic(create_report, args=(df,), rounds=1, iterations=1)
    assert result.intermediates["dataset_stats"]["nrows"] == datasets.SPEC_BY_NAME[name].nrows


@pytest.mark.parametrize("name", DATASETS)
def test_report_baseline_eager(benchmark, loaded, name):
    df = loaded(name)
    benchmark.group = f"table2:{name}"
    result = benchmark.pedantic(eager_profile_report, args=(df,), rounds=1, iterations=1)
    assert result["dataset_stats"]["nrows"] == datasets.SPEC_BY_NAME[name].nrows

"""The paper's contribution: task-centric EDA over Spark DataFrames.

Public API (paper §3.2):

* :func:`plot` — overview / univariate / bivariate analysis
* :func:`plot_correlation` — correlation analysis
* :func:`plot_missing` — missing-value analysis
* :func:`create_report` — full profile report (the §6 benchmark subject)

Each function returns an :class:`~repro.core.intermediates.EDAResult`
holding the computed *intermediates* plus rendered HTML, mirroring the
Compute/Render split of the paper's architecture (§4.2).
"""
from repro.core.config import Config
from repro.core.intermediates import EDAResult, Intermediates
from repro.core.plot import plot
from repro.core.correlation import plot_correlation
from repro.core.missing import plot_missing
from repro.core.report import create_report

__all__ = [
    "Config",
    "EDAResult",
    "Intermediates",
    "plot",
    "plot_correlation",
    "plot_missing",
    "create_report",
]

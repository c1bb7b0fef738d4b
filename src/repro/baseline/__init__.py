"""Baseline comparator: a Pandas-profiling-style eager profiler."""
from repro.baseline.profiler import eager_profile_report

__all__ = ["eager_profile_report"]

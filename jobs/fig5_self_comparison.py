"""Figure-5-style self-comparison (supplementary).

Runs every fine-grained task — ``plot``/``plot_correlation``/
``plot_missing`` per column, and ``plot`` for column pairs (categorical
pairs capped at 100 distinct values, as in the paper) — over the chosen
datasets and reports the percentage of tasks finishing within
0.5 / 1 / 2 / 5 seconds.

Usage::

    python jobs/fig5_self_comparison.py [dataset ...]   # default: titanic solar
"""
import itertools
import sys
import time

from repro import datasets
from repro.core import plot, plot_correlation, plot_missing
from repro.core.dtypes import EDAType, detect_types
from repro.harness import build_session, load_dataset

THRESHOLDS = (0.5, 1.0, 2.0, 5.0)


def run_dataset(spark, name: str, max_pairs: int = 15) -> dict[str, list[float]]:
    df = load_dataset(spark, name)
    types = detect_types(df)
    cols = list(df.columns)
    cat_small = {
        c for c, t in types.items()
        if t is EDAType.CATEGORICAL
    }
    times: dict[str, list[float]] = {"plot": [], "plot_correlation": [], "plot_missing": []}

    def timed(bucket, fn, *args):
        t0 = time.perf_counter()
        try:
            fn(*args)
        except TypeError:
            return  # datetime columns: out of task scope
        times[bucket].append(time.perf_counter() - t0)

    for c in cols:
        timed("plot", plot, df, c)
        timed("plot_missing", plot_missing, df, c)
        if types[c] is EDAType.NUMERICAL:
            timed("plot_correlation", plot_correlation, df, c)
    pairs = [
        (a, b) for a, b in itertools.combinations(cols, 2)
        if not (types[a] is EDAType.CATEGORICAL and types[b] is EDAType.CATEGORICAL)
        or (a in cat_small and b in cat_small)
    ]
    for a, b in pairs[:max_pairs]:
        timed("plot", plot, df, a, b)
    df.unpersist()
    return times


def main(argv: list[str]) -> None:
    names = argv or ["titanic", "solar"]
    spark = build_session("fig5-self-comparison")
    spark.sparkContext.setLogLevel("ERROR")
    try:
        merged: dict[str, list[float]] = {}
        for name in names:
            for bucket, ts in run_dataset(spark, name).items():
                merged.setdefault(bucket, []).extend(ts)
            print(f"[fig5] finished {name}", flush=True)
        print("\n| function | n tasks | " + " | ".join(f"<{t}s" for t in THRESHOLDS) + " |")
        print("|---|---|" + "---|" * len(THRESHOLDS))
        for bucket, ts in merged.items():
            if not ts:
                continue
            cells = " | ".join(
                f"{100 * sum(1 for x in ts if x <= thr) / len(ts):.0f}%" for thr in THRESHOLDS
            )
            print(f"| {bucket} | {len(ts)} | {cells} |")
    finally:
        spark.stop()


if __name__ == "__main__":
    main(sys.argv[1:])

"""Figure-6(b)-style scaling sweep (supplementary).

Times report generation for both systems on the bitcoin-like table while
the row count grows (the paper duplicates rows from 10M to 100M on a
server; this container sweeps a smaller range — the claim under test is
*linear scaling with a constant factor between systems*).

Usage::

    python jobs/fig6_scaling.py [rows ...]     # default: 50000 100000 200000 400000
"""
import sys
import time

from repro import datasets
from repro.baseline import eager_profile_report
from repro.core import create_report
from repro.harness import build_session


def main(argv: list[str]) -> None:
    sizes = [int(a) for a in argv] or [50_000, 100_000, 200_000, 400_000]
    spark = build_session("fig6-scaling")
    spark.sparkContext.setLogLevel("ERROR")
    print("| rows | baseline (s) | fused (s) | speedup |")
    print("|---|---|---|---|")
    try:
        for n in sizes:
            df = datasets.bitcoin_like(spark, nrows=n)
            df.cache().count()
            t0 = time.perf_counter()
            eager_profile_report(df)
            base = time.perf_counter() - t0
            t0 = time.perf_counter()
            create_report(df)
            fused = time.perf_counter() - t0
            df.unpersist()
            print(f"| {n} | {base:.1f} | {fused:.1f} | {base / fused:.1f}x |", flush=True)
    finally:
        spark.stop()


if __name__ == "__main__":
    main(sys.argv[1:])

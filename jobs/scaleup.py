#!/usr/bin/env python
"""Reproduce Figure 9 (D-R-TBS scale-up with batch size)."""
import os
import sys
import time

sys.path.insert(0, os.path.dirname(__file__))
from _session import get_spark  # noqa: E402

from repro.experiments.runtime import run_figure9  # noqa: E402


def main() -> None:
    spark = get_spark()
    t0 = time.time()
    res = run_figure9(spark)
    print("# Figure 9 — Dist-CP D-R-TBS runtime vs batch size (n = 2×batch)")
    print(f"{'batch size':>12}{'mean s/batch':>14}{'min s/batch':>13}")
    for bs, r in res.items():
        print(f"{bs:>12,}{r['mean_s']:>14.3f}{r['min_s']:>13.3f}")
    print(f"# elapsed: {time.time() - t0:.1f}s")
    spark.stop()


if __name__ == "__main__":
    main()

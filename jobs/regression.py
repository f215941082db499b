#!/usr/bin/env python
"""Reproduce Sec. 6.3 (linear regression, saturated and unsaturated).

Three configurations, as in Fig. 12:
  (a) n=1000, Periodic(10,10) — saturated samples;
  (b) n=1600, Periodic(10,10) — R-TBS unsaturated (stable size 1479);
  (c) n=1600, Periodic(16,16).
"""
import os
import time

from repro.datagen.modes import Periodic
from repro.experiments.regression_exp import (
    format_regression,
    run_regression,
    stable_rtbs_sample_size,
)


def main() -> None:
    n_runs = int(os.environ.get("RUNS", "30"))
    t0 = time.time()
    configs = [
        (1000, Periodic(10, 10), "(a) n=1000, P(10,10) — saturated"),
        (1600, Periodic(10, 10), "(b) n=1600, P(10,10) — R-TBS unsaturated"),
        (1600, Periodic(16, 16), "(c) n=1600, P(16,16) — R-TBS unsaturated"),
    ]
    for n, pattern, title in configs:
        res = run_regression(n=n, pattern=pattern, n_runs=n_runs)
        print(format_regression(res, f"# {title} ({n_runs} runs)"))
        print()
    print(
        "# R-TBS stable unsaturated sample size b/(1-e^-λ) ="
        f" {stable_rtbs_sample_size():.0f} (paper: 1479)"
    )
    print(f"# elapsed: {time.time() - t0:.1f}s")


if __name__ == "__main__":
    main()

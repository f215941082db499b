#!/usr/bin/env python
"""Reproduce the Sec. 6.2 varying-batch-size kNN comparison.

Reports Miss%/ES per scheme and the paper's ratio-vs-R-TBS view for the
Uniform(0,200) and 2%-growth regimes (λ=0.07, Periodic(10,10)).
"""
import os
import time

from repro.experiments.varying_batch import ratios_vs_rtbs, run_varying_batch


def main() -> None:
    n_runs = int(os.environ.get("RUNS", "30"))
    t0 = time.time()
    res = run_varying_batch(n_runs=n_runs)
    for regime, by_scheme in res.items():
        print(f"# varying batch size — {regime} ({n_runs} runs)")
        for label, (miss, es) in by_scheme.items():
            print(f"{label:<14} Miss%={miss:6.1f}  ES={es:6.1f}")
        print("# ratios vs R-TBS (Miss, ES):")
        for label, (rm, re_) in ratios_vs_rtbs(by_scheme).items():
            print(f"{label:<14} {rm:5.2f}x  {re_:5.2f}x")
    print(f"# elapsed: {time.time() - t0:.1f}s")


if __name__ == "__main__":
    main()

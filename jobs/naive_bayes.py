#!/usr/bin/env python
"""Reproduce Sec. 6.4 (Naive Bayes on the synthetic Usenet2 stream)."""
import os
import time

from repro.experiments.naive_bayes_exp import format_naive_bayes, run_naive_bayes


def main() -> None:
    n_runs = int(os.environ.get("RUNS", "30"))
    t0 = time.time()
    res = run_naive_bayes(n_runs=n_runs)
    print(f"# Naive Bayes on synthetic Usenet2 ({n_runs} runs, n=300, λ=0.3)")
    print(format_naive_bayes(res))
    print(f"# elapsed: {time.time() - t0:.1f}s")


if __name__ == "__main__":
    main()

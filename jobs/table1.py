#!/usr/bin/env python
"""Reproduce Table 1 (kNN accuracy & robustness across temporal patterns).

    python jobs/table1.py            # 30 runs (paper protocol)
    RUNS=5 python jobs/table1.py     # quicker sanity pass
"""
import os
import time

from repro.experiments.table1 import format_table, run_table1


def main() -> None:
    n_runs = int(os.environ.get("RUNS", "30"))
    t0 = time.time()
    results = run_table1(n_runs=n_runs)
    print(f"# Table 1 — kNN Miss% / 10% ES ({n_runs} runs, b=100, n=1000, k=7)")
    print(format_table(results))
    print(f"# elapsed: {time.time() - t0:.1f}s")


if __name__ == "__main__":
    main()

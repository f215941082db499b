#!/usr/bin/env python
"""Reproduce Figure 1 (T-TBS vs R-TBS sample-size dynamics) as tables."""
import time

from repro.experiments.sample_size import run_sample_size_dynamics, summarize_dynamics

TITLES = {
    "a_growth": "(a) growth φ=1.002 after t=200, λ=0.05",
    "b_constant": "(b) constant B=100, λ=0.1",
    "c_uniform": "(c) B ~ Uniform(0,200), λ=0.1",
    "d_decay": "(d) decay φ=0.8 after t=200, λ=0.01",
}


def main() -> None:
    t0 = time.time()
    dyn = run_sample_size_dynamics()
    print("# Figure 1 — sample size over time (tail-window summary, n=1000)")
    print(
        f"{'regime':<42}{'T-TBS mean':>11}{'max':>9}{'std':>8}"
        f"{'R-TBS mean':>12}{'max':>9}{'std':>8}"
    )
    for key, title in TITLES.items():
        s = summarize_dynamics(dyn[key])
        print(
            f"{title:<42}{s['ttbs_mean']:>11.0f}{s['ttbs_max']:>9.0f}"
            f"{s['ttbs_std']:>8.1f}{s['rtbs_mean']:>12.0f}{s['rtbs_max']:>9.0f}"
            f"{s['rtbs_std']:>8.1f}"
        )
    print(f"# elapsed: {time.time() - t0:.1f}s")


if __name__ == "__main__":
    main()

"""Tests for the prequential harness and the experiment drivers
(small-scale smoke + behavioural shape checks)."""
import math

import numpy as np
import pytest

from repro.datagen.batches import constant
from repro.datagen.gaussian_mixture import GaussianMixtureStream
from repro.datagen.modes import Periodic, SingleEvent
from repro.experiments.harness import (
    build_stream,
    make_scheme,
    run_prequential,
    summarize,
)
from repro.experiments.regression_exp import run_regression, stable_rtbs_sample_size
from repro.experiments.sample_size import run_sample_size_dynamics, summarize_dynamics
from repro.experiments.table1 import format_table, run_table1
from repro.ml.knn import KNNClassifier
from repro.ml.metrics import misclassification_rate


class TestMakeScheme:
    @pytest.mark.parametrize("name", ["rtbs", "sw", "unif", "ttbs"])
    def test_known_schemes(self, name):
        s = make_scheme(name, lam=0.1, n=50, b=100, seed=0)
        s.advance(range(10))
        assert len(s.sample()) <= 50

    def test_unknown_raises(self):
        with pytest.raises(ValueError):
            make_scheme("bogus", lam=0.1, n=10, b=10, seed=0)


class TestBuildStream:
    def test_structure(self):
        gen = GaussianMixtureStream(seed=0)
        X, y, bounds, mask = build_stream(
            gen,
            Periodic(5, 5),
            warmup=3,
            n_batches=10,
            batch_size_fn=constant(20),
            warmup_size=20,
        )
        assert len(bounds) == 13
        assert mask == [False] * 3 + [True] * 10
        assert bounds[0] == (0, 20) and bounds[-1] == (240, 260)
        assert X.shape == (260, 2) and y.shape == (260,)

    def test_variable_sizes(self):
        gen = GaussianMixtureStream(seed=1)
        sizes = {1: 5, 2: 0, 3: 12}
        X, y, bounds, mask = build_stream(
            gen,
            Periodic(2, 2),
            warmup=0,
            n_batches=3,
            batch_size_fn=lambda t: sizes[t],
            warmup_size=10,
        )
        assert [e - s for s, e in bounds] == [5, 0, 12]


class TestRunPrequential:
    def test_metric_per_evaluated_batch(self):
        gen = GaussianMixtureStream(seed=2)
        X, y, bounds, mask = build_stream(
            gen, SingleEvent(), warmup=5, n_batches=8,
            batch_size_fn=constant(30), warmup_size=30,
        )
        scheme = make_scheme("rtbs", lam=0.1, n=100, b=30, seed=0)
        out = run_prequential(
            scheme, lambda: KNNClassifier(3), X, y, bounds, mask,
            misclassification_rate, min_fit=3,
        )
        assert len(out) == 8
        assert all(0.0 <= v <= 100.0 for v in out)

    def test_empty_sample_gives_nan_first(self):
        gen = GaussianMixtureStream(seed=3)
        X, y, bounds, mask = build_stream(
            gen, SingleEvent(), warmup=0, n_batches=3,
            batch_size_fn=constant(10), warmup_size=10,
        )
        scheme = make_scheme("rtbs", lam=0.1, n=100, b=10, seed=0)
        out = run_prequential(
            scheme, lambda: KNNClassifier(3), X, y, bounds, mask,
            misclassification_rate, min_fit=3,
        )
        assert math.isnan(out[0])  # nothing sampled before first batch
        assert not math.isnan(out[1])


class TestSummarize:
    def test_values(self):
        per_batch = [50.0] * 20 + [10.0] * 9 + [90.0]
        acc, es = summarize(per_batch, skip=20, es_z=0.10)
        assert acc == pytest.approx(18.0)
        assert es == pytest.approx(90.0)

    def test_all_skipped_raises(self):
        with pytest.raises(ValueError):
            summarize([1.0, 2.0], skip=5, es_z=0.1)


class TestTable1Shape:
    """Small-scale reproduction shape checks (full run in jobs/)."""

    def test_rtbs_beats_sw_on_robustness(self):
        res = run_table1(
            n_runs=2, lambdas=(0.07,), patterns=(Periodic(10, 10),),
            n_batches=40, seed=123,
        )
        rt = res[("R-TBS λ=0.07", "P(10,10)")]
        sw = res[("SW", "P(10,10)")]
        unif = res[("Unif", "P(10,10)")]
        assert sw[1] > 1.3 * rt[1]       # SW's ES much worse (paper: 1.4-2.7x)
        assert unif[0] > rt[0]           # Unif less accurate

    def test_format_table_renders(self):
        res = run_table1(
            n_runs=1, lambdas=(0.07,), patterns=(SingleEvent(),), seed=9,
        )
        txt = format_table(res)
        assert "SingleEvent Miss%" in txt and "SW" in txt


class TestRegressionShape:
    def test_stable_size_constant_matches_paper(self):
        # paper: n=1600, b=100, λ=0.07 -> sample stabilizes at 1479
        assert round(stable_rtbs_sample_size(lam=0.07, b=100)) == 1479

    def test_saturated_ordering(self):
        res = run_regression(n=1000, n_runs=2, n_batches=40, seed=5)
        rt, sw, unif = res["R-TBS"], res["SW"], res["Unif"]
        # R-TBS best-or-equal accuracy and clearly better robustness
        assert rt[0] <= min(sw[0], unif[0]) * 1.1
        assert rt[1] < min(sw[1], unif[1])


class TestSampleSizeDynamics:
    def test_figure1_shapes(self):
        dyn = run_sample_size_dynamics(seed=1)
        a = summarize_dynamics(dyn["a_growth"])
        assert a["ttbs_max"] > 1500 and a["rtbs_max"] <= 1000 + 1e-9
        b = summarize_dynamics(dyn["b_constant"])
        assert b["rtbs_std"] == 0.0 and b["ttbs_std"] > 5
        c = summarize_dynamics(dyn["c_uniform"])
        assert c["rtbs_max"] <= 1000 + 1e-9
        assert c["ttbs_std"] > c["rtbs_std"]
        d = summarize_dynamics(dyn["d_decay"])
        assert d["ttbs_mean"] < 500 and d["rtbs_mean"] < 500

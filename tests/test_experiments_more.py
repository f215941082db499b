"""Shape/behaviour tests for the remaining experiment drivers
(Naive Bayes E5, varying batch E2, runtime helpers E6/E7)."""
import numpy as np
import pytest

from repro.experiments.naive_bayes_exp import format_naive_bayes, run_naive_bayes
from repro.experiments.runtime import format_runtime
from repro.experiments.varying_batch import ratios_vs_rtbs


class TestNaiveBayesExperiment:
    def test_shape_matches_paper(self):
        """Paper Sec. 6.4: R-TBS most accurate; SW worst ES by a clear
        margin; Unif's ES close to (slightly better than) R-TBS."""
        res = run_naive_bayes(n_runs=4, seed=11)
        rt, sw, unif = res["R-TBS"], res["SW"], res["Unif"]
        assert rt[0] < sw[0] and rt[0] < unif[0]       # best accuracy
        assert sw[1] > rt[1]                            # SW least robust
        assert abs(unif[1] - rt[1]) < 0.35 * rt[1]      # Unif ES ~ R-TBS ES

    def test_format(self):
        res = run_naive_bayes(n_runs=1, seed=3)
        txt = format_naive_bayes(res)
        assert "R-TBS" in txt and "20% ES" in txt


class TestVaryingBatchHelpers:
    def test_ratios_vs_rtbs(self):
        res = {
            "R-TBS λ=0.07": (10.0, 20.0),
            "SW": (12.0, 40.0),
            "Unif": (15.0, 30.0),
        }
        r = ratios_vs_rtbs(res)
        assert r["SW"] == (1.2, 2.0)
        assert r["Unif"] == (1.5, 1.5)


class TestRuntimeHelpers:
    def test_format_runtime(self):
        res = {
            "Cent-KV-RJ": {"mean_s": 2.0, "min_s": 1.9, "rounds": 3},
            "Dist-CP": {"mean_s": 1.0, "min_s": 0.9, "rounds": 3},
        }
        txt = format_runtime(res)
        assert "2.00x" in txt and "1.00x" in txt

    def test_make_int_batch_partitions(self, spark):
        from repro.distributed.common import partition_sizes
        from repro.experiments.runtime import make_int_batch

        df = make_int_batch(spark, 0, 1000, 4)
        sizes = partition_sizes(df)
        assert len(sizes) == 4 and sum(sizes) == 1000

    def test_make_int_batch_deterministic(self, spark):
        from repro.experiments.runtime import make_int_batch

        a = make_int_batch(spark, 3, 100, 2, seed=5).toPandas()
        b = make_int_batch(spark, 3, 100, 2, seed=5).toPandas()
        assert np.array_equal(
            np.sort(a["key"].to_numpy()), np.sort(b["key"].to_numpy())
        )

"""DuckDB-oracle checks for the deterministic Spark aggregates that the
distributed samplers and experiment harnesses rely on.

The samplers themselves are randomized (checked statistically
elsewhere); everything deterministic that flows through Spark SQL —
batch sizing, stream bucketing, aggregate statistics computed on
realized samples — is verified against DuckDB here, per the repo's
correctness policy.
"""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.002, seed=0).localCheckpoint(eager=True)


@pytest.fixture(scope="module")
def orders_df(spark):
    return synth_data.orders(spark, sf=0.002, seed=1).localCheckpoint(eager=True)


class TestStreamBucketing:
    """The runtime experiments stream lineitem in ship-month batches;
    the per-batch sizes |B_t| feed straight into the W/C recursions, so
    they must be exactly right."""

    def test_batch_sizes_by_month(self, spark, li):
        got = (
            li.groupBy(F.date_trunc("month", "l_shipdate").alias("batch_month"))
            .agg(F.count("*").alias("batch_size"))
        )
        assert_equivalent(
            got,
            """
            SELECT date_trunc('month', l_shipdate) AS batch_month,
                   count(*) AS batch_size
            FROM lineitem GROUP BY 1
            """,
            lineitem=li,
        )

    def test_total_stream_size(self, spark, li):
        got = li.agg(F.count("*").alias("n_items"))
        assert_equivalent(
            got, "SELECT count(*) AS n_items FROM lineitem", lineitem=li
        )


class TestSampleAggregates:
    """Aggregates computed over a (here: deterministic) subset of the
    stream — the same shape the ML harness computes over samples."""

    def test_class_frequencies(self, spark, li):
        got = (
            li.groupBy(F.col("l_returnflag").alias("flag"))
            .agg(
                F.count("*").alias("cnt"),
                F.round(F.sum("l_quantity"), 4).alias("qty"),
            )
        )
        assert_equivalent(
            got,
            """
            SELECT l_returnflag AS flag, count(*) AS cnt,
                   round(sum(l_quantity), 4) AS qty
            FROM lineitem GROUP BY 1
            """,
            lineitem=li,
        )

    def test_join_shape_for_enriched_stream(self, spark, li, orders_df):
        """The kNN/regression streams attach batch metadata via joins;
        exercise the shuffle-join path (broadcast is disabled in
        conftest) and oracle-check it."""
        got = (
            li.join(orders_df, li.l_orderkey == orders_df.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.count("*").alias("cnt"))
        )
        assert_equivalent(
            got,
            """
            SELECT o_orderpriority, count(*) AS cnt
            FROM lineitem JOIN orders ON l_orderkey = o_orderkey
            GROUP BY 1
            """,
            lineitem=li,
            orders=orders_df,
        )

    def test_decayed_weight_aggregation(self, spark, li):
        """Total decayed weight W_t = Σ_j B_j e^{-λ(t-j)} computed in
        Spark SQL over month-bucketed batches, vs DuckDB."""
        lam = 0.07
        monthed = li.withColumn(
            "j", F.months_between(F.date_trunc("month", "l_shipdate"), F.lit("1992-01-01"))
        )
        got = monthed.agg(
            F.round(F.sum(F.exp(F.lit(-lam) * (F.lit(83.0) - F.col("j")))), 4).alias(
                "total_weight"
            )
        )
        assert_equivalent(
            got,
            """
            SELECT round(sum(exp(-0.07 * (83.0 - j))), 4) AS total_weight
            FROM (
              SELECT datediff('month', DATE '1992-01-01',
                              date_trunc('month', l_shipdate))::DOUBLE AS j
              FROM lineitem
            )
            """,
            lineitem=li,
        )


class TestUniformKeysOracle:
    def test_zipf_key_counts(self, spark):
        z = synth_data.zipf_keys(spark, n=5000, n_keys=50, seed=3).localCheckpoint(
            eager=True
        )
        got = z.groupBy("k").agg(F.count("*").alias("cnt"))
        assert_equivalent(
            got, "SELECT k, count(*) AS cnt FROM zipf GROUP BY k", zipf=z
        )

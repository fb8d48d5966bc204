"""Provided TPC-H-lite generators plus the transactions() extension."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def tx(spark):
    return synth_data.transactions(spark, sf=0.003, seed=11).cache()


class TestProvidedGenerators:
    def test_lineitem_rowcount_scales(self, spark):
        df = synth_data.lineitem(spark, sf=0.001)
        assert df.count() == 6_000

    def test_orders_deterministic(self, spark):
        a = synth_data.orders(spark, sf=0.001).toPandas()
        b = synth_data.orders(spark, sf=0.001).toPandas()
        assert a.equals(b)

    def test_customer_schema(self, spark):
        cols = set(synth_data.customer(spark, sf=0.001).columns)
        assert {"c_custkey", "c_nationkey", "c_acctbal", "c_mktsegment"} <= cols

    def test_zipf_keys_are_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=20_000, n_keys=1000).toPandas()
        top = df["k"].value_counts().iloc[0]
        assert top > 20_000 / 1000 * 5  # far above the uniform share


class TestTransactions:
    def test_schema_and_positivity(self, tx):
        assert {"src", "dst", "amount", "ts", "is_fraud", "block"} <= set(tx.columns)
        assert tx.filter(F.col("amount") <= 0).count() == 0

    def test_fraud_labels_consistent(self, tx):
        assert tx.filter(
            (F.col("is_fraud") & (F.col("block") < 0))
            | (~F.col("is_fraud") & (F.col("block") >= 0))
        ).count() == 0

    def test_degree_aggregation_matches_duckdb(self, tx):
        got = tx.groupBy("dst").agg(F.count(F.lit(1)).alias("in_deg"))
        assert_equivalent(
            got,
            "SELECT dst, COUNT(*) AS in_deg FROM tx GROUP BY dst",
            tx=tx,
        )

    def test_fraud_density_aggregation_matches_duckdb(self, tx):
        got = tx.groupBy("is_fraud").agg(
            F.count(F.lit(1)).alias("n"),
            F.round(F.sum("amount"), 2).alias("total"),
        )
        assert_equivalent(
            got,
            "SELECT is_fraud, COUNT(*) AS n, ROUND(SUM(amount), 2) AS total "
            "FROM tx GROUP BY is_fraud",
            tx=tx,
        )

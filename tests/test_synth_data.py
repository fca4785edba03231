"""Provided synthetic OLAP generators + the DuckDB oracle wiring."""
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001).cache()


class TestGenerators:
    def test_lineitem_deterministic(self, spark):
        a = synth_data.lineitem(spark, sf=0.0005, seed=3).toPandas()
        b = synth_data.lineitem(spark, sf=0.0005, seed=3).toPandas()
        assert a.equals(b)

    def test_orders_keys_dense(self, spark):
        o = synth_data.orders(spark, sf=0.001).toPandas()
        assert list(o["o_orderkey"]) == list(range(1, len(o) + 1))

    def test_zipf_keys_skewed(self, spark):
        z = synth_data.zipf_keys(spark, n=2000, n_keys=100).toPandas()
        top_share = (z["k"] == 1).mean()
        assert top_share > 0.05  # rank-1 key is hot


class TestOracle:
    def test_aggregation_matches_duckdb(self, spark, li):
        from pyspark.sql import functions as F

        q = li.groupBy("l_returnflag").agg(
            F.sum("l_quantity").alias("sum_qty"),
            F.count("*").alias("n"),
        )
        assert_equivalent(
            q,
            "SELECT l_returnflag, SUM(l_quantity) AS sum_qty, COUNT(*) AS n "
            "FROM lineitem GROUP BY l_returnflag",
            lineitem=li,
        )

    def test_oracle_catches_wrong_result(self, spark, li):
        from pyspark.sql import functions as F

        wrong = li.groupBy("l_returnflag").agg(
            (F.sum("l_quantity") + 1).alias("sum_qty")
        )
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong,
                "SELECT l_returnflag, SUM(l_quantity) AS sum_qty "
                "FROM lineitem GROUP BY l_returnflag",
                lineitem=li,
            )

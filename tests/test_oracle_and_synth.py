"""Provided substrate: DuckDB oracle self-checks + TPC-H-lite smoke.

The paper's workloads are graphs, not TPC-H, but the oracle is the
correctness backbone for every relational pipeline in this repo — these
tests pin down its semantics (and exercise the provided generators).
"""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


class TestOracle:
    def test_passes_on_equivalent_aggregation(self, spark):
        li = synth_data.lineitem(spark, sf=0.001, seed=0)
        got = (
            li.groupBy("l_returnflag")
            .agg(
                F.count(F.lit(1)).alias("cnt"),
                F.round(F.sum("l_quantity"), 2).alias("qty"),
            )
        )
        assert_equivalent(
            got,
            """
            SELECT l_returnflag,
                   count(*) AS cnt,
                   round(sum(l_quantity), 2) AS qty
            FROM lineitem GROUP BY l_returnflag
            """,
            lineitem=li,
        )

    def test_fails_on_wrong_result(self, spark):
        li = synth_data.lineitem(spark, sf=0.001, seed=0)
        wrong = li.groupBy("l_returnflag").agg(
            (F.count(F.lit(1)) + 1).alias("cnt")
        )
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong,
                "SELECT l_returnflag, count(*) AS cnt "
                "FROM lineitem GROUP BY l_returnflag",
                lineitem=li,
            )

    def test_fails_on_column_mismatch(self, spark):
        li = synth_data.lineitem(spark, sf=0.001, seed=0)
        got = li.groupBy("l_returnflag").agg(F.count(F.lit(1)).alias("n"))
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(
                got,
                "SELECT l_returnflag, count(*) AS cnt "
                "FROM lineitem GROUP BY l_returnflag",
                lineitem=li,
            )

    def test_accepts_pandas_tables(self, spark):
        pdf = pd.DataFrame({"k": [1, 1, 2], "v": [1.0, 2.0, 3.0]})
        got = spark.createDataFrame(pdf).groupBy("k").agg(
            F.sum("v").alias("s")
        )
        assert_equivalent(
            got, "SELECT k, sum(v) AS s FROM t GROUP BY k", t=pdf
        )


class TestSynthData:
    def test_deterministic(self, spark):
        a = synth_data.orders(spark, sf=0.001, seed=1).toPandas()
        b = synth_data.orders(spark, sf=0.001, seed=1).toPandas()
        pd.testing.assert_frame_equal(a, b)

    def test_zipf_skew(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100, seed=0)
        top = (
            df.groupBy("k").count().orderBy(F.desc("count")).first()
        )
        assert top["count"] > 5000 / 100 * 5  # head is heavily skewed

    def test_uniform_keys_range(self, spark):
        df = synth_data.uniform_keys(spark, n=1000, n_keys=10, seed=0)
        ks = [r["k"] for r in df.select("k").distinct().collect()]
        assert set(ks) <= set(range(1, 11))

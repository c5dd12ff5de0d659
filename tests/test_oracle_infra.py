"""Smoke tests for the provided infrastructure (synth_data + oracle) —
proves the DuckDB oracle catches wrong results, not just that code runs."""
import pytest
from pyspark.sql import functions as sf

from repro.oracle import assert_equivalent
from repro.synth_data import lineitem, uniform_keys, zipf_keys


class TestSynthData:
    def test_lineitem_deterministic(self, spark):
        a = lineitem(spark, sf=0.0005, seed=1).count()
        b = lineitem(spark, sf=0.0005, seed=1).count()
        assert a == b > 0

    def test_zipf_skew(self, spark):
        df = zipf_keys(spark, n=5000, n_keys=100, alpha=1.5, seed=2)
        top = (
            df.groupBy("k").count().orderBy(sf.col("count").desc()).limit(1)
        ).collect()[0]["count"]
        assert top > 5000 / 100  # heaviest key far above uniform share

    def test_uniform_keys(self, spark):
        df = uniform_keys(spark, n=1000, n_keys=10, seed=3)
        assert df.select("k").distinct().count() == 10


class TestOracle:
    def test_accepts_equivalent(self, spark):
        li = lineitem(spark, sf=0.0005, seed=4)
        got = li.groupBy("l_returnflag").agg(
            sf.round(sf.sum("l_quantity"), 4).alias("qty")
        )
        assert_equivalent(
            got,
            """
            SELECT l_returnflag, round(sum(l_quantity), 4) AS qty
            FROM li GROUP BY l_returnflag
            """,
            li=li,
        )

    def test_rejects_wrong_result(self, spark):
        li = lineitem(spark, sf=0.0005, seed=4)
        wrong = li.groupBy("l_returnflag").agg(
            (sf.round(sf.sum("l_quantity"), 4) + 1).alias("qty")
        )
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong,
                """
                SELECT l_returnflag, round(sum(l_quantity), 4) AS qty
                FROM li GROUP BY l_returnflag
                """,
                li=li,
            )

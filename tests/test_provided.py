"""Sanity tests for the provided substrate modules (oracle, synth_data)
so a regression there is caught close to its source."""
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent


class TestOracle:
    def test_accepts_matching_aggregate(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        got = li.groupBy("l_returnflag").count().withColumnRenamed("count", "n")
        assert_equivalent(
            got,
            "SELECT l_returnflag, COUNT(*) AS n FROM li GROUP BY l_returnflag",
            li=li,
        )

    def test_rejects_wrong_result(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        wrong = li.limit(5).select("l_orderkey")
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong, "SELECT l_orderkey FROM li", li=li
            )

    def test_rejects_column_mismatch(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        got = li.groupBy("l_returnflag").count()
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(
                got,
                "SELECT l_returnflag, COUNT(*) AS n FROM li GROUP BY l_returnflag",
                li=li,
            )


class TestSynthData:
    def test_deterministic(self, spark):
        a = synth_data.orders(spark, sf=0.001).toPandas()
        b = synth_data.orders(spark, sf=0.001).toPandas()
        assert a.equals(b)

    def test_zipf_skew(self, spark):
        zipf = synth_data.zipf_keys(spark, n=5000, n_keys=100, seed=0).toPandas()
        uni = synth_data.uniform_keys(spark, n=5000, n_keys=100, seed=0).toPandas()
        assert zipf.k.value_counts().iloc[0] > uni.k.value_counts().iloc[0]

    def test_scale_factor(self, spark):
        small = synth_data.customer(spark, sf=0.001).count()
        large = synth_data.customer(spark, sf=0.002).count()
        assert large == 2 * small

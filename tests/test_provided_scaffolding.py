"""Smoke tests for the shipped TPC-H-lite generators and DuckDB oracle.

The paper's experiments run on the social+KG schema, but the provided
generators stay exercised (and the oracle's failure mode is verified).
"""
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent


class TestSynthData:
    def test_lineitem_oracle_aggregate(self, spark):
        li = synth_data.lineitem(spark, sf=0.001, seed=0)
        got = li.groupBy("l_returnflag").count().withColumnRenamed("count", "n")
        assert_equivalent(
            got,
            "SELECT l_returnflag, count(*) AS n FROM li GROUP BY l_returnflag",
            li=li,
        )

    def test_join_oracle(self, spark):
        li = synth_data.lineitem(spark, sf=0.001, seed=0)
        o = synth_data.orders(spark, sf=0.001, seed=1)
        got = (
            li.join(o, li.l_orderkey == o.o_orderkey)
            .groupBy("o_orderpriority")
            .count()
            .withColumnRenamed("count", "n")
        )
        assert_equivalent(
            got,
            """SELECT o_orderpriority, count(*) AS n
               FROM li JOIN o ON l_orderkey = o_orderkey
               GROUP BY o_orderpriority""",
            li=li,
            o=o,
        )

    def test_zipf_keys_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100).toPandas()
        top = df["k"].value_counts().iloc[0]
        assert top > 2 * len(df) / 100  # far above uniform share

    def test_oracle_catches_wrong_result(self, spark):
        li = synth_data.lineitem(spark, sf=0.001, seed=0)
        wrong = li.groupBy("l_returnflag").count().withColumnRenamed("count", "n")
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong,
                "SELECT l_returnflag, count(*) + 1 AS n FROM li GROUP BY l_returnflag",
                li=li,
            )

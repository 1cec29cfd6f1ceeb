"""Infrastructure sanity: the DuckDB oracle catches wrong results, and the
TPC-H-lite generators drive a real shuffle join it can verify."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


def test_oracle_accepts_correct_aggregate(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    got = li.groupBy("l_returnflag").agg(
        F.count("*").alias("cnt"), F.round(F.sum("l_quantity"), 2).alias("qty")
    )
    assert_equivalent(
        got,
        """
        SELECT l_returnflag, count(*) AS cnt, round(sum(l_quantity), 2) AS qty
        FROM lineitem GROUP BY l_returnflag
        """,
        lineitem=li,
    )


def test_oracle_verifies_shuffle_join(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    o = synth_data.orders(spark, sf=0.001)
    got = (
        li.join(o, li.l_orderkey == o.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("cnt"))
    )
    assert_equivalent(
        got,
        """
        SELECT o_orderpriority, count(*) AS cnt
        FROM lineitem JOIN orders ON l_orderkey = o_orderkey
        GROUP BY o_orderpriority
        """,
        lineitem=li,
        orders=o,
    )


def test_oracle_rejects_wrong_result(spark):
    df = spark.createDataFrame(pd.DataFrame({"k": [1, 2], "v": [10.0, 99.0]}))
    with pytest.raises(AssertionError):
        assert_equivalent(
            df, "SELECT k, v + 1 AS v FROM t", t=pd.DataFrame({"k": [1, 2], "v": [10.0, 99.0]})
        )


def test_oracle_rejects_column_mismatch(spark):
    df = spark.createDataFrame(pd.DataFrame({"a": [1]}))
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(df, "SELECT 1 AS b", t=pd.DataFrame({"a": [1]}))


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.3)
    counts = df.groupBy("k").count().toPandas().sort_values("count", ascending=False)
    top = counts["count"].iloc[0]
    assert top > 5000 / 100 * 3  # head key far above uniform share

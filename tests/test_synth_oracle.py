"""Sanity checks on the provided TPC-H-lite generators and the DuckDB
result-equality oracle (the shared correctness substrate)."""
from __future__ import annotations

import pyspark.sql.functions as F
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent


def test_lineitem_deterministic(spark):
    a = synth_data.lineitem(spark, sf=0.001, seed=0).toPandas()
    b = synth_data.lineitem(spark, sf=0.001, seed=0).toPandas()
    assert a.equals(b)


def test_oracle_agreement_on_aggregate(spark):
    li = synth_data.lineitem(spark, sf=0.001, seed=0)
    got = li.groupBy("l_returnflag").agg(
        F.sum("l_quantity").alias("q"), F.count("*").alias("n")
    )
    assert_equivalent(
        got,
        "SELECT l_returnflag, sum(l_quantity) AS q, count(*) AS n "
        "FROM li GROUP BY l_returnflag",
        li=li,
    )


def test_oracle_catches_wrong_result(spark):
    li = synth_data.lineitem(spark, sf=0.001, seed=0)
    wrong = li.groupBy("l_returnflag").agg((F.sum("l_quantity") + 1).alias("q"))
    with pytest.raises(AssertionError):
        assert_equivalent(
            wrong,
            "SELECT l_returnflag, sum(l_quantity) AS q FROM li GROUP BY l_returnflag",
            li=li,
        )


def test_oracle_catches_column_mismatch(spark):
    li = synth_data.lineitem(spark, sf=0.001, seed=0)
    got = li.select(F.col("l_orderkey").alias("wrong_name")).limit(1)
    with pytest.raises(AssertionError):
        assert_equivalent(got, "SELECT l_orderkey FROM li LIMIT 1", li=li)


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.3).toPandas()
    counts = df.k.value_counts()
    assert counts.iloc[0] > 5 * counts.mean()

"""Provided scaffolding: synthetic TPC-H-lite generators + DuckDB oracle."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro import synth_data as S
from repro.oracle import assert_equivalent


def test_lineitem_deterministic(spark):
    a = S.lineitem(spark, sf=0.001, seed=3).toPandas()
    b = S.lineitem(spark, sf=0.001, seed=3).toPandas()
    assert a.equals(b)


def test_row_counts_scale(spark):
    assert S.lineitem(spark, sf=0.001).count() == 6000
    assert S.orders(spark, sf=0.001).count() == 1500
    assert S.customer(spark, sf=0.001).count() == 150
    assert S.part(spark, sf=0.001).count() == 200


def test_zipf_skew(spark):
    df = S.zipf_keys(spark, n=5000, n_keys=100, alpha=1.5).toPandas()
    counts = df["k"].value_counts()
    assert counts.iloc[0] > 5 * counts.iloc[-1]


def test_uniform_keys_range(spark):
    df = S.uniform_keys(spark, n=1000, n_keys=50).toPandas()
    assert df["k"].between(1, 50).all()


def test_oracle_catches_agreement(spark):
    li = S.lineitem(spark, sf=0.001)
    got = li.groupBy("l_returnflag").agg(
        F.sum("l_quantity").alias("qty"), F.count("*").alias("n")
    )
    assert_equivalent(
        got,
        "SELECT l_returnflag, SUM(l_quantity) AS qty, COUNT(*) AS n FROM li GROUP BY l_returnflag",
        li=li,
    )


def test_oracle_join_query(spark):
    li = S.lineitem(spark, sf=0.001)
    o = S.orders(spark, sf=0.001)
    got = (
        li.join(o, li.l_orderkey == o.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.sum("l_extendedprice").alias("rev"))
    )
    assert_equivalent(
        got,
        """
        SELECT o_orderpriority, SUM(l_extendedprice) AS rev
        FROM li JOIN o ON l_orderkey = o_orderkey
        GROUP BY o_orderpriority
        """,
        li=li,
        o=o,
    )


def test_oracle_detects_wrong_result(spark):
    li = S.lineitem(spark, sf=0.001)
    wrong = li.groupBy("l_returnflag").agg((F.sum("l_quantity") + 1).alias("qty"))
    with pytest.raises(AssertionError):
        assert_equivalent(
            wrong,
            "SELECT l_returnflag, SUM(l_quantity) AS qty FROM li GROUP BY l_returnflag",
            li=li,
        )


def test_oracle_detects_column_mismatch(spark):
    li = S.lineitem(spark, sf=0.001)
    got = li.groupBy("l_returnflag").agg(F.count("*").alias("cnt"))
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(
            got,
            "SELECT l_returnflag, COUNT(*) AS n FROM li GROUP BY l_returnflag",
            li=li,
        )

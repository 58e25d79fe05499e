"""Smoke tests for the provided TPC-H-lite generators and DuckDB oracle
(kept exercised even though Darwin's corpora are textual)."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001).cache()


def test_lineitem_rowcount(li):
    assert li.count() == 6000


def test_oracle_agg(li):
    got = li.groupBy("l_returnflag").agg(
        F.count("*").alias("n"), F.round(F.sum("l_quantity"), 2).alias("qty")
    )
    assert_equivalent(
        got,
        "SELECT l_returnflag, count(*) AS n, round(sum(l_quantity), 2) AS qty "
        "FROM li GROUP BY l_returnflag",
        li=li,
    )


def test_oracle_join(spark, li):
    o = synth_data.orders(spark, sf=0.001)
    got = (
        li.join(o, li.l_orderkey == o.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("n"))
    )
    assert_equivalent(
        got,
        "SELECT o_orderpriority, count(*) AS n FROM li JOIN o "
        "ON l_orderkey = o_orderkey GROUP BY o_orderpriority",
        li=li,
        o=o,
    )


def test_zipf_keys_skew(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100)
    top = df.groupBy("k").count().orderBy(F.desc("count")).first()
    assert top["k"] <= 3  # most frequent key is a low rank

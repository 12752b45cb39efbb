"""Tests exercising the provided TPC-H-lite generators and the DuckDB oracle
exactly as the scaffold intends: Spark SQL results diffed against DuckDB over
the same inputs. These guard the correctness harness every other test relies
on."""
from __future__ import annotations

import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001).persist()


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=0.001).persist()


def test_lineitem_rowcount_scales(li):
    assert li.count() == 6000


def test_filter_aggregate_matches_duckdb(li):
    out = (
        li.filter(F.col("l_quantity") > 25)
        .groupBy("l_returnflag")
        .agg(
            F.count("*").alias("cnt"),
            F.round(F.sum("l_extendedprice"), 2).alias("revenue"),
        )
    )
    assert_equivalent(
        out,
        """
        SELECT l_returnflag,
               COUNT(*) AS cnt,
               ROUND(SUM(l_extendedprice), 2) AS revenue
        FROM li WHERE l_quantity > 25 GROUP BY l_returnflag
        """,
        li=li,
    )


def test_join_aggregate_matches_duckdb(li, orders):
    out = (
        li.join(orders, li["l_orderkey"] == orders["o_orderkey"])
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("cnt"))
    )
    assert_equivalent(
        out,
        """
        SELECT o_orderpriority, COUNT(*) AS cnt
        FROM li JOIN orders ON li.l_orderkey = orders.o_orderkey
        GROUP BY o_orderpriority
        """,
        li=li,
        orders=orders,
    )


def test_oracle_detects_wrong_result(li):
    wrong = (
        li.groupBy("l_returnflag")
        .agg((F.count("*") + 1).alias("cnt"))  # off-by-one: oracle must fail
    )
    with pytest.raises(AssertionError):
        assert_equivalent(
            wrong,
            "SELECT l_returnflag, COUNT(*) AS cnt FROM li GROUP BY l_returnflag",
            li=li,
        )


def test_oracle_detects_column_mismatch(li):
    out = li.groupBy("l_returnflag").agg(F.count("*").alias("n_rows"))
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(
            out,
            "SELECT l_returnflag, COUNT(*) AS cnt FROM li GROUP BY l_returnflag",
            li=li,
        )


def test_oracle_accepts_pandas_tables(spark):
    pdf = pd.DataFrame({"k": [1, 1, 2], "v": [1.0, 2.0, 3.0]})
    out = spark.createDataFrame(pdf).groupBy("k").agg(F.sum("v").alias("s"))
    assert_equivalent(out, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf)


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.5)
    top = (
        df.groupBy("k").count().orderBy(F.desc("count")).limit(1).first()["count"]
    )
    assert top > 5000 / 100 * 5  # heavy head


def test_uniform_keys_cover_range(spark):
    df = synth_data.uniform_keys(spark, n=2000, n_keys=10)
    ks = {r["k"] for r in df.select("k").distinct().collect()}
    assert ks == set(range(1, 11))


def test_customer_part_generators(spark):
    c = synth_data.customer(spark, sf=0.001)
    p = synth_data.part(spark, sf=0.001)
    assert c.count() == 150
    assert p.count() == 200
    assert c.filter(F.col("c_nationkey") >= 25).count() == 0

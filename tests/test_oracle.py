"""Oracle substrate integration: DuckDB equality checks over TPC-H-lite and
over graph-derived relational results."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.graphs import suite
from repro.oracle import assert_equivalent


def test_lineitem_aggregate(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    got = (
        li.groupBy("l_returnflag")
        .agg(F.sum("l_quantity").alias("qty"), F.count(F.lit(1)).alias("cnt"))
    )
    assert_equivalent(
        got,
        "SELECT l_returnflag, SUM(l_quantity) AS qty, COUNT(*) AS cnt FROM li GROUP BY l_returnflag",
        li=li,
    )


def test_orders_join(spark):
    o = synth_data.orders(spark, sf=0.001)
    c = synth_data.customer(spark, sf=0.001)
    got = (
        o.join(c, o.o_custkey == c.c_custkey)
        .groupBy("c_mktsegment")
        .agg(F.count(F.lit(1)).alias("n_orders"))
    )
    assert_equivalent(
        got,
        "SELECT c_mktsegment, COUNT(*) AS n_orders FROM o JOIN c ON o_custkey = c_custkey GROUP BY c_mktsegment",
        o=o,
        c=c,
    )


def test_degree_distribution_via_oracle(spark):
    g = suite.get("LJ", "test")
    edges = g.df(spark)
    got = edges.groupBy("src").agg(F.count(F.lit(1)).alias("deg"))
    assert_equivalent(
        got, "SELECT src, COUNT(*) AS deg FROM e GROUP BY src", e=g.pandas()
    )


def test_edge_symmetry_via_oracle(spark):
    g = suite.get("RO", "test")
    edges = g.df(spark)
    got = edges.selectExpr("count(*) as cnt")
    assert_equivalent(
        got,
        "SELECT COUNT(*) AS cnt FROM e",
        e=g.pandas(),
    )

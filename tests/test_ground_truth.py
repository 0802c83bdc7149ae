"""Tests for the exact engines — including oracle cross-checks between
exact Spark SQL and DuckDB (repro.oracle) so the ground truth itself is
verified, plus TPC-H-lite coverage."""
import numpy as np
import pandas as pd
import pytest

from repro.ground_truth import ExactEngine, exact_spark
from repro.oracle import assert_equivalent
from repro.queries import Cond, Group, Query, query_sql
from repro.synth_data import lineitem, orders


@pytest.fixture(scope="module")
def li(spark):
    return lineitem(spark, sf=0.002).select(
        "l_orderkey", "l_quantity", "l_extendedprice", "l_discount", "l_returnflag"
    )


@pytest.fixture(scope="module")
def li_pdf(li):
    return li.toPandas()


QUERIES = [
    Query("COUNT", "l_quantity", Cond("l_extendedprice", "<", 30_000.0)),
    Query("SUM", "l_extendedprice", Cond("l_quantity", ">=", 25.0)),
    Query("AVG", "l_quantity", Cond("l_returnflag", "=", "R")),
    Query("MIN", "l_extendedprice", Cond("l_quantity", ">", 45.0)),
    Query("MAX", "l_quantity", Cond("l_discount", "<=", 0.05)),
    Query(
        "SUM",
        "l_quantity",
        Group("or", (Cond("l_returnflag", "=", "A"), Cond("l_discount", ">", 0.08))),
    ),
]


@pytest.mark.parametrize("q", QUERIES, ids=[f"{q.func}-{q.col}" for q in QUERIES])
def test_spark_exact_matches_duckdb_oracle(spark, li, li_pdf, q):
    """The exact Spark SQL path must agree with DuckDB row-for-row — this
    is the oracle check that validates our ground-truth engine."""
    from pyspark.sql import functions as F

    result = exact_spark(spark, li, q).select(F.round("val", 4).alias("val"))
    assert_equivalent(
        result,
        f"SELECT round(val, 4) AS val FROM ({query_sql(q, 'li')})",
        li=li_pdf,
    )


def test_exact_engine_scalar(li_pdf):
    ex = ExactEngine(li_pdf)
    q = QUERIES[0]
    v = ex.scalar(q)
    truth = (li_pdf["l_extendedprice"] < 30_000).sum()
    assert v == truth
    ex.close()


def test_exact_engine_none_on_empty(li_pdf):
    ex = ExactEngine(li_pdf)
    v = ex.scalar(Query("AVG", "l_quantity", Cond("l_quantity", ">", 1e9)))
    assert v is None
    ex.close()


def test_exact_engine_groups(li_pdf):
    ex = ExactEngine(li_pdf)
    q = Query("COUNT", "l_quantity", Cond("l_quantity", ">", 10.0), group_by="l_returnflag")
    groups = ex.groups(q)
    assert set(groups) == set(li_pdf["l_returnflag"].unique())
    assert sum(groups.values()) == (li_pdf["l_quantity"] > 10).sum()
    ex.close()


def test_groupby_spark_oracle(spark, li, li_pdf):
    """Grouped exact query cross-checked through the oracle."""
    from pyspark.sql import functions as F

    q = Query("AVG", "l_quantity", Cond("l_extendedprice", ">", 10_000.0), group_by="l_returnflag")
    result = exact_spark(spark, li, q).select("grp", F.round("val", 4).alias("val"))
    assert_equivalent(
        result,
        f"SELECT grp, round(val, 4) AS val FROM ({query_sql(q, 'li')})",
        li=li_pdf,
    )


def test_join_shaped_oracle(spark):
    """Exercise the shuffle path: aggregate over a lineitem-orders join,
    validated by the oracle (broadcast joins are disabled in conftest)."""
    li = lineitem(spark, sf=0.002)
    od = orders(spark, sf=0.002)
    joined = (
        li.join(od, li.l_orderkey == od.o_orderkey)
        .groupBy("o_orderpriority")
        .count()
        .withColumnRenamed("count", "n")
    )
    assert_equivalent(
        joined,
        "SELECT o_orderpriority, count(*) AS n FROM li JOIN od ON l_orderkey = o_orderkey "
        "GROUP BY o_orderpriority",
        li=li.toPandas(),
        od=od.toPandas(),
    )

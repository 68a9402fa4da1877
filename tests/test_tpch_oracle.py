"""DuckDB oracle checks of the stage-1 Catalyst plans on TPC-H-lite.

Canonicalization (Definition 3.1) and provenance extraction (Definition
2.3) are plain Spark SQL plans; these tests pin them row-for-row against
DuckDB over the provided ``repro.synth_data`` generators at SF=0.01.
"""
import pyspark.sql.functions as F
import pytest

from repro import synth_data
from repro.core.canonical import canonicalize
from repro.core.queries import IMPACT_COL, QuerySpec
from repro.oracle import assert_equivalent

SF = 0.01


@pytest.fixture(scope="module")
def lineitem(spark):
    return synth_data.lineitem(spark, sf=SF).cache()


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=SF).cache()


def test_provenance_sum_impact_matches_duckdb(spark, lineitem):
    q = QuerySpec(("l_returnflag", "l_linestatus"), agg="sum", agg_attr="l_quantity")
    prov = q.provenance(lineitem, "l_shipdate <= DATE '1998-09-02'")
    got = prov.groupBy().agg(F.sum(IMPACT_COL).alias("total"))
    assert_equivalent(
        got,
        "SELECT SUM(l_quantity) AS total FROM li "
        "WHERE l_shipdate <= TIMESTAMP '1998-09-02'",
        li=lineitem,
    )


def test_canonicalization_matches_duckdb_groupby(spark, lineitem):
    q = QuerySpec(("l_returnflag", "l_linestatus"), agg="sum", agg_attr="l_quantity")
    prov = q.provenance(lineitem, "l_shipdate <= DATE '1998-09-02'")
    t = canonicalize(prov, ["l_returnflag", "l_linestatus"]).select(
        "l_returnflag", "l_linestatus", IMPACT_COL
    )
    assert_equivalent(
        t,
        "SELECT l_returnflag, l_linestatus, SUM(impact) AS impact "
        "FROM p GROUP BY l_returnflag, l_linestatus",
        p=prov,
    )


def test_count_provenance_matches_duckdb(spark, orders):
    q = QuerySpec(("o_orderpriority",), agg="count")
    prov = q.provenance(orders, "o_orderstatus = 'O'")
    t = canonicalize(prov, ["o_orderpriority"]).select("o_orderpriority", IMPACT_COL)
    assert_equivalent(
        t,
        "SELECT o_orderpriority, CAST(COUNT(*) AS DOUBLE) AS impact "
        "FROM o WHERE o_orderstatus = 'O' GROUP BY o_orderpriority",
        o=orders,
    )


def test_join_provenance_matches_duckdb(spark, lineitem, orders):
    # Q over a join (the paper's queries allow arbitrary X): revenue per
    # order priority for urgent open orders.
    joined = lineitem.join(orders, F.col("l_orderkey") == F.col("o_orderkey"))
    q = QuerySpec(("o_orderpriority",), agg="sum", agg_attr="l_extendedprice")
    prov = q.provenance(joined, "o_orderpriority = '1-URGENT'")
    t = canonicalize(prov, ["o_orderpriority"]).select("o_orderpriority", IMPACT_COL)
    assert_equivalent(
        t,
        "SELECT o_orderpriority, SUM(l_extendedprice) AS impact "
        "FROM li JOIN o ON l_orderkey = o_orderkey "
        "WHERE o_orderpriority = '1-URGENT' GROUP BY o_orderpriority",
        li=lineitem,
        o=orders,
    )

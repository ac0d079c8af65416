"""Provided TPC-H-lite generators + DuckDB oracle, exercised end to end.

These tests use the scaffolding the repo shipped with: histogram-
generating queries (Definition 1 shapes) over lineitem/orders, checked
by ``assert_equivalent``, plus the generic distance/topk path on TPC-H
columns — showing the contribution is not tied to the synthetic
workload generators.
"""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.core.distance import candidate_distances, candidate_histograms
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.002, seed=0).cache()


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=0.002, seed=1).cache()


def test_definition1_histogram_query(li):
    got = candidate_histograms(li, "l_returnflag", "l_linenumber")
    assert_equivalent(
        got,
        "SELECT l_returnflag, l_linenumber, COUNT(*) AS cnt "
        "FROM lineitem GROUP BY 1, 2",
        lineitem=li,
    )


def test_definition1_with_predicate(li):
    sub = li.filter(F.col("l_quantity") > 25)
    got = candidate_histograms(sub, "l_linestatus", "l_linenumber")
    assert_equivalent(
        got,
        "SELECT l_linestatus, l_linenumber, COUNT(*) AS cnt FROM lineitem "
        "WHERE l_quantity > 25 GROUP BY 1, 2",
        lineitem=li,
    )


def test_orders_priority_histograms(orders):
    got = candidate_histograms(orders, "o_orderstatus", "o_orderpriority")
    assert_equivalent(
        got,
        "SELECT o_orderstatus, o_orderpriority, COUNT(*) AS cnt "
        "FROM orders GROUP BY 1, 2",
        orders=orders,
    )


def test_distance_on_tpch_uniform_target(li):
    """Distance to a uniform line-number target, Spark vs DuckDB."""
    target = {i: 1 / 7 for i in range(1, 8)}
    got = candidate_distances(li, "l_returnflag", "l_linenumber", target)
    vals = ", ".join(f"({i}, {1 / 7})" for i in range(1, 8))
    assert_equivalent(
        got,
        f"""
        WITH counts AS (
            SELECT l_returnflag AS z, l_linenumber AS x, COUNT(*) AS cnt
            FROM lineitem GROUP BY 1, 2
        ),
        totals AS (SELECT z, SUM(cnt) AS total FROM counts GROUP BY 1),
        target(x, q) AS (VALUES {vals}),
        bins AS (SELECT x FROM counts UNION SELECT x FROM target),
        cells AS (
            SELECT t.z, COALESCE(c.cnt, 0) / t.total AS p, COALESCE(tg.q, 0.0) AS q
            FROM totals t
            CROSS JOIN (SELECT DISTINCT x FROM bins) b
            LEFT JOIN counts c ON t.z = c.z AND b.x = c.x
            LEFT JOIN target tg ON b.x = tg.x
        )
        SELECT z AS l_returnflag, SUM(ABS(p - q)) AS dist FROM cells GROUP BY z
        """,
        lineitem=li,
    )

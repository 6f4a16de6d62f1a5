"""NRAB operator semantics vs the DuckDB oracle on flat TPC-H-lite data.

Each test runs an NRAB query through our Spark executor and diffs the
result against the equivalent SQL executed by DuckDB over the same input
(``repro.oracle.assert_equivalent``) — a wrong operator implementation is a
wrong result, not just a crash.
"""
import pytest

from repro import synth_data
from repro.core import algebra as A
from repro.core.exprs import And, Arith, Const, Like, a, cmp
from repro.oracle import assert_equivalent

SF = 0.002


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=SF).cache()

@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=SF).cache()

@pytest.fixture(scope="module")
def cust(spark):
    return synth_data.customer(spark, sf=SF).cache()


def test_selection(spark, li):
    q = A.Select(A.TableAccess("li"), cmp("l_quantity", "<=", 24.0))
    assert_equivalent(
        A.run(q, {"li": li}),
        "SELECT * FROM li WHERE l_quantity <= 24.0",
        li=li,
    )


def test_selection_conjunction(spark, li):
    q = A.Select(
        A.TableAccess("li"),
        And(cmp("l_discount", ">=", 0.05), cmp("l_discount", "<=", 0.07)),
    )
    assert_equivalent(
        A.run(q, {"li": li}),
        "SELECT * FROM li WHERE l_discount >= 0.05 AND l_discount <= 0.07",
        li=li,
    )


def test_projection(spark, li):
    q = A.Project(A.TableAccess("li"), [("k", "l_orderkey"), ("q", "l_quantity")])
    assert_equivalent(
        A.run(q, {"li": li}),
        "SELECT l_orderkey AS k, l_quantity AS q FROM li",
        li=li,
    )


def test_projection_computed(spark, li):
    q = A.Project(
        A.TableAccess("li"),
        [
            ("k", "l_orderkey"),
            ("disc_price", Arith("*", a("l_extendedprice"), Arith("-", Const(1.0), a("l_discount")))),
        ],
    )
    assert_equivalent(
        A.run(q, {"li": li}),
        "SELECT l_orderkey AS k, l_extendedprice * (1.0 - l_discount) AS disc_price FROM li",
        li=li,
    )


def test_rename(spark, li):
    q = A.Rename(A.Project(A.TableAccess("li"), [("x", "l_orderkey")]), {"x": "y"})
    assert_equivalent(A.run(q, {"li": li}), "SELECT l_orderkey AS y FROM li", li=li)


def test_inner_join(spark, li, orders):
    q = A.Project(
        A.Join(A.TableAccess("o"), A.TableAccess("l"), [("o_orderkey", "l_orderkey")]),
        [("o_orderkey", "o_orderkey"), ("l_quantity", "l_quantity")],
    )
    assert_equivalent(
        A.run(q, {"o": orders, "l": li}),
        "SELECT o_orderkey, l_quantity FROM o JOIN l ON o_orderkey = l_orderkey",
        o=orders, l=li,
    )


def test_left_join(spark, orders, cust):
    q = A.Project(
        A.Join(A.TableAccess("c"), A.TableAccess("o"), [("c_custkey", "o_custkey")], kind="left"),
        [("c_custkey", "c_custkey"), ("o_orderkey", "o_orderkey")],
    )
    assert_equivalent(
        A.run(q, {"c": cust, "o": orders}),
        "SELECT c_custkey, o_orderkey FROM c LEFT JOIN o ON c_custkey = o_custkey",
        c=cust, o=orders,
    )


def test_full_join(spark, orders, cust):
    q = A.Project(
        A.Join(A.TableAccess("c"), A.TableAccess("o"), [("c_custkey", "o_custkey")], kind="full"),
        [("c_custkey", "c_custkey"), ("o_orderkey", "o_orderkey")],
    )
    assert_equivalent(
        A.run(q, {"c": cust, "o": orders}),
        "SELECT c_custkey, o_orderkey FROM c FULL JOIN o ON c_custkey = o_custkey",
        c=cust, o=orders,
    )


def test_group_agg_sum(spark, li):
    q = A.GroupAgg(
        A.TableAccess("li"), ["l_returnflag"], [("sum", "l_quantity", "s")]
    )
    assert_equivalent(
        A.run(q, {"li": li}),
        "SELECT l_returnflag, sum(l_quantity) AS s FROM li GROUP BY l_returnflag",
        li=li,
    )


def test_group_agg_count_avg(spark, li):
    q = A.GroupAgg(
        A.TableAccess("li"),
        ["l_linestatus"],
        [("count", "l_orderkey", "n"), ("avg", "l_discount", "d")],
    )
    assert_equivalent(
        A.run(q, {"li": li}),
        "SELECT l_linestatus, count(l_orderkey) AS n, avg(l_discount) AS d "
        "FROM li GROUP BY l_linestatus",
        li=li,
    )


def test_group_agg_expr(spark, li):
    q = A.GroupAgg(
        A.TableAccess("li"),
        ["l_returnflag"],
        [("sum", Arith("*", a("l_extendedprice"), a("l_discount")), "rev")],
    )
    assert_equivalent(
        A.run(q, {"li": li}),
        "SELECT l_returnflag, sum(l_extendedprice * l_discount) AS rev "
        "FROM li GROUP BY l_returnflag",
        li=li,
    )


def test_group_agg_key_alias(spark, orders):
    q = A.GroupAgg(
        A.TableAccess("o"), ["o_orderpriority"], [("count", "o_orderkey", "n")],
        key_out=["priority"],
    )
    assert_equivalent(
        A.run(q, {"o": orders}),
        "SELECT o_orderpriority AS priority, count(o_orderkey) AS n "
        "FROM o GROUP BY o_orderpriority",
        o=orders,
    )


def test_global_agg(spark, li):
    q = A.GroupAgg(A.TableAccess("li"), [], [("sum", "l_tax", "t")])
    assert_equivalent(A.run(q, {"li": li}), "SELECT sum(l_tax) AS t FROM li", li=li)


def test_union(spark, li):
    p = A.Project(A.TableAccess("li"), [("k", "l_orderkey")])
    q = A.Union(p, p)
    assert_equivalent(
        A.run(q, {"li": li}),
        "SELECT l_orderkey AS k FROM li UNION ALL SELECT l_orderkey AS k FROM li",
        li=li,
    )


def test_dedup(spark, li):
    q = A.Dedup(A.Project(A.TableAccess("li"), [("f", "l_returnflag")]))
    assert_equivalent(
        A.run(q, {"li": li}),
        "SELECT DISTINCT l_returnflag AS f FROM li",
        li=li,
    )


def test_like_filter(spark, orders):
    q = A.Project(
        A.Select(A.TableAccess("o"), Like(a("o_orderpriority"), "%URGENT%")),
        [("k", "o_orderkey")],
    )
    assert_equivalent(
        A.run(q, {"o": orders}),
        "SELECT o_orderkey AS k FROM o WHERE o_orderpriority LIKE '%URGENT%'",
        o=orders,
    )


def test_attr_to_attr_selection(spark, li):
    q = A.Project(
        A.Select(A.TableAccess("li"), cmp("l_discount", "<", a("l_tax"))),
        [("k", "l_orderkey"), ("n", "l_linenumber")],
    )
    assert_equivalent(
        A.run(q, {"li": li}),
        "SELECT l_orderkey AS k, l_linenumber AS n FROM li WHERE l_discount < l_tax",
        li=li,
    )

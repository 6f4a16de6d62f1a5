"""Per-tuple aggregation γ (Table 1's formal aggregation over a nested
relation attribute) — the operator behind D2's zero count."""
import pytest

from repro.core import algebra as A


@pytest.fixture(scope="module")
def df(spark):
    return spark.createDataFrame(
        [
            ("a", [{"x": 1.0}, {"x": 3.0}]),
            ("b", [{"x": None}, {"x": 2.0}]),
            ("c", []),
            ("d", [{"x": None}]),
        ],
        "k string, arr array<struct<x:double>>",
    )


def vals(df, out):
    return {r["k"]: r[out] for r in df.collect()}


def test_count_ignores_nulls(df):
    q = A.AggPerTuple(A.TableAccess("t"), "count", "arr", "cnt", inner="x")
    out = vals(A.run(q, {"t": df}), "cnt")
    assert out == {"a": 2, "b": 1, "c": 0, "d": 0}


def test_sum(df):
    q = A.AggPerTuple(A.TableAccess("t"), "sum", "arr", "s", inner="x")
    out = vals(A.run(q, {"t": df}), "s")
    assert out["a"] == 4.0 and out["b"] == 2.0
    assert out["c"] is None and out["d"] is None


def test_avg(df):
    q = A.AggPerTuple(A.TableAccess("t"), "avg", "arr", "m", inner="x")
    out = vals(A.run(q, {"t": df}), "m")
    assert out["a"] == 2.0 and out["b"] == 2.0 and out["c"] is None


def test_min_max(df):
    qmin = A.AggPerTuple(A.TableAccess("t"), "min", "arr", "lo", inner="x")
    qmax = A.AggPerTuple(A.TableAccess("t"), "max", "arr", "hi", inner="x")
    assert vals(A.run(qmin, {"t": df}), "lo")["a"] == 1.0
    assert vals(A.run(qmax, {"t": df}), "hi")["a"] == 3.0


def test_keeps_other_columns(df):
    q = A.AggPerTuple(A.TableAccess("t"), "count", "arr", "cnt", inner="x")
    assert set(A.run(q, {"t": df}).columns) == {"k", "arr", "cnt"}


def test_equivalence_with_nest_then_count(spark):
    """γ over N^R's output equals GroupAgg count — the rewrite our scenario
    queries use (DESIGN.md)."""
    flat = spark.createDataFrame(
        [("a", 1.0), ("a", 2.0), ("b", 3.0)], "k string, v double"
    )
    nested = A.AggPerTuple(
        A.NestRel(A.TableAccess("t"), ["v"], "vs"), "count", "vs", "cnt", inner="v"
    )
    grouped = A.GroupAgg(A.TableAccess("t"), ["k"], [("count", "v", "cnt")])
    out1 = {r["k"]: r["cnt"] for r in A.run(nested, {"t": flat}).collect()}
    out2 = {r["k"]: r["cnt"] for r in A.run(grouped, {"t": flat}).collect()}
    assert out1 == out2 == {"a": 2, "b": 1}

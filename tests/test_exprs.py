"""Expression AST: attrs, substitution, python evaluation, Spark compilation."""
import pytest

from repro.core.exprs import (
    TRUE,
    And,
    Arith,
    Attr,
    Cmp,
    Const,
    Like,
    Or,
    a,
    c,
    cmp,
)


class TestAttrs:
    def test_attr_refs(self):
        assert a("x").attrs() == {"x"}

    def test_cmp_refs(self):
        assert cmp("x", "<", 5).attrs() == {"x"}

    def test_attr_to_attr_cmp_refs(self):
        assert cmp("x", "<", a("y")).attrs() == {"x", "y"}

    def test_arith_refs(self):
        e = Arith("*", a("p"), Arith("-", Const(1.0), a("d")))
        assert e.attrs() == {"p", "d"}

    def test_and_or_refs(self):
        e = And(cmp("x", ">", 1), Or(cmp("y", "<", 2), cmp("z", "=", 3)))
        assert e.attrs() == {"x", "y", "z"}

    def test_like_refs(self):
        assert Like(a("t"), "%x%").attrs() == {"t"}

    def test_true_refs(self):
        assert TRUE.attrs() == set()


class TestSubst:
    def test_attr_subst(self):
        assert a("x").subst({"x": "y"}) == a("y")

    def test_attr_prefix_subst(self):
        assert a("addr.city").subst({"addr": "addr2"}) == a("addr2.city")

    def test_attr_no_match(self):
        assert a("x").subst({"y": "z"}) == a("x")

    def test_cmp_subst(self):
        assert cmp("x", "<", 5).subst({"x": "y"}) == cmp("y", "<", 5)

    def test_arith_subst(self):
        e = Arith("*", a("p"), a("d")).subst({"d": "t"})
        assert e.attrs() == {"p", "t"}

    def test_and_subst(self):
        e = And(cmp("x", ">", 1), cmp("x", "<", 9)).subst({"x": "y"})
        assert e.attrs() == {"y"}

    def test_const_unchanged(self):
        assert c(5).subst({"5": "6"}) == c(5)


class TestHolds:
    def test_cmp_holds(self):
        assert cmp("v", ">", 3).holds(4)
        assert not cmp("v", ">", 3).holds(3)
        assert cmp("v", "=", "x").holds("x")
        assert cmp("v", "!=", "x").holds("y")
        assert not cmp("v", "<=", 2).holds(None)

    def test_and_or_holds(self):
        e = And(cmp("v", ">=", 1), cmp("v", "<=", 3))
        assert e.holds(2) and not e.holds(4)
        o = Or(cmp("v", "<", 0), cmp("v", ">", 10))
        assert o.holds(-1) and o.holds(11) and not o.holds(5)

    def test_like_holds(self):
        assert Like(a("t"), "%BTS%").holds("I love BTS!")
        assert not Like(a("t"), "%BTS%").holds("nothing")
        assert Like(a("t"), "%Dey%", negated=True).holds("Smith")
        assert not Like(a("t"), "%Dey%", negated=True).holds("A Dey")
        assert not Like(a("t"), "%x%").holds(None)


class TestSparkCompilation:
    def test_cmp_compiles(self, spark):
        df = spark.createDataFrame([(1,), (5,)], "x int")
        assert df.filter(cmp("x", ">", 3).to_col()).count() == 1

    def test_arith_compiles(self, spark):
        df = spark.createDataFrame([(10.0, 0.1)], "p double, d double")
        e = Arith("*", a("p"), Arith("-", Const(1.0), a("d")))
        row = df.select(e.to_col().alias("v")).collect()[0]
        assert row["v"] == pytest.approx(9.0)

    def test_nested_attr_compiles(self, spark):
        df = spark.createDataFrame([((1,),)], "s struct<x:int>")
        assert df.filter(cmp("s.x", "=", 1).to_col()).count() == 1

    def test_like_compiles(self, spark):
        df = spark.createDataFrame([("hello BTS",), ("bye",)], "t string")
        assert df.filter(Like(a("t"), "%BTS%").to_col()).count() == 1

    def test_true_compiles(self, spark):
        df = spark.createDataFrame([(1,)], "x int")
        assert df.filter(TRUE.to_col()).count() == 1

    def test_repr_roundtrip_strings(self):
        assert "year >= 2019" in repr(cmp("year", ">=", 2019))
        assert "∧" in repr(And(cmp("a", ">", 1), cmp("b", "<", 2)))

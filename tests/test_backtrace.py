"""Schema backtracing (§5.1) — Examples 11 and 12 plus per-operator rules."""
import pytest

from repro.core import algebra as A
from repro.core import nip as N
from repro.core.backtrace import backtrace, resolve_source
from repro.core.exprs import Arith, a, cmp
from repro.workloads import running_example as RE


@pytest.fixture(scope="module")
def db(spark):
    return RE.db(spark)


@pytest.fixture(scope="module")
def bt(db):
    return backtrace(RE.query(), RE.whynot_nip(), db)


class TestRunningExample:
    def test_table_nip_matches_example11(self, bt):
        """t̄_person = ⟨name:?, address1:?, address2: {{⟨city:NY, year:?⟩, *}}⟩"""
        t = bt.table_nip("person")
        d = t.as_dict()
        assert "address2" in d
        addr = d["address2"]
        assert isinstance(addr, N.Bag) and addr.star
        elem = addr.elems[0].as_dict()
        assert elem["city"] == N.Val("NY")
        assert "address1" not in d or d["address1"].is_trivial()

    def test_table_nip_selects_sue_only(self, bt, db):
        from repro.core.nip import to_spark_pred

        out = db["person"].filter(to_spark_pred(bt.table_nip("person"))).collect()
        assert [r.name for r in out] == ["Sue"]

    def test_level_nip_after_flatten_has_flat_city(self, db):
        q = RE.query()  # fresh query instance: op ids differ from the fixture's
        bt2 = backtrace(q, RE.whynot_nip(), db)
        select = [o for o in A.walk(q) if isinstance(o, A.Select)][0]
        lvl = bt2.level_nips[select.op_id]  # NIP over selection's output
        assert lvl.as_dict()["city"] == N.Val("NY")

    def test_no_deferred_predicates(self, bt):
        assert bt.deferred == []

    def test_resolve_selection_year(self, db):
        """M_sbt: σ.year ↝ person.address2.year (Example 12)."""
        q = RE.query()
        sel = [o for o in A.walk(q) if isinstance(o, A.Select)][0]
        assert resolve_source(sel.child, "year", db) == ("person", "address2.year")

    def test_resolve_projection_name(self, db):
        q = RE.query()
        proj = [o for o in A.walk(q) if isinstance(o, A.Project)][0]
        assert resolve_source(proj.child, "name", db) == ("person", "name")

    def test_resolve_flatten_attr(self, db):
        q = RE.query()
        fl = [o for o in A.walk(q) if isinstance(o, A.FlattenRel)][0]
        assert resolve_source(fl.child, "address2", db) == ("person", "address2")


class TestOperatorRules:
    def test_project_rename_backtraces(self, spark):
        df = spark.createDataFrame([(1, 2)], "x int, y int")
        q = A.Project(A.TableAccess("t"), [("out", "x")])
        bt = backtrace(q, N.tup(out=1), {"t": df})
        assert bt.table_nip("t").as_dict()["x"] == N.Val(1)

    def test_project_computed_defers(self, spark):
        df = spark.createDataFrame([(1.0, 2.0)], "x double, y double")
        q = A.Project(
            A.TableAccess("t"), [("s", Arith("+", a("x"), a("y")))]
        )
        bt = backtrace(q, N.Tup({"s": N.ValPred(cmp("s", ">", 0))}), {"t": df})
        assert len(bt.deferred) == 1
        assert bt.deferred[0].out_attr == "s"
        assert bt.table_nip("t").is_trivial()

    def test_rename_backtraces(self, spark):
        df = spark.createDataFrame([(1,)], "x int")
        q = A.Rename(A.TableAccess("t"), {"x": "y"})
        bt = backtrace(q, N.tup(y=1), {"t": df})
        assert bt.table_nip("t").as_dict()["x"] == N.Val(1)

    def test_join_splits_by_side(self, spark):
        l = spark.createDataFrame([(1, "a")], "k int, lv string")
        r = spark.createDataFrame([(1, "b")], "k2 int, rv string")
        q = A.Join(A.TableAccess("L"), A.TableAccess("R"), [("k", "k2")])
        bt = backtrace(q, N.tup(lv="a", rv="b"), {"L": l, "R": r})
        assert bt.table_nip("L").as_dict()["lv"] == N.Val("a")
        assert bt.table_nip("R").as_dict()["rv"] == N.Val("b")

    def test_flatten_tup_folds_back(self, spark):
        df = spark.createDataFrame(
            [(1, {"f": "v"})], "id int, s struct<f:string>"
        )
        q = A.FlattenTup(A.TableAccess("t"), "s")
        bt = backtrace(q, N.tup(f="v", id=1), {"t": df})
        d = bt.table_nip("t").as_dict()
        assert d["id"] == N.Val(1)
        assert d["s"].as_dict()["f"] == N.Val("v")

    def test_nest_tup_unfolds(self, spark):
        df = spark.createDataFrame([(1, "x")], "id int, v string")
        q = A.NestTup(A.TableAccess("t"), ["v"], "s")
        bt = backtrace(q, N.Tup({"s": N.tup(v="x")}), {"t": df})
        assert bt.table_nip("t").as_dict()["v"] == N.Val("x")

    def test_groupagg_key_passes_value_defers(self, spark):
        df = spark.createDataFrame([(1, 2.0)], "k int, v double")
        q = A.GroupAgg(A.TableAccess("t"), ["k"], [("sum", "v", "s")])
        bt = backtrace(
            q, N.Tup({"k": N.Val(1), "s": N.ValPred(cmp("s", ">", 0))}), {"t": df}
        )
        assert bt.table_nip("t").as_dict()["k"] == N.Val(1)
        assert len(bt.deferred) == 1 and bt.deferred[0].op_id == q.op_id

    def test_agg_per_tuple_defers(self, spark):
        df = spark.createDataFrame(
            [("a", [{"x": 1}])], "k string, arr array<struct<x:int>>"
        )
        q = A.AggPerTuple(A.TableAccess("t"), "count", "arr", "cnt", inner="x")
        bt = backtrace(q, N.Tup({"k": N.Val("a"), "cnt": N.Val(0)}), {"t": df})
        assert bt.table_nip("t").as_dict()["k"] == N.Val("a")
        assert [d.out_attr for d in bt.deferred] == ["cnt"]

    def test_union_sends_to_both(self, spark):
        df = spark.createDataFrame([(1,)], "x int")
        q = A.Union(A.TableAccess("a"), A.TableAccess("b"))
        bt = backtrace(q, N.tup(x=1), {"a": df, "b": df})
        assert bt.table_nip("a").as_dict()["x"] == N.Val(1)
        assert bt.table_nip("b").as_dict()["x"] == N.Val(1)

    def test_resolve_through_groupagg(self, spark):
        df = spark.createDataFrame([(1, 2.0)], "k int, v double")
        q = A.GroupAgg(A.TableAccess("t"), ["k"], [("sum", "v", "s")])
        assert resolve_source(q, "s", {"t": df}) == ("t", "v")
        assert resolve_source(q, "k", {"t": df}) == ("t", "k")

    def test_resolve_computed_is_none(self, spark):
        df = spark.createDataFrame([(1.0, 2.0)], "x double, y double")
        q = A.Project(A.TableAccess("t"), [("s", Arith("+", a("x"), a("y")))])
        assert resolve_source(q, "s", {"t": df}) is None

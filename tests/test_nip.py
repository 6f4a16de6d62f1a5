"""NIP construction and matching — Definitions 3 and 4, Examples 5–7."""
import pytest

from repro.core import nip as N
from repro.core.exprs import a, c, cmp


def t_sue():
    return {
        "name": "Sue",
        "address1": [{"city": "LA", "year": 2019}, {"city": "NY", "year": 2018}],
        "address2": [{"city": "LA", "year": 2019}, {"city": "NY", "year": 2018}],
    }


class TestBasics:
    def test_wild_matches_anything(self):
        assert N.matches(42, N.WILD)
        assert N.matches(None, N.WILD)
        assert N.matches([{"x": 1}], N.WILD)

    def test_val(self):
        assert N.matches("NY", N.Val("NY"))
        assert not N.matches("LA", N.Val("NY"))

    def test_valpred(self):
        p = N.ValPred(cmp("v", ">", 0.45))
        assert N.matches(0.5, p)
        assert not N.matches(0.4, p)
        assert not N.matches(None, p)

    def test_tuple_fields_implicitly_wild(self):
        assert N.matches(t_sue(), N.tup(name="Sue"))
        assert not N.matches(t_sue(), N.tup(name="Peter"))

    def test_tuple_on_none_fails(self):
        assert not N.matches(None, N.tup(name="Sue"))


class TestBagMatching:
    def test_example6_star_matches(self):
        """t_ex = ⟨city: NY, nList: {{?, *}}⟩ matches Sue²+Peter bag."""
        t = {
            "city": "NY",
            "nList": [{"name": "Sue"}, {"name": "Sue"}, {"name": "Peter"}],
        }
        t_ex = N.Tup({"city": N.Val("NY"), "nList": N.Bag([N.WILD], star=True)})
        assert N.matches(t, t_ex)

    def test_example6_two_placeholders_fail_on_multiplicity(self):
        """t'_ex = ⟨city: NY, nList: {{?, ?}}⟩ does NOT match a 3-element bag."""
        t = {
            "city": "NY",
            "nList": [{"name": "Sue"}, {"name": "Sue"}, {"name": "Peter"}],
        }
        t_ex2 = N.Tup({"city": N.Val("NY"), "nList": N.Bag([N.WILD, N.WILD])})
        assert not N.matches(t, t_ex2)

    def test_exact_bag_no_star(self):
        nip = N.Bag([N.tup(name="Sue"), N.tup(name="Peter")])
        assert N.matches([{"name": "Peter"}, {"name": "Sue"}], nip)
        assert not N.matches([{"name": "Sue"}], nip)
        assert not N.matches(
            [{"name": "Sue"}, {"name": "Peter"}, {"name": "Bob"}], nip
        )

    def test_example7_nested_match(self):
        t = N.Tup(
            {
                "name": N.Val("Sue"),
                "address1": N.WILD,
                "address2": N.Bag(
                    [N.Tup({"city": N.WILD, "year": N.Val(2019)})], star=True
                ),
            }
        )
        assert N.matches(t_sue(), t)

    def test_bag_element_needs_distinct_partners(self):
        nip = N.Bag([N.tup(name="Sue"), N.tup(name="Sue")], star=True)
        assert not N.matches([{"name": "Sue"}], nip)
        assert N.matches([{"name": "Sue"}, {"name": "Sue"}], nip)

    def test_empty_bag_pattern(self):
        assert N.matches([], N.Bag([]))
        assert not N.matches([{"name": "x"}], N.Bag([]))
        assert N.matches([], N.Bag([], star=True))

    def test_bag_on_none_fails(self):
        assert not N.matches(None, N.Bag([N.WILD], star=True))


class TestTriviality:
    def test_wild_trivial(self):
        assert N.WILD.is_trivial()

    def test_val_not_trivial(self):
        assert not N.Val(1).is_trivial()

    def test_tup_of_wilds_trivial(self):
        assert N.Tup({"a": N.WILD}).is_trivial()
        assert not N.tup(a=1).is_trivial()

    def test_star_only_bag_trivial(self):
        assert N.Bag([], star=True).is_trivial()
        assert not N.Bag([N.WILD], star=True).is_trivial()


class TestSparkCompilation:
    @pytest.fixture(scope="class")
    def person(self, spark):
        from repro.workloads.running_example import db

        return db(spark)["person"]

    def test_flat_value(self, person):
        pred = N.to_spark_pred(N.tup(name="Sue"))
        assert [r.name for r in person.filter(pred).collect()] == ["Sue"]

    def test_nested_bag_exists(self, person):
        nip = N.Tup(
            {"address2": N.Bag([N.Tup({"city": N.Val("NY")})], star=True)}
        )
        out = person.filter(N.to_spark_pred(nip)).collect()
        assert [r.name for r in out] == ["Sue"]

    def test_nested_bag_no_match(self, person):
        nip = N.Tup(
            {"address2": N.Bag([N.Tup({"city": N.Val("Boston")})], star=True)}
        )
        assert person.filter(N.to_spark_pred(nip)).count() == 0

    def test_conjunction_of_fields(self, person):
        nip = N.Tup(
            {
                "name": N.Val("Sue"),
                "address2": N.Bag(
                    [N.Tup({"city": N.Val("NY"), "year": N.Val(2018)})], star=True
                ),
            }
        )
        assert person.filter(N.to_spark_pred(nip)).count() == 1

    def test_valpred_compiles(self, spark):
        df = spark.createDataFrame([(0.5,), (0.2,)], "v double")
        nip = N.Tup({"v": N.ValPred(cmp("v", ">", 0.45))})
        assert df.filter(N.to_spark_pred(nip)).count() == 1

    def test_null_toplevel_fails_constraint(self, spark):
        df = spark.createDataFrame([(None,), ("NY",)], "city string")
        nip = N.tup(city="NY")
        assert df.filter(N.to_spark_pred(nip)).count() == 1

    def test_trivial_nip_keeps_all(self, person):
        nip = N.Tup({"name": N.WILD})
        assert person.filter(N.to_spark_pred(nip)).count() == 2

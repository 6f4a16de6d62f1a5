"""Crime scenarios C1–C3 (Table 6 + §6.4 'Comparison to other approaches')."""
import pytest

from repro.baselines.conseil import conseil
from repro.baselines.wnpp import wnpp
from repro.core.msr import approximate_msrs
from repro.workloads import crime


@pytest.fixture(scope="module")
def db(spark):
    return crime.db(spark)


def tagged(tags, explanations):
    inv = {v: k for k, v in tags.items()}
    return [frozenset(inv.get(o, f"op{o}") for o in e) for e in explanations]


def tagged_rp(tags, exps):
    inv = {v: k for k, v in tags.items()}
    return [frozenset(inv.get(o, f"op{o}") for o in e.ops) for e in exps]


class TestC1:
    def test_whynot_returns_sigma1_only(self, db):
        q, tags = crime.c1_query()
        out = tagged(tags, wnpp(q, db, crime.c1_whynot()))
        assert out == [frozenset({"σ1"})]

    def test_conseil_finds_combination(self, db):
        q, tags = crime.c1_query()
        out = tagged(tags, conseil(q, db, crime.c1_whynot()))
        assert out == [frozenset({"σ1", "⋈2"})]

    def test_rp_finds_combination(self, db):
        q, tags = crime.c1_query()
        out = tagged_rp(tags, approximate_msrs(q, db, crime.c1_whynot()))
        assert frozenset({"σ1", "⋈2"}) in out

    def test_rp_does_not_return_sigma1_alone(self, db):
        q, tags = crime.c1_query()
        out = tagged_rp(tags, approximate_msrs(q, db, crime.c1_whynot()))
        assert frozenset({"σ1"}) not in out


class TestC2:
    def test_whynot_blames_sigma4_via_partner_analysis(self, db):
        q, tags = crime.c2_query()
        out = tagged(tags, wnpp(q, db, crime.c2_whynot()))
        assert out == [frozenset({"σ4"})]

    def test_conseil_stops_at_sigma4(self, db):
        q, tags = crime.c2_query()
        out = tagged(tags, conseil(q, db, crime.c2_whynot()))
        assert out == [frozenset({"σ4"})]

    def test_rp_returns_both_explanations(self, db):
        q, tags = crime.c2_query()
        out = tagged_rp(tags, approximate_msrs(q, db, crime.c2_whynot()))
        assert frozenset({"σ4"}) in out
        assert frozenset({"σ3", "σ4"}) in out

    def test_rp_ranks_single_op_first(self, db):
        q, tags = crime.c2_query()
        out = tagged_rp(tags, approximate_msrs(q, db, crime.c2_whynot()))
        assert out[0] == frozenset({"σ4"})


class TestC3:
    def test_whynot_blames_join(self, db):
        q, tags = crime.c3_query()
        out = tagged(tags, wnpp(q, db, crime.c3_whynot()))
        assert out == [frozenset({"⋈5"})]

    def test_conseil_blames_join(self, db):
        q, tags = crime.c3_query()
        out = tagged(tags, conseil(q, db, crime.c3_whynot()))
        assert out == [frozenset({"⋈5"})]

    def test_rp_returns_projection_not_join(self, db):
        """Ours: {π⁶} via the hair→clothes SA; the join is NOT an explanation
        (outer-relaxation pads nulls, never yields desc = 'snow')."""
        q, tags = crime.c3_query()
        out = tagged_rp(
            tags, approximate_msrs(q, db, crime.c3_whynot(), crime.c3_alternatives())
        )
        assert frozenset({"π6"}) in out
        assert all("⋈5" not in e for e in out)

    def test_rp_without_sa_finds_nothing(self, db):
        q, tags = crime.c3_query()
        out = approximate_msrs(
            q, db, crime.c3_whynot(), crime.c3_alternatives(), with_sas=False
        )
        assert out == []

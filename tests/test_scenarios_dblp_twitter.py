"""End-to-end explanation tests for the DBLP (D1–D5) and Twitter (T1–T4,
T_ASD) scenarios — the per-scenario rows of Tables 7 and 8.

Deviations from the paper's exact sets are intentional and documented in
EXPERIMENTS.md (per-reference SAs and data-planting differences); each such
case asserts our measured composition explicitly.
"""
import pytest

from repro.workloads.registry import all_scenarios, run_scenario

SF = 0.005


def _s(*tags):
    return frozenset(tags)


@pytest.fixture(scope="module")
def scns():
    return all_scenarios()


@pytest.fixture(scope="module")
def dblp_results(spark, scns):
    db = scns["D1"].build_db(spark, SF)
    return {
        k: run_scenario(spark, scns[k], SF, db=db)
        for k in ["D1", "D2", "D3", "D4", "D5"]
    }


@pytest.fixture(scope="module")
def twitter_results(spark, scns):
    db = scns["T1"].build_db(spark, SF)
    return {
        k: run_scenario(spark, scns[k], SF, db=db)
        for k in ["T1", "T2", "T3", "T4", "TASD"]
    }


class TestD1:
    def test_wn(self, dblp_results):
        assert dblp_results["D1"].wn == [_s("σ2")]

    def test_rpnos(self, dblp_results):
        assert dblp_results["D1"].rpnos == [_s("σ2")]

    def test_rp_matches_paper(self, dblp_results):
        assert dblp_results["D1"].rp == [_s("σ2"), _s("π1")]


class TestD2:
    def test_baselines_empty(self, dblp_results):
        assert dblp_results["D2"].wn == []
        assert dblp_results["D2"].rpnos == []

    def test_rp_finds_tuple_flatten_via_sa(self, dblp_results):
        assert dblp_results["D2"].rp == [_s("F^T3")]


class TestD3:
    def test_baselines_empty(self, dblp_results):
        assert dblp_results["D3"].wn == []
        assert dblp_results["D3"].rpnos == []

    def test_rp_finds_restructuring_op(self, dblp_results):
        """Paper: {N^T4}; we attribute the author→editor swap to the tuple
        flatten that promotes the person (documented deviation — same single
        schema-level explanation, same count)."""
        assert dblp_results["D3"].rp == [_s("F^T4")]


class TestD4:
    def test_wn(self, dblp_results):
        assert dblp_results["D4"].wn == [_s("σ6")]

    def test_rpnos(self, dblp_results):
        assert dblp_results["D4"].rpnos == [_s("σ6"), _s("σ6", "σ7")]

    def test_rp_contains_papers_sets(self, dblp_results):
        rp = dblp_results["D4"].rp
        for e in [_s("σ6"), _s("σ6", "σ7"), _s("F^T5", "σ7"), _s("F^T5", "σ6", "σ7")]:
            assert e in rp

    def test_rp_first_is_sigma6(self, dblp_results):
        assert dblp_results["D4"].rp[0] == _s("σ6")

    def test_rp_at_most_one_extra(self, dblp_results):
        """Documented deviation: {F^T5, σ6} additionally qualifies on our data."""
        extras = set(dblp_results["D4"].rp) - {
            _s("σ6"), _s("σ6", "σ7"), _s("F^T5", "σ7"), _s("F^T5", "σ6", "σ7")
        }
        assert extras <= {_s("F^T5", "σ6")}


class TestD5:
    def test_wn(self, dblp_results):
        assert dblp_results["D5"].wn == [_s("F^I9")]

    def test_rp_first_is_flatten(self, dblp_results):
        assert dblp_results["D5"].rp[0] == _s("F^I9")

    def test_rp_second_uses_projection_sa(self, dblp_results):
        """Paper: {π8}; ours: {F^I9, π8} — the flatten must also be relaxed
        because the planted www record has an empty url list (documented)."""
        assert dblp_results["D5"].rp[1] == _s("F^I9", "π8")
        assert len(dblp_results["D5"].rp) == 2


class TestT1:
    def test_wn_incomplete_single_op(self, twitter_results):
        assert twitter_results["T1"].wn == [_s("F^I11")]

    def test_rpnos_finds_complete_combination(self, twitter_results):
        assert twitter_results["T1"].rpnos == [_s("F^I11", "σ12")]

    def test_rp_matches_paper(self, twitter_results):
        assert twitter_results["T1"].rp == [_s("F^I11", "σ12"), _s("F^T10", "σ12")]


class TestT2:
    def test_wn(self, twitter_results):
        assert twitter_results["T2"].wn == [_s("σ15")]

    def test_rpnos(self, twitter_results):
        assert twitter_results["T2"].rpnos == [_s("σ15"), _s("σ14", "σ15")]

    def test_rp_matches_paper(self, twitter_results):
        assert twitter_results["T2"].rp == [
            _s("σ15"), _s("F^T13"), _s("σ14", "σ15"), _s("F^T13", "σ14", "σ15")
        ]


class TestT3:
    def test_wn(self, twitter_results):
        assert twitter_results["T3"].wn == [_s("F^I17")]

    def test_rp_matches_paper(self, twitter_results):
        assert twitter_results["T3"].rp == [_s("F^I17"), _s("F^T16")]


class TestT4:
    def test_wn_single_selection(self, twitter_results):
        assert twitter_results["T4"].wn == [_s("σ19")]

    def test_rp_contains_paper_core_sets(self, twitter_results):
        rp = twitter_results["T4"].rp
        assert _s("F^T18") in rp
        assert _s("σ19", "σ20") in rp

    def test_rp_composition(self, twitter_results):
        """Documented deviation: {σ20} and {F^T18, σ19} instead of the
        paper's {F^T18, σ19, σ20} (see EXPERIMENTS.md, T4)."""
        assert set(twitter_results["T4"].rp) == {
            _s("σ20"), _s("F^T18"), _s("σ19", "σ20"), _s("F^T18", "σ19")
        }


class TestTASD:
    def test_baselines_empty(self, twitter_results):
        assert twitter_results["TASD"].wn == []
        assert twitter_results["TASD"].rpnos == []

    def test_rp_matches_paper(self, twitter_results):
        assert twitter_results["TASD"].rp == [_s("F21"), _s("F21", "σ22")]

    def test_gold_position(self, twitter_results):
        assert twitter_results["TASD"].gold_pos == 2

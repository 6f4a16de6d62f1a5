"""Scenario registry integrity + crime scenarios through the registry path."""
import pytest

from repro.workloads.registry import all_scenarios, run_scenario


def _s(*tags):
    return frozenset(tags)


@pytest.fixture(scope="module")
def scns():
    return all_scenarios()


class TestCatalogue:
    def test_scenario_count(self, scns):
        # 5 DBLP + 5 Twitter + 6×2 TPC-H + 3 crime = 25
        assert len(scns) == 25

    def test_groups(self, scns):
        groups = {s.group for s in scns.values()}
        assert groups == {"dblp", "twitter", "tpch-nested", "tpch-flat", "crime"}

    def test_queries_construct_with_tags(self, scns):
        for s in scns.values():
            q, tags = s.build_query()
            assert tags and q is not None

    def test_paper_numbers_recorded(self, scns):
        # Table 7 totals over the 16 non-flat, non-crime scenarios
        keys = [k for k, s in scns.items()
                if s.group in ("dblp", "twitter", "tpch-nested")]
        assert len(keys) == 16
        assert sum(len(scns[k].paper_wn) for k in keys) == 12
        assert sum(len(scns[k].paper_rpnos) for k in keys) == 21
        assert sum(len(scns[k].paper_rp) for k in keys) == 48

    def test_gold_standards_present_for_modified_queries(self, scns):
        for k in ["TASD", "Q1", "Q3", "Q4", "Q6", "Q10", "Q13"]:
            assert scns[k].gold is not None
            assert scns[k].paper_gold_pos is not None

    def test_gold_is_among_paper_rp(self, scns):
        for k in ["Q1", "Q3", "Q4", "Q10", "Q13", "TASD"]:
            s = scns[k]
            assert s.gold in set(s.paper_rp)


class TestCrimeViaRegistry:
    @pytest.fixture(scope="class")
    def results(self, spark, scns):
        db = scns["C1"].build_db(spark, 0.01)
        return {k: run_scenario(spark, scns[k], db=db) for k in ["C1", "C2", "C3"]}

    def test_c1(self, results):
        assert results["C1"].wn == [_s("σ1")]
        assert results["C1"].conseil == [_s("σ1", "⋈2")]
        assert results["C1"].rp == [_s("σ1", "⋈2")]

    def test_c2(self, results):
        assert results["C2"].wn == [_s("σ4")]
        assert results["C2"].conseil == [_s("σ4")]
        assert results["C2"].rp == [_s("σ4"), _s("σ3", "σ4")]

    def test_c3(self, results):
        assert results["C3"].wn == [_s("⋈5")]
        assert results["C3"].conseil == [_s("⋈5")]
        assert results["C3"].rp == [_s("π6")]

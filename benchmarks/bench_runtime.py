"""Tracing-overhead benchmark — the data behind Figures 8–10 as numbers.

Measures the original query vs the fully-traced RP pipeline on one DBLP,
one Twitter and one TPC-H scenario and records the overhead factor (the
paper reports factors of 2.4–78.2 on its cluster; we report ours in
EXPERIMENTS.md — the *shape*, traced ≫ original and growing with operator
count, is the reproduced claim)."""
import pytest

from repro.core import algebra as A
from repro.core.msr import approximate_msrs
from repro.workloads.registry import all_scenarios

SF = 0.004


def _setup(spark, key):
    s = all_scenarios()[key]
    db = s.build_db(spark, SF)
    q, _ = s.build_query()
    wn = s.whynot(db, q)
    return db, q, wn, s.alternatives()


@pytest.mark.parametrize("key", ["D4", "T1", "Q3"])
def test_bench_original_query(spark, benchmark, key):
    db, q, _, _ = _setup(spark, key)
    benchmark.pedantic(lambda: A.run(q, db).collect(), rounds=1, iterations=1)


@pytest.mark.parametrize("key", ["D4", "T1", "Q3"])
def test_bench_rp_tracing(spark, benchmark, key):
    db, q, wn, alts = _setup(spark, key)
    out = benchmark.pedantic(
        lambda: approximate_msrs(q, db, wn, alts, with_sas=True),
        rounds=1, iterations=1,
    )
    assert out  # explanations found

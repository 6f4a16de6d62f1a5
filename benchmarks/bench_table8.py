"""Benchmark + reproduction harness for Table 8 (explanation sets) on the
TPC-H scenarios, including the gold positions of Table 7's brackets.
Assertions run inside the benchmarked test so `--benchmark-only` verifies
the table."""
from repro.workloads.registry import sweep

SF = 0.004


def _s(*tags):
    return frozenset(tags)


def test_bench_table8_tpch_nested(spark, benchmark):
    results = benchmark.pedantic(
        lambda: sweep(spark, sf=SF, keys=["Q1", "Q3", "Q10", "Q13"]),
        rounds=1, iterations=1,
    )
    assert results["Q1"].rp == [_s("σ24"), _s("γ23"), _s("γ23", "σ24")]
    assert results["Q1"].gold_pos == 2

    assert results["Q3"].wn == [_s("σ27")]
    assert results["Q3"].rp == [_s("σ26", "σ27"), _s("γ25", "σ26", "σ27")]
    assert results["Q3"].gold_pos == 1

    assert results["Q10"].wn == [_s("⋈38")]  # the paper's "incorrect" WN++ row
    assert results["Q10"].rp == [
        _s("σ35"), _s("σ35", "σ36"), _s("π37", "σ35"), _s("π37", "σ35", "σ36")
    ]
    assert results["Q10"].gold_pos == 4

    assert results["Q13"].rp == [_s("⋈39")]
    assert results["Q13"].gold_pos == 1


def test_bench_table8_q13_flat(spark, benchmark):
    results = benchmark.pedantic(
        lambda: sweep(spark, sf=SF, keys=["Q13F"]), rounds=1, iterations=1
    )
    assert results["Q13F"].wn == [_s("⋈39")]
    assert results["Q13F"].rp == [_s("⋈39")]

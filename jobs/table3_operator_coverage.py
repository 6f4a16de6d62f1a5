"""Reproduce Table 3 — operator kinds that appear in explanations per
formalism (lineage-based vs reparameterization-based).

Computed from the measured scenario results: the set of operator *symbols*
(σ, ⋈, π, F^T/F^I, N, γ) occurring in WN++'s explanations vs in RP's.

Usage: spark-submit jobs/table3_operator_coverage.py [--sf=0.01]
"""
import re

from _common import arg_sf, session

_SYMBOL = re.compile(r"^(σ|π|⋈|γ|N\^?[TR]?|F\^?[TIO]?|F)")


def _symbols(sets) -> set[str]:
    out = set()
    for s in sets:
        for tag in s:
            m = _SYMBOL.match(tag)
            if m:
                out.add(m.group(1))
    return out


def main() -> None:
    from repro.workloads.registry import sweep

    spark = session("table3")
    results = sweep(spark, sf=arg_sf())
    wn, rpnos, rp = set(), set(), set()
    for r in results.values():
        wn |= _symbols(r.wn)
        rpnos |= _symbols(r.rpnos)
        rp |= _symbols(r.rp)
    print("Operators appearing in explanations (measured, NRAB scenarios):")
    print(f"  lineage-based (WN++)         : {sorted(wn)}")
    print(f"  reparameterization w/o SAs   : {sorted(rpnos)}")
    print(f"  reparameterization with SAs  : {sorted(rp)}")
    print("Paper (Table 3, NRAB row): lineage finds σ/⋈-variants/F^I;")
    print("reparameterization additionally finds π, F^T, N, γ.")
    spark.stop()


if __name__ == "__main__":
    main()

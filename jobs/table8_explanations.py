"""Reproduce Table 8 — the explanation sets per scenario.

Usage: spark-submit jobs/table8_explanations.py [--sf=0.01]
For each scenario prints paper vs measured sets for WN++, RP without SAs
and RP with SAs (plus Conseil for the crime scenarios).
"""
from _common import arg_sf, fmt_sets, session


def main() -> None:
    from repro.workloads.registry import sweep

    spark = session("table8")
    results = sweep(spark, sf=arg_sf())
    for key, r in results.items():
        s = r.scenario
        print(f"== {key}: {s.description}")
        print(f"   WN++    paper: {fmt_sets(s.paper_wn)}")
        print(f"           ours : {fmt_sets(r.wn)}")
        if r.conseil is not None:
            print(f"   Conseil ours : {fmt_sets(r.conseil)}")
        print(f"   RPnoSA  paper: {fmt_sets(s.paper_rpnos)}")
        print(f"           ours : {fmt_sets(r.rpnos)}")
        print(f"   RP      paper: {fmt_sets(s.paper_rp)}")
        print(f"           ours : {fmt_sets(r.rp)}")
    spark.stop()


if __name__ == "__main__":
    main()

"""Reproduce Table 7 — explanation counts per scenario for WN++/RPnoSA/RP.

Usage: spark-submit jobs/table7_summary.py [--sf=0.01]
Prints one row per scenario: paper's counts (and gold position, in
parentheses) next to our measured ones.
"""
from _common import arg_sf, session


def main() -> None:
    from repro.workloads.registry import sweep

    spark = session("table7")
    sf = arg_sf()
    results = sweep(spark, sf=sf)

    hdr = f"{'Scen.':6} | {'WN++ p/m':>9} | {'RPnoSA p/m':>11} | {'RP p/m':>9} | gold pos p/m"
    print(hdr)
    print("-" * len(hdr))
    for key, r in results.items():
        s = r.scenario
        gp = f"{s.paper_gold_pos or '-'} / {r.gold_pos or '-'}"
        print(
            f"{key:6} | {len(s.paper_wn):>3} / {len(r.wn):<3} "
            f"| {len(s.paper_rpnos):>4} / {len(r.rpnos):<4} "
            f"| {len(s.paper_rp):>3} / {len(r.rp):<3} | {gp}"
        )
    spark.stop()


if __name__ == "__main__":
    main()

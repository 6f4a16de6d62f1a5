"""Tracing-overhead measurement (the data behind Figures 8–10, reported as a
table since figures are out of scope).

For each scenario: wall-clock of the original query vs one full RP run
(all SAs, tracing + stats + candidate evaluation) → overhead factor.

Usage: spark-submit jobs/perf_overhead.py [--sf=0.01] [--keys=Q3,T1,...]
"""
import sys
import time

from _common import arg_sf, session


def main() -> None:
    from repro.core import algebra as A
    from repro.core.msr import approximate_msrs
    from repro.workloads.registry import all_scenarios

    spark = session("perf-overhead")
    sf = arg_sf()
    keys = None
    for a in sys.argv[1:]:
        if a.startswith("--keys="):
            keys = a.split("=", 1)[1].split(",")
    scns = all_scenarios()
    if keys:
        scns = {k: scns[k] for k in keys}

    dbs = {}
    print(f"{'Scen.':6} | {'orig (s)':>9} | {'RP (s)':>9} | factor")
    for key, s in scns.items():
        if s.group not in dbs:
            dbs[s.group] = s.build_db(spark, sf)
        db = dbs[s.group]
        query, _ = s.build_query()
        whynot = s.whynot(db, query)

        t0 = time.time()
        A.run(query, db).collect()
        t_orig = time.time() - t0

        t0 = time.time()
        approximate_msrs(query, db, whynot, s.alternatives(), with_sas=True)
        t_rp = time.time() - t0
        print(f"{key:6} | {t_orig:9.2f} | {t_rp:9.2f} | {t_rp / max(t_orig, 1e-9):6.1f}x")
    spark.stop()


if __name__ == "__main__":
    main()

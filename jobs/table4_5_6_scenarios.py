"""Print the scenario catalogue — Tables 4 (DBLP), 5 (Twitter), 6 (crime)
and the algebra trees of Tables 9/10.

Usage: spark-submit jobs/table4_5_6_scenarios.py
"""
from _common import session


def main() -> None:
    from repro.workloads.registry import all_scenarios

    spark = session("scenario-catalogue")
    for key, s in all_scenarios().items():
        q, tags = s.build_query()
        alts = s.alternatives()
        print(f"== {key} [{s.group}] {s.description}")
        print(f"   query: {q!r}")
        print(f"   tags : { {t: i for t, i in tags.items()} }")
        if alts:
            alt_str = "; ".join(f"{k} → {'/'.join(v)}" for k, v in alts.items())
            print(f"   SAs  : {alt_str}")
        if s.gold is not None:
            print(f"   gold : {{{', '.join(sorted(s.gold))}}}")
    spark.stop()


if __name__ == "__main__":
    main()

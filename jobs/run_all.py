"""Run the whole reproduction once and print every table (I-VI) plus the
headline scalars — the script that generates the numbers recorded in
EXPERIMENTS.md.

    spark-submit jobs/run_all.py [--sf 1.0] [--seed 7]
"""
import os
import sys
import time

sys.path.insert(0, os.path.dirname(__file__))
from _common import get_spark, parse_args


def main() -> None:
    from repro import tables
    from repro.analysis.temporal import day_profile, hour_profile
    from repro.moby.generator import paper_config
    from repro.pipeline import run_pipeline

    args = parse_args("Reproduce all paper tables")
    spark = get_spark("repro-all")
    spark.sparkContext.setLogLevel("ERROR")
    t0 = time.time()
    result = run_pipeline(spark, paper_config(sf=args.sf, seed=args.seed))
    print(f"pipeline finished in {time.time() - t0:.0f}s (sf={args.sf}, seed={args.seed})")
    for name in ("table1", "table2", "table3", "table4", "table5", "table6"):
        print(f"\n=== {name} ===")
        print(getattr(tables, name)(result).to_string(index=False))
    print("\nheadline:", tables.headline(result))
    # Figure 5 / Figure 7 data (not tables; printed for completeness)
    print("\n=== day profile (fig 5 data, G_Day) ===")
    print(
        day_profile(result.communities["day"].assignment, result.selected_trips)
        .toPandas().pivot(index="community", columns="day_of_week", values="share")
        .round(3).to_string()
    )
    print("\n=== hour profile (fig 7 data, G_Hour) ===")
    print(
        hour_profile(result.communities["hour"].assignment, result.selected_trips)
        .toPandas().pivot(index="community", columns="hour", values="share")
        .fillna(0.0).round(3).to_string()
    )
    spark.stop()


if __name__ == "__main__":
    main()

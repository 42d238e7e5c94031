"""T4 job: scheduler lag attainment, skips, and the init heuristic.

    spark-submit jobs/t4_scheduler.py [--hours 24] [--depth 6]
"""
import argparse

from _common import get_spark

from repro.experiments import t4_scheduler as t4

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--hours", type=float, default=24.0)
    ap.add_argument("--depth", type=int, default=6)
    args = ap.parse_args()
    spark = get_spark("t4_scheduler")
    print(t4.format_table(t4.run(spark, hours=args.hours, depth=args.depth)))
    spark.stop()

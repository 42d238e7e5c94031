"""T1 job: incremental vs full refresh cost vs change fraction.

    spark-submit jobs/t1_incremental_vs_full.py [--sf 0.1]
"""
import argparse

from _common import get_spark

from repro.experiments import t1_incremental_vs_full as t1

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.1)
    args = ap.parse_args()
    spark = get_spark("t1_incremental_vs_full")
    res = t1.run(spark, sf=args.sf)
    print(t1.format_table(res))
    print(f"summary: {t1.summarize(res)}")
    spark.stop()

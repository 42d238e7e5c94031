"""T2 job: cost of NO_DATA / INCREMENTAL / FULL / REINITIALIZE actions.

    spark-submit jobs/t2_refresh_actions.py [--sf 0.1]
"""
import argparse

from _common import get_spark

from repro.experiments import t2_refresh_actions as t2

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.1)
    args = ap.parse_args()
    spark = get_spark("t2_refresh_actions")
    print(t2.format_table(t2.run(spark, sf=args.sf)))
    spark.stop()

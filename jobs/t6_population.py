"""T6 job: fleet usage statistics (§6.3) via simulated fleet + real engine.

    spark-submit jobs/t6_population.py [--dts 150] [--hours 48]
"""
import argparse

from _common import get_spark

from repro.experiments import t6_population as t6

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--dts", type=int, default=150)
    ap.add_argument("--hours", type=float, default=48.0)
    args = ap.parse_args()
    spark = get_spark("t6_population")
    print(t6.format_table(t6.run(spark, n_dts=args.dts, hours=args.hours)))
    spark.stop()

"""T7 job: Listing 1 pipeline — micro-batch IVM vs watermark streaming.

    spark-submit jobs/t7_streaming.py [--trains 8] [--hours 5]
"""
import argparse

from _common import get_spark

from repro.experiments import t7_streaming as t7

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--trains", type=int, default=8)
    ap.add_argument("--hours", type=int, default=5)
    args = ap.parse_args()
    spark = get_spark("t7_streaming")
    print(t7.format_table(t7.run(spark, n_trains=args.trains, hours=args.hours)))
    spark.stop()

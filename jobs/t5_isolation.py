"""T5 job: read-skew detection under PTS vs DVS modeling + engine demo.

    spark-submit jobs/t5_isolation.py [--samples 300]
"""
import argparse

from _common import get_spark

from repro.experiments import t5_isolation as t5

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--samples", type=int, default=300)
    args = ap.parse_args()
    spark = get_spark("t5_isolation")
    print(t5.format_table(t5.run(spark, n_samples=args.samples)))
    spark.stop()

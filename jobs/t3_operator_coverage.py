"""T3 job: incremental operator coverage over a Fig. 6 query population.

    python jobs/t3_operator_coverage.py [--n 400]
(no Spark needed — pure plan analysis)
"""
import argparse

from repro.experiments import t3_operator_coverage as t3

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--n", type=int, default=400)
    args = ap.parse_args()
    print(t3.format_table(t3.run(n_queries=args.n)))

"""Job: paper Table 3 — % of injected homographs in the BC top-50 vs the
number of meanings (paper: 97.5% → 100%).

    spark-submit jobs/table3_meanings.py [--sf 1.0] [--runs 4]
"""
import argparse

from repro.eval.experiments import table3_meanings

from _common import get_spark


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=1.0)
    ap.add_argument("--runs", type=int, default=4)
    ap.add_argument("--samples", type=int, default=2000)
    args = ap.parse_args()
    spark = get_spark("table3_meanings")
    table3_meanings(spark, sf=args.sf, runs=args.runs, n_samples=args.samples)
    spark.stop()


if __name__ == "__main__":
    main()

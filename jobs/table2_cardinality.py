"""Job: paper Table 2 — % of 50 injected homographs in the BC top-50 vs
the cardinality threshold of the replaced values (paper: 85% → 97.5%).

    spark-submit jobs/table2_cardinality.py [--sf 1.0] [--runs 4]
"""
import argparse

from repro.eval.experiments import table2_cardinality

from _common import get_spark


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=1.0)
    ap.add_argument("--runs", type=int, default=4)
    ap.add_argument("--samples", type=int, default=2000)
    args = ap.parse_args()
    spark = get_spark("table2_cardinality")
    table2_cardinality(spark, sf=args.sf, runs=args.runs, n_samples=args.samples)
    spark.stop()


if __name__ == "__main__":
    main()

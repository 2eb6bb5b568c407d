"""Job: §5.1 — SB top-55 comparison of BC vs LCC vs the D4 baseline
(paper: D4 38%, BC 69%; LCC ineffective).

    spark-submit jobs/sb_top55.py [--scale 1.0] [--samples N]
"""
import argparse

from repro.eval.experiments import sb_top55

from _common import get_spark


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--samples", type=int, default=None,
                    help="BC sample count (default: exact BC)")
    args = ap.parse_args()
    spark = get_spark("sb_top55")
    sb_top55(spark, scale=args.scale, n_samples=args.samples)
    spark.stop()


if __name__ == "__main__":
    main()

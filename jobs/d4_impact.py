"""Job: §5.5 / Fig. 10 — impact of injected homographs on D4 domain
discovery (paper: domain count and per-column assignments inflate as
homographs are injected).

    spark-submit jobs/d4_impact.py [--sf 0.5]
"""
import argparse

from repro.eval.experiments import d4_impact

from _common import get_spark


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.5)
    args = ap.parse_args()
    spark = get_spark("d4_impact")
    d4_impact(spark, sf=args.sf)
    spark.stop()


if __name__ == "__main__":
    main()

"""Job: §5.4 / Figs 8–9 — (a) precision & runtime vs BC sample count on
TUS-lite; (b) approx-BC runtime vs subgraph size on the NYC-scale lake
(paper: precision stabilizes at small samples; runtime linear in edges).

    spark-submit jobs/scalability.py [--tus-sf 1.0] [--nyc-sf 0.1]
"""
import argparse

from repro.eval.experiments import scalability_samples, scalability_subgraphs

from _common import get_spark


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--tus-sf", type=float, default=1.0)
    ap.add_argument("--nyc-sf", type=float, default=0.1)
    args = ap.parse_args()
    spark = get_spark("scalability")
    print("== Fig 8 analogue: precision/time vs sample size (TUS-lite) ==")
    scalability_samples(spark, sf=args.tus_sf)
    print("== Fig 9 analogue: approx-BC runtime vs subgraph size (NYC) ==")
    scalability_subgraphs(spark, sf=args.nyc_sf)
    spark.stop()


if __name__ == "__main__":
    main()

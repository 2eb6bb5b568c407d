"""Job: §5.3 / Fig. 7 — top-k precision/recall/F1 on TUS-lite with its
natural homographs, plus the top-10 listing (paper: P@200 = 0.89,
P=R=F1 = 0.622 at k = #homographs, best F1 = 0.655).

    spark-submit jobs/tus_topk.py [--sf 1.0] [--samples 2000]
"""
import argparse

from repro.eval.experiments import tus_topk

from _common import get_spark


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=1.0)
    ap.add_argument("--samples", type=int, default=2000)
    args = ap.parse_args()
    spark = get_spark("tus_topk")
    tus_topk(spark, sf=args.sf, n_samples=args.samples)
    spark.stop()


if __name__ == "__main__":
    main()

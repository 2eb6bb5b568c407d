"""Job: paper Table 1 — dataset statistics for SB / TUS-lite / TUS-I /
NYC-lite at reproduction scale.

    spark-submit jobs/table1_stats.py [--tus-sf 1.0] [--nyc-sf 0.1]
"""
import argparse

from repro.eval.experiments import table1_stats

from _common import get_spark


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sb-scale", type=float, default=1.0)
    ap.add_argument("--tus-sf", type=float, default=1.0)
    ap.add_argument("--nyc-sf", type=float, default=0.1)
    args = ap.parse_args()
    spark = get_spark("table1_stats")
    table1_stats(
        spark, sb_scale=args.sb_scale, tus_sf=args.tus_sf, nyc_sf=args.nyc_sf
    )
    spark.stop()


if __name__ == "__main__":
    main()

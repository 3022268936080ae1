"""Figure 14: EQL on CDF graphs (m=3) vs stitched path baselines.

Usage: python jobs/fig14_cdf_m3.py [--full]
"""
import argparse

from _session import get_spark
from repro.experiments.cdf_eql import run
from repro.experiments.common import fmt_table


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--full", action="store_true")
    args = ap.parse_args()
    spark = get_spark("fig14-cdf-m3")
    print(fmt_table(run(spark, m=3, full=args.full)))
    spark.stop()


if __name__ == "__main__":
    main()

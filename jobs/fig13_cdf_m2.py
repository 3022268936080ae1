"""Figure 13: EQL on CDF graphs (m=2) vs path/reachability baselines.

Usage: python jobs/fig13_cdf_m2.py [--full]
"""
import argparse

from _session import get_spark
from repro.experiments.cdf_eql import run
from repro.experiments.common import fmt_table


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--full", action="store_true")
    args = ap.parse_args()
    spark = get_spark("fig13-cdf-m2")
    print(fmt_table(run(spark, m=2, full=args.full)))
    spark.stop()


if __name__ == "__main__":
    main()

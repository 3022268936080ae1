"""Table 1: EQL queries J1/J2/J3 on yago_lite — MoLESP-EQL vs JEDI-sub,
Virtuoso-sub, Neo4j-sub.

Usage: python jobs/table1_yago.py [--scale S]
"""
import argparse

from _session import get_spark
from repro.experiments.common import fmt_table
from repro.experiments.table1_yago import run_with_session


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=0.25)
    args = ap.parse_args()
    spark = get_spark("table1-yago")
    print(fmt_table(run_with_session(spark, scale=args.scale)))
    spark.stop()


if __name__ == "__main__":
    main()

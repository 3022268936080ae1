"""Figure 10: BFT / BFT-M / BFT-AM / GAM on Line, Comb, Star graphs.

Usage: python jobs/fig10_baselines.py [--full] [--timeout SECONDS]
(No Spark needed: the CTP algorithm comparison is in-memory, as in §5.1.)
"""
import argparse

from repro.experiments.common import fmt_table
from repro.experiments.fig10_baselines import run


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--full", action="store_true")
    ap.add_argument("--timeout", type=float, default=10.0)
    args = ap.parse_args()
    print(fmt_table(run(timeout_s=args.timeout, full=args.full)))


if __name__ == "__main__":
    main()

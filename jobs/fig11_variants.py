"""Figure 11: GAM / ESP / MoESP / LESP / MoLESP runtimes + provenances.

Usage: python jobs/fig11_variants.py [--full] [--timeout SECONDS]
"""
import argparse

from repro.experiments.common import fmt_table
from repro.experiments.fig11_variants import run


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--full", action="store_true")
    ap.add_argument("--timeout", type=float, default=30.0)
    args = ap.parse_args()
    print(fmt_table(run(timeout_s=args.timeout, full=args.full)))


if __name__ == "__main__":
    main()

"""Figure 12: GAM and MoLESP vs QGSTP-sub (DPBF) on dbpedia_lite,
UNI + LIMIT 1, average runtime grouped by number of seed sets m.

Usage: python jobs/fig12_qgstp.py [--scale S] [--queries N] [--timeout T]
"""
import argparse

from repro.experiments.common import fmt_table
from repro.experiments.fig12_qgstp import run


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=0.5)
    ap.add_argument("--queries", type=int, default=8)
    ap.add_argument("--timeout", type=float, default=10.0)
    args = ap.parse_args()
    print(
        fmt_table(
            run(scale=args.scale, queries_per_m=args.queries, timeout_s=args.timeout)
        )
    )


if __name__ == "__main__":
    main()

"""Supplementary (Fig. 14 analog): runtime-prediction error as the GP
adjuster conditions on more completed iterations, vs WeightedAverage and
NoGP.

Usage: spark-submit jobs/fig14_gp_adjustment.py  (or plain `python`).
"""
import sys

from repro.experiments import fig14


def main() -> None:
    rows = fig14.run()
    print("== Fig. 14 analog (total-runtime MSE vs observed iterations) ==")
    print(fig14.format_table(rows))


if __name__ == "__main__":
    sys.exit(main())

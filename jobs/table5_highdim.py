"""Reproduce Table V: pruning power on the high-dimensional datasets
(Apoll-TD d=128, Argo-ETD d=256). Scaled: n = 4000 x Table III ratios.

Usage: spark-submit jobs/table5_highdim.py  (or plain `python`).
"""
import sys

from repro import datasets
from repro.experiments import table4


def main() -> None:
    rows = table4.run(datasets.HIGH_DIM, base_n=8_000)
    print("== Table V (runtime, seconds) ==")
    print(table4.format_table(rows, "time_s"))
    print("\n== Table V (distance computations — machine-independent) ==")
    print(table4.format_table(rows, "n_dist"))


if __name__ == "__main__":
    sys.exit(main())

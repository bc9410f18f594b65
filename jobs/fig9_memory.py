"""Supplementary (Fig. 9 analog): memory cost of every k-means algorithm
at k = 256 (paper: k = 1e3) across the low-dimensional datasets.

Usage: spark-submit jobs/fig9_memory.py  (or plain `python`).
"""
import sys

from repro import datasets
from repro.experiments import fig9


def main() -> None:
    rows = fig9.run(datasets.LOW_DIM)
    print("== Fig. 9 analog (extra memory beyond the dataset, MB) ==")
    print(fig9.format_table(rows))


if __name__ == "__main__":
    sys.exit(main())

"""Reproduce Table IV: runtime of 10 k-means algorithms on the six
low-dimensional datasets, k in {16, 64, 256} (paper: {1e2, 1e3, 1e4}).

Usage: spark-submit jobs/table4_runtime.py   (or plain `python`; the
algorithms under comparison are executor-local, no cluster needed).
"""
import sys

from repro import datasets
from repro.experiments import table4


def main() -> None:
    rows = table4.run(datasets.LOW_DIM)
    print("== Table IV (runtime, seconds) ==")
    print(table4.format_table(rows, "time_s"))
    print("\n== Table IV (distance computations — machine-independent) ==")
    print(table4.format_table(rows, "n_dist"))


if __name__ == "__main__":
    sys.exit(main())

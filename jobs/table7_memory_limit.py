"""Reproduce Table VII: Dask-means under memory budgets (the memory-
tunable index). Budgets are chosen so Eq. 12 lands in the paper's three
f regimes (f ~ 30 / 12 / 6 for their 15 / 20 / 30 MB at n = 1e6).

Usage: spark-submit jobs/table7_memory_limit.py  (or plain `python`).
"""
import sys

from repro import datasets
from repro.experiments import table7


def main() -> None:
    rows = table7.run(datasets.LOW_DIM)
    print("== Table VII (runtime s / cumulative pruned vectors, by budget) ==")
    print(table7.format_table(rows))


if __name__ == "__main__":
    sys.exit(main())

"""Reproduce Table VI: memory-estimation accuracy (estimated/actual ratio)
under increasing k, n', and f.

Usage: spark-submit jobs/table6_memory_estimation.py  (or plain `python`).
"""
import sys

from repro.experiments import table6


def main() -> None:
    rows = table6.run()
    print("== Table VI (estimated / actual memory ratio) ==")
    print(table6.format_table(rows))


if __name__ == "__main__":
    sys.exit(main())

"""Reproduce Table VIII: cost-model ablation — polynomial degree beta x
{basic, interaction} features, scored by MSE/MAE/WMAPE/sMAPE on held-out
k-means tasks.

Usage: spark-submit jobs/table8_cost_model.py  (or plain `python`).
First run generates + caches the 200-task sample set (~minutes).
"""
import sys

from repro.experiments import table8


def main() -> None:
    rows = table8.run()
    print("== Table VIII (runtime-prediction error by beta / features) ==")
    print(table8.format_table(rows))


if __name__ == "__main__":
    sys.exit(main())

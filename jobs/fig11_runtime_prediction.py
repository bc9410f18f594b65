"""Supplementary (Fig. 11 analog): runtime-prediction accuracy and cost of
our estimator vs from-scratch XGBoost/DisNet/AutoML baselines and their
S- per-iteration variants. Carries the abstract's "MSE up to 33.3% lower"
claim.

Usage: spark-submit jobs/fig11_runtime_prediction.py  (or plain `python`).
"""
import sys

from repro.experiments import fig11


def main() -> None:
    rows = fig11.run()
    print("== Fig. 11 analog (runtime prediction: cost + accuracy) ==")
    print(fig11.format_table(rows))


if __name__ == "__main__":
    sys.exit(main())

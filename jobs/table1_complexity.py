"""Table 1: empirical validation of the amortized complexity bounds.

Usage: spark-submit jobs/table1_complexity.py [--scale S]
(Spark is not required for this driver; plain `python` works too.)
"""
from _common import job_args

from repro.harness.experiments import table1_complexity
from repro.harness.runner import fmt_table


def main() -> None:
    args, _ = job_args(__doc__)
    print("Table 1 — amortized cost validation (RAPQ; see EXPERIMENTS.md)")
    print(fmt_table(table1_complexity(scale=args.scale)))


if __name__ == "__main__":
    main()

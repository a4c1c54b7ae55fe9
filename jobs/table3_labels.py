"""Table 3: label bindings per dataset (corrected; see DESIGN.md)."""
from _common import job_args

from repro.harness.experiments import table3_labels
from repro.harness.runner import fmt_table


def main() -> None:
    job_args(__doc__)
    print("Table 3 — label variable bindings per streaming graph")
    print(fmt_table(table3_labels()))


if __name__ == "__main__":
    main()

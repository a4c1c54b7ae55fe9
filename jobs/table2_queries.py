"""Table 2: the real-world RPQ workload with minimal-DFA sizes per dataset."""
from _common import job_args

from repro.harness.experiments import table2_queries
from repro.harness.runner import fmt_table


def main() -> None:
    job_args(__doc__)
    print("Table 2 — real-world RPQ templates (k = minimal DFA states)")
    print(fmt_table(table2_queries()))


if __name__ == "__main__":
    main()

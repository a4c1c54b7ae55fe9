"""Figure 6 (as a table): window-size and slide-interval scalability."""
from _common import job_args

from repro.harness.experiments import fig6_scalability
from repro.harness.runner import fmt_table


def main() -> None:
    args, _ = job_args(__doc__)
    print("Figure 6 (table) — |W| and β sweeps (gMark-like stream, Q3-like query)")
    print(fmt_table(fig6_scalability(scale=args.scale)))


if __name__ == "__main__":
    main()

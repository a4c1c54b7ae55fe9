"""Figure 10 (as a table): explicit-deletion ratio sweep on Yago-like."""
from _common import job_args

from repro.harness.experiments import fig10_deletions
from repro.harness.runner import fmt_table


def main() -> None:
    args, _ = job_args(__doc__)
    print("Figure 10 (table) — p99 latency vs explicit deletion ratio")
    print(fmt_table(fig10_deletions(scale=args.scale)))


if __name__ == "__main__":
    main()

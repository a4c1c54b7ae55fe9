"""Figure 4 (as a table): RAPQ throughput & tail latency per query per graph."""
from _common import job_args

from repro.harness.experiments import fig4_throughput
from repro.harness.runner import fmt_table


def main() -> None:
    args, _ = job_args(__doc__)
    print("Figure 4 (table) — Algorithm RAPQ throughput / p99 latency")
    print(fmt_table(fig4_throughput(scale=args.scale)))


if __name__ == "__main__":
    main()

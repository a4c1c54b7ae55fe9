"""Figure 5 (as a table): Δ tree-index size per query on the SO-like graph."""
from _common import job_args

from repro.harness.experiments import fig5_index_size
from repro.harness.runner import fmt_table


def main() -> None:
    args, _ = job_args(__doc__)
    print("Figure 5 (table) — Δ index size on SO (size anti-correlates with throughput)")
    print(fmt_table(fig5_index_size(scale=args.scale)))


if __name__ == "__main__":
    main()

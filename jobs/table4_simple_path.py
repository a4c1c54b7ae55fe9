"""Table 4: RSPQ feasibility and latency overhead vs RAPQ per graph."""
from _common import job_args

from repro.harness.experiments import table4_simple_path
from repro.harness.runner import fmt_table


def main() -> None:
    args, _ = job_args(__doc__)
    print("Table 4 — simple path semantics: success + p99 overhead vs RAPQ")
    print(fmt_table(table4_simple_path(scale=args.scale)))


if __name__ == "__main__":
    main()

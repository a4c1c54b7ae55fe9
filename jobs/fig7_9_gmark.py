"""Figures 7-9 (as tables): gMark query-size sweep (DFA size, throughput)."""
from _common import job_args

from repro.harness.experiments import fig7_9_gmark, gmark_summary
from repro.harness.runner import fmt_table


def main() -> None:
    args, _ = job_args(__doc__)
    rows = fig7_9_gmark(n_queries=int(100 * min(1.0, args.scale)) or 10,
                        scale=args.scale)
    print("Figures 7-9 (tables) — synthetic gMark RPQ workload")
    print(fmt_table(gmark_summary(rows)))
    print()
    print(fmt_table(rows))


if __name__ == "__main__":
    main()

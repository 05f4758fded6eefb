"""Table 1 — dataset characteristics, ours vs the paper.

    spark-submit jobs/table1_datasets.py [--scale 1.0]
"""
from _common import parser, scaled_sizes


def main() -> None:
    args = parser(__doc__).parse_args()
    from repro.experiments import fmt_table, table1_rows

    rows = table1_rows(scaled_sizes(args.scale))
    print("\n== Table 1: dataset characteristics (ours vs paper) ==")
    print(fmt_table(rows))


if __name__ == "__main__":
    main()

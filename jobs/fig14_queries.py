"""Figure 14a-d — scan-based analytical queries (Table 2) per layout,
code-generated execution.  Requires jobs/fig12_13_ingest.py first.

    spark-submit jobs/fig14_queries.py [--data-dir D]
"""
from _common import parser


def main() -> None:
    args = parser(__doc__).parse_args()
    from repro.experiments import fmt_table, query_sweep

    rows = query_sweep(args.data_dir)
    print("\n== Fig 14: query times (codegen) ==")
    print(fmt_table(rows))


if __name__ == "__main__":
    main()

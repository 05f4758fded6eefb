"""Figure 10 — interpreted vs code-generated execution (Q1 + a GROUP BY
aggregate) across the four layouts.  Requires jobs/fig12_13_ingest.py.

    spark-submit jobs/fig10_codegen.py [--data-dir D]
"""
from _common import parser


def main() -> None:
    args = parser(__doc__).parse_args()
    from repro.experiments import codegen_vs_interp, fmt_table

    rows = codegen_vs_interp(args.data_dir)
    print("\n== Fig 10: interpreted vs codegen ==")
    print(fmt_table(rows))


if __name__ == "__main__":
    main()

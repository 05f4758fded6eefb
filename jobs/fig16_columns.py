"""Figure 16 — impact of the number of accessed columns on APAX/AMAX,
scan-based and index-based.  Requires jobs/fig12_13_ingest.py.

    spark-submit jobs/fig16_columns.py [--data-dir D] [--scale 1.0]
"""
from _common import parser, scaled_sizes


def main() -> None:
    args = parser(__doc__).parse_args()
    from repro.experiments import fmt_table, tweet2_column_sweep

    n = scaled_sizes(args.scale)["tweet_2"]
    rows = tweet2_column_sweep(args.data_dir, n)
    print("\n== Fig 16: column-count sweep ==")
    print(fmt_table(rows))


if __name__ == "__main__":
    main()

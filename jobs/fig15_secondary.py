"""Figure 15 — secondary-index range queries vs scans at different
selectivities on tweet_2.  Requires jobs/fig12_13_ingest.py.

    spark-submit jobs/fig15_secondary.py [--data-dir D] [--scale 1.0]
"""
from _common import parser, scaled_sizes


def main() -> None:
    args = parser(__doc__).parse_args()
    from repro.experiments import fmt_table, tweet2_selectivity_sweep

    n = scaled_sizes(args.scale)["tweet_2"]
    rows = tweet2_selectivity_sweep(args.data_dir, n)
    print("\n== Fig 15: scan vs secondary index ==")
    print(fmt_table(rows))


if __name__ == "__main__":
    main()

"""Figures 12a + 13a — storage size and ingestion time for all datasets
and layouts (insert-only), plus the tweet_2 update-intensive workload
with a primary-key index and a timestamp secondary index.

Run this FIRST: it writes the stores the query jobs read.

    spark-submit jobs/fig12_13_ingest.py [--data-dir D] [--scale 1.0]
"""
from _common import get_spark, parser, scaled_sizes


def main() -> None:
    args = parser(__doc__).parse_args()
    spark = get_spark("fig12_13_ingest")
    from repro.experiments import (
        fmt_table,
        storage_ingestion_sweep,
        tweet2_update_ingest,
    )

    sizes = scaled_sizes(args.scale)
    rows = storage_ingestion_sweep(spark, args.data_dir, sizes)
    print("\n== Fig 12a/13a: insert-only storage size + ingestion time ==")
    print(fmt_table(rows))
    rows2 = tweet2_update_ingest(spark, args.data_dir, sizes["tweet_2"])
    print("\n== Fig 12a/13a tweet_2*: 50% updates + secondary indexes ==")
    print(fmt_table(rows2))
    spark.stop()


if __name__ == "__main__":
    main()

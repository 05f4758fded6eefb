"""Benchmark fixtures: one shared ingestion of every dataset x layout.

``REPRO_BENCH_SCALE`` scales the bench-scale record counts (default 1.0,
see repro.experiments.BENCH_SIZES / DESIGN §5.5).
"""
import os

import pytest


@pytest.fixture(scope="session")
def bench_dir(tmp_path_factory):
    return str(tmp_path_factory.mktemp("bench_data"))


@pytest.fixture(scope="session")
def ingested(spark, bench_dir):
    """Ingest all five datasets in all four layouts (the Fig 12/13 sweep);
    every other benchmark reads these stores."""
    from repro.experiments import (
        BENCH_SIZES,
        storage_ingestion_sweep,
        tweet2_update_ingest,
    )

    scale = float(os.environ.get("REPRO_BENCH_SCALE", "1.0"))
    sizes = {k: max(200, int(v * scale)) for k, v in BENCH_SIZES.items()}
    insert_rows = storage_ingestion_sweep(spark, bench_dir, sizes)
    update_rows = tweet2_update_ingest(spark, bench_dir, sizes["tweet_2"])
    return {
        "dir": bench_dir,
        "sizes": sizes,
        "insert_rows": insert_rows,
        "update_rows": update_rows,
    }

"""Spark-parallel partitioned ingestion (paper §2.1.1 architecture).

AsterixDB hash-partitions incoming records by primary key into data
partitions, each managing its own LSM tree.  Here the documents arrive as
a Spark DataFrame ``(pk BIGINT, seq BIGINT, doc STRING)``; we
``repartition(n, pk)`` and run one :class:`repro.lsm.store.LSMStore` per
task via ``mapInPandas`` — real parallel ingestion across cores, one
on-disk store directory per partition.  Each task returns a stats row.

``seq`` is the arrival order: updates must apply after the insert they
replace, so each task re-sorts its partition by ``seq`` before feeding
the store (Spark does not preserve cross-batch order through a shuffle).
"""
from __future__ import annotations

import json
import os
import time
from typing import Iterator

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

STATS_SCHEMA = (
    "partition INT, n_ops BIGINT, seconds DOUBLE, size_bytes BIGINT, "
    "n_flushes INT, n_merges INT, n_components INT"
)


def docs_to_df(
    spark: SparkSession, docs: Iterator[tuple[int, dict]]
) -> DataFrame:
    """Materialize (pk, doc) pairs as a Spark DataFrame of JSON strings."""
    rows = [(pk, i, json.dumps(doc)) for i, (pk, doc) in enumerate(docs)]
    return spark.createDataFrame(rows, "pk BIGINT, seq BIGINT, doc STRING")


def ingest(
    spark: SparkSession,
    df: DataFrame,
    base_dir: str,
    layout: str,
    *,
    n_partitions: int = 4,
    page_size: int = 32 * 1024,
    mem_budget: int = 4 * 1024 * 1024,
    record_limit: int = 15_000,
    pk_index: bool = False,
    secondary: dict | None = None,
    deletes: DataFrame | None = None,
) -> tuple[pd.DataFrame, float]:
    """Ingest ``df`` into ``n_partitions`` LSM stores under ``base_dir``.

    Returns (per-partition stats, wall-clock seconds).  ``deletes`` may
    carry ``(pk, seq, doc=NULL)`` rows interleaved by ``seq``.
    """
    os.makedirs(base_dir, exist_ok=True)
    if deletes is not None:
        df = df.unionByName(deletes)

    def run_partition(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        from pyspark import TaskContext

        from ..lsm.store import LSMStore
        from ..storage.pagefile import BufferCache

        pid = TaskContext.get().partitionId()
        pdf = pd.concat(list(batches)) if batches else pd.DataFrame()
        t0 = time.time()
        store = LSMStore(
            os.path.join(base_dir, f"part_{pid}"),
            layout,
            cache=BufferCache(),
            page_size=page_size,
            mem_budget=mem_budget,
            record_limit=record_limit,
            pk_index=pk_index,
            secondary=secondary,
        )
        n = 0
        if len(pdf):
            pdf = pdf.sort_values("seq")  # arrival order within partition
            for pk, doc in zip(pdf["pk"], pdf["doc"]):
                if doc is None:
                    store.delete(int(pk))
                else:
                    store.upsert(int(pk), json.loads(doc))
                n += 1
        store.close()
        yield pd.DataFrame(
            [
                {
                    "partition": pid,
                    "n_ops": n,
                    "seconds": time.time() - t0,
                    "size_bytes": store.total_size_bytes(),
                    "n_flushes": store.n_flushes,
                    "n_merges": store.n_merges,
                    "n_components": len(store.components),
                }
            ]
        )

    t0 = time.time()
    stats = (
        df.repartition(n_partitions, F.col("pk"))
        .mapInPandas(run_partition, STATS_SCHEMA)
        .toPandas()
    )
    wall = time.time() - t0
    return stats, wall


def open_partitions(base_dir: str, cache=None) -> list:
    """Reopen every partition store under ``base_dir`` (driver side)."""
    from ..lsm.store import LSMStore
    from ..storage.pagefile import BufferCache

    stores = []
    for name in sorted(os.listdir(base_dir)):
        if name.startswith("part_"):
            stores.append(
                LSMStore.open(
                    os.path.join(base_dir, name), cache or BufferCache()
                )
            )
    return stores

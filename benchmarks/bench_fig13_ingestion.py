"""Fig 13a — ingestion time per dataset x layout.

Paper's shape: VB fastest on nested data (cheap construction); Open slow
(recursive copies); APAX slowest on many-column datasets (tweet_1); AMAX
between VB and APAX; update-intensive tweet_2* slower for columnar
(point-lookup decode cost, ~24% APAX / ~35% AMAX over Open).
"""
import os
import shutil

import pytest

from repro.experiments import emit, fmt_table, ingest_dataset


def test_fig13_report(ingested, benchmark):
    benchmark.pedantic(lambda: None, rounds=1, iterations=1)
    rows = ingested["insert_rows"] + ingested["update_rows"]
    emit("\n== Fig 13a: ingestion wall-clock (s) ==")
    emit(fmt_table(
        [
            {k: r[k] for k in ("dataset", "layout", "n_ops", "wall_s", "task_s",
                               "flushes", "merges")}
            for r in rows
        ]
    ))
    t = {(r["dataset"], r["layout"]): r["task_s"] for r in rows}
    # many-column dataset: APAX ingestion slowest of all layouts (paper)
    assert t[("tweet_1", "apax")] > t[("tweet_1", "vb")]
    assert t[("tweet_1", "apax")] > t[("tweet_1", "amax")]


@pytest.mark.parametrize("layout", ["open", "vb", "apax", "amax"])
def test_fig13_ingest_sensors(benchmark, spark, tmp_path, layout):
    """Benchmark-proper timing of one insert-only ingestion (sensors)."""
    def run():
        shutil.rmtree(str(tmp_path / layout), ignore_errors=True)
        return ingest_dataset(
            spark, "sensors", layout, str(tmp_path / layout), 800,
            n_partitions=2,
        )
    r = benchmark.pedantic(run, rounds=1, iterations=1)
    emit(f"sensors/{layout}: task_s={r['task_s']} size={r['size_bytes']}")

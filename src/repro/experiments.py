"""Experiment harnesses — one function per evaluation artifact.

Each returns printable rows; ``jobs/*.py`` are thin spark-submit wrappers
and ``benchmarks/bench_*.py`` time the same functions at bench scale.
Paper-vs-measured numbers are recorded in EXPERIMENTS.md.
"""
from __future__ import annotations

import json
import os
import shutil
import time
from typing import Optional

from .docgen import DATASETS, PAPER_TABLE1
from .dremel.shred import Shredder
from .query.engine import index_count_query, run_query
from .query.queries import QUERIES, column_sweep_query, tweet2_range_count
from .sparkio.ingest import docs_to_df, ingest, open_partitions

LAYOUTS = ("open", "vb", "apax", "amax")

# bench-scale record counts (paper scale / ~3.5e4; see DESIGN §5.5)
BENCH_SIZES = {
    "cell": 30_000,
    "sensors": 2_000,
    "tweet_1": 2_500,
    "wos": 2_000,
    "tweet_2": 5_000,
}

STORE_OPTS = dict(page_size=32 * 1024, mem_budget=2 * 1024 * 1024, record_limit=15_000)


def dominant_kind(batch) -> str:
    """Dominant value type by data *volume* (paper Table 1's sense: wos is
    'String' because abstracts dominate bytes, not column count).  Two or
    more kinds within 2x of the leader report as 'Mix'."""
    vol: dict[str, int] = {}
    for c in batch.columns:
        k = c.info.kind
        if k == "string":
            vol[k] = vol.get(k, 0) + sum(len(v) for v in c.values)
        else:
            vol[k] = vol.get(k, 0) + 8 * len(c.values)
    if not vol:
        return "none"
    total = sum(vol.values())
    major = [k for k, v in vol.items() if v >= 0.1 * total]
    if len(major) >= 3:
        return "mix"
    return max(vol, key=vol.get)


# ------------------------------------------------------------------ Table 1
def table1_rows(n_per_dataset: Optional[dict] = None) -> list[dict]:
    """Dataset characteristics: ours vs paper Table 1."""
    sizes = n_per_dataset or {k: 500 for k in DATASETS}
    rows = []
    for name, gen in DATASETS.items():
        n = sizes[name]
        sh = Shredder()
        total = 0
        for pk, doc in gen(n):
            sh.add(doc, pk)
            total += len(json.dumps(doc))
        batch = sh.finish()
        dominant = dominant_kind(batch)
        paper = PAPER_TABLE1[name]
        rows.append(
            {
                "dataset": name,
                "n_records": n,
                "avg_record_bytes": total // n,
                "n_columns": len(batch.schema.columns),
                "dominant": dominant,
                "paper_avg_record": paper["avg_record"],
                "paper_n_columns": paper["n_columns"],
                "paper_dominant": paper["dominant"],
            }
        )
    return rows


# ----------------------------------------------------- Fig 12/13: ingestion
def ingest_dataset(
    spark,
    dataset: str,
    layout: str,
    base_dir: str,
    n: int,
    *,
    n_partitions: int = 4,
    update_fraction: float = 0.0,
    pk_index: bool = False,
    secondary: Optional[dict] = None,
    store_opts: Optional[dict] = None,
) -> dict:
    """Ingest one dataset in one layout via the Spark partitioned feed.

    ``update_fraction`` > 0 re-upserts that fraction of records (uniform,
    §6.3.2's update-intensive workload).  Returns size/time stats.
    """
    import numpy as np

    opts = dict(STORE_OPTS)
    opts.update(store_opts or {})
    gen = DATASETS[dataset]
    docs = list(gen(n))
    if update_fraction > 0:
        rng = np.random.default_rng(7)
        idx = rng.choice(n, size=int(n * update_fraction), replace=False)
        redo = [docs[i] for i in idx]
        docs = docs + [(pk, {**doc, "updated": True}) for pk, doc in redo]
    df = docs_to_df(spark, iter(docs))
    path = os.path.join(base_dir, f"{dataset}_{layout}")
    shutil.rmtree(path, ignore_errors=True)
    stats, wall = ingest(
        spark,
        df,
        path,
        layout,
        n_partitions=n_partitions,
        pk_index=pk_index,
        secondary=secondary,
        **opts,
    )
    return {
        "dataset": dataset,
        "layout": layout,
        "n_ops": int(stats.n_ops.sum()),
        "wall_s": round(wall, 2),
        "task_s": round(float(stats.seconds.max()), 2),
        "size_bytes": int(stats.size_bytes.sum()),
        "flushes": int(stats.n_flushes.sum()),
        "merges": int(stats.n_merges.sum()),
        "path": path,
    }


def storage_ingestion_sweep(
    spark, base_dir: str, sizes: Optional[dict] = None, layouts=LAYOUTS
) -> list[dict]:
    """Fig 12a + Fig 13a: sizes and ingestion times, insert-only datasets."""
    sizes = sizes or BENCH_SIZES
    rows = []
    for dataset in ("cell", "sensors", "tweet_1", "wos"):
        for layout in layouts:
            rows.append(
                ingest_dataset(spark, dataset, layout, base_dir, sizes[dataset])
            )
    return rows


def tweet2_update_ingest(
    spark, base_dir: str, n: Optional[int] = None, layouts=LAYOUTS
) -> list[dict]:
    """Fig 12a/13a tweet_2*: 50% uniform updates with a primary-key index
    and a ``timestamp`` secondary index (§6.3.2)."""
    n = n or BENCH_SIZES["tweet_2"]
    rows = []
    for layout in layouts:
        r = ingest_dataset(
            spark,
            "tweet_2",
            layout,
            base_dir,
            n,
            update_fraction=0.5,
            pk_index=True,
            secondary={"ts": "timestamp"},
        )
        rows.append(r)
    return rows


# --------------------------------------------------------- Fig 14: queries
def query_sweep(
    base_dir: str, datasets=("cell", "sensors", "tweet_1", "wos"),
    layouts=LAYOUTS, model: str = "codegen",
) -> list[dict]:
    rows = []
    for dataset in datasets:
        for layout in layouts:
            stores = open_partitions(os.path.join(base_dir, f"{dataset}_{layout}"))
            for qname, q in QUERIES[dataset].items():
                res, st = run_query(stores, q, model=model)
                rows.append(
                    {
                        "dataset": dataset,
                        "layout": layout,
                        "query": qname,
                        "model": model,
                        "wall_s": round(st.wall_s, 3),
                        "pages_read": st.pages_read,
                        "bytes_read": st.io.bytes_read,
                        "result": res[0] if res else None,
                    }
                )
    return rows


# --------------------------------------------------------- Fig 10: codegen
def codegen_vs_interp(base_dir: str, dataset: str = "sensors", layouts=LAYOUTS):
    """Fig 10: Q1 and a GROUP-BY aggregate (Q3) interpreted vs codegen."""
    rows = []
    for layout in layouts:
        stores = open_partitions(os.path.join(base_dir, f"{dataset}_{layout}"))
        for qname in ("Q1", "Q3"):
            q = QUERIES[dataset][qname]
            for model in ("interp", "codegen"):
                if q.is_count_star and model == "interp":
                    continue  # count(*) bypasses both pipelines
                res, st = run_query(stores, q, model=model)
                rows.append(
                    {
                        "layout": layout,
                        "query": qname,
                        "model": model,
                        "wall_s": round(st.wall_s, 3),
                        "result": res[0] if res else None,
                    }
                )
    return rows


# --------------------------------------- Fig 15/16: secondary-index queries
def tweet2_selectivity_sweep(
    base_dir: str, n: int, layouts=LAYOUTS,
    selectivities=(0.00001, 0.0001, 0.001, 0.01),
) -> list[dict]:
    """Fig 15: timestamp range counts, scan vs secondary index."""
    t0 = 1_460_000_000_000
    rows = []
    for layout in layouts:
        stores = open_partitions(os.path.join(base_dir, f"tweet_2_{layout}"))
        for sel in selectivities:
            span = max(1, int(n * sel)) * 1000
            lo, hi = t0 + (n // 3) * 1000, t0 + (n // 3) * 1000 + span - 1
            res_s, st_s = run_query(stores, tweet2_range_count(lo, hi))
            res_i, st_i = index_count_query(stores, "ts", lo, hi)
            assert res_s[0][0] == res_i[0][0], (res_s, res_i)
            rows.append(
                {
                    "layout": layout,
                    "selectivity": sel,
                    "count": res_s[0][0],
                    "scan_s": round(st_s.wall_s, 4),
                    "scan_pages": st_s.pages_read,
                    "index_s": round(st_i.wall_s, 4),
                    "index_pages": st_i.pages_read,
                }
            )
    return rows


SWEEP_PATHS = [
    "text",
    "user.followers_count",
    "user.name",
    "lang",
    "retweet_count",
    "user.description",
    "place.country",
    "source",
    "favorite_count",
    "user.screen_name",
]


def tweet2_column_sweep(
    base_dir: str, n: int, layouts=("apax", "amax"),
    n_columns=(1, 2, 4, 6, 8, 10), selectivities=(0.001, 0.01),
) -> list[dict]:
    """Fig 16: impact of the number of accessed columns, scan-based and
    index-based (APAX vs AMAX only, as in the paper)."""
    t0 = 1_460_000_000_000
    rows = []
    for layout in layouts:
        stores = open_partitions(os.path.join(base_dir, f"tweet_2_{layout}"))
        for k in n_columns:
            paths = SWEEP_PATHS[:k]
            res, st = run_query(stores, column_sweep_query(paths))
            rows.append(
                {
                    "layout": layout,
                    "n_columns": k,
                    "mode": "scan",
                    "wall_s": round(st.wall_s, 4),
                    "pages_read": st.pages_read,
                    "counts": res[0] if res else None,
                }
            )
            for sel in selectivities:
                span = max(1, int(n * sel)) * 1000
                lo = t0 + (n // 3) * 1000
                hi = lo + span - 1
                res_i, st_i = index_count_query(stores, "ts", lo, hi, paths)
                rows.append(
                    {
                        "layout": layout,
                        "n_columns": k,
                        "mode": f"index_{sel}",
                        "wall_s": round(st_i.wall_s, 4),
                        "pages_read": st_i.pages_read,
                        "counts": res_i[0] if res_i else None,
                    }
                )
    return rows


RESULTS_PATH = os.environ.get(
    "REPRO_RESULTS_FILE",
    os.path.join(
        os.path.dirname(os.path.dirname(os.path.dirname(os.path.abspath(__file__)))),
        "bench_tables.txt",
    ),
)


def emit(*lines) -> None:
    """Print a result line/table AND append it to ``bench_tables.txt`` so
    the numbers survive pytest's output capture in bench_output.txt."""
    text = "\n".join(str(l) for l in lines)
    print(text)
    try:
        with open(RESULTS_PATH, "a") as f:
            f.write(text + "\n")
    except OSError:
        pass


def fmt_table(rows: list[dict]) -> str:
    """Plain-text table for job output / EXPERIMENTS.md."""
    if not rows:
        return "(no rows)"
    cols = list(rows[0].keys())
    widths = {
        c: max(len(str(c)), *(len(str(r.get(c, ""))) for r in rows)) for c in cols
    }
    out = [" | ".join(str(c).ljust(widths[c]) for c in cols)]
    out.append("-+-".join("-" * widths[c] for c in cols))
    for r in rows:
        out.append(" | ".join(str(r.get(c, "")).ljust(widths[c]) for c in cols))
    return "\n".join(out)

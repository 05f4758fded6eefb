"""Fig 10 — interpreted vs code-generated execution.

Paper's shape: codegen beats the interpreted model on every layout
(their Q2 improved even for row formats; interpreted AMAX could lose to
row-major VB because of value reassembly costs).
"""
import os

import pytest

from repro.experiments import emit, fmt_table
from repro.query.engine import run_query
from repro.query.queries import QUERIES
from repro.sparkio.ingest import open_partitions

LAYOUTS = ("open", "vb", "apax", "amax")
CASES = [(l, m) for l in LAYOUTS for m in ("interp", "codegen")]
_results = []


@pytest.fixture(scope="module")
def sensor_stores(ingested):
    return {
        l: open_partitions(os.path.join(ingested["dir"], f"sensors_{l}"))
        for l in LAYOUTS
    }


@pytest.mark.parametrize("layout,model", CASES, ids=[f"{l}-{m}" for l, m in CASES])
def test_fig10_groupby(benchmark, sensor_stores, layout, model):
    q = QUERIES["sensors"]["Q3"]  # the GROUP BY aggregate of Fig 10's Q2
    stores = sensor_stores[layout]
    run_query(stores, q, model=model)  # warm
    times = []

    def run():
        rows, stats = run_query(stores, q, model=model)
        times.append(stats.wall_s)
        return rows

    benchmark.pedantic(run, rounds=3, iterations=1)
    _results.append(
        {"layout": layout, "model": model, "wall_s": round(min(times), 4)}
    )


def test_fig10_report(sensor_stores, benchmark):
    benchmark.pedantic(lambda: None, rounds=1, iterations=1)
    emit("\n== Fig 10: interpreted vs codegen (sensors GROUP BY) ==")
    emit(fmt_table(_results))
    t = {(r["layout"], r["model"]): r["wall_s"] for r in _results}
    for layout in LAYOUTS:
        assert t[(layout, "codegen")] < t[(layout, "interp")]

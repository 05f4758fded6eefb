"""Fig 15 — range queries via secondary index vs scan, by selectivity.

Paper's shape: low-selectivity queries comparable everywhere (<1s);
at 0.1% the scan times correlate with storage size; the index
accelerates row layouts and APAX, while AMAX's scan can beat its own
index-based run for count-only queries (only Page 0 is needed).
"""
from repro.experiments import emit, fmt_table, tweet2_selectivity_sweep


def test_fig15_selectivity(ingested, benchmark):
    rows = benchmark.pedantic(
        lambda: tweet2_selectivity_sweep(
            ingested["dir"], ingested["sizes"]["tweet_2"]
        ),
        rounds=1,
        iterations=1,
    )
    emit("\n== Fig 15: scan vs secondary-index range counts ==")
    emit(fmt_table(rows))
    by = {(r["layout"], r["selectivity"]): r for r in rows}
    # index touches far fewer pages than the scan for selective queries
    # on row layouts (the paper's index benefit)
    sel = min(r["selectivity"] for r in rows)
    for layout in ("open", "vb"):
        r = by[(layout, sel)]
        assert r["index_pages"] <= r["scan_pages"]
    # AMAX count-only scan stays cheap (Page 0 + zone maps)
    r = by[("amax", sel)]
    assert r["scan_pages"] <= by[("open", sel)]["scan_pages"]

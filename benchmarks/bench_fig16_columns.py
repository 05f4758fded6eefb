"""Fig 16 — impact of the number of accessed columns (APAX vs AMAX).

Paper's shape: scan cost grows with accessed columns on AMAX (10 cols
~9.5x slower than 1) but stays flat on APAX (every page is read anyway);
index-based queries are far less sensitive to the column count.
"""
from repro.experiments import emit, fmt_table, tweet2_column_sweep


def test_fig16_column_sweep(ingested, benchmark):
    rows = benchmark.pedantic(
        lambda: tweet2_column_sweep(
            ingested["dir"], ingested["sizes"]["tweet_2"]
        ),
        rounds=1,
        iterations=1,
    )
    emit("\n== Fig 16: #columns accessed, scan vs index ==")
    emit(fmt_table(rows))
    scan = {
        (r["layout"], r["n_columns"]): r
        for r in rows
        if r["mode"] == "scan"
    }
    # AMAX scan: more columns -> more pages read (the paper's slope)
    assert scan[("amax", 10)]["pages_read"] > scan[("amax", 1)]["pages_read"]
    # APAX scan: page count flat w.r.t. projected columns
    assert scan[("apax", 10)]["pages_read"] == scan[("apax", 1)]["pages_read"]
    # AMAX still reads fewer pages than APAX even at 10 columns
    assert scan[("amax", 10)]["pages_read"] <= scan[("apax", 10)]["pages_read"]
    # index-based: pages ~ flat in practice vs scan growth (report only)

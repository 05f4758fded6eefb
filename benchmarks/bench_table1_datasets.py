"""Table 1 — dataset characteristics (generation + schema inference)."""
from repro.experiments import emit, fmt_table, table1_rows

PAPER = """paper Table 1:  cell 141B/7 cols/Mix; sensors 3.8KB/16/Integer;
tweet_1 5.3KB/933/String; wos 6.2KB/296/String; tweet_2 2.7KB/275/String"""


def test_table1_characteristics(benchmark):
    rows = benchmark.pedantic(
        lambda: table1_rows({k: 400 for k in ("cell", "sensors", "tweet_1", "wos", "tweet_2")}),
        rounds=1,
        iterations=1,
    )
    emit("\n== Table 1: ours vs paper ==")
    emit(fmt_table(rows))
    emit(PAPER)
    by = {r["dataset"]: r for r in rows}
    assert by["cell"]["n_columns"] == 7
    assert by["sensors"]["n_columns"] == 16
    assert by["tweet_1"]["n_columns"] > by["tweet_2"]["n_columns"] > 100
    assert by["wos"]["dominant"] == "string"

"""Spark-side tests: partitioned mapInPandas ingestion, the lsmcol
Python DataSourceV2 (Catalyst planning + filter pushdown), and DuckDB
oracle agreement for query results."""
import json

import pandas as pd
import pytest

from repro.docgen import cell, sensors, tweet_2
from repro.oracle import assert_equivalent
from repro.query.engine import run_query
from repro.query.queries import CELL, SENSORS
from repro.sparkio.datasource import LsmColumnarDataSource, _parse_fields
from repro.sparkio.ingest import docs_to_df, ingest, open_partitions

N_CELL = 2000


@pytest.fixture(scope="module")
def cell_amax(spark, tmp_path_factory):
    base = str(tmp_path_factory.mktemp("spark_cell") / "cell_amax")
    df = docs_to_df(spark, cell(N_CELL))
    stats, _wall = ingest(
        spark, df, base, "amax", n_partitions=2,
        mem_budget=256 * 1024, page_size=8192, record_limit=1000,
    )
    return base, stats


@pytest.fixture(scope="module")
def cell_pdf():
    return pd.DataFrame([d for _pk, d in cell(N_CELL)])


@pytest.fixture(scope="module")
def registered(spark):
    spark.dataSource.register(LsmColumnarDataSource)
    return spark


class TestIngestJob:
    def test_all_records_ingested(self, cell_amax):
        _base, stats = cell_amax
        assert int(stats.n_ops.sum()) == N_CELL
        assert len(stats) == 2  # one row per data partition

    def test_partitions_disjoint_and_complete(self, cell_amax):
        base, _stats = cell_amax
        stores = open_partitions(base)
        assert len(stores) == 2
        rows, _ = run_query(stores, CELL["Q1"])
        assert rows[0][0] == N_CELL

    def test_engine_matches_duckdb(self, cell_amax, cell_pdf, spark):
        base, _ = cell_amax
        stores = open_partitions(base)
        rows, _ = run_query(stores, CELL["Q3"])
        import duckdb

        exp = duckdb.sql(
            "SELECT COUNT(*) FROM cell_pdf WHERE duration >= 600"
        ).fetchone()[0]
        assert rows[0][0] == exp

    def test_update_ordering_across_shuffle(self, spark, tmp_path_factory):
        # upserts must apply in arrival order even after repartition
        base = str(tmp_path_factory.mktemp("upd") / "d")
        docs = [(i, {"v": 1}) for i in range(200)]
        docs += [(i, {"v": 2}) for i in range(200)]  # updates, later seq
        df = docs_to_df(spark, iter(docs))
        ingest(spark, df, base, "vb", n_partitions=2, mem_budget=8 * 1024)
        stores = open_partitions(base)
        from repro.query.plan import Agg, GroupBy, Query, Scan, Select

        q = Query(
            "updord",
            [Scan({"v": "v"}), Select("eq(v, 2)")],
            GroupBy([], [Agg("c", "count", "")]),
        )
        rows, _ = run_query(stores, q)
        assert rows[0][0] == 200


class TestFieldSpec:
    def test_parse_default_names(self):
        fs = _parse_fields("caller:bigint, user.name:string")
        assert fs[0] == ("caller", "caller", "bigint")
        assert fs[1][0] == "user_name"

    def test_parse_explicit_names(self):
        fs = _parse_fields("uname=user.name:string")
        assert fs[0] == ("uname", "user.name", "string")


class TestDataSource:
    def test_scan_matches_duckdb(self, registered, cell_amax, cell_pdf):
        base, _ = cell_amax
        df = (
            registered.read.format("lsmcol")
            .option("path", base)
            .option("fields", "caller:bigint,duration:bigint,kind:string")
            .load()
        )
        df.createOrReplaceTempView("cell_v")
        sql = (
            "SELECT kind, COUNT(*) AS c, MAX(duration) AS m FROM cell_v "
            "GROUP BY kind ORDER BY kind"
        )
        assert_equivalent(
            registered.sql(sql), sql.replace("cell_v", "cell_pdf"), cell_pdf=cell_pdf
        )

    def test_filter_pushdown_plans(self, registered, cell_amax, cell_pdf):
        base, _ = cell_amax
        df = (
            registered.read.format("lsmcol")
            .option("path", base)
            .option("fields", "duration:bigint")
            .load()
        )
        df.createOrReplaceTempView("cell_f")
        sql = "SELECT COUNT(*) AS c FROM cell_f WHERE duration >= 600"
        assert_equivalent(
            registered.sql(sql), sql.replace("cell_f", "cell_pdf"), cell_pdf=cell_pdf
        )

    def test_aggregate_over_catalyst(self, registered, cell_amax, cell_pdf):
        base, _ = cell_amax
        df = (
            registered.read.format("lsmcol")
            .option("path", base)
            .option("fields", "caller:bigint,cost:double")
            .load()
        )
        df.createOrReplaceTempView("cell_a")
        sql = (
            "SELECT caller, ROUND(SUM(cost), 2) AS s FROM cell_a "
            "GROUP BY caller ORDER BY s DESC, caller LIMIT 5"
        )
        assert_equivalent(
            registered.sql(sql), sql.replace("cell_a", "cell_pdf"), cell_pdf=cell_pdf
        )


class TestSensorsOracle:
    def test_unnested_aggregate(self, spark, tmp_path_factory):
        base = str(tmp_path_factory.mktemp("sens") / "amax")
        docs = list(sensors(40))
        df = docs_to_df(spark, iter(docs))
        ingest(spark, df, base, "amax", n_partitions=2, mem_budget=128 * 1024)
        stores = open_partitions(base)
        rows, _ = run_query(stores, SENSORS["Q2"])
        flat = pd.DataFrame(
            [
                {"sid": d["sensor_id"], "temp": r["temp"]}
                for _pk, d in docs
                for r in d["readings"]
            ]
        )
        import duckdb

        mx, mn = duckdb.sql("SELECT MAX(temp), MIN(temp) FROM flat").fetchone()
        assert rows[0] == (mx, mn)

"""Benchmarks for paper Tables 1, 2 and 15 (loading + storage sizes)."""
from __future__ import annotations

import pytest

from repro import synth_data
from repro.harness.loading import (
    TPCDS_FKS,
    TPCDS_PKS,
    TPCH_FKS,
    TPCH_PKS,
    load_duckdb,
    load_parquet,
    load_tag,
)
from repro.tpcds import synth as tpcds_synth

SF = 0.01


@pytest.fixture(scope="module")
def tpch_tables(spark):
    return synth_data.tpch(spark, sf=SF)


@pytest.fixture(scope="module")
def tpcds_tables(spark):
    return tpcds_synth.tpcds(spark, sf=SF)


@pytest.mark.parametrize("benchmark_name", ["tpch", "tpcds"])
def test_load_tag_graph(benchmark, spark, tpch_tables, tpcds_tables, benchmark_name):
    tables = tpch_tables if benchmark_name == "tpch" else tpcds_tables
    benchmark.group = f"load-{benchmark_name}"

    def build():
        res, graph = load_tag(spark, tables)
        graph.unpersist()
        return res.seconds

    benchmark.pedantic(build, rounds=2, iterations=1)


@pytest.mark.parametrize("benchmark_name", ["tpch", "tpcds"])
def test_load_duckdb_with_indexes(
    benchmark, tpch_tables, tpcds_tables, benchmark_name
):
    tables = tpch_tables if benchmark_name == "tpch" else tpcds_tables
    pks = TPCH_PKS if benchmark_name == "tpch" else TPCDS_PKS
    fks = TPCH_FKS if benchmark_name == "tpch" else TPCDS_FKS
    benchmark.group = f"load-{benchmark_name}"
    benchmark.pedantic(
        lambda: load_duckdb(tables, pks, fks), rounds=2, iterations=1
    )


@pytest.mark.parametrize("benchmark_name", ["tpch", "tpcds"])
def test_write_parquet(
    benchmark, tmp_path, tpch_tables, tpcds_tables, benchmark_name
):
    tables = tpch_tables if benchmark_name == "tpch" else tpcds_tables
    benchmark.group = f"load-{benchmark_name}"
    benchmark.pedantic(
        lambda: load_parquet(tables, str(tmp_path)), rounds=2, iterations=1
    )

"""Benchmarks for paper Tables 5, 6, 11/12/13 (TPC-DS per-query runtimes)."""
from __future__ import annotations

import pytest

from repro.tpcds.queries import QUERIES

ALL = sorted(QUERIES)
SYSTEMS = ["duckdb", "spark_sql", "tag"]


@pytest.mark.parametrize("system", SYSTEMS)
@pytest.mark.parametrize("name", ALL)
def test_tpcds_query(benchmark, tpcds_bench, name, system):
    q = QUERIES[name]
    fn = {
        "tag": lambda: tpcds_bench._run_tag(q),
        "spark_sql": lambda: tpcds_bench._run_spark_sql(q),
        "duckdb": lambda: tpcds_bench._run_duckdb(q),
    }[system]
    benchmark.group = f"tpcds-{name}"
    rows = benchmark.pedantic(fn, rounds=2, iterations=1, warmup_rounds=1)
    assert rows >= 0

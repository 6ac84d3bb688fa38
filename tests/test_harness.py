"""Harness tests: runner, loading, memory, table renderers."""
from __future__ import annotations

import pytest

from repro.harness import tables as T
from repro.harness.loading import (
    TPCH_FKS,
    TPCH_PKS,
    arrow_in_memory_bytes,
    load_duckdb,
    load_parquet,
    load_tag,
)
from repro.harness.memory import (
    PeakRssSampler,
    process_tree_rss_bytes,
    total_system_memory_bytes,
)
from repro.harness.runner import BenchRunner, ShuffleMeter, speedup_class
from repro.tpch.queries import QUERIES as TPCH_QUERIES

BENCH_SF = 0.002


@pytest.fixture(scope="module")
def runner(spark, tpch_data, tpch_graph):
    r = BenchRunner(spark, tpch_data, tpch_graph, reps=1, warmup=0)
    yield r
    r.close()


class TestRunner:
    @pytest.mark.parametrize("system", ["tag", "spark_sql", "duckdb"])
    def test_single_query_all_systems(self, runner, system):
        res = runner.run_query(TPCH_QUERIES["q6"], system)
        assert res.mean_s > 0
        assert res.system == system
        assert res.rows == 1  # scalar aggregate
        if system == "tag":
            assert res.messages is not None and res.messages >= 0

    def test_systems_agree_on_row_counts(self, runner):
        q = TPCH_QUERIES["q3"]
        counts = {
            s: runner.run_query(q, s).rows for s in ("tag", "spark_sql", "duckdb")
        }
        assert len(set(counts.values())) == 1, counts

    def test_run_workload_subset(self, runner):
        res = runner.run_workload(
            {"q6": TPCH_QUERIES["q6"]}, systems=("duckdb", "tag")
        )
        assert {r.system for r in res} == {"duckdb", "tag"}

    def test_shuffle_meter_graceful_when_ui_disabled(self, spark):
        meter = ShuffleMeter(spark)
        # conftest disables the UI → meter returns None rather than failing
        assert meter.total_shuffle_write() is None or isinstance(
            meter.total_shuffle_write(), int
        )

    @pytest.mark.parametrize(
        "tag_s,other_s,expected",
        [
            (1.0, 2.0, "outperforms"),
            (1.0, 1.1, "competitive"),
            (2.0, 1.0, "worse"),
            (1.0, 1.0, "competitive"),
        ],
    )
    def test_speedup_class(self, tag_s, other_s, expected):
        assert speedup_class(tag_s, other_s) == expected


class TestLoading:
    def test_load_tag(self, spark, tpch_data):
        res, graph = load_tag(spark, tpch_data)
        assert res.seconds > 0
        assert "tuple vertices" in res.detail
        graph.unpersist()

    def test_load_duckdb_with_indexes(self, tpch_data):
        res, _size = load_duckdb(tpch_data, TPCH_PKS, TPCH_FKS)
        assert res.seconds > 0
        assert "index" in res.detail

    def test_load_parquet_and_sizes(self, spark, tpch_data, tmp_path):
        res, nbytes = load_parquet(
            {"nation": tpch_data["nation"]}, str(tmp_path)
        )
        assert res.seconds > 0 and nbytes > 0

    def test_arrow_bytes_positive_and_bigger_than_parquet(
        self, spark, tpch_data, tmp_path
    ):
        subset = {"lineitem": tpch_data["lineitem"]}
        raw = arrow_in_memory_bytes(subset)
        _, pq = load_parquet(subset, str(tmp_path))
        assert raw > pq  # columnar compression shrinks the data (Table 15)


class TestMemory:
    def test_process_tree_rss_positive(self):
        rss = process_tree_rss_bytes()
        assert rss > 50 * 1024 * 1024  # python + JVM well over 50 MB

    def test_total_system_memory(self):
        assert total_system_memory_bytes() > 1 << 30

    def test_sampler_records_peak(self):
        with PeakRssSampler(interval=0.05) as s:
            _ = [bytearray(1 << 20) for _ in range(50)]
        assert s.peak_bytes > 0
        assert 0 < s.peak_fraction < 1


class TestTables:
    def test_render_table_alignment(self):
        text = T.render_table(
            ["a", "long_header"], [[1, 2.5], ["xx", 3.0]], title="T"
        )
        assert "## T" in text
        assert "long_header" in text
        assert "2.500" in text

    def test_sf_map_matches_paper(self):
        assert list(T.SF_MAP) == [30, 50, 75]
        assert T.SF_MAP[75] == 0.1

    def test_run_suite_tiny(self, spark):
        suite = T.run_suite(
            spark,
            "tpch",
            sfs=(BENCH_SF,),
            reps=1,
            systems=("duckdb", "tag"),
            queries={"q6": TPCH_QUERIES["q6"], "q19": TPCH_QUERIES["q19"]},
        )
        results = suite["sfs"][str(BENCH_SF)]
        assert {r["system"] for r in results} == {"duckdb", "tag"}
        assert {r["query"] for r in results} == {"q6", "q19"}
        text, _ = T.table_all_queries(suite, "tpch")
        assert "q6" in text and "tag_s" in text

    def test_table_selectors_from_results(self):
        fake = []
        for q in sum(T.TABLE3_QUERIES.values(), []) + T.TABLE4_QUERIES:
            for s, v in (("tag", 1.0), ("duckdb", 2.0), ("spark_sql", 4.0)):
                fake.append({"query": q, "system": s, "mean_s": v})
        t3, d3 = T.table_03(fake)
        assert "2.0x" in t3 and "4.0x" in t3
        t4, d4 = T.table_04(fake)
        assert "q1" in t4

    def test_table_05_counts(self):
        fake = []
        for q, tag_t in (("a", 1.0), ("b", 1.0), ("c", 10.0)):
            fake.append({"query": q, "system": "tag", "mean_s": tag_t})
            fake.append({"query": q, "system": "duckdb", "mean_s": 2.0})
            fake.append({"query": q, "system": "spark_sql", "mean_s": 1.0})
        text, data = T.table_05(fake)
        assert data["duckdb"] == {"outperforms": 2, "competitive": 0, "worse": 1}
        assert data["spark_sql"]["worse"] == 1

    def test_table_14_aggregates(self):
        suite = {
            "sfs": {
                "0.1": [
                    {"query": "q6", "system": s, "mean_s": v}
                    for s, v in (("tag", 1.0), ("duckdb", 2.0), ("spark_sql", 3.0))
                ]
            }
        }
        text, data = T.table_14(suite, suite)
        assert data["tag"]["TPC-H@0.1"] == 1.0
        assert data["spark_sql"]["TPC-DS@0.1"] == 3.0

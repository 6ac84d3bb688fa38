"""Reproduction of every table in the paper's evaluation section (§8).

Scale-factor mapping (DESIGN.md): the paper's SF 30/50/75 (GB) become our
SF 0.025/0.05/0.1 — same 1:2:3-ish progression, laptop-scale data.

Each ``table_XX`` function prints rows shaped like the paper's table and
returns the structured data; ``jobs/tableXX_*.py`` are spark-submit
wrappers, and EXPERIMENTS.md records paper numbers next to ours.

The timing-bearing tables (3/4/8–13 and 5/6/14 derived from them) share
one measurement suite per benchmark (``run_suite``) so a query is timed
once per (sf, system) and every table derives from the same JSON results.
"""
from __future__ import annotations

import json
import os
import time
from dataclasses import asdict
from typing import Iterable

from pyspark.sql import SparkSession

from .. import synth_data
from ..core.tag import TAGGraph
from ..tpcds import synth as tpcds_synth
from ..tpcds.queries import QUERIES as TPCDS_QUERIES
from ..tpch.queries import QUERIES as TPCH_QUERIES
from .loading import (
    TPCDS_FKS,
    TPCDS_PKS,
    TPCH_FKS,
    TPCH_PKS,
    arrow_in_memory_bytes,
    load_duckdb,
    load_parquet,
    load_tag,
)
from .memory import PeakRssSampler
from .runner import BenchRunner, QueryResult, speedup_class

#: paper SF → our SF
SF_MAP = {30: 0.025, 50: 0.05, 75: 0.1}
DEFAULT_SFS = tuple(SF_MAP.values())

RESULTS_DIR = os.environ.get(
    "REPRO_RESULTS_DIR", os.path.join(os.path.dirname(__file__), "../../../results")
)


def _benchmark(name: str):
    if name == "tpch":
        return synth_data.tpch, TPCH_QUERIES, TPCH_PKS, TPCH_FKS
    if name == "tpcds":
        return tpcds_synth.tpcds, TPCDS_QUERIES, TPCDS_PKS, TPCDS_FKS
    raise ValueError(name)


def build_bench(
    spark: SparkSession, benchmark: str, sf: float, reps: int = 2
) -> BenchRunner:
    gen, queries, _, _ = _benchmark(benchmark)
    tables = {k: v.cache() for k, v in gen(spark, sf=sf).items()}
    for df in tables.values():
        df.count()
    graph = TAGGraph.encode(spark, tables)
    graph.materialize()
    return BenchRunner(spark, tables, graph, reps=reps)


def run_suite(
    spark: SparkSession,
    benchmark: str = "tpch",
    sfs: Iterable[float] = DEFAULT_SFS,
    reps: int = 2,
    systems=("tag", "spark_sql", "duckdb"),
    with_messages: bool = False,
    queries: dict | None = None,
) -> dict:
    """Time every query × system at every SF; returns a JSON-able dict."""
    _, all_queries, _, _ = _benchmark(benchmark)
    queries = queries or all_queries
    out = {"benchmark": benchmark, "reps": reps, "sfs": {}}
    for sf in sfs:
        runner = build_bench(spark, benchmark, sf, reps=reps)
        try:
            results = runner.run_workload(
                queries, systems=systems, with_messages=with_messages
            )
        finally:
            runner.graph.unpersist()
            for df in runner.tables.values():
                df.unpersist()
            runner.close()
        out["sfs"][str(sf)] = [asdict(r) for r in results]
    return out


def save_json(obj: dict, name: str) -> str:
    os.makedirs(RESULTS_DIR, exist_ok=True)
    path = os.path.join(RESULTS_DIR, name)
    with open(path, "w") as f:
        json.dump(obj, f, indent=1)
    return path


def load_json(name: str) -> dict:
    with open(os.path.join(RESULTS_DIR, name)) as f:
        return json.load(f)


def render_table(headers: list[str], rows: list[list], title: str = "") -> str:
    def fmt(v):
        if isinstance(v, float):
            return f"{v:.3f}"
        return str(v)

    cells = [[fmt(v) for v in row] for row in rows]
    widths = [
        max(len(h), *(len(r[i]) for r in cells)) if cells else len(h)
        for i, h in enumerate(headers)
    ]
    lines = []
    if title:
        lines.append(f"## {title}")
    lines.append(" | ".join(h.ljust(w) for h, w in zip(headers, widths)))
    lines.append("-|-".join("-" * w for w in widths))
    for r in cells:
        lines.append(" | ".join(c.ljust(w) for c, w in zip(r, widths)))
    return "\n".join(lines)


def _by(results: list[dict], sf: float) -> dict[tuple[str, str], dict]:
    return {(r["query"], r["system"]): r for r in results}


def _mean(results: list[dict], query: str, system: str) -> float:
    for r in results:
        if r["query"] == query and r["system"] == system:
            return r["mean_s"]
    raise KeyError((query, system))


# ---------------------------------------------------------------------------
# Tables 1 & 2: loading times
# ---------------------------------------------------------------------------


def table_loading(
    spark: SparkSession, benchmark: str, sfs: Iterable[float] = DEFAULT_SFS
) -> tuple[str, dict]:
    """Tables 1/2: load time per system per SF (seconds). The paper's five
    RDBMS columns collapse to `duckdb` (load + PK/FK index build) and
    `spark_parquet`; `TAG_spark` is the graph build (no index build)."""
    gen, _, pks, fks = _benchmark(benchmark)
    data: dict = {"benchmark": benchmark, "rows": []}
    for sf in sfs:
        tables = {k: v.cache() for k, v in gen(spark, sf=sf).items()}
        for df in tables.values():
            df.count()
        duck, _ = load_duckdb(tables, pks, fks)
        import tempfile

        with tempfile.TemporaryDirectory() as d:
            pq, pq_bytes = load_parquet(tables, d)
        tag, graph = load_tag(spark, tables)
        graph.unpersist()
        for df in tables.values():
            df.unpersist()
        data["rows"].append(
            {
                "sf": sf,
                "duckdb_s": duck.seconds,
                "spark_parquet_s": pq.seconds,
                "tag_s": tag.seconds,
                "parquet_bytes": pq_bytes,
                "tag_detail": tag.detail,
            }
        )
    headers = ["system"] + [f"SF-{sf}" for sf in sfs]
    by_system = {
        "duckdb (load+index)": [r["duckdb_s"] for r in data["rows"]],
        "spark parquet": [r["spark_parquet_s"] for r in data["rows"]],
        "TAG_spark (graph build)": [r["tag_s"] for r in data["rows"]],
    }
    rows = [[name] + vals for name, vals in by_system.items()]
    n = 1 if benchmark == "tpch" else 2
    text = render_table(headers, rows, f"Table {n}: {benchmark} loading times (s)")
    return text, data


# ---------------------------------------------------------------------------
# Tables 3 & 4: selected TPC-H queries at the largest SF
# ---------------------------------------------------------------------------

TABLE3_QUERIES = {"LA": ["q3", "q4", "q5", "q10"], "Corr": ["q2", "q17", "q20"]}
TABLE4_QUERIES = ["q1", "q6", "q7", "q9", "q19"]


def table_03(results_75: list[dict]) -> tuple[str, dict]:
    """Table 3: TAG runtime + speedup over each system, LA + Corr queries."""
    rows, data = [], []
    for cls, names in TABLE3_QUERIES.items():
        for q in names:
            tag = _mean(results_75, q, "tag")
            duck = _mean(results_75, q, "duckdb")
            sql = _mean(results_75, q, "spark_sql")
            rows.append(
                [f"{cls}:{q}", tag, f"{duck / tag:.1f}x", f"{sql / tag:.1f}x"]
            )
            data.append(
                {"class": cls, "query": q, "tag_s": tag,
                 "duckdb_speedup": duck / tag, "spark_sql_speedup": sql / tag}
            )
    text = render_table(
        ["query", "TAG_s", "duckdb", "spark_sql"],
        rows,
        "Table 3: TPC-H LA & correlated queries @ largest SF (TAG speedups)",
    )
    return text, {"rows": data}


def table_04(results_75: list[dict]) -> tuple[str, dict]:
    """Table 4: GA / scalar-GA query runtimes (seconds, all systems)."""
    rows, data = [], []
    for q in TABLE4_QUERIES:
        tag = _mean(results_75, q, "tag")
        duck = _mean(results_75, q, "duckdb")
        sql = _mean(results_75, q, "spark_sql")
        rows.append([q, tag, duck, sql])
        data.append({"query": q, "tag_s": tag, "duckdb_s": duck, "spark_sql_s": sql})
    text = render_table(
        ["query", "TAG_s", "duckdb_s", "spark_sql_s"],
        rows,
        "Table 4: TPC-H GA & scalar queries @ largest SF (runtimes)",
    )
    return text, {"rows": data}


# ---------------------------------------------------------------------------
# Tables 5 & 6: TPC-DS summary and selected speedups
# ---------------------------------------------------------------------------


def table_05(results_75: list[dict]) -> tuple[str, dict]:
    """Table 5: #queries where TAG outperforms / is competitive / is worse
    against each comparison system (>1.2x thresholds)."""
    queries = sorted({r["query"] for r in results_75})
    data = {}
    for system in ("duckdb", "spark_sql"):
        counts = {"outperforms": 0, "competitive": 0, "worse": 0}
        for q in queries:
            counts[
                speedup_class(_mean(results_75, q, "tag"), _mean(results_75, q, system))
            ] += 1
        data[system] = counts
    rows = [
        [sys, c["outperforms"], c["competitive"], c["worse"]]
        for sys, c in data.items()
    ]
    text = render_table(
        ["vs system", "outperforms", "competitive", "worse"],
        rows,
        f"Table 5: TPC-DS win/competitive/worse counts ({len(queries)} queries)",
    )
    return text, data


TABLE6_QUERIES = {
    "No agg": ["ds_q37", "ds_q84"],
    "Local": ["ds_q7", "ds_q12", "ds_q33", "ds_q98"],
    "Global": ["ds_q45", "ds_q69", "ds_q32"],
    "Corr": ["ds_q6"],
}


def table_06(results_75: list[dict]) -> tuple[str, dict]:
    rows, data = [], []
    for cls, names in TABLE6_QUERIES.items():
        for q in names:
            tag = _mean(results_75, q, "tag")
            duck = _mean(results_75, q, "duckdb")
            sql = _mean(results_75, q, "spark_sql")
            rows.append(
                [f"{cls}:{q}", tag, f"{duck / tag:.1f}x", f"{sql / tag:.1f}x"]
            )
            data.append(
                {"class": cls, "query": q, "tag_s": tag,
                 "duckdb_speedup": duck / tag, "spark_sql_speedup": sql / tag}
            )
    text = render_table(
        ["query", "TAG_s", "duckdb", "spark_sql"],
        rows,
        "Table 6: selected TPC-DS queries @ largest SF (TAG speedups)",
    )
    return text, {"rows": data}


# ---------------------------------------------------------------------------
# Table 7: peak RAM during workload execution
# ---------------------------------------------------------------------------


def table_07(
    spark: SparkSession, sf: float = 0.1, reps: int = 1
) -> tuple[str, dict]:
    data = {}
    for benchmark in ("tpch", "tpcds"):
        _, queries, _, _ = _benchmark(benchmark)
        runner = build_bench(spark, benchmark, sf, reps=reps)
        try:
            per_system = {}
            for system in ("tag", "spark_sql", "duckdb"):
                with PeakRssSampler(interval=0.5) as sampler:
                    runner.run_workload(queries, systems=(system,))
                per_system[system] = sampler.peak_fraction
            data[benchmark] = per_system
        finally:
            runner.graph.unpersist()
            for df in runner.tables.values():
                df.unpersist()
            runner.close()
    rows = [
        [bm] + [f"{data[bm][s] * 100:.1f}%" for s in ("tag", "spark_sql", "duckdb")]
        for bm in data
    ]
    text = render_table(
        ["benchmark", "tag", "spark_sql", "duckdb"],
        rows,
        "Table 7: peak RAM (process tree RSS / machine RAM) during workload",
    )
    return text, data


# ---------------------------------------------------------------------------
# Tables 8-13: full per-query runtimes per SF
# ---------------------------------------------------------------------------


def table_all_queries(suite: dict, benchmark: str) -> tuple[str, dict]:
    """Tables 8/9/10 (TPC-H) or 11/12/13 (TPC-DS): per-query runtimes at
    each SF, all systems."""
    texts = []
    base = 8 if benchmark == "tpch" else 11
    for i, (sf, results) in enumerate(sorted(suite["sfs"].items(), reverse=True)):
        queries = sorted({r["query"] for r in results})
        systems = [
            s
            for s in ("duckdb", "spark_sql", "tag")
            if any(r["system"] == s for r in results)
        ]
        rows = [
            [q] + [_mean(results, q, s) for s in systems] for q in queries
        ]
        texts.append(
            render_table(
                ["query"] + [f"{s}_s" for s in systems],
                rows,
                f"Table {base + i}: {benchmark} per-query runtimes @ SF {sf}",
            )
        )
    return "\n\n".join(texts), suite


# ---------------------------------------------------------------------------
# Table 14: aggregate runtimes
# ---------------------------------------------------------------------------


def table_14(suite_h: dict, suite_ds: dict) -> tuple[str, dict]:
    data = {}
    for name, suite in (("TPC-H", suite_h), ("TPC-DS", suite_ds)):
        for sf, results in sorted(suite["sfs"].items()):
            for system in ("duckdb", "spark_sql", "tag"):
                total = sum(
                    r["mean_s"] for r in results if r["system"] == system
                )
                data.setdefault(system, {})[f"{name}@{sf}"] = total
    cols = sorted(next(iter(data.values())).keys())
    rows = [[system] + [data[system][c] for c in cols] for system in data]
    text = render_table(
        ["system"] + cols, rows, "Table 14: aggregate runtimes (s)"
    )
    return text, data


# ---------------------------------------------------------------------------
# Table 15: columnar store sizes
# ---------------------------------------------------------------------------


def table_15(
    spark: SparkSession, sfs: Iterable[float] = DEFAULT_SFS
) -> tuple[str, dict]:
    """Table 15: uncompressed in-memory (Arrow) size vs compressed columnar
    (parquet) size — the RDBMS-X IM column-store compression analogue."""
    import tempfile

    data = {"rows": []}
    for benchmark in ("tpch", "tpcds"):
        gen, *_ = _benchmark(benchmark)
        for sf in sfs:
            tables = gen(spark, sf=sf)
            raw = arrow_in_memory_bytes(tables)
            with tempfile.TemporaryDirectory() as d:
                _, pq_bytes = load_parquet(tables, d)
            data["rows"].append(
                {
                    "benchmark": benchmark,
                    "sf": sf,
                    "arrow_bytes": raw,
                    "parquet_bytes": pq_bytes,
                }
            )
    rows = [
        [
            r["benchmark"],
            r["sf"],
            f"{r['arrow_bytes'] / 1e6:.1f}",
            f"{r['parquet_bytes'] / 1e6:.1f}",
        ]
        for r in data["rows"]
    ]
    text = render_table(
        ["benchmark", "SF", "in-memory MB", "columnar MB"],
        rows,
        "Table 15: data size vs compressed columnar size",
    )
    return text, data


# ---------------------------------------------------------------------------
# Tables 16 & 17: 'distributed' TAG vs Spark SQL (+ network-traffic proxy)
# ---------------------------------------------------------------------------


def table_distributed(
    spark: SparkSession,
    benchmark: str,
    sf: float = 0.1,
    reps: int = 2,
    shuffle_partitions: int = 192,
) -> tuple[str, dict]:
    """Tables 16/17: TAG-join vs Spark SQL under a shuffle-heavy config.

    The cluster becomes many shuffle partitions on one box; communication is
    metered as TAG message counts and (if the UI is up) shuffle bytes — the
    local equivalent of Figure 9(b)'s network traffic."""
    n = 16 if benchmark == "tpch" else 17
    prev = spark.conf.get("spark.sql.shuffle.partitions")
    spark.conf.set("spark.sql.shuffle.partitions", str(shuffle_partitions))
    try:
        _, queries, _, _ = _benchmark(benchmark)
        runner = build_bench(spark, benchmark, sf, reps=reps)
        try:
            results = runner.run_workload(
                queries, systems=("tag", "spark_sql"), with_messages=True
            )
        finally:
            runner.graph.unpersist()
            for df in runner.tables.values():
                df.unpersist()
            runner.close()
    finally:
        spark.conf.set("spark.sql.shuffle.partitions", prev)
    res = [asdict(r) if isinstance(r, QueryResult) else r for r in results]
    queries_names = sorted({r["query"] for r in res})
    rows = []
    for q in queries_names:
        tag = _mean(res, q, "tag")
        sql = _mean(res, q, "spark_sql")
        msg = next(
            (r["messages"] for r in res if r["query"] == q and r["system"] == "tag"),
            None,
        )
        rows.append([q, sql, tag, msg if msg is not None else "-"])
    tag_total = sum(r["mean_s"] for r in res if r["system"] == "tag")
    sql_total = sum(r["mean_s"] for r in res if r["system"] == "spark_sql")
    tag_sb = sum(r["shuffle_bytes"] or 0 for r in res if r["system"] == "tag")
    sql_sb = sum(r["shuffle_bytes"] or 0 for r in res if r["system"] == "spark_sql")
    rows.append(["TOTAL", sql_total, tag_total, ""])
    text = render_table(
        ["query", "spark_sql_s", "TAG_s", "TAG msgs"],
        rows,
        f"Table {n}: distributed-mode {benchmark} (shuffle partitions="
        f"{shuffle_partitions}); totals incl. shuffle bytes "
        f"(spark_sql={sql_sb}, tag={tag_sb})",
    )
    return text, {
        "results": res,
        "totals": {
            "tag_s": tag_total,
            "spark_sql_s": sql_total,
            "tag_shuffle_bytes": tag_sb,
            "spark_sql_shuffle_bytes": sql_sb,
        },
    }


# ---------------------------------------------------------------------------
# Standalone-session helper for jobs/
# ---------------------------------------------------------------------------


def job_session(app: str, ui: bool = True) -> SparkSession:
    """Session for spark-submit jobs (tests use the conftest fixture).

    The UI is enabled by default so the ShuffleMeter can read shuffle
    bytes for the network-traffic proxy."""
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.enabled", str(ui).lower())
        .config("spark.ui.showConsoleProgress", "false")
        .getOrCreate()
    )

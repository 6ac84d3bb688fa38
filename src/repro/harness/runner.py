"""Benchmark runner: TAG-join vs Spark SQL vs DuckDB on identical queries.

The paper's single-server comparison (§8.1.3) runs TigerGraph TAG-join
against PostgreSQL, RDBMS-X (row + in-memory column store), RDBMS-Y and
Spark SQL. Offline substitutions (DESIGN.md):

- ``tag``       — our TAG-join dataflow execution over the cached TAG graph;
- ``spark_sql`` — the paper's actual comparator: plain Spark SQL over the
  same cached tables (broadcast joins disabled session-wide, as conftest);
- ``duckdb``    — stand-in for the reference RDBMS columns (an in-memory
  columnar RDBMS, closest in spirit to RDBMS-X IM).

Methodology mirrors §8.1.5: one warm-up run, then ``reps`` timed runs,
reporting the average. Results are materialised (``collect``) so both
engines pay their full execution cost. Communication is metered as TAG
message counts (RunStats) and, when the Spark UI is reachable, shuffle
read/write bytes from the status REST API for *both* Spark-backed systems.
"""
from __future__ import annotations

import json
import time
import urllib.request
from dataclasses import dataclass, field

import duckdb
from pyspark.sql import SparkSession

from ..core.tag import TAGGraph
from ..tpch.queries import Query

SYSTEMS = ("tag", "spark_sql", "duckdb")


@dataclass
class QueryResult:
    query: str
    system: str
    mean_s: float
    runs_s: list[float] = field(default_factory=list)
    rows: int = 0
    agg_class: str = ""
    paper_class: str = ""
    messages: int | None = None  # TAG communication (message count)
    shuffle_bytes: int | None = None  # Spark shuffle write delta


class ShuffleMeter:
    """Total shuffle-write bytes from the Spark UI REST API (if enabled).

    The distributed experiment (§8.6.3) reports network traffic via `sar`;
    locally the equivalent quantity is the bytes crossing the shuffle — the
    data that would traverse the network on a cluster. Returns None when
    the UI is disabled (the conftest default)."""

    def __init__(self, spark: SparkSession):
        self.spark = spark
        self._base = None
        try:
            ui = spark.sparkContext.uiWebUrl
            if ui:
                app_id = spark.sparkContext.applicationId
                self._base = f"{ui}/api/v1/applications/{app_id}"
        except Exception:
            self._base = None

    def total_shuffle_write(self) -> int | None:
        if not self._base:
            return None
        try:
            with urllib.request.urlopen(
                f"{self._base}/stages?status=complete", timeout=5
            ) as r:
                stages = json.load(r)
            return sum(s.get("shuffleWriteBytes", 0) for s in stages)
        except Exception:
            return None

    def delta(self, before: int | None) -> int | None:
        after = self.total_shuffle_write()
        if before is None or after is None:
            return None
        return max(0, after - before)


class BenchRunner:
    """Times the three systems over one dataset + query workload."""

    def __init__(
        self,
        spark: SparkSession,
        tables: dict,  # name -> Spark DataFrame (cached)
        graph: TAGGraph,
        reps: int = 3,
        warmup: int = 1,
    ):
        self.spark = spark
        self.tables = tables
        self.graph = graph
        self.reps = reps
        self.warmup = warmup
        self.meter = ShuffleMeter(spark)
        self._duck = duckdb.connect()
        for name, df in tables.items():
            self._duck.register(name, df.toPandas())
        for name, df in tables.items():
            df.createOrReplaceTempView(name)

    def close(self) -> None:
        self._duck.close()

    # -- per-system single executions ------------------------------------

    def _run_tag(self, q: Query) -> int:
        df, _ = q.run_tag(self.graph)
        return len(df.collect())

    def _run_spark_sql(self, q: Query) -> int:
        # Re-register this runner's views: TPC-H and TPC-DS share table
        # names (e.g. `customer`), and runners for both benchmarks can
        # coexist on one session. Registration is metadata-only (~ms).
        for t in q.tables:
            self.tables[t].createOrReplaceTempView(t)
        return len(self.spark.sql(q.sql).collect())

    def _run_duckdb(self, q: Query) -> int:
        return len(self._duck.execute(q.sql).fetchall())

    def run_query(self, q: Query, system: str) -> QueryResult:
        fn = {
            "tag": self._run_tag,
            "spark_sql": self._run_spark_sql,
            "duckdb": self._run_duckdb,
        }[system]
        for _ in range(self.warmup):
            rows = fn(q)
        shuffle_before = (
            self.meter.total_shuffle_write() if system != "duckdb" else None
        )
        runs = []
        for _ in range(self.reps):
            t0 = time.perf_counter()
            rows = fn(q)
            runs.append(time.perf_counter() - t0)
        result = QueryResult(
            query=q.name,
            system=system,
            mean_s=sum(runs) / len(runs),
            runs_s=runs,
            rows=rows,
            agg_class=q.agg_class,
            paper_class=q.paper_class,
            shuffle_bytes=(
                self.meter.delta(shuffle_before) if system != "duckdb" else None
            ),
        )
        if system == "tag":
            _, stats = q.run_tag(self.graph, stats=True)
            result.messages = stats.total_messages()
        return result

    def run_workload(
        self,
        queries: dict[str, Query],
        systems: tuple[str, ...] = SYSTEMS,
        with_messages: bool = False,
    ) -> list[QueryResult]:
        out = []
        for name in sorted(queries):
            q = queries[name]
            for system in systems:
                if system == "tag" and not with_messages:
                    # skip the extra stats pass unless asked
                    r = self._run_query_no_stats(q, system)
                else:
                    r = self.run_query(q, system)
                out.append(r)
        return out

    def _run_query_no_stats(self, q: Query, system: str) -> QueryResult:
        fn = {
            "tag": self._run_tag,
            "spark_sql": self._run_spark_sql,
            "duckdb": self._run_duckdb,
        }[system]
        for _ in range(self.warmup):
            rows = fn(q)
        runs = []
        for _ in range(self.reps):
            t0 = time.perf_counter()
            rows = fn(q)
            runs.append(time.perf_counter() - t0)
        return QueryResult(
            query=q.name,
            system=system,
            mean_s=sum(runs) / len(runs),
            runs_s=runs,
            rows=rows,
            agg_class=q.agg_class,
            paper_class=q.paper_class,
        )


def speedup_class(tag_s: float, other_s: float) -> str:
    """Paper Table 5 buckets: TAG 'outperforms' (>1.2x faster),
    'competitive' (within 1.2x either way) or 'worse'."""
    if other_s > 1.2 * tag_s:
        return "outperforms"
    if tag_s > 1.2 * other_s:
        return "worse"
    return "competitive"

"""Benchmark fixtures: SF≈0.02 datasets + TAG graphs, built once.

Benchmarks regenerate the paper's timing-bearing tables under
pytest-benchmark; the full three-SF sweeps live in jobs/ (the benchmarks
here use one SF to keep `pytest benchmarks/ --benchmark-only` short).
"""
from __future__ import annotations

import pytest

from repro import synth_data
from repro.core.tag import TAGGraph
from repro.harness.runner import BenchRunner
from repro.tpcds import synth as tpcds_synth

BENCH_SF = 0.02


def _bench(spark, gen):
    tables = {k: v.cache() for k, v in gen(spark, sf=BENCH_SF).items()}
    for df in tables.values():
        df.count()
    graph = TAGGraph.encode(spark, tables)
    graph.materialize()
    return BenchRunner(spark, tables, graph, reps=1, warmup=0)


@pytest.fixture(scope="session")
def tpch_bench(spark):
    r = _bench(spark, synth_data.tpch)
    yield r
    r.close()


@pytest.fixture(scope="session")
def tpcds_bench(spark):
    r = _bench(spark, tpcds_synth.tpcds)
    yield r
    r.close()

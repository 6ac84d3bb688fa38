"""Benchmarks for the cyclic-join machinery (§6): triangle heavy/light vs
vanilla on skewed data — the worst-case-optimal claim's empirical face."""
from __future__ import annotations

import pytest

from repro import synth_data
from repro.core.cyclic import cycle_join
from repro.core.tag import TAGGraph


@pytest.fixture(scope="module")
def triangle_graph(spark):
    rels = {
        f"R{i + 1}": synth_data.binary_relation(
            spark, n=4000, n_keys=250, cols=(f"l{i}", f"r{i}"),
            seed=200 + i, skew=1.0,
        ).cache()
        for i in range(3)
    }
    for df in rels.values():
        df.count()
    graph = TAGGraph.encode(spark, rels)
    graph.materialize()
    cyc = [(f"R{i + 1}", f"l{i}", f"r{i}") for i in range(3)]
    return graph, cyc


@pytest.mark.parametrize("split", [True, False], ids=["heavy-light", "vanilla"])
def test_triangle(benchmark, triangle_graph, split):
    graph, cyc = triangle_graph
    benchmark.group = "triangle"
    benchmark.pedantic(
        lambda: cycle_join(graph, cyc, split=split)[0].count(),
        rounds=2,
        iterations=1,
        warmup_rounds=1,
    )

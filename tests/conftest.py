"""Shared fixtures: small TPC-H-lite / TPC-DS-lite instances + TAG graphs.

Session-scoped so the (cached) graphs are encoded once per run; tests treat
them as read-only. SF is small (tests are correctness, not performance).
"""
from __future__ import annotations

import pytest

from repro import synth_data
from repro.core.tag import TAGGraph
from repro.tpcds import synth as tpcds_synth

TEST_SF = 0.005


@pytest.fixture(scope="session")
def tpch_data(spark):
    rels = synth_data.tpch(spark, sf=TEST_SF)
    return {k: v.cache() for k, v in rels.items()}


@pytest.fixture(scope="session")
def tpch_graph(spark, tpch_data):
    g = TAGGraph.encode(spark, tpch_data)
    g.materialize()
    return g


@pytest.fixture(scope="session")
def tpcds_data(spark):
    rels = tpcds_synth.tpcds(spark, sf=TEST_SF)
    return {k: v.cache() for k, v in rels.items()}


@pytest.fixture(scope="session")
def tpcds_graph(spark, tpcds_data):
    g = TAGGraph.encode(spark, tpcds_data)
    g.materialize()
    return g

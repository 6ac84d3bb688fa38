"""Reproduction of Smagulova & Deutsch, "Vertex-centric Parallel
Computation of SQL Queries" (SIGMOD 2021) on PySpark.

Subpackages:

- ``core``    — TAG encoding + TAG-join (the paper's contribution)
- ``bsp``     — Pregel-style BSP substrate + faithful vertex programs
- ``tpch``    — TPC-H-lite query workload (TAG spec + SQL per query)
- ``tpcds``   — TPC-DS-lite generator + query workload
- ``harness`` — benchmark runner and per-table experiment reproduction

Top-level modules: ``synth_data`` (TPC-H-lite generators), ``oracle``
(DuckDB result-equality checker).
"""

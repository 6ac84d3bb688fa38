"""Vertex-centric BSP substrate (§2) and vertex programs (§4–5).

``engine`` is a Pregel-style engine over Spark DataFrames; ``programs``
holds the TAG vertex programs (two-way join, two-attribute join,
Algorithm 2) plus ``build_tag_bsp`` to TAG-encode pandas relations as a
BSP graph.
"""
from .engine import BSPEngine, BSPGraph, ComputeResult, Vertex, VertexProgram  # noqa: F401
from .programs import (  # noqa: F401
    Algorithm2Program,
    TwoWayJoinProgram,
    TwoWayMultiAttrProgram,
    build_tag_bsp,
)

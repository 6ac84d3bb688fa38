"""BSP engine mechanics (§2): supersteps, messaging, halting, aggregators."""
from __future__ import annotations

from dataclasses import dataclass

import pytest

from repro.bsp.engine import (
    AGGREGATOR_VID,
    BSPEngine,
    BSPGraph,
    ComputeResult,
    Vertex,
    VertexProgram,
)


def _line_graph(n: int) -> BSPGraph:
    """0 → 1 → … → n-1, edges labelled 'next'."""
    vertices = [(i, "node", {"i": i}) for i in range(n)]
    edges = [(i, i + 1, "next") for i in range(n - 1)]
    return BSPGraph.from_frames(vertices, edges)


@dataclass
class ForwardProgram(VertexProgram):
    """Each vertex forwards a counter along 'next' edges until the end."""

    def initial_messages(self, graph):
        return [(0, {"hops": 0})]

    def compute(self, ctx, vertex: Vertex, messages):
        res = ComputeResult()
        hops = max(m["hops"] for m in messages)
        res.state = {"hops": hops}
        for t in vertex.targets("next"):
            res.messages.append((t, {"hops": hops + 1}))
        if not vertex.targets("next"):
            res.outputs = [{"vid": vertex.vid, "hops": hops}]
        return res


@dataclass
class MaxAggregatorProgram(VertexProgram):
    """All vertices send their value to the global aggregator (§2), which
    outputs the maximum — the 'global aggregation' primitive."""

    def initial_messages(self, graph):
        return [(vid, {"__wake": True}) for vid in graph.vmeta if vid != AGGREGATOR_VID]

    def before_superstep(self, superstep):
        return {"phase": "send" if superstep == 0 else "aggregate"}

    def compute(self, ctx, vertex: Vertex, messages):
        res = ComputeResult()
        if ctx["phase"] == "send":
            res.messages.append((AGGREGATOR_VID, {"v": vertex.data["i"]}))
        else:
            assert vertex.vid == AGGREGATOR_VID
            res.outputs = [{"max": max(m["v"] for m in messages)}]
        return res


class TestEngine:
    def test_message_propagation_and_halting(self, spark):
        g = _line_graph(4)
        run = BSPEngine(spark, g).run(ForwardProgram())
        assert run.outputs == [{"vid": 3, "hops": 3}]
        assert run.supersteps == 4  # one per hop, then halt (no messages)

    def test_message_counts_per_superstep(self, spark):
        g = _line_graph(4)
        run = BSPEngine(spark, g).run(ForwardProgram())
        assert [t.messages_delivered for t in run.traces] == [1, 1, 1, 1]
        assert run.total_messages == 4

    def test_state_persists_across_supersteps(self, spark):
        g = _line_graph(3)
        run = BSPEngine(spark, g).run(ForwardProgram())
        assert run.state[1] == {"hops": 1}
        assert run.state[2] == {"hops": 2}

    def test_inactive_vertices_do_not_compute(self, spark):
        # vertex 5 in a disconnected component never receives messages
        g = BSPGraph.from_frames(
            [(0, "node", {"i": 0}), (5, "node", {"i": 5})], []
        )
        run = BSPEngine(spark, g).run(ForwardProgram())
        assert 5 not in run.state

    def test_aggregator_vertex(self, spark):
        g = BSPGraph.from_frames(
            [(i, "node", {"i": i * 7 % 5}) for i in range(5)]
            + [(AGGREGATOR_VID, "__agg", {})],
            [],
        )
        run = BSPEngine(spark, g).run(MaxAggregatorProgram())
        assert run.outputs == [{"max": 4}]

    def test_wake_messages_not_counted_as_communication(self, spark):
        g = BSPGraph.from_frames(
            [(0, "node", {"i": 0}), (AGGREGATOR_VID, "__agg", {})], []
        )
        run = BSPEngine(spark, g).run(MaxAggregatorProgram())
        # superstep 0 delivered only wake self-activations
        assert run.traces[0].messages_delivered == 0

    def test_max_supersteps_cutoff(self, spark):
        @dataclass
        class PingPong(VertexProgram):
            def initial_messages(self, graph):
                return [(0, {"n": 0})]

            def compute(self, ctx, vertex, messages):
                res = ComputeResult()
                res.messages.append((vertex.vid, {"n": messages[0]["n"] + 1}))
                return res

        g = BSPGraph.from_frames([(0, "node", {})], [])
        run = BSPEngine(spark, g).run(PingPong(), max_supersteps=5)
        assert run.supersteps == 5

    def test_vertices_with_label(self):
        g = _line_graph(3)
        assert g.vertices_with_label("node") == [0, 1, 2]
        assert g.vertices_with_label("other") == []

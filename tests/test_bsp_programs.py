"""Vertex-program fidelity tests (§4, §5.2).

The BSP programs are the faithful message-passing implementations; these
tests check them against ground truth (pandas joins) and against the
dataflow executor on the *same* instances — including per-superstep message
counts on chain queries, where the two execution forms coincide exactly.
"""
from __future__ import annotations

import pandas as pd
import pytest

from repro.bsp.engine import BSPEngine
from repro.bsp.programs import (
    Algorithm2Program,
    TwoWayJoinProgram,
    TwoWayMultiAttrProgram,
    build_tag_bsp,
    natural_join_rows,
)
from repro.core.plan import build_plan, gensteps
from repro.core.reduction import RunStats
from repro.core.spec import Node, QuerySpec
from repro.core.tag import TAGGraph
from repro.core.tagjoin import run_spec


class TestNaturalJoinRows:
    def test_joins_on_shared_keys(self):
        left = [{"a": 1, "b": 2}, {"a": 1, "b": 3}]
        right = [{"b": 2, "c": 9}]
        assert natural_join_rows(left, right) == [{"a": 1, "b": 2, "c": 9}]

    def test_cross_product_when_no_shared_keys(self):
        left = [{"a": 1}, {"a": 2}]
        right = [{"b": 3}]
        assert len(natural_join_rows(left, right)) == 2

    def test_empty_inputs(self):
        assert natural_join_rows([], [{"a": 1}]) == []
        assert natural_join_rows([{"a": 1}], []) == []


@pytest.fixture(scope="module")
def figure2_instance():
    """Figure 2: three R tuples and three S tuples joining through b1."""
    R = pd.DataFrame({"a": [1, 2, 3, 9], "b": [10, 10, 10, 99]})
    S = pd.DataFrame({"b": [10, 10, 10, 77], "c": [5, 6, 7, 8]})
    return R, S


class TestTwoWayJoin:
    def test_figure2_join(self, spark, figure2_instance):
        R, S = figure2_instance
        g = build_tag_bsp({"R": R, "S": S})
        run = BSPEngine(spark, g).run(TwoWayJoinProgram("R", "S", "R.b", "S.b"))
        expected = R.merge(S, on="b")
        got = sorted((o["a"], o["b"], o["c"]) for o in run.outputs)
        assert got == sorted(map(tuple, expected[["a", "b", "c"]].values.tolist()))

    def test_three_supersteps(self, spark, figure2_instance):
        R, S = figure2_instance
        g = build_tag_bsp({"R": R, "S": S})
        run = BSPEngine(spark, g).run(TwoWayJoinProgram("R", "S", "R.b", "S.b"))
        assert run.supersteps == 3  # check → reply → combine (§4.1.1)

    def test_message_bound_min_in_out(self, spark, figure2_instance):
        """§4.1.2: per-phase communication ≤ min(IN, OUT)+IN-ish bounds;
        here: superstep 1 messages = |R⋉S| + |S⋉R|."""
        R, S = figure2_instance
        g = build_tag_bsp({"R": R, "S": S})
        run = BSPEngine(spark, g).run(TwoWayJoinProgram("R", "S", "R.b", "S.b"))
        semi = len(R[R.b.isin(S.b)]) + len(S[S.b.isin(R.b)])
        # superstep 0 delivered wakes only; superstep 1 = reduction signals,
        # superstep 2 = data replies along marked edges.
        assert run.traces[1].messages_delivered == semi
        assert run.traces[2].messages_delivered == semi

    def test_dangling_values_deactivate(self, spark):
        R = pd.DataFrame({"a": [1], "b": [10]})
        S = pd.DataFrame({"b": [20], "c": [5]})
        g = build_tag_bsp({"R": R, "S": S})
        run = BSPEngine(spark, g).run(TwoWayJoinProgram("R", "S", "R.b", "S.b"))
        assert run.outputs == []
        # no attribute vertex joins both sides → no reduction messages
        assert run.traces[1].messages_delivered == 0 if len(run.traces) > 1 else True


class TestTwoWayMultiAttr:
    def test_example_4_1(self, spark):
        """Example 4.1: b-coordinated intersection of secondary a values."""
        R = pd.DataFrame({"a": [1, 2, 3], "b": [10, 20, 20], "c": [100, 200, 300]})
        S = pd.DataFrame({"a": [1, 9, 3], "b": [10, 20, 20], "d": [7, 8, 9]})
        g = build_tag_bsp({"R": R, "S": S})
        run = BSPEngine(spark, g).run(
            TwoWayMultiAttrProgram("R", "S", "R.b", "S.b", secondary="a")
        )
        expected = R.merge(S, on=["a", "b"])
        got = sorted((o["a"], o["b"], o["c"], o["d"]) for o in run.outputs)
        assert got == sorted(
            map(tuple, expected[["a", "b", "c", "d"]].values.tolist())
        )

    def test_agreeing_on_first_attr_only_is_rejected(self, spark):
        # b matches but a differs → the intersection eliminates the pair
        R = pd.DataFrame({"a": [2], "b": [20], "c": [1]})
        S = pd.DataFrame({"a": [3], "b": [20], "d": [2]})
        g = build_tag_bsp({"R": R, "S": S})
        run = BSPEngine(spark, g).run(
            TwoWayMultiAttrProgram("R", "S", "R.b", "S.b", secondary="a")
        )
        assert run.outputs == []


def _chain_data():
    R = pd.DataFrame({"ra": [1, 2, 3, 4], "rb": [10, 20, 30, 99]})
    S = pd.DataFrame({"sb": [10, 20, 77], "sc": [100, 200, 700]})
    T = pd.DataFrame({"tc": [100, 300, 800], "td": [7, 8, 9]})
    return {"R": R, "S": S, "T": T}


def _chain_spec() -> QuerySpec:
    return QuerySpec(
        name="chain",
        root=Node(
            relation="R",
            need=["ra", "rb"],
            children=[
                Node(
                    relation="S",
                    parent_join=("rb", "sb"),
                    need=["sc"],
                    children=[
                        Node(relation="T", parent_join=("sc", "tc"), need=["td"])
                    ],
                )
            ],
        ),
        select=[("ra", "ra"), ("rb", "rb"), ("sc", "sc"), ("td", "td")],
    )


class TestAlgorithm2Fidelity:
    """The BSP vertex program and the dataflow executor are two executions
    of the same superstep sequence — results must coincide."""

    @pytest.fixture(scope="class")
    def both_runs(self, spark):
        data = _chain_data()
        spec = _chain_spec()
        steps = gensteps(build_plan(spec.root))
        labels = [f"{a}.{c}" for a, c in steps]

        bsp_graph = build_tag_bsp(data)
        bsp_run = BSPEngine(spark, bsp_graph).run(
            Algorithm2Program(labels, start_label=steps[0][0])
        )

        tag_graph = TAGGraph.encode(
            spark, {k: spark.createDataFrame(v) for k, v in data.items()}
        )
        stats = RunStats()
        df, _ = run_spec(tag_graph, spec, stats=False)
        from repro.core.reduction import reduce_phase

        reduce_phase(tag_graph, spec.nodes(), steps, stats)
        return data, spec, bsp_run, df.toPandas(), stats, labels

    def test_same_result_rows(self, both_runs):
        data, spec, bsp_run, df, *_ = both_runs
        cols = ["ra", "rb", "sc", "td"]
        got_bsp = sorted(tuple(o[c] for c in cols) for o in bsp_run.outputs)
        got_flow = sorted(map(tuple, df[cols].values.tolist()))
        assert got_bsp == got_flow

    def test_ground_truth(self, both_runs):
        data, spec, bsp_run, *_ = both_runs
        expected = (
            data["R"]
            .merge(data["S"], left_on="rb", right_on="sb")
            .merge(data["T"], left_on="sc", right_on="tc")
        )
        assert len(bsp_run.outputs) == len(expected)

    def test_chain_reduction_message_counts_match_dataflow(self, both_runs):
        """On chains (each relation semijoined once per pass) the vertex
        program's per-superstep message counts equal the dataflow counts."""
        *_, bsp_run, _df, stats, labels = both_runs
        n = len(labels)
        # BSP supersteps 1..2n carry the UP+DOWN reduction messages (the
        # messages sent at superstep i are delivered/counted at i+1).
        bsp_counts = [t.messages_delivered for t in bsp_run.traces[1 : 2 * n + 1]]
        flow_counts = [t.messages for t in stats.traces]
        assert bsp_counts == flow_counts

    def test_supersteps_linear_in_query_size(self, both_runs):
        *_, bsp_run, _df, _stats, labels = both_runs
        # UP + DOWN + collect + final output superstep
        assert bsp_run.supersteps == 3 * len(labels) + 1


class TestAlgorithm2Star:
    def test_star_query_results(self, spark):
        F_ = pd.DataFrame({"k1": [1, 2, 3], "k2": [10, 20, 30], "fv": [7, 8, 9]})
        D1 = pd.DataFrame({"d1k": [1, 2, 9], "p1": ["a", "b", "c"]})
        D2 = pd.DataFrame({"d2k": [10, 30, 77], "p2": ["x", "y", "z"]})
        data = {"F": F_, "D1": D1, "D2": D2}
        root = Node(
            relation="F",
            need=["k1", "k2", "fv"],
            children=[
                Node(relation="D1", parent_join=("k1", "d1k"), need=["p1"]),
                Node(relation="D2", parent_join=("k2", "d2k"), need=["p2"]),
            ],
        )
        steps = gensteps(build_plan(root))
        labels = [f"{a}.{c}" for a, c in steps]
        g = build_tag_bsp(data)
        run = BSPEngine(spark, g).run(
            Algorithm2Program(labels, start_label=steps[0][0])
        )
        expected = F_.merge(D1, left_on="k1", right_on="d1k").merge(
            D2, left_on="k2", right_on="d2k"
        )
        got = sorted((o["fv"], o["p1"], o["p2"]) for o in run.outputs)
        assert got == sorted(
            map(tuple, expected[["fv", "p1", "p2"]].values.tolist())
        )

"""Cartesian product tests (§6.3): naive vs distributed vs crossJoin."""
from __future__ import annotations

import pandas as pd
import pytest

from repro.core.cartesian import cartesian_product
from repro.core.reduction import RunStats


@pytest.fixture(scope="module")
def rels(spark):
    R = spark.createDataFrame(pd.DataFrame({"a": [1, 2, 3], "b": ["x", "y", "z"]}))
    S = spark.createDataFrame(pd.DataFrame({"c": [10, 20]}))
    T = spark.createDataFrame(pd.DataFrame({"d": ["p"]}))
    return R, S, T


class TestCartesian:
    @pytest.mark.parametrize("distributed", [True, False])
    def test_two_way(self, spark, rels, distributed):
        R, S, _ = rels
        out = cartesian_product(spark, [R, S], distributed=distributed)
        expected = sorted(map(tuple, R.crossJoin(S).collect()))
        assert sorted(map(tuple, out.collect())) == expected
        assert out.count() == R.count() * S.count()

    @pytest.mark.parametrize("distributed", [True, False])
    def test_three_way(self, spark, rels, distributed):
        R, S, T = rels
        out = cartesian_product(spark, [R, S, T], distributed=distributed)
        assert out.count() == 6
        assert set(out.columns) == {"a", "b", "c", "d"}

    @pytest.mark.parametrize("distributed", [True, False])
    def test_empty_side(self, spark, rels, distributed):
        R, _, _ = rels
        empty = R.where("a > 100")
        out = cartesian_product(spark, [R, empty.select("a").withColumnRenamed("a", "e")], distributed=distributed)
        assert out.count() == 0

    def test_rejects_duplicate_columns(self, spark, rels):
        R, _, _ = rels
        with pytest.raises(AssertionError, match="distinct"):
            cartesian_product(spark, [R, R])

    def test_rejects_single_relation(self, spark, rels):
        R, _, _ = rels
        with pytest.raises(AssertionError):
            cartesian_product(spark, [R])

    def test_stats_ledger(self, spark, rels):
        """§6.3 cost accounting: |R|+|S| id messages to GA, then |R|·|S|
        data messages; total O(|R|·|S|)."""
        R, S, _ = rels
        stats = RunStats()
        cartesian_product(spark, [R, S], stats=stats)
        assert stats.traces[0].messages == R.count() + S.count()
        assert stats.traces[1].messages == R.count() * S.count()

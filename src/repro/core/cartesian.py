"""Cartesian product via a global aggregator vertex (§6.3).

Two variants, both with total cost O(∏|Rᵢ|):

- **naive**: every tuple vertex sends its tuple to the aggregator vertex GA,
  which combines them locally (sequential — here: collected to the driver,
  which plays the GA role, and the product is computed there);
- **distributed**: tuple vertices of R₁…R_{n-1} learn the ids of R_n's
  tuple vertices from GA and send their tuples directly; each R_n-tuple
  vertex combines the received messages with its own tuple, leaving the
  result distributed. In dataflow form this is Spark's cartesian-product
  exchange (broadcast is disabled session-wide), which replicates the small
  sides to every partition of the large side — the same message pattern.

With ``stats`` on, the communication ledger mirrors §6.3's accounting:
|R|+|S| id messages to GA, then |R|·|S| data messages.
"""
from __future__ import annotations

from functools import reduce as _reduce

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from .reduction import RunStats, StepTrace


def cartesian_product(
    spark: SparkSession,
    dfs: list[DataFrame],
    distributed: bool = True,
    stats: RunStats | None = None,
) -> DataFrame:
    """Cartesian product of the given relations (distinct column names)."""
    assert len(dfs) >= 2
    cols = [c for df in dfs for c in df.columns]
    assert len(cols) == len(set(cols)), "column names must be distinct"

    if stats is not None:
        sizes = [df.count() for df in dfs]
        id_msgs = sum(sizes)  # tuple vertices announce their ids to GA
        data_msgs = 1
        for s in sizes:
            data_msgs *= s
        stats.traces.append(
            StepTrace("cartesian", 1, "ids->GA", "message", id_msgs)
        )
        stats.traces.append(
            StepTrace("cartesian", 2, "tuples->targets", "message", data_msgs)
        )

    if distributed:
        return _reduce(lambda a, b: a.crossJoin(b), dfs)

    # Naive GA variant: the aggregator (driver) receives all tuples and
    # builds the product locally.
    pdfs = [df.toPandas() for df in dfs]
    out = _reduce(
        lambda a, b: a.assign(__k=1).merge(b.assign(__k=1), on="__k").drop(
            columns="__k"
        ),
        pdfs,
    )
    if out.empty:
        return _reduce(lambda a, b: a.crossJoin(b), dfs).limit(0)
    return spark.createDataFrame(pd.DataFrame(out))

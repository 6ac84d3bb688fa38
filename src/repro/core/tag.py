"""Tuple-Attribute Graph (TAG) encoding of a relational database (§3).

A relational instance becomes a bipartite graph:

- one **tuple vertex** per tuple (identified here by a per-relation
  ``__tid`` column added to the tuple table — the vertex "state" is the
  tuple itself);
- one **attribute vertex** per distinct value in the active domain
  (attribute vertices are *the values*: because the edge tables below are
  keyed by value, any two tuples sharing a value share the vertex by
  construction, with no duplication — the paper's "shared index" property);
- one edge labelled ``R.A`` per occurrence of value ``a`` in attribute ``A``
  of an ``R``-tuple. The edge table for label ``R.A`` is a DataFrame
  ``(__tid, __val)``.

Mirroring §3's practical note, float-typed and long-text attributes are not
materialised as attribute vertices by default (they are never join keys in
the workloads); they remain stored on the tuple vertex.

The encoding is query-independent and linear in the database size; it is
computed once ("offline") and cached.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

TID = "__tid"
VAL = "__val"

#: Spark type names whose columns get attribute vertices by default.
_MATERIALIZED_TYPES = ("int", "bigint", "smallint", "tinyint", "date",
                       "timestamp", "timestamp_ntz", "string")
#: Max string length heuristic stand-in: columns whose *name* marks them as
#: free text are kept on the tuple vertex only (the paper skips comments).
_TEXT_MARKERS = ("comment", "description")


def default_attribute_columns(df: DataFrame) -> list[str]:
    """Columns that get attribute vertices: non-float, non-free-text (§3)."""
    out = []
    for name, dtype in df.dtypes:
        if any(m in name.lower() for m in _TEXT_MARKERS):
            continue
        if dtype in _MATERIALIZED_TYPES:
            out.append(name)
    return out


@dataclass
class TAGStats:
    """Graph-size accounting (used by the loading experiments, Tables 1/2)."""

    tuple_vertices: dict[str, int] = field(default_factory=dict)
    edges: dict[str, int] = field(default_factory=dict)  # "R.A" -> edge count

    @property
    def total_tuple_vertices(self) -> int:
        return sum(self.tuple_vertices.values())

    @property
    def total_edges(self) -> int:
        return sum(self.edges.values())


class TAGGraph:
    """TAG representation of a set of relations, backed by DataFrames.

    ``tuples[R]`` is relation R with the extra ``__tid`` vertex-id column;
    ``edges[R][A]`` is the edge table for label ``R.A``.
    """

    def __init__(
        self,
        spark: SparkSession,
        tuples: dict[str, DataFrame],
        edges: dict[str, dict[str, DataFrame]],
    ):
        self.spark = spark
        self.tuples = tuples
        self.edges = edges

    @classmethod
    def encode(
        cls,
        spark: SparkSession,
        relations: dict[str, DataFrame],
        attributes: dict[str, list[str]] | None = None,
        cache: bool = True,
    ) -> "TAGGraph":
        """Build the TAG graph from relational DataFrames.

        ``attributes`` optionally overrides, per relation, which columns are
        materialised as attribute vertices (default:
        :func:`default_attribute_columns`).
        """
        tuples: dict[str, DataFrame] = {}
        edges: dict[str, dict[str, DataFrame]] = {}
        for name, df in relations.items():
            t = df.withColumn(TID, F.monotonically_increasing_id())
            if cache:
                t = t.cache()
            tuples[name] = t
            cols = (attributes or {}).get(name) or default_attribute_columns(df)
            edges[name] = {}
            for col in cols:
                e = (
                    t.select(F.col(TID), F.col(col).alias(VAL))
                    .where(F.col(VAL).isNotNull())
                )
                if cache:
                    e = e.cache()
                edges[name][col] = e
        return cls(spark, tuples, edges)

    def edge(self, relation: str, col: str) -> DataFrame:
        """Edge table for label ``relation.col``; lazily derived if the
        column was not materialised as attribute vertices."""
        by_col = self.edges.setdefault(relation, {})
        if col not in by_col:
            by_col[col] = (
                self.tuples[relation]
                .select(F.col(TID), F.col(col).alias(VAL))
                .where(F.col(VAL).isNotNull())
            )
        return by_col[col]

    def materialize(self) -> TAGStats:
        """Force computation of all vertices/edges; returns size stats.

        This is the TAG analogue of "load + index build" for an RDBMS: after
        this call every edge table (the attribute-vertex index) is resident.
        """
        stats = TAGStats()
        for name, t in self.tuples.items():
            stats.tuple_vertices[name] = t.count()
        for name, by_col in self.edges.items():
            for col, e in by_col.items():
                stats.edges[f"{name}.{col}"] = e.count()
        return stats

    def attribute_vertices(self, pairs: list[tuple[str, str]]) -> DataFrame:
        """Distinct attribute-vertex values across the given ``R.A`` labels
        (one vertex per value, shared across labels — §3 step 2)."""
        frames = [self.edge(r, c).select(VAL) for r, c in pairs]
        out = frames[0]
        for f_ in frames[1:]:
            out = out.unionByName(f_)
        return out.distinct()

    def unpersist(self) -> None:
        for t in self.tuples.values():
            t.unpersist()
        for by_col in self.edges.values():
            for e in by_col.values():
                e.unpersist()

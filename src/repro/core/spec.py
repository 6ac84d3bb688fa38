"""Declarative query specs consumed by the TAG-join executor.

A :class:`QuerySpec` is the reproduction's stand-in for the SQL front end:
it carries the join tree (the paper assumes a GHD/join tree as input, §5.1),
pushed-down selections, the residual (multi-relation) predicate for GHD bags
that contain more than one join condition (e.g. cycle-closing predicates),
and the aggregation spec classified into the paper's three styles (§7):
local (LA), global (GA) and scalar.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Optional

JoinCond = tuple[str, str]  # (parent column, child column) — equi-join


@dataclass
class Preagg:
    """Eager group-by (§7 'Aggregations'): aggregate a subtree before the
    join with its parent. ``keys`` must contain the subtree's join column
    with the parent; ``aggs`` are decomposable (SUM/COUNT/MIN/MAX) Spark SQL
    expressions producing the columns consumed higher up."""

    keys: list[str]
    aggs: list[tuple[str, str]]  # (expr, alias)


@dataclass
class Node:
    """A join-tree node: one relation occurrence (bag labelled by a single
    relation — the acyclic case of §5.1)."""

    relation: str
    alias: Optional[str] = None
    parent_join: Optional[JoinCond] = None  # None only at the root
    filter: Optional[str] = None  # single-relation predicate, pushed down
    children: list["Node"] = field(default_factory=list)
    preagg: Optional[Preagg] = None
    # Extra columns of this relation needed above the join (output/agg/
    # residual-predicate inputs). Join columns are added automatically.
    need: list[str] = field(default_factory=list)

    @property
    def name(self) -> str:
        return self.alias or self.relation

    def walk(self):
        yield self
        for c in self.children:
            yield from c.walk()


@dataclass
class QuerySpec:
    """A full query: join tree + residual predicate + aggregation."""

    name: str
    root: Node
    select: list[tuple[str, str]] = field(default_factory=list)  # (expr, alias)
    group_by: list[str] = field(default_factory=list)
    aggregates: list[tuple[str, str]] = field(default_factory=list)  # (expr, alias)
    post_filter: Optional[str] = None  # residual predicate after joins
    having: Optional[str] = None
    distinct: bool = False
    agg_class: str = "none"  # 'none' | 'LA' | 'GA' | 'scalar'

    def nodes(self) -> list[Node]:
        return list(self.root.walk())

    def validate(self) -> None:
        names = [n.name for n in self.nodes()]
        assert len(names) == len(set(names)), f"duplicate aliases in {self.name}"
        for n in self.nodes():
            if n is self.root:
                assert n.parent_join is None
            else:
                assert n.parent_join is not None, f"{n.name} missing parent_join"
        assert self.agg_class in ("none", "LA", "GA", "scalar")
        if self.agg_class == "scalar":
            assert not self.group_by
        if self.agg_class in ("LA", "GA"):
            assert self.group_by

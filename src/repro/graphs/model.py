"""Labelled-graph data model shared by the partitioners and the trie.

The paper (Sec. 1.3) defines a labelled graph ``G = (V, E, L_V, f_l)`` with
undirected edges and a surjective vertex->label map. Query patterns are just
small labelled graphs. This module provides a light driver-side
representation used by the streaming state machines; the data-parallel side
(generation, matching, ipt accounting) works on Spark DataFrames with the
schemas produced by :func:`vertices_df` / :func:`edges_df`.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Iterable, Iterator

import pandas as pd
from pyspark.sql import DataFrame, SparkSession


def norm_edge(u: int, v: int) -> tuple[int, int]:
    """Canonical (min, max) form of an undirected edge."""
    return (u, v) if u <= v else (v, u)


@dataclass(frozen=True)
class Edge:
    """A stream element: an undirected edge with a unique stream id."""

    eid: int
    u: int
    v: int

    def endpoints(self) -> tuple[int, int]:
        return (self.u, self.v)

    def key(self) -> tuple[int, int]:
        return norm_edge(self.u, self.v)


@dataclass
class LabeledGraph:
    """An undirected labelled graph held in driver memory.

    ``labels`` maps vertex id -> label string; ``edges`` is a list of
    (u, v) pairs. Self-loops are rejected (query patterns in the paper are
    simple graphs); parallel edges are collapsed by :meth:`canonical_edges`.
    """

    labels: dict[int, str]
    edges: list[tuple[int, int]] = field(default_factory=list)

    def __post_init__(self) -> None:
        for u, v in self.edges:
            if u == v:
                raise ValueError(f"self-loop ({u},{v}) not supported")
            if u not in self.labels or v not in self.labels:
                raise ValueError(f"edge ({u},{v}) references unlabelled vertex")

    @property
    def n_vertices(self) -> int:
        return len(self.labels)

    @property
    def n_edges(self) -> int:
        return len(self.canonical_edges())

    def canonical_edges(self) -> list[tuple[int, int]]:
        """Deduplicated, canonically-oriented edge list, sorted."""
        return sorted({norm_edge(u, v) for u, v in self.edges})

    def degree(self, v: int) -> int:
        return sum(1 for e in self.canonical_edges() if v in e)

    def adjacency(self) -> dict[int, list[int]]:
        adj: dict[int, list[int]] = {v: [] for v in self.labels}
        for u, v in self.canonical_edges():
            adj[u].append(v)
            adj[v].append(u)
        return adj

    def label_of(self, v: int) -> str:
        return self.labels[v]

    def label_set(self) -> set[str]:
        return set(self.labels.values())


def subgraph_degrees(edges: Iterable[tuple[int, int]]) -> dict[int, int]:
    """Vertex -> degree within the sub-graph induced by ``edges``."""
    deg: dict[int, int] = {}
    for u, v in edges:
        deg[u] = deg.get(u, 0) + 1
        deg[v] = deg.get(v, 0) + 1
    return deg


def iter_stream(graph: LabeledGraph, order: list[tuple[int, int]] | None = None) -> Iterator[Edge]:
    """Yield the graph's edges as stream :class:`Edge` elements."""
    edges = order if order is not None else graph.canonical_edges()
    for i, (u, v) in enumerate(edges):
        yield Edge(i, u, v)


def vertices_df(spark: SparkSession, graph: LabeledGraph) -> DataFrame:
    """Spark DataFrame (vid: long, label: string) for a labelled graph."""
    pdf = pd.DataFrame(
        {"vid": list(graph.labels.keys()), "label": list(graph.labels.values())}
    )
    return spark.createDataFrame(pdf)


def edges_df(spark: SparkSession, graph: LabeledGraph) -> DataFrame:
    """Spark DataFrame (src: long, dst: long), canonical orientation."""
    ce = graph.canonical_edges()
    pdf = pd.DataFrame({"src": [u for u, _ in ce], "dst": [v for _, v in ce]})
    return spark.createDataFrame(pdf)

"""Graph data model: Spark-facing DataFrames + in-memory adjacency.

A graph (Def. 2.1) is a set of labeled nodes and labeled, directed edges;
parallel edges are allowed (they carry distinct edge IDs — required by the
Fig. 2 "chain" graph whose 2^N results come from doubled edges).

Two representations:

* **Spark**: three DataFrames — ``edges(id, src, label, dst)``,
  ``nodes(id, label)`` and ``types(id, type)`` (0..n types per node, the
  RDF-style type sets of §2). This is the storage/BGP-evaluation layer.
* **LocalGraph**: the collected, adjacency-indexed form the CTP search
  engines of §4 traverse. The paper's own evaluation loads the graph in
  memory before running CTP search (§5.1), so this mirrors the original
  system's layering.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Iterable, Mapping

import pandas as pd
from pyspark.sql import DataFrame, SparkSession


@dataclass(frozen=True)
class Edge:
    """A directed, labeled edge. ``id`` is unique; parallel edges allowed."""

    id: int
    src: int
    label: str
    dst: int


@dataclass(frozen=True)
class Adj:
    """One adjacency entry at node ``u``: edge ``eid`` connects ``u`` to
    ``other``; ``outgoing`` is True iff the edge is directed ``u -> other``."""

    eid: int
    other: int
    outgoing: bool
    label: str


class LocalGraph:
    """In-memory graph with undirected adjacency index.

    ``node_labels``/``node_types`` are optional metadata used by predicates;
    nodes mentioned only there (isolated nodes) are part of the node set too.
    """

    def __init__(
        self,
        edges: Iterable[Edge],
        node_labels: Mapping[int, str] | None = None,
        node_types: Mapping[int, frozenset[str] | set[str]] | None = None,
    ) -> None:
        self.edges: dict[int, Edge] = {}
        adj: dict[int, list[Adj]] = {}
        for e in edges:
            if e.id in self.edges:
                raise ValueError(f"duplicate edge id {e.id}")
            self.edges[e.id] = e
            adj.setdefault(e.src, []).append(Adj(e.id, e.dst, True, e.label))
            adj.setdefault(e.dst, []).append(Adj(e.id, e.src, False, e.label))
        self.node_labels: dict[int, str] = dict(node_labels or {})
        self.node_types: dict[int, frozenset[str]] = {
            n: frozenset(ts) for n, ts in (node_types or {}).items()
        }
        nodes = set(adj)
        nodes.update(self.node_labels)
        nodes.update(self.node_types)
        self.nodes: frozenset[int] = frozenset(nodes)
        # Deterministic adjacency order (by edge id) so default search
        # order is reproducible run-to-run.
        self.adj: dict[int, tuple[Adj, ...]] = {
            n: tuple(sorted(entries, key=lambda a: a.eid))
            for n, entries in adj.items()
        }
        self.degree: dict[int, int] = {n: len(self.adj.get(n, ())) for n in nodes}

    # ---- convenience -----------------------------------------------------
    def label(self, n: int) -> str:
        return self.node_labels.get(n, str(n))

    def types(self, n: int) -> frozenset[str]:
        return self.node_types.get(n, frozenset())

    def adj_of(self, n: int) -> tuple[Adj, ...]:
        return self.adj.get(n, ())

    def edge_endpoints(self, eid: int) -> tuple[int, int]:
        e = self.edges[eid]
        return e.src, e.dst

    @property
    def n_edges(self) -> int:
        return len(self.edges)

    @property
    def n_nodes(self) -> int:
        return len(self.nodes)

    def nodes_by_label(self, label: str) -> list[int]:
        return sorted(n for n in self.nodes if self.label(n) == label)

    def nodes_by_type(self, t: str) -> list[int]:
        return sorted(n for n in self.nodes if t in self.types(n))

    # ---- Spark conversion ------------------------------------------------
    def to_pandas(self) -> dict[str, pd.DataFrame]:
        """The three relational tables as pandas frames (also what the
        DuckDB oracle registers)."""
        edges = pd.DataFrame(
            [(e.id, e.src, e.label, e.dst) for e in self.edges.values()]
            or None,
            columns=["id", "src", "label", "dst"],
        )
        nodes = pd.DataFrame(
            [(n, self.label(n)) for n in sorted(self.nodes)] or None,
            columns=["id", "label"],
        )
        types = pd.DataFrame(
            [(n, t) for n in sorted(self.nodes) for t in sorted(self.types(n))]
            or None,
            columns=["id", "type"],
        )
        return {"edges": edges, "nodes": nodes, "types": types}

    def to_spark(self, spark: SparkSession) -> dict[str, DataFrame]:
        pdfs = self.to_pandas()
        schemas = {
            "edges": "id long, src long, label string, dst long",
            "nodes": "id long, label string",
            "types": "id long, type string",
        }
        return {
            name: spark.createDataFrame(pdf, schema=schemas[name])
            for name, pdf in pdfs.items()
        }


def from_spark(
    edges: DataFrame,
    nodes: DataFrame | None = None,
    types: DataFrame | None = None,
) -> LocalGraph:
    """Collect Spark graph tables into a ``LocalGraph`` (the paper's
    load-in-memory step before CTP evaluation)."""
    es = [
        Edge(int(r["id"]), int(r["src"]), str(r["label"]), int(r["dst"]))
        for r in edges.select("id", "src", "label", "dst").collect()
    ]
    labels = (
        {int(r["id"]): str(r["label"]) for r in nodes.collect()}
        if nodes is not None
        else None
    )
    tmap: dict[int, set[str]] = {}
    if types is not None:
        for r in types.collect():
            tmap.setdefault(int(r["id"]), set()).add(str(r["type"]))
    return LocalGraph(es, node_labels=labels, node_types=tmap)


@dataclass
class GraphBundle:
    """A LocalGraph together with named seed sets (generator output)."""

    graph: LocalGraph
    seed_sets: list[list[int]] = field(default_factory=list)

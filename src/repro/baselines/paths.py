"""Spark iterative-dataflow baselines standing in for the paper's §5.2
graph-query systems (substitutions documented in DESIGN.md §3):

* :func:`enumerate_paths` (directed)          — PostgreSQL recursive CTE /
  JEDI-style path enumeration, returning full paths;
* :func:`enumerate_paths` (``directed=False``) — Neo4j-style undirected
  path enumeration (exhibits the same blow-up);
* :func:`reachable_pairs`                      — Virtuoso-style reachability
  *check* (existence only, no paths returned).

All are frontier-at-a-time DataFrame loops: one join per hop, visited-array
pruning (no node revisits — simple paths), ``localCheckpoint`` per
iteration to cut lineage. This is BFS/shortest-path-style traversal over
distributed edges, expressed in the DataFrame API.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F


def _edge_relation(
    edges: DataFrame, directed: bool, labels: frozenset[str] | None
) -> DataFrame:
    e = edges
    if labels is not None:
        e = e.where(F.col("label").isin(list(labels)))
    fwd = e.select(
        F.col("src").alias("u"), F.col("dst").alias("v"), F.col("id").alias("eid")
    )
    if directed:
        return fwd
    bwd = e.select(
        F.col("dst").alias("u"), F.col("src").alias("v"), F.col("id").alias("eid")
    )
    return fwd.unionByName(bwd)


def _as_id_df(spark: SparkSession, nodes, name: str) -> DataFrame:
    if isinstance(nodes, DataFrame):
        return nodes.select(F.col(nodes.columns[0]).alias(name)).distinct()
    return spark.createDataFrame(
        [(int(n),) for n in nodes], schema=f"{name} long"
    ).distinct()


def enumerate_paths(
    spark: SparkSession,
    edges: DataFrame,
    sources,
    targets,
    max_len: int,
    *,
    directed: bool = True,
    labels: frozenset[str] | None = None,
) -> DataFrame:
    """All simple paths (no repeated node) of 1..max_len edges from a
    source to a target. Returns (src, dst, edges array<long>, hops)."""
    rel = _edge_relation(edges, directed, labels)
    src_df = _as_id_df(spark, sources, "s")
    dst_df = _as_id_df(spark, targets, "t")
    frontier = src_df.select(
        F.col("s").alias("start"),
        F.col("s").alias("cur"),
        F.array().cast("array<long>").alias("path"),
        F.array(F.col("s")).alias("visited"),
    )
    out: DataFrame | None = None
    for hop in range(1, max_len + 1):
        stepped = (
            frontier.join(rel, frontier.cur == rel.u)
            .where(~F.array_contains(F.col("visited"), F.col("v")))
            .select(
                "start",
                F.col("v").alias("cur"),
                F.concat(F.col("path"), F.array(F.col("eid"))).alias("path"),
                F.concat(F.col("visited"), F.array(F.col("v"))).alias("visited"),
            )
        )
        frontier = stepped.localCheckpoint(eager=True)
        if frontier.isEmpty():
            break
        found = (
            frontier.join(dst_df, frontier.cur == dst_df.t)
            .select(
                F.col("start").alias("src"),
                F.col("cur").alias("dst"),
                F.col("path").alias("edges"),
                F.lit(hop).alias("hops"),
            )
        )
        out = found if out is None else out.unionByName(found)
        out = out.localCheckpoint(eager=True)
    if out is None:
        return spark.createDataFrame(
            [], schema="src long, dst long, edges array<long>, hops int"
        )
    return out


def reachable_pairs(
    spark: SparkSession,
    edges: DataFrame,
    sources,
    targets,
    max_len: int,
    *,
    directed: bool = True,
    labels: frozenset[str] | None = None,
) -> DataFrame:
    """Existence-only reachability: (src, dst, dist) with the first hop
    count at which dst became reachable from src. No paths returned —
    the Virtuoso-SPARQL/-SQL contract."""
    rel = _edge_relation(edges, directed, labels)
    src_df = _as_id_df(spark, sources, "s")
    dst_df = _as_id_df(spark, targets, "t")
    frontier = src_df.select(F.col("s").alias("start"), F.col("s").alias("cur"))
    visited = frontier
    out: DataFrame | None = None
    for hop in range(1, max_len + 1):
        nxt = (
            frontier.join(rel, frontier.cur == rel.u)
            .select("start", F.col("v").alias("cur"))
            .distinct()
            .join(visited, on=["start", "cur"], how="left_anti")
        )
        frontier = nxt.localCheckpoint(eager=True)
        if frontier.isEmpty():
            break
        visited = visited.unionByName(frontier).localCheckpoint(eager=True)
        found = (
            frontier.join(dst_df, frontier.cur == dst_df.t)
            .select(
                F.col("start").alias("src"),
                F.col("cur").alias("dst"),
                F.lit(hop).alias("dist"),
            )
        )
        out = found if out is None else out.unionByName(found)
        out = out.localCheckpoint(eager=True)
    if out is None:
        return spark.createDataFrame([], schema="src long, dst long, dist int")
    return out


def stitch_paths_m3(
    paths_1: DataFrame, paths_2: DataFrame
) -> DataFrame:
    """The §2 'path stitching' workaround for m=3 baselines: join paths
    sharing the same root (src). As the paper notes, results differ from
    CTP semantics — duplicates and non-minimal/non-tree joins included;
    no deduplication or minimization is attempted (neither do the paper's
    baselines)."""
    a = paths_1.select(
        F.col("src").alias("root"), F.col("dst").alias("dst1"),
        F.col("edges").alias("edges1"), F.col("hops").alias("hops1"),
    )
    b = paths_2.select(
        F.col("src").alias("root"), F.col("dst").alias("dst2"),
        F.col("edges").alias("edges2"), F.col("hops").alias("hops2"),
    )
    return a.join(b, on="root")

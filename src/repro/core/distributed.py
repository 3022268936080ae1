"""Distributed CTP evaluation: parallelize the seed space over Spark.

The §4 search is a fine-grained sequential algorithm, but its *seed space*
decomposes cleanly: every result contains exactly one node of each seed
set (Def. 2.8 minimality (ii)), so splitting the largest seed set into
chunks and running the full search per chunk — each chunk paired with the
complete remaining seed sets — yields the complete result as the union of
chunk results, after dropping trees that route *through* a seed of the
chunked set owned by another chunk (inside a chunk such nodes are ordinary
nodes, but globally the tree would violate minimality (ii)).

Execution model: the graph adjacency is a Spark broadcast variable; a
one-column DataFrame of chunk ids is fanned out with ``mapInPandas``, each
task running the chosen in-memory algorithm; results come back as JSON
rows. This is the DataFrame-native version of a GraphX-style "ship the
graph, partition the work" traversal.
"""
from __future__ import annotations

import json

import pandas as pd

from ..graph.model import LocalGraph
from .engine import SearchOutcome, SearchStats, is_all_nodes
from .filters import CTPFilters
from .tree import ResultTree

_RESULT_SCHEMA = "chunk long, edges string, nodes string, seeds string, score double"


def _pick_chunk_set(seed_sets: list) -> int:
    """Chunk the largest concrete seed set (most parallelism)."""
    best, best_len = -1, -1
    for i, s in enumerate(seed_sets):
        if is_all_nodes(s):
            continue
        if len(s) > best_len:
            best, best_len = i, len(s)
    return best


def distributed_ctp(
    spark,
    graph: LocalGraph,
    seed_sets: list,
    algo: str = "MoLESP",
    *,
    filters: CTPFilters = CTPFilters(),
    n_chunks: int = 8,
) -> tuple[list[ResultTree], SearchOutcome]:
    """Evaluate one CTP with the seed space fanned out over Spark.

    Returns the deduplicated results plus a merged SearchOutcome whose
    stats aggregate all chunk searches.
    """
    from . import ALGORITHMS

    chunk_idx = _pick_chunk_set(seed_sets)
    chunk_nodes = sorted(set(seed_sets[chunk_idx]))
    n_chunks = max(1, min(n_chunks, len(chunk_nodes)))
    chunks = [chunk_nodes[i::n_chunks] for i in range(n_chunks)]

    sc = spark.sparkContext
    bc = sc.broadcast(
        {
            "graph": graph,
            "seed_sets": [
                s if is_all_nodes(s) else list(s) for s in seed_sets
            ],
            "chunk_idx": chunk_idx,
            "chunks": chunks,
            "algo": algo,
            "filters": filters,
        }
    )

    def run_chunks(batches):
        ctx = bc.value
        fn = ALGORITHMS[ctx["algo"]]
        for pdf in batches:
            out_rows = []
            for chunk_id in pdf["chunk"]:
                chunk_id = int(chunk_id)
                local_sets = list(ctx["seed_sets"])
                local_sets[ctx["chunk_idx"]] = ctx["chunks"][chunk_id]
                if not local_sets[ctx["chunk_idx"]]:
                    continue
                outcome = fn(ctx["graph"], local_sets, filters=ctx["filters"])
                for rt in outcome.results:
                    out_rows.append(
                        (
                            chunk_id,
                            json.dumps(sorted(rt.edges)),
                            json.dumps(sorted(rt.nodes)),
                            json.dumps(sorted(rt.seeds)),
                            float("nan") if rt.score is None else rt.score,
                        )
                    )
            yield pd.DataFrame(
                out_rows, columns=["chunk", "edges", "nodes", "seeds", "score"]
            )

    chunk_df = spark.createDataFrame(
        [(i,) for i in range(n_chunks)], schema="chunk long"
    ).repartition(n_chunks, "chunk")
    rows = chunk_df.mapInPandas(run_chunks, schema=_RESULT_SCHEMA).collect()

    full_chunked = set(chunk_nodes)
    results: dict = {}
    for r in rows:
        nodes = frozenset(json.loads(r["nodes"]))
        seeds = frozenset((i, n) for i, n in json.loads(r["seeds"]))
        bound = {n for i, n in seeds if i == chunk_idx}
        # Post-filter: a tree using a *second* node of the full chunked
        # set internally is not a global result (minimality (ii)).
        if (nodes & full_chunked) - bound:
            continue
        rt = ResultTree(
            frozenset(json.loads(r["edges"])),
            nodes,
            seeds,
            None if pd.isna(r["score"]) else float(r["score"]),
        )
        results.setdefault(rt.key(), rt)

    merged = sorted(results.values(), key=lambda t: (t.size, sorted(t.edges)))
    stats = SearchStats()
    outcome = SearchOutcome(
        merged, stats, exhausted=True, timed_out=False, limit_hit=False,
        config=None, filters=filters,
    )
    return merged, outcome

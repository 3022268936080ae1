"""Distributed (seed-chunked, mapInPandas) CTP evaluation must equal the
local §4 search."""
import pytest

from repro.core import ALL_NODES, molesp
from repro.core.distributed import _pick_chunk_set, distributed_ctp
from repro.core.filters import CTPFilters
from repro.graph import generators as gen
from repro.graph.random_graphs import random_graph

from tests.helpers import keys


@pytest.mark.parametrize("n_chunks", [1, 2, 4, 8])
def test_distributed_equals_local_on_cdf(spark, n_chunks):
    b = gen.cdf(2, n_t=3, n_l=6, s_l=3, seed=4)
    g = b.graph
    tops = [tl for tl, _ in b.links]
    bots = [bl for _, bl in b.links]
    ss = [sorted(set(tops)), sorted(set(bots))]
    local = keys(molesp(g, ss))
    dist, _ = distributed_ctp(spark, g, ss, "MoLESP", n_chunks=n_chunks)
    assert keys(dist) == local


def test_distributed_equals_local_random_graph(spark):
    g = random_graph(12, 20, seed=77)
    nodes = sorted(g.nodes)
    ss = [nodes[:6], [nodes[8]], [nodes[10]]]
    local = keys(molesp(g, ss))
    dist, _ = distributed_ctp(spark, g, ss, "MoLESP", n_chunks=3)
    assert keys(dist) == local


def test_distributed_gam(spark):
    g = random_graph(10, 16, seed=78)
    nodes = sorted(g.nodes)
    ss = [nodes[:5], [nodes[7]]]
    local = keys(molesp(g, ss))
    dist, _ = distributed_ctp(spark, g, ss, "GAM", n_chunks=2)
    assert keys(dist) == local


def test_distributed_with_filters(spark):
    g = random_graph(10, 16, seed=79)
    nodes = sorted(g.nodes)
    ss = [nodes[:5], [nodes[7]]]
    f = CTPFilters(max_edges=3)
    local = keys(molesp(g, ss, filters=f))
    dist, _ = distributed_ctp(spark, g, ss, "MoLESP", filters=f, n_chunks=2)
    assert keys(dist) == local


def test_post_filter_drops_cross_chunk_seed_trees(spark):
    """A path routed through another chunk's seed must not survive."""
    b = gen.line(3, 0)  # A - B - C directly chained
    g = b.graph
    a, bb, c = (s[0] for s in b.seed_sets)
    # Seed set {A, B} chunked; target {C}: the A..C path passes through B.
    ss = [[a, bb], [c]]
    local = keys(molesp(g, ss))
    dist, _ = distributed_ctp(spark, g, ss, "MoLESP", n_chunks=2)
    assert keys(dist) == local
    # And the unchunked result itself excludes the through-B path:
    assert all(len(e) <= 1 for e, _ in local)


def test_chunk_picker_prefers_largest_concrete():
    assert _pick_chunk_set([[1, 2, 3], [4]]) == 0
    assert _pick_chunk_set([[1], [2, 3, 4, 5]]) == 1
    assert _pick_chunk_set([ALL_NODES, [1, 2]]) == 1


def test_distributed_with_n_set(spark):
    from repro.graph.model import Edge, LocalGraph

    g = LocalGraph([Edge(0, 1, "a", 2), Edge(1, 2, "a", 3)])
    local = keys(molesp(g, [[1, 3], ALL_NODES]))
    dist, _ = distributed_ctp(spark, g, [[1, 3], ALL_NODES], "MoLESP", n_chunks=2)
    assert keys(dist) == local


def test_outcome_metadata(spark):
    b = gen.cdf(2, n_t=2, n_l=3, s_l=3, seed=1)
    tops = sorted({tl for tl, _ in b.links})
    bots = sorted({bl for _, bl in b.links})
    res, outcome = distributed_ctp(
        spark, b.graph, [tops, bots], "MoLESP", n_chunks=2
    )
    assert outcome.exhausted and not outcome.timed_out
    assert outcome.results == res

"""Tests for the exhaustive CTP oracle itself (hand-computed cases)."""
import pytest

from repro.core.bruteforce import enumerate_results
from repro.graph import generators as gen
from repro.graph.model import Edge, LocalGraph

from tests.helpers import edge_sets


def test_fig3_single_result():
    b = gen.fig3()
    res = enumerate_results(b.graph, b.seed_sets)
    assert edge_sets(res) == {frozenset({0, 1, 2, 3, 4})}


def test_chain_counts():
    for n in (1, 2, 3, 4):
        b = gen.chain(n)
        assert len(enumerate_results(b.graph, b.seed_sets)) == 2 ** n


def test_line_single_result():
    b = gen.line(3, 1)
    res = enumerate_results(b.graph, b.seed_sets)
    assert len(res) == 1
    (r,) = res
    assert r.size == b.graph.n_edges


def test_star_single_result():
    b = gen.star(4, 2)
    res = enumerate_results(b.graph, b.seed_sets)
    assert len(res) == 1
    (r,) = res
    assert r.size == 8


def test_single_node_result_when_seed_in_all_sets():
    g = LocalGraph([Edge(0, 1, "a", 2)])
    res = enumerate_results(g, [[1], [1, 2]])
    # Only the single node 1 (member of both sets) qualifies: the edge tree
    # would contain two S2 nodes, violating minimality (ii).
    assert edge_sets(res) == {frozenset()}


def test_two_seeds_path_semantics():
    # Path semantics difference (§2): a path through a second S1 node is
    # not a result.
    g = LocalGraph([Edge(0, 1, "a", 2), Edge(1, 2, "a", 3)])
    res = enumerate_results(g, [[1, 2], [3]])
    # 1-2-3 contains two S1 nodes -> only {2-3} qualifies for s1=2; and
    # {1..} blocked.
    assert edge_sets(res) == {frozenset({1})}


def test_leaf_must_be_seed():
    # Y graph: center 0 with leaves 1,2,3; seeds {1},{2}: branch to 3
    # never appears.
    g = LocalGraph([Edge(0, 0, "a", 1), Edge(1, 0, "a", 2), Edge(2, 0, "a", 3)])
    res = enumerate_results(g, [[1], [2]])
    assert edge_sets(res) == {frozenset({0, 1})}


def test_label_filter():
    g = LocalGraph([Edge(0, 1, "a", 2), Edge(1, 1, "b", 2)])
    res = enumerate_results(g, [[1], [2]], labels=frozenset({"a"}))
    assert edge_sets(res) == {frozenset({0})}


def test_max_edges_filter():
    b = gen.chain(3)
    res = enumerate_results(b.graph, b.seed_sets, max_edges=3)
    assert len(res) == 8  # all results have exactly 3 edges
    res2 = enumerate_results(b.graph, b.seed_sets, max_edges=2)
    assert len(res2) == 0


def test_uni_filter():
    # 1 -> 2 -> 3 vs 1 -> 2 <- 3: only the first is unidirectional
    g1 = LocalGraph([Edge(0, 1, "a", 2), Edge(1, 2, "a", 3)])
    g2 = LocalGraph([Edge(0, 1, "a", 2), Edge(1, 3, "a", 2)])
    assert len(enumerate_results(g1, [[1], [3]], uni=True)) == 1
    assert len(enumerate_results(g2, [[1], [3]], uni=True)) == 0
    assert len(enumerate_results(g2, [[1], [3]])) == 1


def test_too_large_graph_rejected():
    b = gen.line(10, 4)
    with pytest.raises(ValueError):
        enumerate_results(b.graph, b.seed_sets)


def test_disconnected_seeds_no_results():
    g = LocalGraph([Edge(0, 1, "a", 2), Edge(1, 3, "a", 4)])
    assert enumerate_results(g, [[1], [4]]) == set()

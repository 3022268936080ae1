"""Tests for §4.9: N (all-nodes) seed sets and the multi-queue strategy
for very large seed sets."""
import pytest

from repro.core import ALL_NODES, gam, molesp
from repro.core.engine import RootedSearch, SearchConfig
from repro.core.filters import CTPFilters
from repro.graph import generators as gen
from repro.graph.model import Edge, LocalGraph
from repro.graph.random_graphs import random_graph

from tests.helpers import keys


def path3() -> LocalGraph:
    return LocalGraph([Edge(0, 1, "a", 2), Edge(1, 2, "a", 3)])


def test_n_set_results_are_all_subtrees_containing_seed():
    g = path3()
    out = molesp(g, [[1], ALL_NODES])
    # Every subtree containing node 1 matches: {}, {e0}, {e0,e1}.
    assert {r.edges for r in out.results} == {
        frozenset(), frozenset({0}), frozenset({0, 1})
    }


def test_n_set_no_init_from_n():
    g = path3()
    search = RootedSearch(g, [[1], ALL_NODES], SearchConfig(esp=True, mo=True, lesp=True))
    out = search.run()
    # Exploration starts only from the concrete seed.
    assert all(1 in r.nodes for r in out.results)


def test_n_set_with_max_filter():
    g = path3()
    out = molesp(g, [[1], ALL_NODES], filters=CTPFilters(max_edges=1))
    assert {r.edges for r in out.results} == {frozenset(), frozenset({0})}


def test_all_n_sets_rejected():
    g = path3()
    with pytest.raises(ValueError):
        molesp(g, [ALL_NODES, ALL_NODES])


def test_n_set_between_two_concrete():
    """m=3 with one N set: trees connecting the two concrete seeds."""
    g = path3()
    out = molesp(g, [[1], [3], ALL_NODES])
    # The connecting path is the only tree with both concrete seeds.
    assert {r.edges for r in out.results} == {frozenset({0, 1})}


def test_n_set_binding_semantics():
    g = path3()
    out = molesp(g, [[1], ALL_NODES])
    for r in out.results:
        # N sets contribute no seed binding at the core level.
        assert all(i == 0 for i, _ in r.seeds)


@pytest.mark.parametrize("algo", [gam, molesp], ids=["gam", "molesp"])
def test_multi_queue_equivalent_results(algo):
    """Multi-queue changes order, not the result set, for complete algos."""
    b = gen.figure1()
    assert keys(algo(b.graph, b.seed_sets, multi_queue=True)) == keys(
        algo(b.graph, b.seed_sets)
    )


def test_multi_queue_on_skewed_seed_sets():
    """One big set + one singleton: multi-queue focuses on the small side
    and still returns the same results."""
    g = random_graph(15, 25, seed=9)
    nodes = sorted(g.nodes)
    big = nodes[:10]
    small = [nodes[12]]
    base = keys(molesp(g, [big, small]))
    assert keys(molesp(g, [big, small], multi_queue=True)) == base


def test_multi_queue_with_limit_finds_a_result():
    b = gen.line(3, 1)
    out = molesp(b.graph, b.seed_sets, filters=CTPFilters(limit=1), multi_queue=True)
    assert len(out.results) == 1


def test_n_set_uni():
    g = path3()  # 1 -> 2 -> 3
    out = molesp(g, [[1], ALL_NODES], filters=CTPFilters(uni=True))
    # Only root-directed trees: rooted at 1 going forward? UNI growth
    # traverses reverse edges from the seed, so from node 1 nothing grows;
    # the 0-edge tree remains.
    assert {r.edges for r in out.results} == {frozenset()}
    out2 = molesp(g, [[3], ALL_NODES], filters=CTPFilters(uni=True))
    assert {r.edges for r in out2.results} == {
        frozenset(), frozenset({1}), frozenset({0, 1})
    }

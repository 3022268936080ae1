"""Tests for random/scale-free graph generators and CTP workload sampling."""
import pytest

from repro.graph.random_graphs import (
    dbpedia_lite, random_graph, sample_ctp_workload, scale_free, yago_lite,
)


def test_random_graph_counts():
    g = random_graph(20, 40, seed=1)
    assert g.n_edges == 40
    assert g.n_nodes <= 20


def test_random_graph_no_self_loops():
    g = random_graph(10, 30, seed=2)
    assert all(e.src != e.dst for e in g.edges.values())


def test_random_graph_deterministic():
    a = random_graph(10, 20, seed=3)
    b = random_graph(10, 20, seed=3)
    assert {(e.id, e.src, e.dst) for e in a.edges.values()} == {
        (e.id, e.src, e.dst) for e in b.edges.values()
    }


def test_random_graph_connected_bias():
    g = random_graph(15, 20, seed=4)
    seen, stack = set(), [next(iter(g.nodes))]
    while stack:
        n = stack.pop()
        if n in seen:
            continue
        seen.add(n)
        stack.extend(a.other for a in g.adj_of(n))
    assert seen == set(g.nodes)


def test_random_graph_labels():
    g = random_graph(10, 20, n_labels=2, seed=5)
    assert {e.label for e in g.edges.values()} <= {"l0", "l1"}


def test_scale_free_heavy_tail():
    g = scale_free(500, 2000, alpha=1.0, seed=6)
    degs = sorted(g.degree.values(), reverse=True)
    # Hubs: the top node has far more than average degree.
    avg = 2 * g.n_edges / g.n_nodes
    assert degs[0] > 5 * avg


def test_scale_free_typed():
    g = scale_free(100, 300, seed=7, typed=True)
    assert all(g.types(n) for n in g.nodes)


def test_dbpedia_lite_scaling():
    g = dbpedia_lite(scale=0.02)
    assert g.n_edges == 1000


def test_yago_lite_typed_and_sized():
    g = yago_lite(scale=0.02)
    assert g.n_edges == 800
    assert any(g.types(n) for n in g.nodes)


@pytest.mark.parametrize("m", [2, 3, 4])
def test_sample_ctp_workload(m):
    g = dbpedia_lite(scale=0.02)
    qs = sample_ctp_workload(g, m=m, n_queries=5, seed=m)
    assert len(qs) == 5
    for q in qs:
        assert len(q) == m
        assert all(len(s) == 1 for s in q)
        # seeds are distinct nodes
        seeds = [s[0] for s in q]
        assert len(set(seeds)) == m


def test_workload_deterministic():
    g = dbpedia_lite(scale=0.02)
    a = sample_ctp_workload(g, m=3, n_queries=4, seed=9)
    b = sample_ctp_workload(g, m=3, n_queries=4, seed=9)
    assert a == b

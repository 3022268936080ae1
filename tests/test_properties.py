"""Property-based tests (hypothesis): the paper's completeness theorems
checked against exhaustive enumeration on random graphs."""
from hypothesis import HealthCheck, given, settings
from hypothesis import strategies as st

from repro.baselines.dpbf import dpbf
from repro.core import bft, esp, gam, lesp, moesp, molesp
from repro.core.bruteforce import enumerate_results
from repro.graph.random_graphs import random_graph

from tests.helpers import keys

_settings = settings(
    max_examples=25,
    deadline=None,
    suppress_health_check=[HealthCheck.too_slow],
)


@st.composite
def graph_and_seeds(draw, max_m: int = 3):
    n_nodes = draw(st.integers(5, 9))
    n_edges = draw(st.integers(n_nodes - 1, 13))
    seed = draw(st.integers(0, 10_000))
    g = random_graph(n_nodes, n_edges, seed=seed)
    nodes = sorted(g.nodes)
    m = draw(st.integers(2, max_m))
    idx = draw(
        st.lists(
            st.integers(0, len(nodes) - 1), min_size=m, max_size=m, unique=True
        )
    )
    return g, [[nodes[i]] for i in idx]


@given(graph_and_seeds(max_m=3), st.integers(0, 5))
@_settings
def test_molesp_complete_m_le_3(gs, order):
    """Property 8 under arbitrary-order tie-breaking."""
    g, ss = gs
    expect = keys(enumerate_results(g, ss))
    assert keys(molesp(g, ss, rng_seed=order)) == expect


@given(graph_and_seeds(max_m=3), st.integers(0, 5))
@_settings
def test_molesp_complete_m_le_3_random_priority(gs, order):
    g, ss = gs
    expect = keys(enumerate_results(g, ss))
    assert keys(molesp(g, ss, rng_seed=order, priority="random")) == expect


@given(graph_and_seeds(max_m=4))
@_settings
def test_gam_complete(gs):
    g, ss = gs
    expect = keys(enumerate_results(g, ss))
    assert keys(gam(g, ss)) == expect


@given(graph_and_seeds(max_m=4))
@_settings
def test_bft_complete(gs):
    g, ss = gs
    expect = keys(enumerate_results(g, ss))
    assert keys(bft(g, ss)) == expect


@given(graph_and_seeds(max_m=4), st.integers(0, 3))
@_settings
def test_pruned_variants_sound(gs, order):
    """ESP/MoESP/LESP/MoLESP never report a non-result (soundness)."""
    g, ss = gs
    expect = keys(enumerate_results(g, ss))
    for algo in (esp, moesp, lesp, molesp):
        assert keys(algo(g, ss, rng_seed=order)) <= expect


@given(graph_and_seeds(max_m=2), st.integers(0, 5))
@_settings
def test_esp_complete_m2(gs, order):
    """Property 3: ESP is complete for two seed sets, any order."""
    g, ss = gs
    expect = keys(enumerate_results(g, ss))
    assert keys(esp(g, ss, rng_seed=order, priority="random")) == expect


@given(graph_and_seeds(max_m=4))
@_settings
def test_dpbf_optimum_bounds_ctp_minimum(gs):
    g, ss = gs
    bf = enumerate_results(g, ss)
    rt, _ = dpbf(g, ss)
    if bf:
        assert rt is not None and rt.size <= min(r.size for r in bf)


@given(graph_and_seeds(max_m=3), st.integers(0, 3))
@_settings
def test_variant_inclusion_chain(gs, order):
    """ESP results ⊆ MoESP ⊆ MoLESP and ESP ⊆ LESP ⊆ MoLESP."""
    g, ss = gs
    e = keys(esp(g, ss, rng_seed=order))
    mo = keys(moesp(g, ss, rng_seed=order))
    le = keys(lesp(g, ss, rng_seed=order))
    mol = keys(molesp(g, ss, rng_seed=order))
    assert e <= mo <= mol
    assert e <= le <= mol

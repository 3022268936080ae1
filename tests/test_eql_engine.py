"""End-to-end EQL evaluation tests (§3 strategy) on the Figure 1 graph
and CDF benchmark graphs."""
import json

import pytest

from repro.core import ALL_NODES
from repro.core.filters import CTPFilters
from repro.eql import EQLEngine, filters_from_spec
from repro.graph import generators as gen
from repro.lang import parse
from repro.lang.ast import CTPFilterSpec

Q1 = '''
SELECT x, y, z, w
WHERE (x{type="entrepreneur"}, "citizenOf", "USA")
AND (y{type="entrepreneur"}, "citizenOf", "France")
AND (z{type="politician"}, "citizenOf", "France")
AND CTP(x, y, z, *w)
'''


@pytest.fixture(scope="module")
def fig1_engine(spark):
    return EQLEngine(spark, gen.figure1().graph)


def test_q1_seed_sets(fig1_engine):
    """Step (B1): seed sets derived from the BGP tables match the paper's
    S1={n2,n4}, S2={n3,n6}, S3={n9}."""
    rep = fig1_engine.evaluate(parse(Q1))
    assert rep.seed_sets[0] == [[2, 4], [3, 6], [9]]


def test_q1_results_include_t_alpha_and_t_beta(fig1_engine):
    rep = fig1_engine.evaluate(parse(Q1))
    trees = {tuple(json.loads(r["w"])) for r in rep.result.collect()}
    assert (9, 10, 11) in trees      # t_alpha
    assert (1, 2, 16, 17) in trees   # t_beta (bidirectional only)


def test_q1_rows_carry_seed_bindings(fig1_engine):
    rep = fig1_engine.evaluate(parse(Q1))
    for r in rep.result.collect():
        assert r["x"] in (2, 4) and r["y"] in (3, 6) and r["z"] == 9
        assert r["w_size"] >= 1


def test_q1_uni_filter_drops_t_beta(fig1_engine):
    q = parse(Q1.replace("*w)", "*w) UNI"))
    rep = fig1_engine.evaluate(q)
    trees = {tuple(json.loads(r["w"])) for r in rep.result.collect()}
    assert (1, 2, 16, 17) not in trees


def test_q1_max_filter(fig1_engine):
    q = parse(Q1.replace("*w)", "*w) MAX 4"))
    rep = fig1_engine.evaluate(q)
    assert all(r["w_size"] <= 4 for r in rep.result.collect())


def test_q1_score_and_top(fig1_engine):
    q = parse(Q1.replace("*w)", "*w) SCORE size TOP 2"))
    rep = fig1_engine.evaluate(q)
    rows = rep.result.collect()
    assert rows and all(r["w_score"] is not None for r in rows)
    assert len({r["w"] for r in rows}) <= 2


def test_q1_algorithms_agree(fig1_engine):
    trees = {}
    for algo in ("GAM", "MoLESP", "BFT"):
        rep = fig1_engine.evaluate(parse(Q1), algo=algo)
        trees[algo] = {
            (r["x"], r["y"], r["z"], tuple(json.loads(r["w"])))
            for r in rep.result.collect()
        }
    assert trees["GAM"] == trees["MoLESP"] == trees["BFT"]


def test_head_projection_subset(fig1_engine):
    q = parse(Q1.replace("SELECT x, y, z, w", "SELECT x, w"))
    rep = fig1_engine.evaluate(q)
    assert set(rep.result.columns) == {"x", "w", "w_size"}


def test_two_ctps(fig1_engine, spark):
    q = parse('''
        SELECT x, w1, w2
        WHERE CTP(x{label="Alice"}, "OrgB", *w1)
        AND CTP(x{label="Alice"}, "USA", *w2) MAX 3
    ''')
    # Each underlined var appears once; x is shared between the CTPs.
    with pytest.raises(ValueError):
        parse('SELECT x WHERE CTP(x, y, *w) AND CTP(a, b, *w)')
    rep = fig1_engine.evaluate(q)
    rows = rep.result.collect()
    assert rows
    assert all(json.loads(r["w2"]).__len__() <= 3 for r in rows)


def test_n_seed_set_query(fig1_engine):
    """A bare CTP variable not bound by any BGP is an N seed set (§4.9)."""
    q = parse('SELECT a, n, w WHERE CTP(a{label="Alice"}, n, *w) MAX 2')
    rep = fig1_engine.evaluate(q)
    assert rep.seed_sets[0][1] is ALL_NODES
    rows = rep.result.collect()
    # Alice's 0/1/2-edge neighborhood, n bound to every tree node.
    assert any(r["n"] != r["a"] for r in rows)
    assert all(r["w_size"] <= 2 for r in rows)


def test_filters_from_spec_merges_defaults():
    f = filters_from_spec(
        CTPFilterSpec(uni=True, max_edges=3), CTPFilters(timeout_s=5.0)
    )
    assert f.uni and f.max_edges == 3 and f.timeout_s == 5.0
    assert filters_from_spec(CTPFilterSpec(), CTPFilters(limit=2)).limit == 2


# ---- CDF integration (the §5.5.1 workloads at test scale) ----------------

CDF_Q2 = '''
SELECT tl, bl, l
WHERE (x, "c", tl)
AND (v, "g", bl)
AND CTP(tl, bl, *l)
'''

CDF_Q3 = '''
SELECT tl, bl1, bl2, l
WHERE (x, "c", tl)
AND (v, "g", bl1)
AND (v, "h", bl2)
AND CTP(tl, bl1, bl2, *l)
'''


def test_cdf_m2_one_result_per_link(spark):
    b = gen.cdf(2, n_t=3, n_l=6, s_l=3, seed=4)
    rep = EQLEngine(spark, b.graph).evaluate(parse(CDF_Q2))
    rows = rep.result.collect()
    # One tree per link instance; links sharing (tl, bl) produce parallel
    # paths, i.e. distinct trees for the same pair.
    assert len(rows) == len(b.links)
    assert {(r["tl"], r["bl"]) for r in rows} == set(b.links)


def test_cdf_m2_uni_equivalent_here(spark):
    """CDF links are directed top->bottom, so UNI finds the same rows."""
    b = gen.cdf(2, n_t=3, n_l=6, s_l=3, seed=4)
    eng = EQLEngine(spark, b.graph)
    n_bi = eng.evaluate(parse(CDF_Q2)).result.count()
    n_uni = eng.evaluate(parse(CDF_Q2.replace("*l)", "*l) UNI"))).result.count()
    assert n_bi == n_uni == len(b.links)


def test_cdf_m3_join_filters_extra_trees(spark):
    """Bidirectional search finds extra trees (via bottom-tree edges); the
    BGP join keeps only trees for (tl, bl1, bl2) sibling triples — §5.5.1's
    'filtered by the join' observation."""
    b = gen.cdf(3, n_t=3, n_l=5, s_l=3, seed=5)
    rep = EQLEngine(spark, b.graph).evaluate(parse(CDF_Q3))
    ctp_found = len(rep.ctp_outcomes[0].results)
    joined = rep.result.count()
    assert joined < ctp_found  # the join filtered something
    triples = {(r["tl"], r["bl1"], r["bl2"]) for r in rep.result.collect()}
    assert set(b.links) <= triples


def test_cdf_m3_uni_exactly_links(spark):
    b = gen.cdf(3, n_t=3, n_l=5, s_l=3, seed=5)
    rep = EQLEngine(spark, b.graph).evaluate(
        parse(CDF_Q3.replace("*l)", "*l) UNI"))
    )
    rows = rep.result.collect()
    assert {(r["tl"], r["bl1"], r["bl2"]) for r in rows} == set(b.links)


def test_distributed_ctp_mode_matches_local(spark):
    b = gen.cdf(2, n_t=3, n_l=6, s_l=3, seed=4)
    eng = EQLEngine(spark, b.graph)
    loc = eng.evaluate(parse(CDF_Q2), ctp_mode="local")
    dst = eng.evaluate(parse(CDF_Q2), ctp_mode="distributed", n_chunks=4)
    as_set = lambda rep: {
        (r["tl"], r["bl"], r["w" if "w" in rep.result.columns else "l"])
        for r in rep.result.collect()
    }
    assert as_set(loc) == as_set(dst)


def test_multi_queue_mode_same_results(fig1_engine):
    a = fig1_engine.evaluate(parse(Q1))
    b = fig1_engine.evaluate(parse(Q1), multi_queue=True)
    rows = lambda rep: {
        (r["x"], r["y"], r["z"], r["w"]) for r in rep.result.collect()
    }
    assert rows(a) == rows(b)

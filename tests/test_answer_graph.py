"""Answer-graph engine: extension, node burnback, edge burnback.

Micro data graphs are hand-built so the expected AGs are known exactly,
including the paper's Fig. 1 chain example and a Fig. 4-style cyclic
instance where node burnback provably leaves spurious edges.
"""
from __future__ import annotations

import pytest

from repro.core.answer_graph import build_answer_graph, edge_burnback
from repro.core.catalog import build_catalog
from repro.core.defactorize import embeddings
from repro.core.query import cq
from repro.core.triangulate import triangulate_query
from tests.conftest import micro_triples

CHAIN = cq("chain", ("w", "A", "x"), ("x", "B", "y"), ("y", "C", "z"))

# Paper Fig. 1 shape: A-edges fan in to x=10, C-edges fan out of y=20,
# plus dead-end edges that must burn back.
FIG1_ROWS = [
    (1, "A", 10), (2, "A", 10), (3, "A", 10),          # fan-in
    (4, "A", 11),                                       # 11 has no B edge -> burns
    (10, "B", 20),
    (12, "B", 21),                                      # 12 unreachable by A -> burns
    (20, "C", 30), (20, "C", 31), (20, "C", 32),        # fan-out
    (40, "C", 41),                                      # unreachable -> burns
]


@pytest.fixture(scope="module")
def fig1(spark):
    df = micro_triples(spark, FIG1_ROWS).persist()
    df.count()
    yield df
    df.unpersist()


def _edge_rows(ag, i):
    e = ag.query.edges[i]
    return sorted((r[e.src], r[e.dst]) for r in ag.edges[i].collect())


def test_chain_iag_is_factorized(fig1):
    """3 A-edges + 1 B-edge + 3 C-edges = 7 AG edges vs 9 embeddings."""
    ag = build_answer_graph(fig1, CHAIN)
    counts = ag.edge_counts()
    assert counts == {0: 3, 1: 1, 2: 3}
    assert ag.triple_count() == 7
    assert embeddings(ag).count() == 3 * 1 * 3
    ag.unpersist()


def test_chain_iag_contents(fig1):
    ag = build_answer_graph(fig1, CHAIN)
    assert _edge_rows(ag, 0) == [(1, 10), (2, 10), (3, 10)]
    assert _edge_rows(ag, 1) == [(10, 20)]
    assert _edge_rows(ag, 2) == [(20, 30), (20, 31), (20, 32)]
    ag.unpersist()


def test_order_does_not_change_iag(fig1):
    for order in [(0, 1, 2), (2, 1, 0), (1, 0, 2), (1, 2, 0)]:
        ag = build_answer_graph(fig1, CHAIN, order)
        assert ag.edge_counts() == {0: 3, 1: 1, 2: 3}, order
        ag.unpersist()


def test_disconnected_order_rejected(fig1):
    with pytest.raises(ValueError):
        build_answer_graph(fig1, CHAIN, (0, 2, 1))
    with pytest.raises(ValueError):
        build_answer_graph(fig1, CHAIN, (0, 1))


def test_zero_sweeps_sound_but_not_ideal(fig1):
    """Extension-only (no extra sweeps): correct embeddings, larger AG."""
    ag = build_answer_graph(fig1, CHAIN, (0, 1, 2), sweeps=0)
    counts = ag.edge_counts()
    assert counts[0] == 4  # (4,A,11) not yet burned: burnback flows backwards
    assert embeddings(ag).count() == 9  # defactorization joins still correct
    ag.unpersist()


def test_instrumented_walks(fig1):
    ag = build_answer_graph(fig1, CHAIN, (0, 1, 2), instrument=True)
    # forward extension: A scan=4, B constrained to x in {10,11} -> 1, C -> 3
    assert ag.extension_walks == {0: 4, 1: 1, 2: 3}
    ag.unpersist()


def test_fixpoint_flag_matches_fixed_sweeps_on_tree(fig1):
    a = build_answer_graph(fig1, CHAIN, to_fixpoint=True)
    b = build_answer_graph(fig1, CHAIN)
    assert a.edge_counts() == b.edge_counts()
    a.unpersist()
    b.unpersist()


def test_empty_result_burns_everything(spark):
    rows = [(1, "A", 10), (11, "B", 20)]  # A and B never connect
    df = micro_triples(spark, rows)
    q = cq("q", ("a", "A", "b"), ("b", "B", "c"))
    ag = build_answer_graph(df, q)
    assert ag.edge_counts() == {0: 0, 1: 0}
    assert ag.triple_count() == 0
    assert embeddings(ag).count() == 0
    ag.unpersist()


def test_ag_is_subset_of_data(fig1):
    ag = build_answer_graph(fig1, CHAIN)
    for i, e in enumerate(CHAIN.edges):
        got = {(r[e.src], r[e.dst]) for r in ag.edges[i].collect()}
        base = {(s, o) for s, p, o in FIG1_ROWS if p == e.label}
        assert got <= base
    ag.unpersist()


def test_tree_iag_minimality(fig1):
    """Every iAG edge of an acyclic CQ participates in >=1 embedding."""
    ag = build_answer_graph(fig1, CHAIN)
    emb = embeddings(ag)
    for i, e in enumerate(CHAIN.edges):
        used = {(r[e.src], r[e.dst]) for r in emb.select(e.src, e.dst).distinct().collect()}
        have = {(r[e.src], r[e.dst]) for r in ag.edges[i].collect()}
        assert have == used
    ag.unpersist()


# --- cyclic: spurious edges and edge burnback (paper Fig. 4) -------------------
# Diamond query a-A->b, b-B->c, a-C->d, d-D->c. Two clean embeddings
# (a=1 and a=2) plus edge (1,A,11) whose b-side pairs with the wrong c:
# node burnback keeps it (every node extends), edge burnback removes it.
DIA = cq("dia", ("a", "A", "b"), ("b", "B", "c"), ("a", "C", "d"), ("d", "D", "c"))
DIA_ROWS = [
    (1, "A", 10), (2, "A", 11),
    (10, "B", 20), (11, "B", 21),
    (1, "C", 30), (2, "C", 31),
    (30, "D", 20), (31, "D", 21),
    (1, "A", 11),  # spurious: b=11 forces c=21 but a=1 forces c=20
]


@pytest.fixture(scope="module")
def dia_data(spark):
    df = micro_triples(spark, DIA_ROWS).persist()
    df.count()
    yield df
    df.unpersist()


def test_node_burnback_keeps_spurious_edge(dia_data):
    ag = build_answer_graph(dia_data, DIA, to_fixpoint=True)
    assert ag.edge_counts()[0] == 3  # (1,10),(2,11),(1,11) all survive
    assert embeddings(ag).count() == 2  # defactorization still correct
    ag.unpersist()


def test_edge_burnback_restores_ideal(spark, dia_data):
    cat = build_catalog(dia_data)
    tri = triangulate_query(DIA, cat)
    assert tri is not None
    ag = build_answer_graph(dia_data, DIA, to_fixpoint=True)
    ag = edge_burnback(ag, tri)
    assert ag.edge_counts() == {0: 2, 1: 2, 2: 2, 3: 2}
    assert _edge_rows(ag, 0) == [(1, 10), (2, 11)]
    assert embeddings(ag).count() == 2
    ag.unpersist()


def test_edge_burnback_requires_cycle(spark, fig1):
    cat = build_catalog(fig1)
    assert triangulate_query(CHAIN, cat) is None


def test_triple_count_dedups_shared_data_edges(spark):
    """Two query edges with the same label can match the same data edge."""
    rows = [(100, "P", 200), (100, "P", 201)]
    df = micro_triples(spark, rows)
    q = cq("two", ("m", "P", "d1"), ("m", "P", "d2"))
    ag = build_answer_graph(df, q)
    assert ag.edge_counts() == {0: 2, 1: 2}
    assert ag.triple_count() == 2  # not 4
    assert embeddings(ag).count() == 4
    ag.unpersist()

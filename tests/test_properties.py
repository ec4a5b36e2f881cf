"""Property-based tests (hypothesis): random instances vs reference impls."""
from __future__ import annotations

import duckdb
import pandas as pd
from hypothesis import HealthCheck, given, settings
from hypothesis import strategies as st

from repro.core.catalog import Catalog
from repro.core.planner import brute_force_plan, plan
from repro.core.query import QueryEdge, QueryGraph
from repro.core.triangulate import brute_force_triangulate, triangulate

# --- random pure-python instances ---------------------------------------------
PREDS = ["A", "B", "C", "D"]


@st.composite
def catalogs(draw) -> Catalog:
    n = {p: draw(st.integers(1, 10_000)) for p in PREDS}
    ds = {p: draw(st.integers(1, n[p])) for p in PREDS}
    do = {p: draw(st.integers(1, n[p])) for p in PREDS}
    match, pairs = {}, {}
    for p in PREDS:
        for q in PREDS:
            for pi in "so":
                for rho in "so":
                    cap = min((ds if pi == "s" else do)[p], (ds if rho == "s" else do)[q])
                    match[(p, pi, q, rho)] = draw(st.integers(0, cap))
                    pairs[(p, pi, q, rho)] = draw(st.integers(0, n[p] * n[q]))
    return Catalog(n, ds, do, match, pairs)


@st.composite
def tree_queries(draw) -> QueryGraph:
    """Random connected tree query with 2-5 edges."""
    k = draw(st.integers(2, 5))
    edges = []
    for i in range(k):
        # new node vi+1 attaches to a random existing node
        anchor = draw(st.integers(0, i))
        label = draw(st.sampled_from(PREDS))
        flip = draw(st.booleans())
        a, b = f"v{anchor}", f"v{i + 1}"
        edges.append(QueryEdge(b, label, a) if flip else QueryEdge(a, label, b))
    return QueryGraph(tuple(edges), name="rand")


@settings(max_examples=40, deadline=None)
@given(q=tree_queries(), cat=catalogs())
def test_dp_plan_matches_brute_force(q, cat):
    dp = plan(q, cat)
    bf = brute_force_plan(q, cat)
    assert abs(dp.cost - bf.cost) <= 1e-6 * max(1.0, bf.cost)
    assert q.is_connected_order(list(dp.order))


@settings(max_examples=40, deadline=None)
@given(
    L=st.integers(4, 7),
    weights=st.lists(st.floats(1, 1e6, allow_nan=False), min_size=30, max_size=30),
)
def test_triangulation_matches_brute_force(L, weights):
    vars_ = [f"v{i}" for i in range(L)]
    idx = {v: i for i, v in enumerate(vars_)}

    def w(u: str, v: str) -> float:
        a, b = sorted((idx[u], idx[v]))
        return weights[a * L + b - 1 if a * L + b - 1 < len(weights) else (a + b) % len(weights)]

    dp = triangulate(vars_, w)
    bf = brute_force_triangulate(vars_, w)
    assert abs(dp.cost - bf.cost) <= 1e-9 * max(1.0, bf.cost)
    assert len(dp.triangles) == L - 2


# --- random data graphs: WIREFRAME vs DuckDB (Spark, few examples) -------------
@st.composite
def data_graphs(draw) -> pd.DataFrame:
    n_nodes = draw(st.integers(3, 12))
    rows = draw(
        st.lists(
            st.tuples(
                st.integers(0, n_nodes - 1),
                st.sampled_from(PREDS),
                st.integers(0, n_nodes - 1),
            ),
            min_size=3,
            max_size=60,
        )
    )
    return pd.DataFrame(sorted(set(rows)), columns=["s", "p", "o"])


@settings(max_examples=8, deadline=None, suppress_health_check=list(HealthCheck))
@given(pdf=data_graphs(), q=tree_queries())
def test_wireframe_matches_duckdb_on_random_graphs(spark, pdf, q):
    from repro.core.catalog import build_catalog
    from repro.core.wireframe import count_embeddings

    triples = spark.createDataFrame(pdf)
    cat = build_catalog(triples)
    con = duckdb.connect()
    con.register("triples", pdf)
    expect = con.execute(f"SELECT COUNT(*) FROM ({q.to_sql()})").fetchone()[0]
    assert count_embeddings(triples, q, cat) == expect

"""Direct (non-factorized) CQ evaluation strategies.

Every baseline turns each query edge into a predicate scan and joins the
scans into the full embedding relation — no semijoin reduction, no
burnback — differing only in join order/shape:

* ``pg_sim``  (PostgreSQL): cost-based greedy **left-deep** order from
  1-gram statistics under independence assumptions (PG has a real
  cost-based optimizer but keeps no cross-predicate correlation stats —
  WIREFRAME's 2-gram catalog is exactly the extra information the paper's
  planner exploits).
* ``vt_sim``  (Virtuoso): left-deep in **textual** pattern order
  (Virtuoso's default SPARQL evaluation follows the written order far
  more than PG does).
* ``md_sim``  (MonetDB): **bushy** bulk plan — repeatedly join the two
  smallest connected partial results, column-store style.
* ``nj_sim``  (Neo4J): graph-exploration order — start at the edge with
  the smallest predicate scan and expand one *connected* edge at a time
  choosing the smallest next scan (1-gram only, like a traversal engine
  without join statistics).
"""
from __future__ import annotations

from typing import Callable

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.cardinality import Estimator
from repro.core.catalog import Catalog
from repro.core.query import QueryGraph
from repro.rdf import triple_store


def _scans(triples: DataFrame, query: QueryGraph) -> list[DataFrame]:
    return [
        triple_store.scan(triples, e.label).select(
            F.col("s").alias(e.src), F.col("o").alias(e.dst)
        )
        for e in query.edges
    ]


def _join_left_deep(scans: list[DataFrame], query: QueryGraph, order: list[int]) -> DataFrame:
    out: DataFrame | None = None
    for i in order:
        rel = scans[i]
        if out is None:
            out = rel
            continue
        shared = [c for c in rel.columns if c in out.columns]
        out = out.join(rel, on=shared, how="inner") if shared else out.crossJoin(rel)
    assert out is not None
    return out.select(*query.variables)


def pg_order(query: QueryGraph, catalog: Catalog) -> list[int]:
    """Greedy left-deep order from 1-gram stats under independence."""
    est = Estimator(catalog, query, twogram=False)
    k = len(query.edges)
    order: list[int] = []
    s: frozenset[int] = frozenset()
    while len(order) < k:
        bound = {v for i in s for v in query.edges[i].vars()}
        cands = [
            j
            for j in range(k)
            if j not in s and (not s or set(query.edges[j].vars()) & bound)
        ]
        nxt = min(cands, key=lambda j: (est.extension_walks(s, j), j))
        order.append(nxt)
        s = s | {nxt}
    return order


def pg_sim(triples: DataFrame, query: QueryGraph, catalog: Catalog) -> DataFrame:
    """Cost-based greedy left-deep direct join (PostgreSQL stand-in).

    Plans with 1-gram statistics under independence assumptions —
    PostgreSQL keeps per-relation stats but no cross-predicate join
    correlations, so (unlike WIREFRAME) it cannot see that e.g. the
    actors of hub movies rarely survive the created/hasDuration branch.
    """
    return _join_left_deep(_scans(triples, query), query, pg_order(query, catalog))


def vt_order(query: QueryGraph, catalog: Catalog) -> list[int]:
    """Textual pattern order (Virtuoso's written-order evaluation)."""
    return list(range(len(query.edges)))


def vt_sim(triples: DataFrame, query: QueryGraph, catalog: Catalog) -> DataFrame:
    """Textual-order left-deep direct join (Virtuoso stand-in)."""
    return _join_left_deep(_scans(triples, query), query, vt_order(query, catalog))


# An MD merge tree is an edge index or a pair of subtrees.
MdTree = int | tuple["MdTree", "MdTree"]


def md_tree(query: QueryGraph, catalog: Catalog) -> MdTree:
    """Bushy merge tree: repeatedly pair the two smallest *connected*
    partials (by 1-gram scan count, merged estimate = the larger of the
    two — bulk column-at-a-time processing has no per-tuple pipeline)."""
    parts: list[tuple[set[str], MdTree, float]] = [
        (set(e.vars()), i, float(catalog.count(e.label)))
        for i, e in enumerate(query.edges)
    ]
    while len(parts) > 1:
        best: tuple[int, int] | None = None
        best_size = float("inf")
        for a in range(len(parts)):
            for b in range(a + 1, len(parts)):
                if parts[a][0] & parts[b][0]:
                    size = max(parts[a][2], parts[b][2])
                    if size < best_size:
                        best_size, best = size, (a, b)
        if best is None:  # disconnected query — rejected upstream
            best = (0, 1)
        a, b = best
        va, ta, _ = parts[a]
        vb, tb, _ = parts[b]
        parts = [p for i, p in enumerate(parts) if i not in (a, b)]
        parts.append((va | vb, (ta, tb), best_size))
    return parts[0][1]


def md_sim(triples: DataFrame, query: QueryGraph, catalog: Catalog) -> DataFrame:
    """Bushy bulk direct join (MonetDB stand-in)."""
    scans = _scans(triples, query)

    def build(t: MdTree) -> DataFrame:
        if isinstance(t, int):
            return scans[t]
        dfa, dfb = build(t[0]), build(t[1])
        shared = [c for c in dfb.columns if c in dfa.columns]
        return dfa.join(dfb, on=shared, how="inner") if shared else dfa.crossJoin(dfb)

    return build(md_tree(query, catalog)).select(*query.variables)


def nj_order(query: QueryGraph, catalog: Catalog) -> list[int]:
    """Exploration order: smallest scan first, then the smallest connected
    next scan (1-gram only, a traversal engine without join statistics)."""
    k = len(query.edges)
    order = [min(range(k), key=lambda j: (catalog.count(query.edges[j].label), j))]
    bound = set(query.edges[order[0]].vars())
    while len(order) < k:
        cands = [
            j for j in range(k) if j not in order and set(query.edges[j].vars()) & bound
        ] or [j for j in range(k) if j not in order]
        nxt = min(cands, key=lambda j: (catalog.count(query.edges[j].label), j))
        order.append(nxt)
        bound |= set(query.edges[nxt].vars())
    return order


def nj_sim(triples: DataFrame, query: QueryGraph, catalog: Catalog) -> DataFrame:
    """Exploration-order direct join (Neo4J stand-in)."""
    return _join_left_deep(_scans(triples, query), query, nj_order(query, catalog))


BASELINES: dict[str, Callable[[DataFrame, QueryGraph, Catalog], DataFrame]] = {
    "PG": pg_sim,
    "VT": vt_sim,
    "MD": md_sim,
    "NJ": nj_sim,
}

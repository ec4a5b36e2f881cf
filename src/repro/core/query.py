"""Conjunctive-query (CQ) model.

A SPARQL CQ is a *query graph*: nodes are binding variables, directed
edges carry predicate labels. An answer is a homomorphic embedding — a
tuple of data-graph node ids, one per variable, such that every query
edge maps to a data edge with the same label.

This module provides the query-graph data structure, shape predicates
(connected / tree / cycle extraction), and a translation of a CQ to the
equivalent self-join SQL over a ``(s, p, o)`` triple table — used both by
the DuckDB correctness oracle and by tests.
"""
from __future__ import annotations

from dataclasses import dataclass, field


@dataclass(frozen=True)
class QueryEdge:
    """One triple pattern ``?src --label--> ?dst``."""

    src: str
    label: str
    dst: str

    def __post_init__(self) -> None:
        if self.src == self.dst:
            raise ValueError(f"self-loop query edges are not supported: {self}")
        for v in (self.src, self.dst):
            if not v.isidentifier():
                raise ValueError(f"variable {v!r} must be a SQL-safe identifier")

    def position(self, var: str) -> str:
        """``'s'`` if ``var`` is this edge's subject, ``'o'`` if object."""
        if var == self.src:
            return "s"
        if var == self.dst:
            return "o"
        raise ValueError(f"{var!r} not in {self}")

    def vars(self) -> tuple[str, str]:
        return (self.src, self.dst)

    def other(self, var: str) -> str:
        return self.dst if var == self.src else self.src


@dataclass(frozen=True)
class QueryGraph:
    """A CQ as an ordered tuple of query edges (order = textual order)."""

    edges: tuple[QueryEdge, ...]
    name: str = ""

    def __post_init__(self) -> None:
        if not self.edges:
            raise ValueError("a CQ needs at least one query edge")
        object.__setattr__(self, "edges", tuple(self.edges))

    # -- structure ------------------------------------------------------
    @property
    def variables(self) -> tuple[str, ...]:
        """All variables, in order of first appearance."""
        seen: dict[str, None] = {}
        for e in self.edges:
            seen.setdefault(e.src)
            seen.setdefault(e.dst)
        return tuple(seen)

    def adjacency(self) -> dict[str, set[str]]:
        """Undirected variable adjacency."""
        adj: dict[str, set[str]] = {v: set() for v in self.variables}
        for e in self.edges:
            adj[e.src].add(e.dst)
            adj[e.dst].add(e.src)
        return adj

    def incident(self, var: str) -> list[int]:
        """Indices of edges touching ``var``."""
        return [i for i, e in enumerate(self.edges) if var in e.vars()]

    def is_connected(self) -> bool:
        adj = self.adjacency()
        seen = {self.variables[0]}
        stack = [self.variables[0]]
        while stack:
            for w in adj[stack.pop()]:
                if w not in seen:
                    seen.add(w)
                    stack.append(w)
        return len(seen) == len(self.variables)

    def is_tree(self) -> bool:
        """Acyclic and connected (tree-shaped CQ)."""
        return self.is_connected() and len(self.edges) == len(self.variables) - 1

    def find_cycle(self) -> list[str] | None:
        """Variables of one simple cycle, in cycle order; None if acyclic.

        Recursive DFS on the variable multigraph (edges identified by
        index, so parallel query edges between the same pair form a
        2-cycle — our workloads have none). In undirected DFS every
        non-tree edge is a back edge, so the parent chain from ``v`` to
        the back-edge target ``w`` recovers the cycle in order.
        """
        parent: dict[str, str | None] = {}

        def dfs(v: str, via: int | None) -> list[str] | None:
            for i in self.incident(v):
                if i == via:
                    continue
                w = self.edges[i].other(v)
                if w in parent:
                    cyc = [v]
                    while cyc[-1] != w:
                        cyc.append(parent[cyc[-1]])  # type: ignore[arg-type]
                    return cyc
                parent[w] = v
                found = dfs(w, i)
                if found is not None:
                    return found
            return None

        for start in self.variables:
            if start in parent:
                continue
            parent[start] = None
            found = dfs(start, None)
            if found is not None:
                return found
        return None

    def is_connected_order(self, order: list[int]) -> bool:
        """Is ``order`` (edge indices) a connected left-deep sequence?"""
        if sorted(order) != list(range(len(self.edges))):
            return False
        bound: set[str] = set()
        for i in order:
            e = self.edges[i]
            if bound and not (set(e.vars()) & bound):
                return False
            bound |= set(e.vars())
        return True

    # -- translation -----------------------------------------------------
    def to_sql(self, table: str = "triples") -> str:
        """Equivalent self-join SQL over a ``(s,p,o)`` triple table.

        Every variable is projected under its own name; with set-semantic
        triples the result rows are exactly the CQ's embeddings.
        """
        first: dict[str, str] = {}
        where: list[str] = []
        for i, e in enumerate(self.edges):
            where.append(f"t{i}.p = '{e.label}'")
            for var, col in ((e.src, "s"), (e.dst, "o")):
                ref = f"t{i}.{col}"
                if var in first:
                    where.append(f"{ref} = {first[var]}")
                else:
                    first[var] = ref
        select = ", ".join(f"{first[v]} AS {v}" for v in self.variables)
        tables = ", ".join(f"{table} t{i}" for i in range(len(self.edges)))
        return f"SELECT {select} FROM {tables} WHERE {' AND '.join(where)}"

    @property
    def labels(self) -> tuple[str, ...]:
        return tuple(e.label for e in self.edges)

    def __str__(self) -> str:  # pragma: no cover - debugging aid
        body = ", ".join(f"(?{e.src} {e.label} ?{e.dst})" for e in self.edges)
        return f"{self.name or 'CQ'}[{body}]"


def cq(name: str, *triples: tuple[str, str, str]) -> QueryGraph:
    """Shorthand constructor: ``cq('q', ('a','livesIn','b'), ...)``."""
    return QueryGraph(tuple(QueryEdge(s, p, o) for s, p, o in triples), name=name)

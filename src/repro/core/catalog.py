"""Offline 1-gram / 2-gram edge-label statistics (the WIREFRAME catalog).

The paper's planner estimates node and edge cardinalities from a catalog
of 1-gram and 2-gram edge-label statistics computed offline. Here:

* **1-gram**, per predicate ``p``: ``n(p)`` (triple count), ``ds(p)``
  (distinct subjects), ``do(p)`` (distinct objects).
* **2-gram**, per ordered predicate pair ``(p, q)`` and position pair
  ``(pi, rho)`` in ``{s,o}^2``:
  ``match(p,pi,q,rho)`` — distinct nodes occurring at position ``pi`` of a
  ``p``-triple *and* at position ``rho`` of a ``q``-triple (how many join
  values exist), and
  ``pairs(p,pi,q,rho) = sum_v deg_{p,pi}(v) * deg_{q,rho}(v)`` — the exact
  size of the one-join ``p ⋈ q`` on those positions.

Everything is computed with DataFrame aggregations over per-node degree
tables (size ≤ #triples), never a triple×triple join, then collected to
the driver: with ~100 predicates the catalog is a few thousand numbers.
"""
from __future__ import annotations

import json
from dataclasses import dataclass, field

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

Pos = str  # 's' | 'o'
TwoGramKey = tuple[str, Pos, str, Pos]


@dataclass
class Catalog:
    """Driver-side statistics used by the cardinality estimator."""

    n: dict[str, int]
    ds: dict[str, int]
    do: dict[str, int]
    match: dict[TwoGramKey, int] = field(default_factory=dict)
    pairs: dict[TwoGramKey, int] = field(default_factory=dict)

    # -- lookups ---------------------------------------------------------
    def count(self, p: str) -> int:
        """Total triples with predicate ``p`` (0 if absent)."""
        return self.n.get(p, 0)

    def distinct(self, p: str, pos: Pos) -> int:
        """Distinct nodes at position ``pos`` of predicate ``p``."""
        d = self.ds if pos == "s" else self.do
        return d.get(p, 0)

    def avg_degree(self, p: str, pos: Pos) -> float:
        """Average #edges per distinct node at ``pos`` of ``p``."""
        d = self.distinct(p, pos)
        return self.count(p) / d if d else 0.0

    def match_count(self, p: str, pi: Pos, q: str, rho: Pos) -> int:
        """Distinct shared nodes between (p, pi) and (q, rho)."""
        return self.match.get((p, pi, q, rho), 0)

    def pair_count(self, p: str, pi: Pos, q: str, rho: Pos) -> int:
        """Exact size of the single join p ⋈ q on positions (pi, rho)."""
        return self.pairs.get((p, pi, q, rho), 0)

    @property
    def predicates(self) -> list[str]:
        return sorted(self.n)

    # -- persistence ------------------------------------------------------
    def to_json(self, path: str) -> None:
        """Serialize to a JSON file (tuple keys flattened to '|')."""
        blob = {
            "n": self.n,
            "ds": self.ds,
            "do": self.do,
            "match": {"|".join(k): v for k, v in self.match.items()},
            "pairs": {"|".join(k): v for k, v in self.pairs.items()},
        }
        with open(path, "w") as f:
            json.dump(blob, f)

    @classmethod
    def from_json(cls, path: str) -> "Catalog":
        with open(path) as f:
            blob = json.load(f)

        def unkey(d: dict[str, int]) -> dict[TwoGramKey, int]:
            return {tuple(k.split("|")): v for k, v in d.items()}  # type: ignore[misc]

        return cls(blob["n"], blob["ds"], blob["do"], unkey(blob["match"]), unkey(blob["pairs"]))


def build_catalog(triples: DataFrame) -> Catalog:
    """Compute the full catalog from a (s, p, o) triple DataFrame."""
    one = (
        triples.groupBy("p")
        .agg(
            F.count("*").alias("n"),
            F.countDistinct("s").alias("ds"),
            F.countDistinct("o").alias("do"),
        )
        .collect()
    )
    n = {r["p"]: r["n"] for r in one}
    ds = {r["p"]: r["ds"] for r in one}
    do = {r["p"]: r["do"] for r in one}

    deg = {
        pos: triples.groupBy("p", F.col(pos).alias("v")).agg(F.count("*").alias("d")).persist()
        for pos in ("s", "o")
    }
    match: dict[TwoGramKey, int] = {}
    pairs: dict[TwoGramKey, int] = {}
    for pi in ("s", "o"):
        for rho in ("s", "o"):
            left = deg[pi].select(F.col("p").alias("p1"), "v", F.col("d").alias("d1"))
            right = deg[rho].select(F.col("p").alias("p2"), "v", F.col("d").alias("d2"))
            rows = (
                left.join(right, "v")
                .groupBy("p1", "p2")
                .agg(
                    F.countDistinct("v").alias("m"),
                    F.sum(F.col("d1") * F.col("d2")).alias("j"),
                )
                .collect()
            )
            for r in rows:
                match[(r["p1"], pi, r["p2"], rho)] = r["m"]
                pairs[(r["p1"], pi, r["p2"], rho)] = int(r["j"])
    for df in deg.values():
        df.unpersist()
    return Catalog(n, ds, do, match, pairs)

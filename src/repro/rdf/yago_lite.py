"""YAGO2s-lite: a deterministic synthetic RDF triple generator.

The paper evaluates on YAGO2s (242M triples, 104 distinct predicates),
which is not available offline. This module generates a structurally
similar labeled multigraph at a configurable scale factor:

* typed entity pools (persons, movies, cities, countries, universities,
  companies, products, events, dates, durations) with disjoint integer
  id ranges (an RDF dictionary encoding);
* 18 YAGO predicates covering every label used by the paper's Table-1
  queries, with Zipf-skewed many-many predicates (``actedIn``,
  ``influences``, ``linksTo``) so that hub nodes create the fan-in /
  fan-out multiplicity that makes answer graphs far smaller than
  embedding sets;
* *planted correlations* that close the 4-cycles of the diamond-shaped
  queries (citizenship follows residence, universities link to people who
  died where their alumni were born, events link to the citizenship
  countries of locals, events happen in a person's birth and death
  cities) — without these, random edges almost never close a cycle at
  laptop scale and the cyclic workload would be empty.

SF=1.0 is ~2.4M triples; the benchmark uses SF=0.1 (~240k) and the unit
tests SF=0.01 (~24k). Everything is deterministic in ``seed``.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

# Disjoint id ranges per entity kind (RDF dictionary encoding). Range
# widths are far above any count reachable at SF<=2, so kinds never
# collide and ``kind_of`` below stays a simple range lookup.
ID_BASE = {
    "person": 1_000_000,
    "movie": 2_000_000,
    "city": 3_000_000,
    "country": 3_500_000,
    "university": 4_000_000,
    "company": 4_500_000,
    "product": 5_000_000,
    "event": 6_000_000,
    "date": 7_000_000,
    "duration": 7_500_000,
}

# (base count at SF=1, floor) — floors keep the small-SF graphs dense
# enough that every Table-1 query is non-empty.
_POOL = {
    "person": (200_000, 1_500),
    "movie": (50_000, 400),
    "city": (3_000, 25),
    "country": (200, 12),
    "university": (1_500, 15),
    "company": (2_500, 20),
    "product": (400, 10),
    "event": (8_000, 60),
    "date": (5_000, 365),
    "duration": (200, 30),
}

# Edge-count bases at SF=1 (floors scale with the pool floors implicitly).
# Tuned (DESIGN.md §2) so that at SF=0.1 the snowflake CQs show the
# paper's regime: heavy many-many middles (skewed actedIn hubs) with
# *selective* attribute edges (hasDuration on ~15% of movies, dates on
# ~50%) — direct join orders materialize intermediates 10-100x larger
# than the final embedding sets, while the answer graph prunes first.
_EDGES = {
    "actedIn": 700_000,
    "created": 60_000,
    "influences": 100_000,
    "hasChild": 80_000,
    "isMarriedTo": 60_000,
    "diedIn": 80_000,
    "wasBornIn": 180_000,
    "livesIn": 150_000,
    "isCitizenOf": 150_000,
    "graduatedFrom": 80_000,
    "wasBornOnDate": 180_000,
    "owns": 20_000,
    "exports": 300,
    "happenedIn": 15_000,
    "hasDuration": 8_000,
    "wasCreatedOnDate": 35_000,
    "linksTo": 500_000,
}

PREDICATES = sorted(_EDGES) + ["isLocatedIn"]


def pool_sizes(sf: float) -> dict[str, int]:
    """Entity-pool sizes at scale factor ``sf`` (with small-SF floors)."""
    return {k: max(floor, int(base * sf)) for k, (base, floor) in _POOL.items()}


# Per-predicate minimum edge counts; exports stays sparse (≈1-2 products
# per country) or the snowflake S3 embedding count explodes multiplicatively.
_EDGE_FLOORS = {"exports": 24}


def _n_edges(pred: str, sf: float) -> int:
    return max(_EDGE_FLOORS.get(pred, 60), int(_EDGES[pred] * sf))


def ids(kind: str, sf: float) -> np.ndarray:
    """All entity ids of ``kind`` at scale ``sf``."""
    n = pool_sizes(sf)[kind]
    return np.arange(ID_BASE[kind], ID_BASE[kind] + n, dtype=np.int64)


def kind_of(node_id: int) -> str:
    """Entity kind of a dictionary-encoded node id."""
    best = None
    for kind, base in ID_BASE.items():
        if node_id >= base and (best is None or base > ID_BASE[best]):
            best = kind
    if best is None:
        raise ValueError(f"id {node_id} below every id range")
    return best


def _zipf_pick(g: np.random.Generator, pool: np.ndarray, size: int, alpha: float) -> np.ndarray:
    """Sample ``size`` items from ``pool`` with rank-Zipf(alpha) weights.

    Ranks are shuffled once (deterministically) so the hubs are not always
    the lowest ids.
    """
    n = len(pool)
    w = 1.0 / np.arange(1, n + 1, dtype=np.float64) ** alpha
    w /= w.sum()
    idx = g.choice(n, size=size, p=w)
    perm = g.permutation(n)
    return pool[perm[idx]]


def _uniform_pick(g: np.random.Generator, pool: np.ndarray, size: int) -> np.ndarray:
    return pool[g.integers(0, len(pool), size)]


def _functional(g: np.random.Generator, subjects: np.ndarray, n: int) -> np.ndarray:
    """Pick ``n`` distinct subjects (at-most-one-edge-per-subject preds)."""
    n = min(n, len(subjects))
    return g.choice(subjects, size=n, replace=False)


def yago_lite_pdf(*, sf: float = 0.01, seed: int = 42) -> pd.DataFrame:
    """The full triple set as a pandas DataFrame (s:int64, p:str, o:int64).

    Triples are a *set* (duplicates dropped) so CQ answers under SQL
    self-joins have set semantics, matching SPARQL embeddings.
    """
    g = np.random.default_rng(seed)
    P = {k: ids(k, sf) for k in _POOL}
    person, movie, city, country = P["person"], P["movie"], P["city"], P["country"]
    university, company, product = P["university"], P["company"], P["product"]
    event, date, duration = P["event"], P["date"], P["duration"]

    frames: list[pd.DataFrame] = []

    def emit(p: str, s: np.ndarray, o: np.ndarray) -> None:
        frames.append(pd.DataFrame({"s": s.astype(np.int64), "p": p, "o": o.astype(np.int64)}))

    # --- geography backbone (functional) ------------------------------
    city_country = _uniform_pick(g, country, len(city))  # city -> its country
    emit("isLocatedIn", city, city_country)
    univ_city = _uniform_pick(g, city, len(university))  # university -> its city
    emit("isLocatedIn", university, univ_city)

    # --- person attributes --------------------------------------------
    n = _n_edges("wasBornIn", sf)
    born_s = _functional(g, person, n)
    born_o = _uniform_pick(g, city, len(born_s))
    emit("wasBornIn", born_s, born_o)
    birth_city = dict(zip(born_s.tolist(), born_o.tolist()))

    n = _n_edges("diedIn", sf)
    died_s = _functional(g, person, n)
    # death city == birth city with prob .3 (locals), else random.
    died_o = _uniform_pick(g, city, len(died_s))
    stay = g.random(len(died_s)) < 0.3
    died_o = np.where(
        stay & np.isin(died_s, born_s),
        np.array([birth_city.get(s, o) for s, o in zip(died_s.tolist(), died_o.tolist())]),
        died_o,
    )
    emit("diedIn", died_s, died_o)

    # livesIn and isCitizenOf are deliberately multi-valued (people move,
    # dual citizens): in a diamond CQ the embeddings then multiply over
    # (city, country) *combinations* per person while the AG grows only
    # linearly — the factorization gap the paper reports for cyclic CQs.
    n = _n_edges("livesIn", sf)
    lives_s = _uniform_pick(g, person, n)
    lives_o = _uniform_pick(g, city, n)
    emit("livesIn", lives_s, lives_o)
    city_country_map = dict(zip(city.tolist(), city_country.tolist()))

    n = _n_edges("isCitizenOf", sf)
    # 70% of citizenship edges are planted along a lived-in city's country
    # (closes the livesIn/isCitizenOf/isLocatedIn diamonds); rest uniform.
    n_plant = int(0.7 * n)
    idx = g.integers(0, len(lives_s), n_plant)
    emit(
        "isCitizenOf",
        lives_s[idx],
        np.array([city_country_map[c] for c in lives_o[idx].tolist()], dtype=np.int64),
    )
    n_rand = max(1, n - n_plant)
    emit("isCitizenOf", _uniform_pick(g, person, n_rand), _uniform_pick(g, country, n_rand))
    # pool reused by the Q7 plant below: citizens with a known lived city
    cit_s = lives_s[idx]
    cit_o = np.array([city_country_map[c] for c in lives_o[idx].tolist()], dtype=np.int64)

    n = _n_edges("wasBornOnDate", sf)
    bod_s = _functional(g, person, n)
    emit("wasBornOnDate", bod_s, _uniform_pick(g, date, len(bod_s)))

    n = _n_edges("graduatedFrom", sf)
    grad_s = _uniform_pick(g, person, n)
    grad_o = _zipf_pick(g, university, n, 0.8)
    emit("graduatedFrom", grad_s, grad_o)

    emit("owns", _uniform_pick(g, person, _n_edges("owns", sf)),
         _zipf_pick(g, company, _n_edges("owns", sf), 0.9))

    # --- person-person (skewed: famous people are hubs) ----------------
    for pred, alpha_s, alpha_o in (("influences", 1.0, 0.9), ("hasChild", 0.4, 0.3),
                                   ("isMarriedTo", 0.3, 0.3)):
        n = _n_edges(pred, sf)
        emit(pred, _zipf_pick(g, person, n, alpha_s), _zipf_pick(g, person, n, alpha_o))

    # --- movies (the many-many snowflake fuel) -------------------------
    n = _n_edges("actedIn", sf)
    emit("actedIn", _zipf_pick(g, person, n, 0.9), _zipf_pick(g, movie, n, 1.05))
    n = _n_edges("created", sf)
    emit("created", _zipf_pick(g, person, n, 0.9), _uniform_pick(g, movie, n))
    n = _n_edges("hasDuration", sf)
    emit("hasDuration", _uniform_pick(g, movie, n), _uniform_pick(g, duration, n))
    # movies get 1-2 creation dates (regional releases) so repeated
    # wasCreatedOnDate query edges are satisfiable with distinct bindings.
    n = _n_edges("wasCreatedOnDate", sf)
    emit("wasCreatedOnDate", _uniform_pick(g, movie, n), _uniform_pick(g, date, n))

    # --- countries ------------------------------------------------------
    n = _n_edges("exports", sf)
    emit("exports", _uniform_pick(g, country, n), _uniform_pick(g, product, n))

    # --- events ----------------------------------------------------------
    n = _n_edges("happenedIn", sf)
    hap_s = _uniform_pick(g, event, n)
    hap_o = _uniform_pick(g, city, n)
    # 40% of events are planted on a person's (birth, death) city pair so
    # the diedIn/wasBornIn/happenedIn/happenedIn diamond closes.
    pool_bd = np.intersect1d(born_s, died_s)
    if len(pool_bd):
        n_plant = max(1, int(0.4 * len(event)))
        pe = g.choice(event, size=n_plant, replace=False)
        pp = g.choice(pool_bd, size=n_plant)
        emit("happenedIn", pe, np.array([birth_city[s] for s in pp.tolist()]))
        died_map = dict(zip(died_s.tolist(), died_o.tolist()))
        emit("happenedIn", pe, np.array([died_map[s] for s in pp.tolist()]))
    emit("happenedIn", hap_s, hap_o)

    # --- linksTo: the mixed-pool wiki-link predicate ---------------------
    n_links = _n_edges("linksTo", sf)
    # (a) dense country->country links (Q6 closure): each country links to
    #     up to 40 others.
    k = min(40, len(country) - 1)
    cc_s = np.repeat(country, k)
    cc_o = np.concatenate([g.choice(country[country != c], size=k, replace=False) for c in country])
    emit("linksTo", cc_s, cc_o)
    # (b) university->person links, half planted to people who died where
    #     an alum was born (Q8 closure).
    n_up = max(30, n_links // 25)
    up_s = _uniform_pick(g, university, n_up)
    up_o = _zipf_pick(g, person, n_up, 0.8)
    emit("linksTo", up_s, up_o)
    grad_pdf = pd.DataFrame({"alum": grad_s, "univ": grad_o})
    grad_pdf["bcity"] = grad_pdf["alum"].map(birth_city)
    died_pdf = pd.DataFrame({"dead": died_s, "bcity": died_o})
    planted = grad_pdf.dropna().merge(died_pdf, on="bcity")
    if len(planted):
        take = planted.sample(n=min(len(planted), n_up), random_state=int(g.integers(1 << 31)))
        emit("linksTo", take["univ"].to_numpy(), take["dead"].to_numpy())
    # (c) event->country links, half planted to the citizenship country of
    #     a person living in the event's city (Q7 closure).
    n_ec = max(30, n_links // 25)
    emit("linksTo", _uniform_pick(g, event, n_ec), _uniform_pick(g, country, n_ec))
    hap_pdf = pd.DataFrame({"event": hap_s, "city": hap_o})
    lives_pdf = pd.DataFrame({"who": cit_s, "ctry": cit_o, "city": lives_o[idx]})
    planted = hap_pdf.merge(lives_pdf, on="city")
    if len(planted):
        take = planted.sample(n=min(len(planted), n_ec), random_state=int(g.integers(1 << 31)))
        emit("linksTo", take["event"].to_numpy(), take["ctry"].to_numpy())
    # (d) the remaining mass: zipf-skewed links over a mixed entity pool.
    mixed = np.concatenate([person, movie, city, country, university, event])
    n_rest = max(60, n_links - k * len(country) - 2 * n_up - 2 * n_ec)
    emit("linksTo", _zipf_pick(g, mixed, n_rest, 0.9), _zipf_pick(g, mixed, n_rest, 1.0))

    pdf = pd.concat(frames, ignore_index=True)
    pdf = pdf.drop_duplicates(ignore_index=True)
    # Deterministic row order independent of generation order.
    return pdf.sort_values(["p", "s", "o"], ignore_index=True)


def yago_lite(spark: SparkSession, *, sf: float = 0.01, seed: int = 42) -> DataFrame:
    """The triple set as a Spark DataFrame (s BIGINT, p STRING, o BIGINT)."""
    return spark.createDataFrame(yago_lite_pdf(sf=sf, seed=seed))

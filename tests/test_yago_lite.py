"""Generator invariants for the YAGO2s-lite synthetic dataset (pure pandas)."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.rdf import yago_lite as yl

SF = 0.01
SEED = 42

# predicate -> (subject kinds, object kinds)
TYPING: dict[str, tuple[set[str], set[str]]] = {
    "actedIn": ({"person"}, {"movie"}),
    "created": ({"person"}, {"movie"}),
    "influences": ({"person"}, {"person"}),
    "hasChild": ({"person"}, {"person"}),
    "isMarriedTo": ({"person"}, {"person"}),
    "diedIn": ({"person"}, {"city"}),
    "wasBornIn": ({"person"}, {"city"}),
    "livesIn": ({"person"}, {"city"}),
    "isCitizenOf": ({"person"}, {"country"}),
    "graduatedFrom": ({"person"}, {"university"}),
    "wasBornOnDate": ({"person"}, {"date"}),
    "owns": ({"person"}, {"company"}),
    "exports": ({"country"}, {"product"}),
    "happenedIn": ({"event"}, {"city"}),
    "hasDuration": ({"movie"}, {"duration"}),
    "wasCreatedOnDate": ({"movie"}, {"date"}),
    "isLocatedIn": ({"city", "university"}, {"country", "city"}),
    "linksTo": (
        {"person", "movie", "city", "country", "university", "event"},
        {"person", "movie", "city", "country", "university", "event"},
    ),
}

FUNCTIONAL = ["diedIn", "wasBornIn", "wasBornOnDate"]


@pytest.fixture(scope="module")
def pdf() -> pd.DataFrame:
    return yl.yago_lite_pdf(sf=SF, seed=SEED)


def test_deterministic():
    a = yl.yago_lite_pdf(sf=SF, seed=SEED)
    b = yl.yago_lite_pdf(sf=SF, seed=SEED)
    pd.testing.assert_frame_equal(a, b)


def test_seed_changes_data():
    a = yl.yago_lite_pdf(sf=SF, seed=1)
    b = yl.yago_lite_pdf(sf=SF, seed=2)
    assert not a.equals(b)


def test_schema(pdf):
    assert list(pdf.columns) == ["s", "p", "o"]
    assert pdf["s"].dtype == np.int64
    assert pdf["o"].dtype == np.int64
    assert pdf["p"].map(type).eq(str).all()


def test_set_semantics(pdf):
    assert not pdf.duplicated().any()


def test_all_predicates_present(pdf):
    assert set(pdf["p"]) == set(yl.PREDICATES)


def test_scale_monotone():
    small = len(yl.yago_lite_pdf(sf=0.005, seed=SEED))
    big = len(yl.yago_lite_pdf(sf=0.02, seed=SEED))
    assert big > small


def test_sf01_size_band(pdf):
    # ~24k triples at SF=0.01 (DESIGN.md)
    assert 15_000 <= len(pdf) <= 40_000


@pytest.mark.parametrize("kind", sorted(yl.ID_BASE))
def test_pool_ids_within_range(kind):
    arr = yl.ids(kind, SF)
    assert len(arr) == yl.pool_sizes(SF)[kind]
    nxt = min((b for b in yl.ID_BASE.values() if b > yl.ID_BASE[kind]), default=None)
    assert arr.min() == yl.ID_BASE[kind]
    if nxt is not None:
        assert arr.max() < nxt


@pytest.mark.parametrize("kind", sorted(yl.ID_BASE))
def test_kind_of_roundtrip(kind):
    arr = yl.ids(kind, SF)
    assert yl.kind_of(int(arr[0])) == kind
    assert yl.kind_of(int(arr[-1])) == kind


@pytest.mark.parametrize("pred", sorted(TYPING))
def test_predicate_typing(pdf, pred):
    skinds, okinds = TYPING[pred]
    sub = pdf[pdf["p"] == pred]
    assert len(sub) > 0, f"{pred} generated no triples"
    assert {yl.kind_of(v) for v in sub["s"].unique()} <= skinds
    assert {yl.kind_of(v) for v in sub["o"].unique()} <= okinds


@pytest.mark.parametrize("pred", FUNCTIONAL)
def test_functional_predicates(pdf, pred):
    sub = pdf[pdf["p"] == pred]
    assert sub["s"].is_unique, f"{pred} must have at most one object per subject"


def test_acted_in_has_hubs(pdf):
    """The many-many fan that makes factorization matter (paper §2)."""
    per_movie = pdf[pdf["p"] == "actedIn"].groupby("o").size()
    assert per_movie.max() >= 10
    per_person = pdf[pdf["p"] == "actedIn"].groupby("s").size()
    assert per_person.max() >= 5


def test_city_located_in_exactly_one_country(pdf):
    cities = set(yl.ids("city", SF).tolist())
    sub = pdf[(pdf["p"] == "isLocatedIn") & (pdf["s"].isin(cities))]
    assert set(sub["s"]) == cities
    assert sub["s"].is_unique


def test_planted_citizenship_correlation(pdf):
    """>half of citizenship edges close a livesIn/isLocatedIn diamond."""
    lives = pdf[pdf["p"] == "livesIn"][["s", "o"]].rename(columns={"o": "city"})
    loc = pdf[pdf["p"] == "isLocatedIn"].set_index("s")["o"]
    lives["ctry"] = lives["city"].map(loc)
    cit = pdf[pdf["p"] == "isCitizenOf"][["s", "o"]]
    closed = cit.merge(lives[["s", "ctry"]].drop_duplicates(), on="s", how="left")
    frac = (
        closed.assign(hit=closed["o"] == closed["ctry"]).groupby(["s", "o"])["hit"].any().mean()
    )
    assert frac > 0.5


def test_multivalued_residence(pdf):
    """livesIn is multi-valued so diamond embeddings multiply (DESIGN.md)."""
    per_person = pdf[pdf["p"] == "livesIn"].groupby("s").size()
    assert per_person.max() >= 2


def test_country_links_dense(pdf):
    countries = set(yl.ids("country", SF).tolist())
    links = pdf[(pdf["p"] == "linksTo") & pdf["s"].isin(countries) & pdf["o"].isin(countries)]
    assert len(links) >= 5 * len(countries)


def test_spark_roundtrip(spark, pdf):
    df = yl.yago_lite(spark, sf=SF, seed=SEED)
    assert df.count() == len(pdf)
    assert dict(df.dtypes) == {"s": "bigint", "p": "string", "o": "bigint"}

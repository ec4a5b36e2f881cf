"""Shared fixtures: one SF=0.01 YAGO-lite dataset + catalog per session.

The root conftest provides the session SparkSession; everything here is
derived from it once and shared, because catalog construction and triple
upload dominate per-test time otherwise.
"""
from __future__ import annotations

import pandas as pd
import pytest
from pyspark.sql import DataFrame, SparkSession

from repro.core.catalog import Catalog, build_catalog
from repro.rdf.yago_lite import yago_lite_pdf

TEST_SF = 0.01
TEST_SEED = 42


@pytest.fixture(scope="session")
def triples_pdf() -> pd.DataFrame:
    """SF=0.01 YAGO-lite triples as pandas (DuckDB oracle input)."""
    return yago_lite_pdf(sf=TEST_SF, seed=TEST_SEED)


@pytest.fixture(scope="session")
def triples(spark: SparkSession, triples_pdf: pd.DataFrame) -> DataFrame:
    """The same triples as a persisted Spark DataFrame."""
    df = spark.createDataFrame(triples_pdf).persist()
    df.count()
    yield df
    df.unpersist()


@pytest.fixture(scope="session")
def catalog(triples: DataFrame) -> Catalog:
    """The 1-/2-gram statistics catalog over the session triples."""
    return build_catalog(triples)


def micro_triples(spark: SparkSession, rows: list[tuple[int, str, int]]) -> DataFrame:
    """Hand-built micro data graphs for algorithm unit tests."""
    pdf = pd.DataFrame(rows, columns=["s", "p", "o"]).drop_duplicates()
    pdf["s"] = pdf["s"].astype("int64")
    pdf["o"] = pdf["o"].astype("int64")
    return spark.createDataFrame(pdf)

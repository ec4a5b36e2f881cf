"""Benchmark fixtures: a Parquet-backed YAGO2s-lite store at bench scale.

Environment knobs:
  REPRO_BENCH_SF       scale factor (default 0.1, ~240k triples)
  REPRO_BENCH_SEED     generator seed (default 42)
  REPRO_BENCH_ROUNDS   timed rounds per cell (default 1; +1 warm-up)
  REPRO_BENCH_TIMEOUT  per-execution budget in seconds (default 120,
                       the scaled stand-in for the paper's 300 s)
"""
from __future__ import annotations

import os

import pytest
from pyspark.sql import SparkSession

from repro.core.catalog import Catalog, build_catalog
from repro.rdf import triple_store
from repro.rdf.yago_lite import yago_lite

BENCH_SF = float(os.environ.get("REPRO_BENCH_SF", "0.1"))
BENCH_SEED = int(os.environ.get("REPRO_BENCH_SEED", "42"))
BENCH_ROUNDS = int(os.environ.get("REPRO_BENCH_ROUNDS", "1"))
BENCH_TIMEOUT = float(os.environ.get("REPRO_BENCH_TIMEOUT", "120"))


@pytest.fixture(scope="session")
def bench_env(spark: SparkSession, tmp_path_factory) -> tuple:
    """(Parquet-backed triples, catalog) at REPRO_BENCH_SF."""
    # keep broadcast joins off under AQE as well, so the baselines'
    # many-many joins truly shuffle (root conftest handles the static conf)
    spark.conf.set("spark.sql.adaptive.autoBroadcastJoinThreshold", "-1")
    path = str(tmp_path_factory.mktemp("store") / f"yago_sf{BENCH_SF}")
    triples = triple_store.materialize(
        spark, yago_lite(spark, sf=BENCH_SF, seed=BENCH_SEED), path
    )
    catalog = build_catalog(triples)
    return triples, catalog

"""Shared SparkSession factory for standalone job entrypoints.

Mirrors the pytest session fixture's configuration (shuffle partitions,
Arrow, broadcast joins disabled) so jobs and tests exercise identical
plans. Inside pytest, always use the ``spark`` fixture instead.
"""
from __future__ import annotations

import os

from pyspark.sql import SparkSession


def _driver_mem() -> str:
    """~75% of the container memory limit (same derivation as conftest.py);
    the 1g local-mode default OOMs on the larger baseline intermediates."""
    if m := os.environ.get("SPARK_DRIVER_MEM"):
        return m
    for p in (
        "/sys/fs/cgroup/memory.max",
        "/sys/fs/cgroup/memory/memory.limit_in_bytes",
    ):
        try:
            raw = open(p).read().strip()
            if not raw or raw == "max":
                continue
            gib = int(raw) / (1 << 30)
            if 1 <= gib <= 1024:
                return f"{max(1, int(gib * 0.75))}g"
        except (OSError, ValueError):
            continue
    return "48g"


def get_spark(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .master(os.environ.get("SPARK_MASTER", "local[*]"))
        .config("spark.driver.memory", _driver_mem())
        .config(
            "spark.sql.shuffle.partitions",
            os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"),
        )
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.sql.adaptive.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )

"""The Table-1 workload: 5 snowflake (acyclic) + 5 diamond (cyclic) CQs.

Rows 1-8 use the paper's own per-row label multisets (Table 1, column 2),
assembled into type-consistent query graphs for the YAGO2s-lite schema —
the paper's template figures are not recoverable from the text, so the
exact variable wiring is a documented reconstruction. Diamond rows 9-10
are garbled in the source text and are replaced by two mined diamonds
over the same predicate vocabulary (see DESIGN.md §2 / EXPERIMENTS.md).

Paper-reported numbers (times in seconds; ``None`` = ``*`` timeout at
300 s) are attached so the harness can print paper-vs-measured rows.
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.core.query import QueryGraph, cq


@dataclass(frozen=True)
class PaperRow:
    """One Table-1 row as printed in the paper."""

    query: QueryGraph
    shape: str  # "snowflake" | "diamond"
    pg: float | None
    wf: float | None
    vt: float | None
    md: float | None
    nj: float | None
    ag_size: int | None  # iAG for snowflakes, (non-ideal) AG for diamonds
    embeddings: int | None


SNOWFLAKES: tuple[QueryGraph, ...] = (
    cq(
        "S1",
        ("x", "diedIn", "c1"),
        ("x", "influences", "y"),
        ("y", "actedIn", "m1"),
        ("y", "owns", "co"),
        ("m1", "wasCreatedOnDate", "d1"),
        ("z", "actedIn", "m1"),
        ("z", "created", "m2"),
        ("m2", "hasDuration", "dur"),
        ("m2", "wasCreatedOnDate", "d2"),
    ),
    cq(
        "S2",
        ("x", "hasChild", "k"),
        ("w", "influences", "x"),
        ("x", "actedIn", "m1"),
        ("y", "actedIn", "m1"),
        ("y", "wasBornIn", "c"),
        ("y", "created", "m2"),
        ("z", "actedIn", "m2"),
        ("m2", "hasDuration", "dur"),
        ("m2", "wasCreatedOnDate", "d"),
    ),
    cq(
        "S3",
        ("x", "isCitizenOf", "n"),
        ("n", "exports", "pr"),
        ("w", "influences", "x"),
        ("x", "actedIn", "m1"),
        ("m1", "wasCreatedOnDate", "d1"),
        ("y", "actedIn", "m1"),
        ("y", "created", "m2"),
        ("m2", "hasDuration", "dur"),
        ("m2", "wasCreatedOnDate", "d2"),
    ),
    cq(
        "S4",
        ("x", "isMarriedTo", "sp"),
        ("w", "influences", "x"),
        ("x", "actedIn", "m1"),
        ("y", "actedIn", "m1"),
        ("y", "wasBornOnDate", "bd"),
        ("y", "created", "m2"),
        ("z", "actedIn", "m2"),
        ("m2", "hasDuration", "dur"),
        ("m2", "wasCreatedOnDate", "d"),
    ),
    cq(
        "S5",
        ("x", "isMarriedTo", "sp"),
        ("sp", "diedIn", "c1"),
        ("x", "actedIn", "m1"),
        ("x", "wasBornIn", "c2"),
        ("x", "owns", "co"),
        ("y", "actedIn", "m1"),
        ("m1", "wasCreatedOnDate", "d1"),
        ("m1", "hasDuration", "dur"),
        ("m1", "wasCreatedOnDate", "d2"),
    ),
)

DIAMONDS: tuple[QueryGraph, ...] = (
    cq(
        "D6",
        ("a", "livesIn", "b"),
        ("a", "isCitizenOf", "c"),
        ("b", "isLocatedIn", "d"),
        ("c", "linksTo", "d"),
    ),
    cq(
        "D7",
        ("a", "livesIn", "b"),
        ("a", "isCitizenOf", "c"),
        ("e", "happenedIn", "b"),
        ("e", "linksTo", "c"),
    ),
    cq(
        "D8",
        ("a", "diedIn", "b"),
        ("c", "wasBornIn", "b"),
        ("c", "graduatedFrom", "u"),
        ("u", "linksTo", "a"),
    ),
    # Rows 9-10 are unreadable in the source text; mined substitutes:
    cq(
        "D9",
        ("a", "wasBornIn", "b"),
        ("a", "livesIn", "c"),
        ("b", "isLocatedIn", "d"),
        ("c", "isLocatedIn", "d"),
    ),
    cq(
        "D10",
        ("a", "diedIn", "b"),
        ("a", "wasBornIn", "c"),
        ("e", "happenedIn", "b"),
        ("e", "happenedIn", "c"),
    ),
)

ALL_QUERIES: tuple[QueryGraph, ...] = SNOWFLAKES + DIAMONDS

# Paper Table 1, as printed (None = '*' = killed at 300 s; rows 9-10 were
# unreadable, their paper numbers are unknown).
PAPER_TABLE1: tuple[PaperRow, ...] = (
    PaperRow(SNOWFLAKES[0], "snowflake", 51, 16, None, None, None, 1660, 2_931_986),
    PaperRow(SNOWFLAKES[1], "snowflake", 88, 5, 151, None, None, 993, 2_847_184),
    PaperRow(SNOWFLAKES[2], "snowflake", 69, 12, None, None, None, 1140, 2_670_339),
    PaperRow(SNOWFLAKES[3], "snowflake", 78, 8, None, None, None, 3317, 2_569_017),
    PaperRow(SNOWFLAKES[4], "snowflake", 42, 12, None, None, None, 10_761, 1_306_406),
    PaperRow(DIAMONDS[0], "diamond", None, 103, None, None, None, 833_355, 58_785_214),
    PaperRow(DIAMONDS[1], "diamond", None, 118, 38, None, 127, 22_555, 100_160),
    PaperRow(DIAMONDS[2], "diamond", None, 20, 110, None, 213, 68_720, 106_214),
    PaperRow(DIAMONDS[3], "diamond", None, None, None, None, None, None, None),
    PaperRow(DIAMONDS[4], "diamond", None, None, None, None, None, None, None),
)

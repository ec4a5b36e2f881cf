"""Table 1 benchmark: per-(query, system) execution time at bench scale.

One pytest-benchmark case per Table-1 cell: 10 queries × {PG, WF, VT,
MD, NJ}. Each case performs the full evaluation — plan, build the answer
graph (WF only), and retrieve/count all result tuples — with one warm-up
round, matching the paper's warm-cache protocol. Cells that exceed
REPRO_BENCH_TIMEOUT are skipped, mirroring the paper's ``*`` entries.

The complete table (including the AG-size and embedding-count columns and
the paper-vs-measured diff) is produced by ``jobs/run_table1.py``; this
module is the pytest-benchmark view of the same cells.
"""
from __future__ import annotations

import pytest

from benchmarks.conftest import BENCH_ROUNDS, BENCH_TIMEOUT
from repro.core.queries_table1 import PAPER_TABLE1
from repro.experiments import table1


@pytest.mark.parametrize("system", table1.SYSTEMS)
@pytest.mark.parametrize("row", PAPER_TABLE1, ids=lambda r: r.query.name)
def test_table1_cell(benchmark, spark, bench_env, row, system):
    triples, catalog = bench_env
    runner = table1._make_runner(system, triples, row.query, catalog)

    def target():
        try:
            return table1.run_with_timeout(spark, runner, BENCH_TIMEOUT)
        except table1.Timeout:
            pytest.skip(
                f"{row.query.name}/{system} exceeded {BENCH_TIMEOUT:.0f}s "
                "(a '*' cell in Table 1)"
            )

    n = benchmark.pedantic(target, rounds=BENCH_ROUNDS, iterations=1, warmup_rounds=1)
    benchmark.extra_info["result_tuples"] = n
    benchmark.extra_info["shape"] = row.shape
    paper_time = getattr(row, system.lower())
    benchmark.extra_info["paper_seconds"] = "*" if paper_time is None else paper_time

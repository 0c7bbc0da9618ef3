"""Table A benchmark — per-query execution time, AIQL engine vs the
semantically-equivalent big SQL (paper Figure 4 / "3.6 min vs 77 min, 21x").

Each workload query is benchmarked twice under the same group so
pytest-benchmark's comparison table lines the two systems up per query.
Pedantic timing, one warmup + two measured rounds: Table A is a
wall-clock comparison of two execution strategies over identical data, and
the warmup keeps Spark's session cold-start (JIT, codegen caches) out of
whichever bench happens to run first.

Regenerate the full table (totals, log10, speedup): jobs/table_a_performance.py.
"""
import pytest

from repro.core.baseline import run_baseline
from repro.workload.queries import QUERIES

IDS = [q.name for q in QUERIES]


@pytest.mark.parametrize("q", QUERIES, ids=IDS)
def test_aiql_engine(benchmark, bench_engine, q):
    """Optimized engine: partition-pruned scans, pruning-power join order,
    measured broadcasts."""
    benchmark.group = q.name
    benchmark.name = "aiql"
    n = benchmark.pedantic(
        lambda: bench_engine.execute(q.aiql).count(),
        rounds=2, iterations=1, warmup_rounds=1)
    assert n >= 1  # the injected attack guarantees at least one match


@pytest.mark.parametrize("q", QUERIES, ids=IDS)
def test_sql_baseline(benchmark, spark, bench_flat, q):
    """Baseline: the one-big-SQL plan over the flat, unpartitioned table
    with automatic broadcasts disabled."""
    benchmark.group = q.name
    benchmark.name = "sql"
    n = benchmark.pedantic(
        lambda: run_baseline(spark, q.aiql, bench_flat).count(),
        rounds=2, iterations=1, warmup_rounds=1)
    assert n >= 1

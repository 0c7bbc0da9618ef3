"""Benchmark fixtures: one SF-configurable dataset shared by all benches.

``REPRO_BENCH_SF`` (default 0.5 ≈ 10M events + the injected attack)
controls scale. The default is deliberately above the ~100 MB tier: the
paper's comparison is about scan/join work on bulk data, and below ~10M
rows Spark's fixed per-job overhead (~0.3 s) swamps the data costs on both
sides, hiding the effect being measured (see EXPERIMENTS.md). Set
``REPRO_BENCH_SF=0.1`` for a quick, overhead-dominated run.

The dataset is written once per session in both store layouts; the AIQL
engine reads the partitioned layout, the baseline the flat one — exactly
the Table A setup in DESIGN.md §5.
"""
import os

import pytest


@pytest.fixture(scope="session")
def bench_sf() -> float:
    return float(os.environ.get("REPRO_BENCH_SF", "0.5"))


@pytest.fixture(scope="session")
def bench_store(spark, bench_sf, tmp_path_factory):
    from repro.monitor.generator import gen_events
    from repro.monitor.storage import EventStore

    store = EventStore(spark, tmp_path_factory.mktemp("bench_store"))
    store.write(gen_events(spark, sf=bench_sf))
    return store


@pytest.fixture(scope="session")
def bench_engine(spark, bench_store):
    from repro.core.engine import AIQLEngine

    return AIQLEngine(spark, store=bench_store)


@pytest.fixture(scope="session")
def bench_flat(bench_store):
    df = bench_store.events_flat()
    df.count()  # warm the file listing so the first bench isn't penalized
    return df

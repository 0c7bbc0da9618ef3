"""Table B benchmark — query conciseness, AIQL vs equivalent SQL (paper:
SQL has >=3.0x constraints, 3.5x words, 5.2x chars).

The metric computation itself is benchmarked (parse + analyze + SQL
synthesis for all 20 queries); the assertions verify the paper's direction
holds on this workload. Full per-query table: jobs/table_b_conciseness.py.
"""
from jobs.table_b_conciseness import measure_all


def test_conciseness_ratios(benchmark):
    rows, ratios = benchmark(measure_all)
    assert len(rows) == 20
    # Paper's shape: SQL is several times larger on every metric.
    assert ratios["constraints"] >= 2.0
    assert ratios["words"] >= 2.0
    assert ratios["chars"] >= 2.0

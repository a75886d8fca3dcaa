"""Benchmark for Table 1: dataset generation + statistics.

Trivially cheap next to the clustering tables, but keeps the
table->bench mapping complete: regenerating Table 1's rows is itself a
measured, reproducible operation.
"""
from __future__ import annotations

from jobs.table1_graph_stats import table1_rows


def test_bench_table1_stats(benchmark):
    rows = benchmark.pedantic(
        lambda: table1_rows(rmat_scales=(10, 12), wq_n=10_000),
        rounds=1,
        iterations=1,
    )
    assert len(rows) == 7
    assert all(r["m"] > 0 for r in rows)

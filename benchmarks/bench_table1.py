"""Benchmark + reproduction of Table 1 (dataset statistics).

Run: pytest benchmarks/bench_table1.py --benchmark-only
The produced table is printed (captured into bench_output.txt) and the
rows are compared against the paper's in EXPERIMENTS.md.
"""
from __future__ import annotations

from repro.tables import format_rows, table1_rows


def test_table1(benchmark, spark):
    rows = benchmark.pedantic(
        lambda: table1_rows(spark), rounds=1, iterations=1
    )
    print()
    print(format_rows("Table 1 — dataset statistics (ours, bench scale)", rows))
    assert len(rows) == 4
    for r in rows:
        assert r["matches"] > 0

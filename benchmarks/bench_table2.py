"""Benchmark + reproduction of Table 2 (block statistics)."""
from __future__ import annotations

from repro.tables import format_rows, table2_rows


def test_table2(benchmark, spark):
    rows = benchmark.pedantic(
        lambda: table2_rows(spark), rounds=1, iterations=1
    )
    print()
    print(format_rows("Table 2 — block statistics (ours, bench scale)", rows))
    assert len(rows) == 4
    for r in rows:
        # the paper's blocking picture: near-total recall, low precision,
        # comparisons far below the Cartesian product
        assert r["recall"] >= 99.0
        assert r["token_comparisons"] + r["name_comparisons"] < r["cartesian"]

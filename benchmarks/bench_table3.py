"""Benchmark + reproduction of Table 3 (MinoanER vs baselines).

One bench per dataset so timings are attributable; each runs MinoanER,
grid-tuned BSL, SiGMa-lite and PARIS-lite on the bench-scale profile.
"""
from __future__ import annotations

import pytest

from repro.tables import format_rows, table3_rows

_ROWS: list[dict] = []


@pytest.mark.parametrize(
    "dataset", ["restaurant", "rexa_dblp", "bbc_dbpedia", "yago_imdb"]
)
def test_table3(benchmark, spark, dataset):
    rows = benchmark.pedantic(
        lambda: table3_rows(spark, profiles=[dataset]),
        rounds=1,
        iterations=1,
    )
    _ROWS.extend(rows)
    print()
    print(format_rows(f"Table 3 — {dataset} (ours, bench scale)", rows))
    ours = {r["method"]: r for r in rows}
    assert ours["MinoanER"]["recall"] > 0


def test_table3_shape(benchmark):
    """The paper's headline shape, asserted on our measured rows:
    MinoanER ~ties BSL on Restaurant and clearly beats it on the two
    high-Variety datasets; PARIS collapses on BBCmusic-DBpedia.

    Uses the benchmark fixture (trivially) so --benchmark-only runs it
    after the per-dataset benches populate _ROWS.
    """
    if not _ROWS:
        pytest.skip("table3 benches did not run")

    def check():
        by = {(r["dataset"], r["method"]): r["f1"] for r in _ROWS}
        assert by[("restaurant", "BSL")] >= 90
        assert by[("restaurant", "MinoanER")] >= 90
        for ds in ("bbc_dbpedia", "yago_imdb"):
            assert by[(ds, "MinoanER")] > by[(ds, "BSL")]
        assert by[("bbc_dbpedia", "PARIS-lite")] < 20
        assert by[("bbc_dbpedia", "MinoanER")] >= 70

    benchmark.pedantic(check, rounds=1, iterations=1)

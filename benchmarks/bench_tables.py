"""One benchmark per evaluation table (paper Tables 4–10).

Each benchmark regenerates the corresponding table end-to-end, so the
recorded time is the full cost of reproducing that artifact. Heavy
multi-policy experiments run a single round.
"""
import pytest

from repro.experiments import (
    table4_defaults,
    table5_manual_pagerank,
    table6_stats,
    table7_lhs,
    table8_recommendations,
    table9_bo_svm,
    table10_overheads,
)


def _once(benchmark, fn):
    result = benchmark.pedantic(fn, rounds=1, iterations=1)
    assert result.rows
    return result


def test_table04_defaults(benchmark):
    result = benchmark(table4_defaults.run)
    assert len(result.rows) == 6


def test_table05_manual_pagerank(benchmark):
    result = benchmark(table5_manual_pagerank.run)
    assert len(result.rows) == 4


def test_table06_stats(benchmark):
    result = _once(benchmark, table6_stats.run)
    assert len(result.rows) == 11


def test_table07_lhs(benchmark):
    result = benchmark(table7_lhs.run)
    assert len(result.rows) == 4


def test_table08_recommendations(benchmark):
    result = _once(benchmark, table8_recommendations.run)
    assert len(result.rows) == 25  # 5 apps x 5 policies


def test_table09_bo_svm(benchmark):
    result = _once(benchmark, table9_bo_svm.run)
    assert len(result.rows) >= 10


def test_table10_overheads(benchmark):
    result = _once(benchmark, table10_overheads.run)
    assert len(result.rows) == 4

"""Benchmarks for the numeric figure reproductions (Figs 16/17/21/26/27)."""
from repro.experiments import (
    fig16_overheads,
    fig17_perf,
    fig26_rf,
    fig27_ddpg_generality,
    tpch_relm,
)


def _once(benchmark, fn):
    result = benchmark.pedantic(fn, rounds=1, iterations=1)
    assert result.rows
    return result


def test_fig16_training_overheads(benchmark):
    result = _once(benchmark, lambda: fig16_overheads.run(n_repeats=1))
    assert len(result.rows) == 20  # 5 apps x 4 policies


def test_fig17_performance(benchmark):
    result = _once(benchmark, fig17_perf.run)
    assert len(result.rows) == 25


def test_fig21_tpch_relm(benchmark):
    result = _once(benchmark, tpch_relm.run)
    assert len(result.rows) == 2


def test_fig26_rf_surrogate(benchmark):
    result = _once(benchmark, lambda: fig26_rf.run(n_repeats=1))
    assert len(result.rows) == 4


def test_fig27_ddpg_generality(benchmark):
    result = _once(benchmark, fig27_ddpg_generality.run)
    assert len(result.rows) == 3

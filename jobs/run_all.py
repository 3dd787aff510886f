"""Run every table/figure experiment and print the full report.

This is what regenerates the numbers recorded in EXPERIMENTS.md.
"""
import _common  # noqa: F401

from repro.experiments import (
    fig16_overheads,
    fig17_perf,
    fig26_rf,
    fig27_ddpg_generality,
    table4_defaults,
    table5_manual_pagerank,
    table6_stats,
    table7_lhs,
    table8_recommendations,
    table9_bo_svm,
    table10_overheads,
    tpch_relm,
)

MODULES = (
    table4_defaults,
    table5_manual_pagerank,
    table6_stats,
    table7_lhs,
    table8_recommendations,
    table9_bo_svm,
    table10_overheads,
    fig16_overheads,
    fig17_perf,
    tpch_relm,
    fig26_rf,
    fig27_ddpg_generality,
)

if __name__ == "__main__":
    for mod in MODULES:
        mod.run().print()
        print()

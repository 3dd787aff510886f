"""Exhaustive search: sequential baseline + Spark-parallel sweep."""
import pytest

from repro.cluster import CLUSTER_A
from repro.config import grid_configs
from repro.simcluster import simulate
from repro.tuners.base import Objective
from repro.tuners.exhaustive import (
    best_safe_row,
    cluster_by_name,
    exhaustive_search,
    exhaustive_search_spark,
    grid_df,
    top_percentile_threshold,
)
from repro.workloads import dominant_pool, workload_model


class TestSequential:
    def test_covers_whole_grid(self):
        obj = Objective(workload_model("SVM"), CLUSTER_A)
        res = exhaustive_search(obj, dominant_pool="cache")
        assert res.iterations == len(grid_configs(CLUSTER_A, dominant_pool="cache"))

    def test_best_is_clean_minimum(self):
        obj = Objective(workload_model("PageRank"), CLUSTER_A)
        res = exhaustive_search(obj, dominant_pool="cache")
        clean = [s for s in res.samples if not s.aborted]
        assert res.best_runtime_sec <= min(s.runtime_sec for s in clean) + 1e-9


class TestClusterResolver:
    @pytest.mark.parametrize("name", ["A", "B"])
    def test_known(self, name):
        assert cluster_by_name(name).name == name

    def test_unknown(self):
        with pytest.raises(KeyError):
            cluster_by_name("C")


class TestSparkSweep:
    def test_grid_df_rows(self, spark):
        df = grid_df(spark, CLUSTER_A, dominant_pool="cache")
        assert df.count() == len(grid_configs(CLUSTER_A, dominant_pool="cache"))

    @pytest.mark.parametrize("name", ["PageRank", "SortByKey"])
    def test_spark_sweep_matches_sequential(self, spark, name):
        # The applyInPandas evaluation must agree with in-process
        # simulation config-for-config (same seeds, same simulator).
        result = exhaustive_search_spark(
            spark, name, CLUSTER_A, dominant_pool=dominant_pool(name)
        )
        assert len(result) == 176
        m = workload_model(name)
        for _, row in result.head(5).iterrows():
            from repro.config import MemoryConfig

            cfg = MemoryConfig(
                int(row.containers_per_node), int(row.task_concurrency),
                float(row.cache_capacity), float(row.shuffle_capacity), int(row.new_ratio),
            )
            again = simulate(m, cfg, CLUSTER_A, seed=0)
            assert again.runtime_sec == pytest.approx(row.runtime_sec)
            assert again.aborted == bool(row.aborted)

    def test_best_safe_row_has_no_failures(self, spark):
        result = exhaustive_search_spark(spark, "PageRank", CLUSTER_A, dominant_pool="cache")
        best = best_safe_row(result)
        assert not best.aborted and best.failed_containers == 0

    def test_top_percentile_threshold_ordering(self, spark):
        result = exhaustive_search_spark(spark, "SortByKey", CLUSTER_A, dominant_pool="shuffle")
        thr = top_percentile_threshold(result)
        assert result.runtime_sec.min() <= thr <= result.runtime_sec.max()

"""SimulatedRun behavior: determinism, structure, failure accounting."""
import pytest

from repro.cluster import CLUSTER_A, CLUSTER_B
from repro.config import MemoryConfig, max_resource_allocation
from repro.simcluster import simulate
from repro.workloads import SUITE, workload_model


class TestDeterminism:
    @pytest.mark.parametrize("name", SUITE)
    def test_same_seed_same_run(self, name):
        m = workload_model(name)
        cfg = max_resource_allocation(CLUSTER_A)
        a = simulate(m, cfg, CLUSTER_A, seed=7)
        b = simulate(m, cfg, CLUSTER_A, seed=7)
        assert a.runtime_sec == b.runtime_sec
        assert a.failed_containers == b.failed_containers

    def test_different_seeds_jitter_runtime(self):
        m = workload_model("WordCount")
        cfg = max_resource_allocation(CLUSTER_A)
        rts = {simulate(m, cfg, CLUSTER_A, seed=s).runtime_sec for s in range(5)}
        assert len(rts) == 5  # log-normal noise differs per seed

    def test_noise_is_small_for_clean_runs(self):
        m = workload_model("WordCount")
        cfg = max_resource_allocation(CLUSTER_A)
        rts = [simulate(m, cfg, CLUSTER_A, seed=s).runtime_sec for s in range(10)]
        assert max(rts) / min(rts) < 1.25


class TestStructure:
    @pytest.mark.parametrize("name", SUITE)
    def test_positive_runtime(self, name):
        r = simulate(workload_model(name), max_resource_allocation(CLUSTER_A), CLUSTER_A)
        assert r.runtime_sec > 0
        assert r.runtime_min == pytest.approx(r.runtime_sec / 60)

    @pytest.mark.parametrize("name", SUITE)
    def test_utilizations_bounded(self, name):
        r = simulate(workload_model(name), max_resource_allocation(CLUSTER_A), CLUSTER_A)
        assert 0 <= r.cpu_avg_pct <= 100
        assert 0 <= r.disk_avg_pct <= 100

    def test_gc_overhead_property(self):
        r = simulate(workload_model("K-means"), max_resource_allocation(CLUSTER_A), CLUSTER_A)
        assert r.gc_overhead == r.gc.total


class TestScalingBehavior:
    def test_more_slots_fewer_waves_faster(self):
        m = workload_model("WordCount")
        few = simulate(m, MemoryConfig(1, 2, 0.0, 0.2, 1), CLUSTER_A)
        many = simulate(m, MemoryConfig(2, 4, 0.0, 0.2, 1), CLUSTER_A)
        assert many.runtime_sec < few.runtime_sec

    def test_cluster_b_faster_at_equal_slots(self):
        # B has half the nodes of A, so compare at the same total slot
        # count (64): B's bigger heaps and faster network win.
        m = workload_model("SVM")
        a = simulate(m, MemoryConfig(1, 8, 0.5, 0.1, 2), CLUSTER_A)
        b = simulate(m, MemoryConfig(1, 16, 0.5, 0.1, 2), CLUSTER_B)
        assert b.runtime_sec < a.runtime_sec

    def test_failures_inflate_runtime(self):
        m = workload_model("K-means")
        clean = simulate(m, MemoryConfig(1, 2, 0.6, 0.1, 5), CLUSTER_A)
        failing = simulate(m, MemoryConfig(4, 2, 0.4, 0.2, 2), CLUSTER_A)
        assert failing.failed_containers > 0
        assert clean.failed_containers == 0


class TestFullGcPresence:
    def test_low_pressure_run_has_no_full_gc(self):
        # SVM on a big heap: young GCs suffice (§6.4 setup of Figure 22).
        r = simulate(workload_model("SVM"), max_resource_allocation(CLUSTER_A), CLUSTER_A)
        assert r.full_gc_events == 0

    def test_pressured_run_has_full_gc(self):
        r = simulate(workload_model("PageRank"), MemoryConfig(1, 2, 0.6, 0.0, 2), CLUSTER_A)
        assert r.full_gc_events > 0

    def test_small_heap_restores_full_gc_for_svm(self):
        # The §4.1 remedial heuristics (smaller heap, more concurrency).
        r = simulate(workload_model("SVM"), MemoryConfig(4, 2, 0.4, 0.1, 4), CLUSTER_A)
        assert r.full_gc_events > 0

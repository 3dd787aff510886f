"""GC-overhead model components (repro.simcluster.gc_model)."""
import pytest

from repro.cluster import CLUSTER_A
from repro.config import MemoryConfig
from repro.simcluster.gc_model import GC_CAP, gc_overhead
from repro.simcluster.memory import layout
from repro.workloads import SUITE, workload_model


def _gc(name, cfg):
    m = workload_model(name)
    lay = layout(m, cfg, CLUSTER_A)
    return gc_overhead(lay, m, cfg)


class TestComponents:
    @pytest.mark.parametrize("name", SUITE)
    def test_total_bounded(self, name):
        gc = _gc(name, MemoryConfig(1, 2, 0.4, 0.2, 2))
        assert 0.0 <= gc.total <= GC_CAP

    @pytest.mark.parametrize("name", SUITE)
    def test_components_nonnegative(self, name):
        gc = _gc(name, MemoryConfig(2, 2, 0.4, 0.1, 3))
        assert gc.young >= 0 and gc.full_thrash >= 0 and gc.spill >= 0 and gc.pressure >= 0

    def test_young_overhead_grows_with_concurrency(self):
        # Figure 6: concurrent tasks compete for a fixed heap; GC
        # overhead rises with Task Concurrency.
        g1 = _gc("WordCount", MemoryConfig(1, 1, 0.0, 0.2, 2))
        g8 = _gc("WordCount", MemoryConfig(1, 8, 0.0, 0.2, 2))
        assert g8.young > g1.young

    def test_young_overhead_grows_with_new_ratio(self):
        # Figure 9: needlessly high NewRatio → small Eden → many young GCs.
        g2 = _gc("K-means", MemoryConfig(1, 2, 0.6, 0.1, 2))
        g8 = _gc("K-means", MemoryConfig(1, 2, 0.6, 0.1, 8))
        assert g8.young > g2.young

    def test_full_thrash_when_old_too_small(self):
        # Observation 5: Old smaller than Cache Storage → full-GC thrash.
        small_old = _gc("K-means", MemoryConfig(1, 2, 0.7, 0.1, 1))
        big_old = _gc("K-means", MemoryConfig(1, 2, 0.7, 0.1, 7))
        assert small_old.full_thrash > big_old.full_thrash
        assert small_old.full_thrash > 0.1

    def test_spill_gc_when_grant_exceeds_half_eden(self):
        # Observation 7: shuffle grant above ½·Eden/p forces full GCs.
        big_grant = _gc("SortByKey", MemoryConfig(1, 2, 0.0, 0.7, 2))
        small_grant = _gc("SortByKey", MemoryConfig(1, 2, 0.0, 0.1, 2))
        assert big_grant.spill > 0.1
        assert small_grant.spill == 0.0

    def test_pressure_kicks_in_near_capacity(self):
        low = _gc("PageRank", MemoryConfig(1, 1, 0.3, 0.0, 2))
        high = _gc("PageRank", MemoryConfig(1, 2, 0.6, 0.0, 2))
        assert high.pressure > low.pressure

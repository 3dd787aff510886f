"""RelM: the white-box memory autotuner (paper §4).

Pipeline (Figure 12): profile statistics → for every enumerable
container size, **Initializer** (Eqs 1–4) sets each pool independently,
then **Arbitrator** (Algorithm 1) resolves contention to guarantee
safety, and the **Selector** ranks the per-container-size winners by the
utility score ``U`` (Line 13) — the fraction of heap put to productive
use — returning the best as the recommendation.
"""
from __future__ import annotations

import math
from dataclasses import dataclass

from ..cluster import ClusterSpec, ContainerChoice
from ..config import NEW_RATIO_MAX, NEW_RATIO_MIN, MemoryConfig
from ..profiler.stats import ProfileStats
from ..units import clamp

#: Safety factor δ: fraction of memory kept unassigned (§6.1 uses 0.1).
DEFAULT_DELTA = 0.1
#: Guard on Algorithm 1's loop (it terminates long before this; see the
#: §4.3 analysis — iterations are linear in the degree of parallelism).
MAX_ARBITRATION_ITERS = 200


@dataclass(frozen=True)
class InitialConfig:
    """Initializer output for one container choice (Eqs 1–4)."""

    heap_mb: float
    containers_per_node: int
    cache_mb: float  # m_c
    shuffle_task_mb: float  # m_s (per task)
    task_concurrency: int  # p
    new_ratio: int  # NR
    old_mb: float  # m_o
    eden_mb: float  # m_e


@dataclass(frozen=True)
class ArbitratedConfig:
    """Arbitrator output (Algorithm 1): a safe configuration + utility."""

    heap_mb: float
    containers_per_node: int
    cache_mb: float
    shuffle_task_mb: float
    task_concurrency: int
    new_ratio: int
    old_mb: float
    eden_mb: float
    utility: float
    iterations: int

    def to_memory_config(self, survivor_ratio: int = 8) -> MemoryConfig:
        """Translate pool sizes into the Table 1 knob vector.

        Cache Capacity is ``m_c/m_h``; Shuffle Capacity is the *total*
        shuffle pool (p tasks × per-task grant) over heap; NewRatio
        follows from the arbitrated Old size.
        """
        f_c = clamp(self.cache_mb / self.heap_mb, 0.0, 0.95)
        f_s = clamp(self.task_concurrency * self.shuffle_task_mb / self.heap_mb, 0.0, 0.95 - f_c)
        return MemoryConfig(
            containers_per_node=self.containers_per_node,
            task_concurrency=self.task_concurrency,
            cache_capacity=round(f_c, 2),
            shuffle_capacity=round(f_s, 2),
            new_ratio=_new_ratio_from_old(self.old_mb, self.heap_mb),
            survivor_ratio=survivor_ratio,
        )


def _gc_pools(heap_mb: float, code_mb: float, cache_mb: float, survivor_ratio: int) -> tuple[int, float, float]:
    """Eq 3: NewRatio sized so Old just fits the long-term pools.

    Returns (NR, old_mb, eden_mb).
    """
    long_term = code_mb + cache_mb
    denom = heap_mb - long_term
    if denom <= 0:
        nr = NEW_RATIO_MAX
    else:
        nr = int(clamp(math.ceil(long_term / denom), NEW_RATIO_MIN, NEW_RATIO_MAX))
    old = heap_mb * nr / (nr + 1)
    eden = heap_mb / (nr + 1) * (survivor_ratio - 2) / survivor_ratio
    return nr, old, eden


def _new_ratio_from_old(old_mb: float, heap_mb: float) -> int:
    """Invert old = heap·NR/(NR+1); ceil keeps Old at least ``old_mb``."""
    young = heap_mb - old_mb
    if young <= 0:
        return NEW_RATIO_MAX
    return int(clamp(math.ceil(old_mb / young), NEW_RATIO_MIN, NEW_RATIO_MAX))


def initialize(
    stats: ProfileStats,
    choice: ContainerChoice,
    cluster: ClusterSpec,
    *,
    delta: float = DEFAULT_DELTA,
    survivor_ratio: int = 8,
) -> InitialConfig:
    """Initializer (§4.2): optimize each pool independently.

    Implements Eq 1 (cache from hit ratio), Eq 2 (shuffle from spill
    fraction), Eq 3 (GC pools), Eq 4 (task concurrency from CPU, disk
    and memory bottlenecks, assuming linear scaling).
    """
    n = choice.containers_per_node
    m_h = choice.heap_mb

    # Eq 1 — scale observed cache usage by the hit ratio to the true demand.
    if stats.cache_mb > 0 and stats.cache_hit_ratio > 0:
        m_c = m_h * min(stats.cache_mb / (stats.cache_hit_ratio * stats.heap_mb), 1.0 - delta)
    else:
        m_c = 0.0

    # Eq 2 — scale observed shuffle usage by the spill fraction.
    if stats.shuffle_task_mb > 0:
        denom = 1.0 - stats.spill_fraction / stats.task_concurrency
        m_s = min(stats.shuffle_task_mb / max(1e-6, denom), (1.0 - delta) * m_h)
    else:
        m_s = 0.0

    # Eq 3 — GC pools sized for the long-term requirements.
    nr, old, eden = _gc_pools(m_h, stats.code_mb, m_c, survivor_ratio)

    # Eq 4 — concurrency bounded by each resource, linear model. The
    # paper's formula divides node utilization by P alone because its
    # profiles always come from MaxResourceAllocation (one container per
    # node); we also divide by the profiled containers-per-node N so a
    # re-profiled run (profile_with_full_gc may raise N) stays correct.
    tasks_per_node = stats.containers_per_node * stats.task_concurrency
    per_task_cpu = stats.cpu_avg_pct / tasks_per_node
    per_task_disk = stats.disk_avg_pct / tasks_per_node
    p_cpu = (1.0 / n) * (1.0 - delta) * 100.0 / max(1e-6, per_task_cpu)
    p_disk = (1.0 / n) * (1.0 - delta) * 100.0 / max(1e-6, per_task_disk)
    p_mem = (1.0 - delta) * m_h / max(1e-6, stats.unmanaged_task_mb)
    p = int(min(p_cpu, p_disk, p_mem, cluster.max_task_concurrency(n)))
    p = max(1, p)

    return InitialConfig(
        heap_mb=m_h,
        containers_per_node=n,
        cache_mb=m_c,
        shuffle_task_mb=m_s,
        task_concurrency=p,
        new_ratio=nr,
        old_mb=old,
        eden_mb=eden,
    )


def arbitrate(
    init: InitialConfig,
    stats: ProfileStats,
    *,
    delta: float = DEFAULT_DELTA,
    survivor_ratio: int = 8,
) -> ArbitratedConfig | None:
    """Arbitrator (Algorithm 1). Returns ``None`` when the container is
    too small to run even a single task (Line 1's insufficiency check).
    """
    m_h = init.heap_mb
    m_i, m_u = stats.code_mb, stats.unmanaged_task_mb

    # Line 1: bare minimum — one task must fit.
    if (m_i + m_u) > (1.0 - delta) * m_h:
        return None

    p = init.task_concurrency
    m_c = init.cache_mb
    m_s = init.shuffle_task_mb
    old = init.old_mb
    eden = init.eden_mb
    nr = init.new_ratio

    action = 0
    iters = 0
    # Lines 4–10: shrink demand / grow Old round-robin until the
    # long-term + tenured demand fits in Old.
    while (m_i + p * m_u + m_c) > old:
        if iters >= MAX_ARBITRATION_ITERS:
            return None  # cannot be made safe on this container size
        iters += 1
        act = action % 3
        action += 1
        if act == 0:
            # I. Decrease Task Concurrency.
            if p > 1:
                p -= 1
        elif act == 1:
            # II. Reduce Cache Storage by M_u; re-derive GC pools (Eq 3).
            if m_c - m_u > 0:
                m_c -= m_u
                nr, old, eden = _gc_pools(m_h, m_i, m_c, survivor_ratio)
        else:
            # III. Grow Old by M_u (trade GC overhead for safety, Obs 6).
            if old + m_u < (1.0 - delta) * m_h:
                old += m_u
                nr = _new_ratio_from_old(old, m_h)
                eden = m_h / (nr + 1) * (survivor_ratio - 2) / survivor_ratio
        # If every action is exhausted, the loop cannot progress.
        if p == 1 and m_c - m_u <= 0 and old + m_u >= (1.0 - delta) * m_h:
            if (m_i + p * m_u + m_c) > old:
                return None

    # Line 11: bound shuffle by half the per-task Eden share (Obs 7).
    m_s = min(m_s, 0.5 * eden / p)
    # Line 13: utility — fraction of heap put to productive use.
    utility = (m_i + m_c + p * (m_u + m_s)) / m_h
    return ArbitratedConfig(
        heap_mb=m_h,
        containers_per_node=init.containers_per_node,
        cache_mb=m_c,
        shuffle_task_mb=m_s,
        task_concurrency=p,
        new_ratio=nr,
        old_mb=old,
        eden_mb=eden,
        utility=utility,
        iterations=iters,
    )


def relm_recommend(
    stats: ProfileStats,
    cluster: ClusterSpec,
    *,
    delta: float = DEFAULT_DELTA,
) -> tuple[MemoryConfig, ArbitratedConfig, list[ArbitratedConfig]]:
    """Enumerate container sizes, arbitrate each, pick the max-utility one.

    Returns (recommended knob vector, winning arbitrated configuration,
    all candidates in enumeration order) — the candidate list backs the
    Figure 24 utility-vs-performance ranking analysis.
    """
    candidates: list[ArbitratedConfig] = []
    for choice in cluster.container_choices():
        init = initialize(stats, choice, cluster, delta=delta)
        arb = arbitrate(init, stats, delta=delta)
        if arb is not None:
            candidates.append(arb)
    if not candidates:
        raise ValueError(
            "RelM: no container choice can safely run this workload "
            f"(M_i={stats.code_mb:.0f}MB, M_u={stats.unmanaged_task_mb:.0f}MB)"
        )
    best = max(candidates, key=lambda c: c.utility)
    return best.to_memory_config(), best, candidates

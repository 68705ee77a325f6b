"""Table 7 — SFC learning time (seconds), varying dataset cardinality N.

Compares the wall-clock curve-learning time of:

* BMTree (the original sampled-point reward, "BMTree-SP"),
* LBMC (RL over the constant-time cost model), and
* QUILTS with our cost estimation (as in the paper's own experiments).

Paper shape (N = 1e4 .. 1e8): BMTree grows with N (54 s -> 551 s),
LBMC is constant (15 s), QUILTS is constant and tiny (0.2 s).  We scale
N down (default 1e4 .. 1e6) and keep the same workload construction
(OSM-like data, 1,000 learning queries).
"""
from __future__ import annotations

import time

from repro.core.cost_model import WorkloadCostEstimator
from repro.learn.bmtree import BMTreeLite
from repro.learn.lbmc import LBMC
from repro.learn.quilts import design_candidates, quilts
from repro.workloads.datasets import osm_like
from repro.workloads.queries import data_following
from .common import DEFAULT_ELL_QUERY


def run(
    n_values: list[int] | None = None,
    ell: int = DEFAULT_ELL_QUERY,
    n_learn: int = 1000,
    delta: int = 256,
    h: int = 6,
    sample_rate: float = 0.1,
    lbmc_episodes: int = 6,
    seed: int = 0,
) -> list[dict]:
    # sample_rate is scaled up from the paper's rho = 1e-3 so that the
    # *absolute* sample size at our largest N (0.1 * 1e6 = 1e5 points)
    # matches the paper's at its largest N (1e-3 * 1e8 = 1e5 points);
    # SP reward time is driven by the absolute sample size.
    """One row per N with the three learning times in seconds."""
    n_values = n_values or [10_000, 100_000, 1_000_000]
    rows = []
    for n_pts in n_values:
        points = osm_like(n_pts, ell, seed=seed)
        queries = data_following(points, n_learn, ell, delta=delta, seed=seed + 1)

        t0 = time.perf_counter()
        BMTreeLite(
            2, ell, h=h, reward="sp", sample_rate=sample_rate, seed=seed
        ).fit(points, queries)
        t_bmtree = time.perf_counter() - t0

        t0 = time.perf_counter()
        est = WorkloadCostEstimator(queries, 2, ell)
        LBMC(est, episodes=lbmc_episodes, seed=seed).learn(
            warm_start=design_candidates(queries, 2, ell)
        )
        t_lbmc = time.perf_counter() - t0

        t0 = time.perf_counter()
        quilts(est, queries)
        t_quilts = time.perf_counter() - t0

        rows.append(
            {
                "N": n_pts,
                "BMTree_s": round(t_bmtree, 3),
                "LBMC_s": round(t_lbmc, 3),
                "QUILTS_s": round(t_quilts, 4),
            }
        )
    return rows

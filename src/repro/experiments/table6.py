"""Table 6 — initialization costs of GC and LC, varying n (§6.2.3).

Four timings per workload size n (square queries at random locations,
d = 2, ell = 10, delta = 16, matching Table 5's defaults):

* IGC — the O(n) scan building the global-cost coefficients A[j][k]
* NGC — the naive Eq. 5 evaluation over all n queries (per BMC)
* ILC — the O(n) pattern-table build (Algorithm 1)
* NLC — the naive section count by cell enumeration (per BMC)

The paper's claim: IGC < NGC and ILC < NLC at every n, with all four
growing roughly linearly in n.
"""
from __future__ import annotations

from repro.core.bmc import BMC
from repro.core.global_cost import GlobalCostEstimator, naive_global_cost
from repro.core.local_cost import PatternTables, naive_local_cost
from repro.workloads.queries import random_squares
from .common import DEFAULT_DELTA, DEFAULT_ELL, time_call


def run(
    n_values: list[int] | None = None,
    ell: int = DEFAULT_ELL,
    delta: int = DEFAULT_DELTA,
    d: int = 2,
    seed: int = 0,
    repeats: int = 3,
) -> list[dict]:
    """One row per n: the four timings (and the IGC/NGC, ILC/NLC ratios)."""
    n_values = n_values or [2**i for i in range(1, 11)]
    sigma = BMC.zc(d, ell)
    rows = []
    for n in n_values:
        queries = random_squares(n, ell, delta, seed=seed, d=d)
        t_igc, _ = time_call(GlobalCostEstimator, queries, d, ell, repeats=repeats)
        t_ngc, _ = time_call(naive_global_cost, sigma, queries, repeats=repeats)
        t_ilc, _ = time_call(PatternTables, queries, d, ell, repeats=repeats)
        t_nlc, _ = time_call(naive_local_cost, sigma, queries, repeats=repeats)
        rows.append(
            {
                "n": n,
                "IGC_ms": round(t_igc * 1e3, 3),
                "NGC_ms": round(t_ngc * 1e3, 3),
                "ILC_s": round(t_ilc, 5),
                "NLC_s": round(t_nlc, 5),
                "IGC<NGC": t_igc < t_ngc,
                "ILC<NLC": t_ilc < t_nlc,
            }
        )
    return rows

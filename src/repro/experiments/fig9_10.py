"""Figures 9 & 10 — cost-estimation efficiency sweeps (§6.2).

Times one *per-candidate-BMC* estimation (initialization excluded, as
in the paper) for the efficient algorithms (GC = Eq. 6 scoring,
LC = Algorithm 2) against the naive baselines (NGC = Eq. 5 over all
queries, NLC = brute-force section counting), sweeping n, delta, ell
and d.  Paper shape: GC/LC flat in n and delta; NGC linear in n; NLC
grows with n and delta; gains up to ~24x (GC) and ~1e5 x (LC).
"""
from __future__ import annotations

from repro.core.bmc import BMC
from repro.core.global_cost import GlobalCostEstimator, naive_global_cost
from repro.core.local_cost import PatternTables, naive_local_cost
from repro.workloads.queries import random_squares
from .common import DEFAULT_DELTA, DEFAULT_ELL, DEFAULT_N_QUERIES, time_call


def _measure(queries, d, ell, repeats=5) -> dict:
    sigma = BMC.zc(d, ell)
    gc_est = GlobalCostEstimator(queries, d, ell)
    lc_est = PatternTables(queries, d, ell)
    t_gc, _ = time_call(gc_est.cost, sigma, repeats=repeats)
    t_ngc, _ = time_call(naive_global_cost, sigma, queries, repeats=repeats)
    t_lc, _ = time_call(lc_est.local_cost, sigma, repeats=repeats)
    t_nlc, _ = time_call(naive_local_cost, sigma, queries, repeats=repeats)
    return {
        "GC_us": round(t_gc * 1e6, 2),
        "NGC_us": round(t_ngc * 1e6, 2),
        "LC_us": round(t_lc * 1e6, 2),
        "NLC_us": round(t_nlc * 1e6, 2),
        "gain_GC": round(t_ngc / t_gc, 1) if t_gc > 0 else float("inf"),
        "gain_LC": round(t_nlc / t_lc, 1) if t_lc > 0 else float("inf"),
    }


def vary_n(n_values=None, ell=DEFAULT_ELL, delta=DEFAULT_DELTA, d=2, seed=0):
    """Figures 9a / 10a: vary the number of queries."""
    rows = []
    for n in n_values or [2**i for i in range(0, 11, 2)]:
        queries = random_squares(n, ell, delta, seed=seed, d=d)
        rows.append({"n": n, **_measure(queries, d, ell)})
    return rows


def vary_delta(deltas=None, n=DEFAULT_N_QUERIES, ell=DEFAULT_ELL, d=2, seed=0):
    """Figures 9b / 10b: vary the query edge length."""
    rows = []
    for delta in deltas or [16, 32, 64, 128, 256]:
        queries = random_squares(n, ell, delta, seed=seed, d=d)
        rows.append({"delta": delta, **_measure(queries, d, ell)})
    return rows


def vary_ell(ells=None, n=DEFAULT_N_QUERIES, delta=DEFAULT_DELTA, d=2, seed=0):
    """Figures 9c / 10c: vary the bits per dimension."""
    rows = []
    for ell in ells or [10, 12, 14, 16]:
        queries = random_squares(n, ell, delta, seed=seed, d=d)
        rows.append({"ell": ell, **_measure(queries, d, ell)})
    return rows


def vary_d(ds=(2, 3, 4), n=DEFAULT_N_QUERIES, ell=8, delta=8, seed=0):
    """Figures 9d / 10d: vary the dimensionality (reporting gains)."""
    rows = []
    for d in ds:
        queries = random_squares(n, ell, delta, seed=seed, d=d)
        m = _measure(queries, d, ell)
        rows.append({"d": d, "gain_GC": m["gain_GC"], "gain_LC": m["gain_LC"]})
    return rows

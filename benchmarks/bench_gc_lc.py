"""Benchmarks for Figures 9-10 — per-BMC cost estimation time.

GC and LC score one candidate BMC after initialization (the paper's
O(1) claim); NGC and NLC are the naive per-query baselines over the
same workload (n = 2^4 squares, the Table 5 default).
"""
import pytest

from repro.core.bmc import BMC
from repro.core.global_cost import GlobalCostEstimator, naive_global_cost
from repro.core.local_cost import PatternTables, naive_local_cost
from repro.workloads.queries import random_squares

N = 2**4
ELL = 10
DELTA = 16


@pytest.fixture(scope="module")
def workload():
    return random_squares(N, ELL, DELTA, seed=0)


@pytest.fixture(scope="module")
def sigma():
    return BMC.zc(2, ELL)


@pytest.fixture(scope="module")
def gc_est(workload):
    return GlobalCostEstimator(workload, 2, ELL)


@pytest.fixture(scope="module")
def lc_est(workload):
    return PatternTables(workload, 2, ELL)


def test_gc_per_bmc(benchmark, gc_est, sigma):
    """GC: O(d*ell) global cost per candidate BMC."""
    assert benchmark(gc_est.cost, sigma) > 0


def test_ngc_per_bmc(benchmark, workload, sigma):
    """NGC: O(n*d*ell) naive global cost per candidate BMC."""
    assert benchmark(naive_global_cost, sigma, workload) > 0


def test_lc_per_bmc(benchmark, lc_est, sigma):
    """LC: O(d*ell) table lookups per candidate BMC (Algorithm 2)."""
    assert benchmark(lc_est.local_cost, sigma) > 0


def test_nlc_per_bmc(benchmark, workload, sigma):
    """NLC: brute-force section counting per candidate BMC."""
    assert benchmark(naive_local_cost, sigma, workload) > 0

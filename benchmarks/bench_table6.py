"""Benchmark for Table 6 — GC/LC initialization vs naive baselines.

Regenerates the timing rows of Table 6 at the paper's defaults
(d=2, ell=10, delta=16) for the largest workload size n=2^10.
"""
import pytest

from repro.core.bmc import BMC
from repro.core.global_cost import GlobalCostEstimator, naive_global_cost
from repro.core.local_cost import PatternTables, naive_local_cost
from repro.workloads.queries import random_squares

N = 2**10
ELL = 10
DELTA = 16


@pytest.fixture(scope="module")
def workload():
    return random_squares(N, ELL, DELTA, seed=0)


@pytest.fixture(scope="module")
def sigma():
    return BMC.zc(2, ELL)


def test_igc_initialization(benchmark, workload):
    """IGC: the O(n) global-cost coefficient scan."""
    est = benchmark(GlobalCostEstimator, workload, 2, ELL)
    assert est.n == N


def test_ngc_naive_eval(benchmark, workload, sigma):
    """NGC: Eq. 5 evaluated over all n queries for one BMC."""
    cost = benchmark(naive_global_cost, sigma, workload)
    assert cost > 0


def test_ilc_initialization(benchmark, workload):
    """ILC: pattern-table construction (Algorithm 1)."""
    tables = benchmark(PatternTables, workload, 2, ELL)
    assert tables.n == N


def test_nlc_naive_eval(benchmark, workload, sigma):
    """NLC: brute-force section counting over all n queries."""
    cost = benchmark.pedantic(
        naive_local_cost, args=(sigma, workload), rounds=3, iterations=1
    )
    assert cost > 0

"""Benchmark for Table 7 — SFC learning time per technique.

Scaled to N=20k points (paper: up to 1e8); the claim regenerated here
is the ordering BMTree-SP >> LBMC >> QUILTS and SP's growth with N
(see jobs/table7_learning_time.py for the full sweep).
"""
import pytest

from repro.core.cost_model import WorkloadCostEstimator
from repro.learn.bmtree import BMTreeLite
from repro.learn.lbmc import LBMC
from repro.learn.quilts import quilts
from repro.workloads.datasets import osm_like
from repro.workloads.queries import data_following

ELL = 12
N_PTS = 20_000
N_LEARN = 200


@pytest.fixture(scope="module")
def data():
    points = osm_like(N_PTS, ELL, seed=0)
    queries = data_following(points, N_LEARN, ELL, delta=64, seed=1)
    return points, queries


@pytest.fixture(scope="module")
def estimator(data):
    _, queries = data
    return WorkloadCostEstimator(queries, 2, ELL)


def test_bmtree_sp_learning(benchmark, data):
    """BMTree with the original sampled-point reward (grows with N)."""
    points, queries = data

    def fit():
        return BMTreeLite(2, ELL, h=4, reward="sp", sample_rate=1e-2, seed=0).fit(
            points, queries
        )

    tree = benchmark.pedantic(fit, rounds=3, iterations=1)
    assert tree.stats.n_leaves >= 1


def test_lbmc_learning(benchmark, estimator):
    """LBMC: constant-time rewards make learning N-independent."""

    def learn():
        return LBMC(estimator, episodes=4, seed=0).learn()

    res = benchmark.pedantic(learn, rounds=3, iterations=1)
    assert res.best_cost <= res.initial_cost


def test_quilts_learning(benchmark, estimator, data):
    """QUILTS with our cost estimation — a handful of candidates."""
    _, queries = data
    res = benchmark(quilts, estimator, queries)
    assert res.n_candidates >= 4

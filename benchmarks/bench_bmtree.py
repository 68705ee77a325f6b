"""Benchmark for Figures 11-13 — BMTree reward-variant learning.

Fits BMTree-lite with each reward on the same data/workload; the
benchmark times expose SP's reward-calculation overhead vs GC/LC.
"""
import pytest

from repro.learn.bmtree import BMTreeLite
from repro.workloads.datasets import osm_like
from repro.workloads.queries import data_following

ELL = 12
N_PTS = 20_000


@pytest.fixture(scope="module")
def data():
    points = osm_like(N_PTS, ELL, seed=0)
    queries = data_following(points, 100, ELL, delta=64, seed=1)
    return points, queries


@pytest.mark.parametrize("reward", ["sp", "gc", "lc"])
def test_bmtree_fit(benchmark, data, reward):
    points, queries = data

    def fit():
        return BMTreeLite(
            2, ELL, h=4, reward=reward, sample_rate=1e-2, seed=0
        ).fit(points, queries)

    tree = benchmark.pedantic(fit, rounds=3, iterations=1)
    assert tree.stats.n_reward_evals > 0

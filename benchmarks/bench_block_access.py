"""Benchmark for Figures 14-17 — query execution over curve orders.

Times the block-store query path for each SFC ordering technique at a
fixed dataset/workload (the per-technique block-access *values* are
produced by jobs/block_access.py and recorded in EXPERIMENTS.md).
"""
import pytest

from repro.core.bmc import BMC
from repro.core.hilbert import hilbert_values
from repro.storage.blockstore import BlockStore
from repro.workloads.datasets import osm_like
from repro.workloads.queries import data_following

ELL = 14
N_PTS = 50_000


@pytest.fixture(scope="module")
def setup():
    points = osm_like(N_PTS, ELL, seed=0)
    queries = data_following(points, 100, ELL, delta=256, aspect=1 / 16.0, seed=2)
    return points, queries


@pytest.mark.parametrize("curve", ["ZC", "LC", "HC"])
def test_query_workload(benchmark, setup, curve):
    points, queries = setup
    if curve == "ZC":
        vals = BMC.zc(2, ELL).values(points)
    elif curve == "LC":
        vals = BMC.lex(2, ELL).values(points)
    else:
        vals = hilbert_values(points, ELL)
    store = BlockStore(points, vals, 204)
    avg = benchmark.pedantic(store.avg_block_accesses, args=(queries,), rounds=3, iterations=1)
    assert avg > 0


def test_curve_value_computation(benchmark, setup):
    """Bulk BMC value mapping throughput (layout-write hot path)."""
    points, _ = setup
    sigma = BMC.zc(2, ELL)
    vals = benchmark(sigma.values, points)
    assert len(vals) == N_PTS

"""Benchmark for the Spark layout path (reproduction brief's deployment).

Times (1) the distributed per-partition estimator initialization over a
query DataFrame and (2) the curve-ordered Parquet write.
"""
import pytest

from repro.core.bmc import BMC
from repro.sparkops.estimator import fit_estimator_distributed, queries_to_spark
from repro.sparkops.layout import write_curve_ordered
from repro.workloads.datasets import osm_like, to_spark
from repro.workloads.queries import data_following

ELL = 14
N_PTS = 50_000


@pytest.fixture(scope="module")
def setup(spark):
    points = osm_like(N_PTS, ELL, seed=0)
    queries = data_following(points, 500, ELL, delta=256, seed=1)
    qdf = queries_to_spark(spark, queries, n_partitions=8).cache()
    qdf.count()
    pdf = to_spark(spark, points).cache()
    pdf.count()
    return qdf, pdf


def test_distributed_estimator_init(benchmark, setup):
    qdf, _ = setup
    est = benchmark.pedantic(
        fit_estimator_distributed, args=(qdf, 2, ELL), rounds=3, iterations=1
    )
    assert est.n == 500


def test_curve_ordered_write(benchmark, setup, tmp_path_factory):
    _, pdf = setup
    sigma = BMC.zc(2, ELL)
    counter = iter(range(100))

    def write():
        path = str(tmp_path_factory.mktemp("bench") / f"t{next(counter)}")
        write_curve_ordered(pdf, sigma, ["x", "y"], path, n_files=8)

    benchmark.pedantic(write, rounds=3, iterations=1)

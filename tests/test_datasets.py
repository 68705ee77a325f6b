"""Tests for the dataset generators (OSM/NYC/UNI/SKEW substitutes)."""
import numpy as np
import pytest

from repro.workloads.datasets import DATASETS, make_dataset, nyc_like, osm_like, skew, uni


@pytest.mark.parametrize("name", sorted(DATASETS))
class TestAllGenerators:
    def test_shape_and_domain(self, name):
        pts = make_dataset(name, 2000, ell=10, seed=0)
        assert pts.shape == (2000, 2)
        assert pts.dtype == np.uint64
        assert pts.max() < 1 << 10

    def test_deterministic(self, name):
        a = make_dataset(name, 500, ell=8, seed=7)
        b = make_dataset(name, 500, ell=8, seed=7)
        assert np.array_equal(a, b)

    def test_seed_changes_data(self, name):
        a = make_dataset(name, 500, ell=8, seed=1)
        b = make_dataset(name, 500, ell=8, seed=2)
        assert not np.array_equal(a, b)


class TestDistributionShapes:
    def test_uni_is_spread_out(self):
        pts = uni(20_000, 10, 0)
        # mean near grid centre, high occupancy of coarse cells
        assert abs(pts.mean() - 511.5) < 15
        coarse = (pts // 128).astype(int)
        occupied = len({(x, y) for x, y in coarse})
        assert occupied == 64  # all 8x8 coarse cells hit

    def test_skew_concentrates_near_origin(self):
        pts = skew(20_000, 10, 0)
        # the skewed mass sits well below the grid centre
        assert np.median(pts[:, 0]) < 100
        assert np.median(pts[:, 1]) < 100

    def test_osm_is_clustered(self):
        pts = osm_like(20_000, 10, 0)
        # clustered: top coarse cell holds far more than uniform share
        coarse = (pts // 64).astype(int)
        _, counts = np.unique(coarse[:, 0] * 16 + coarse[:, 1], return_counts=True)
        assert counts.max() > 3 * 20_000 / 256

    def test_nyc_hotspots(self):
        pts = nyc_like(20_000, 10, 0)
        coarse = (pts // 64).astype(int)
        _, counts = np.unique(coarse[:, 0] * 16 + coarse[:, 1], return_counts=True)
        assert counts.max() > 5 * 20_000 / 256

    def test_unknown_name(self):
        with pytest.raises(ValueError):
            make_dataset("MARS", 10, 8)


class TestSparkWrap:
    def test_to_spark(self, spark):
        from repro.workloads.datasets import to_spark

        pts = uni(1000, 8, 0)
        df = to_spark(spark, pts, n_partitions=4)
        assert df.columns == ["x", "y"]
        assert df.count() == 1000
        assert df.rdd.getNumPartitions() == 4

"""Tests for the curve-ordered block storage substrate (§4.2 intuition)."""
import numpy as np
import pytest

from repro.core.bmc import BMC
from repro.core.query import RangeQuery
from repro.storage.blockstore import BlockStore, order_by_curve


def grid_points(ell):
    n = 1 << ell
    return np.array([(x, y) for x in range(n) for y in range(n)], dtype=np.uint64)


class TestBasics:
    def test_sorted_by_value(self):
        pts = grid_points(3)
        sigma = BMC.zc(2, 3)
        store = BlockStore(pts, sigma.values(pts), block_size=4)
        assert np.all(np.diff(store.values.astype(np.int64)) >= 0)

    def test_n_blocks(self):
        pts = grid_points(2)  # 16 points
        store = BlockStore(pts, BMC.zc(2, 2).values(pts), block_size=5)
        assert store.n_blocks == 4  # ceil(16 / 5)

    def test_empty_store(self):
        store = BlockStore(np.empty((0, 2)), np.empty(0), block_size=4)
        assert store.n_blocks == 0
        assert store.query(RangeQuery((0, 0), (1, 1))) == (0, 0)

    def test_invalid_args(self):
        pts = grid_points(2)
        with pytest.raises(ValueError):
            BlockStore(pts, np.zeros(3))
        with pytest.raises(ValueError):
            BlockStore(pts, BMC.zc(2, 2).values(pts), block_size=0)


class TestQuery:
    def test_result_count_matches_filter(self):
        rng = np.random.default_rng(0)
        pts = rng.integers(0, 64, size=(500, 2)).astype(np.uint64)
        sigma = BMC.zc(2, 6)
        store = order_by_curve(pts, sigma.values)
        q = RangeQuery((10, 10), (30, 25))
        n, blocks = store.query(q)
        expected = sum(1 for p in pts if q.contains(p))
        assert n == expected
        assert 0 <= blocks <= store.n_blocks

    def test_no_match_zero_blocks(self):
        pts = np.zeros((10, 2), dtype=np.uint64)
        store = BlockStore(pts, np.zeros(10), block_size=4)
        assert store.query(RangeQuery((5, 5), (6, 6))) == (0, 0)

    def test_dimension_mismatch(self):
        pts = grid_points(2)
        store = BlockStore(pts, BMC.zc(2, 2).values(pts), block_size=4)
        with pytest.raises(ValueError):
            store.query(RangeQuery((0, 0, 0), (1, 1, 1)))

    def test_good_curve_fewer_blocks(self):
        # Example 3's point: the same query needs fewer blocks under a
        # curve with fewer query sections. Wide query, full grid:
        pts = grid_points(4)
        q = RangeQuery((0, 5), (15, 5))  # one full row
        x_low = BMC.from_string("YYYYYYYYXXXXXXXX")  # row-contiguous
        y_low = BMC.from_string("XXXXXXXXYYYYYYYY")
        b_good = order_by_curve(pts, x_low.values).query(q)[1]
        b_bad = order_by_curve(pts, y_low.values).query(q)[1]
        assert b_good < b_bad

    def test_avg_block_accesses(self):
        pts = grid_points(3)
        sigma = BMC.zc(2, 3)
        store = order_by_curve(pts, sigma.values)
        qs = [RangeQuery((0, 0), (1, 1)), RangeQuery((4, 4), (7, 7))]
        avg = store.avg_block_accesses(qs)
        assert avg == (store.query(qs[0])[1] + store.query(qs[1])[1]) / 2

    def test_avg_empty_workload_rejected(self):
        store = order_by_curve(grid_points(2), BMC.zc(2, 2).values)
        with pytest.raises(ValueError):
            store.avg_block_accesses([])


class TestPrecision:
    def test_single_section_precision(self):
        # §4.2: one query section over B=4 blocks — Example 3's layout.
        # A full row query under a row-contiguous curve is one section.
        pts = grid_points(3)
        x_low = BMC.from_string("YYYXXX")
        store = BlockStore(pts, x_low.values(pts), block_size=4)
        q = RangeQuery((0, 2), (7, 2))  # one row = 8 points = 2 blocks
        n, blocks = store.query(q)
        assert n == 8
        assert store.precision(q) == pytest.approx(8 / (blocks * 4))

    def test_perfect_precision_when_aligned(self):
        pts = grid_points(2)
        sigma = BMC.zc(2, 2)
        store = BlockStore(pts, sigma.values(pts), block_size=4)
        # ZC quadrant = exactly one block of 4
        q = RangeQuery((0, 0), (1, 1))
        assert store.precision(q) == 1.0

    def test_empty_query_precision(self):
        store = BlockStore(np.zeros((4, 2), dtype=np.uint64), np.arange(4), 2)
        assert store.precision(RangeQuery((9, 9), (9, 9))) == 1.0

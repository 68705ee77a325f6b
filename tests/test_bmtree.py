"""Tests for BMTree-lite (piecewise BMC learner, §6.3 host)."""
import numpy as np
import pytest

from repro.core.bmc import BMC
from repro.core.query import RangeQuery
from repro.learn.bmtree import BMTreeLite, _fill_curve
from repro.storage.blockstore import order_by_curve
from repro.workloads.datasets import osm_like, uni
from repro.workloads.queries import data_following


class TestFillCurve:
    def test_empty_prefix_is_interleave(self):
        assert _fill_curve([], 2, 3).to_string() == "XYXYXY"

    def test_prefix_goes_to_top(self):
        sigma = _fill_curve([1, 1], 2, 3)  # two Y bits first
        assert sigma.to_string().startswith("YY")
        assert sigma.d == 2 and sigma.ell == 3

    def test_prefix_exhausting_dimension(self):
        sigma = _fill_curve([0, 0, 0], 2, 3)
        assert sigma.to_string() == "XXXYYY"

    def test_over_budget_prefix_rejected(self):
        with pytest.raises(ValueError):
            _fill_curve([0, 0, 0, 0], 2, 3)


class TestConstruction:
    def setup_method(self):
        self.ell = 8
        self.pts = osm_like(4000, self.ell, seed=0)
        self.queries = data_following(self.pts, 40, self.ell, delta=8, seed=1)

    @pytest.mark.parametrize("reward", ["sp", "gc", "lc"])
    def test_fit_produces_partition(self, reward):
        tree = BMTreeLite(2, self.ell, h=4, reward=reward, sample_rate=0.05, seed=0)
        tree.fit(self.pts, self.queries)
        assert 1 <= tree.stats.n_leaves <= 16
        # leaves partition the grid: values() covers every point exactly once
        vals = tree.values(self.pts)
        assert len(vals) == len(self.pts)

    def test_values_bijective_on_grid(self):
        ell = 3
        tree = BMTreeLite(2, ell, h=2, reward="gc", seed=0)
        grid = np.array(
            [(x, y) for x in range(8) for y in range(8)], dtype=np.uint64
        )
        queries = [RangeQuery((0, 0), (3, 3)), RangeQuery((4, 2), (6, 7))]
        tree.fit(grid, queries)
        vals = tree.values(grid)
        assert len(set(vals.tolist())) == 64
        assert vals.max() == 63

    def test_values_requires_fit(self):
        tree = BMTreeLite(2, 4, h=2)
        with pytest.raises(RuntimeError):
            tree.values(np.zeros((1, 2), dtype=np.uint64))

    def test_out_of_domain_points_rejected(self):
        tree = BMTreeLite(2, 3, h=1, reward="gc")
        tree.fit(uni(100, 3, 0), [RangeQuery((0, 0), (3, 3))])
        with pytest.raises(ValueError):
            tree.values(np.array([[100, 0]], dtype=np.uint64))

    def test_invalid_params(self):
        with pytest.raises(ValueError):
            BMTreeLite(2, 4, h=2, reward="xx")
        with pytest.raises(ValueError):
            BMTreeLite(2, 4, h=0)
        with pytest.raises(ValueError):
            BMTreeLite(2, 4, h=2, sample_rate=0)


class TestRewardAccounting:
    def test_equal_eval_counts_across_variants(self):
        # the paper's comparison requires all variants to perform the
        # same number of reward evaluations
        pts = osm_like(2000, 6, seed=1)
        qs = data_following(pts, 30, 6, delta=4, seed=2)
        counts = set()
        for reward in ("sp", "gc", "lc"):
            tree = BMTreeLite(2, 6, h=3, reward=reward, sample_rate=0.1, seed=0)
            tree.fit(pts, qs)
            counts.add(tree.stats.n_reward_evals)
        assert len(counts) == 1

    def test_sp_samples_at_rate(self):
        pts = uni(10_000, 8, 0)
        qs = data_following(pts, 10, 8, delta=4, seed=0)
        tree = BMTreeLite(2, 8, h=2, reward="sp", sample_rate=0.01, seed=0)
        tree.fit(pts, qs)
        assert tree.stats.sample_size == 100

    def test_gc_lc_ignore_data_size(self):
        qs = [RangeQuery((0, 0), (7, 7))]
        for reward in ("gc", "lc"):
            tree = BMTreeLite(2, 6, h=2, reward=reward)
            tree.fit(uni(50, 6, 0), qs)
            assert tree.stats.sample_size == 0


class TestQueryQuality:
    def test_learned_tree_not_much_worse_than_zc(self):
        # sanity: the learned piecewise curve should be competitive with
        # plain ZC on its own learning workload
        ell = 8
        pts = osm_like(6000, ell, seed=3)
        qs = data_following(pts, 60, ell, delta=16, aspect=16.0, seed=4)
        zc_store = order_by_curve(pts, BMC.zc(2, ell).values)
        zc_cost = zc_store.avg_block_accesses(qs)
        tree = BMTreeLite(2, ell, h=4, reward="lc", seed=0).fit(pts, qs)
        tree_cost = order_by_curve(pts, tree.values).avg_block_accesses(qs)
        assert tree_cost <= 1.5 * zc_cost

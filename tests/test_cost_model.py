"""Tests for the combined cost model (Eq. 4) and its O(1) estimator."""
import numpy as np
import pytest

from repro.core.bmc import BMC
from repro.core.cost_model import (
    WorkloadCostEstimator,
    naive_cost,
    per_query_cost,
    workload_cost_arrays,
)
from repro.core.query import RangeQuery


def random_workload(rng, n, d, ell, max_edge=6):
    top = (1 << ell) - 1
    out = []
    for _ in range(n):
        lo = rng.integers(0, top + 1, d)
        hi = np.minimum(top, lo + rng.integers(0, max_edge, d))
        out.append(RangeQuery(tuple(int(x) for x in lo), tuple(int(x) for x in hi)))
    return out


class TestCombinedCost:
    @pytest.mark.parametrize("d,ell", [(2, 6), (3, 4)])
    def test_estimator_equals_naive(self, d, ell):
        rng = np.random.default_rng(d * ell)
        queries = random_workload(rng, 20, d, ell)
        est = WorkloadCostEstimator(queries, d, ell)
        for _ in range(6):
            sigma = BMC(tuple(int(s) for s in rng.permutation(list(range(d)) * ell)))
            assert est.cost(sigma) == naive_cost(sigma, queries)
            assert est.cost(sigma) == est.global_cost(sigma) * est.local_cost(sigma)

    def test_per_query_cost_product(self):
        sigma = BMC.from_string("XYXYXY")
        q = RangeQuery((0, 2), (4, 3))
        # from the §4.2.1 example: 3 sections; Cg = F((4,3)) - F((0,2)) + 1
        cg = sigma.value((4, 3)) - sigma.value((0, 2)) + 1
        assert per_query_cost(sigma, q) == cg * 3

    def test_best_of_picks_minimum(self):
        rng = np.random.default_rng(1)
        queries = random_workload(rng, 16, 2, 6)
        est = WorkloadCostEstimator(queries, 2, 6)
        cands = [BMC.zc(2, 6), BMC.lex(2, 6), BMC.from_string("YYYYYYXXXXXX")]
        best, cost = est.best_of(cands)
        assert cost == min(est.cost(c) for c in cands)
        assert est.cost(best) == cost

    def test_best_of_empty_rejected(self):
        est = WorkloadCostEstimator([RangeQuery((0, 0), (1, 1))], 2, 4)
        with pytest.raises(ValueError):
            est.best_of([])

    def test_workload_cost_arrays(self):
        lo = np.array([[0, 0], [2, 2]])
        hi = np.array([[1, 1], [3, 3]])
        est = workload_cost_arrays(lo, hi, 2, 4)
        sigma = BMC.zc(2, 4)
        direct = WorkloadCostEstimator(
            [RangeQuery((0, 0), (1, 1)), RangeQuery((2, 2), (3, 3))], 2, 4
        )
        assert est.cost(sigma) == direct.cost(sigma)

    def test_merge_matches_whole(self):
        rng = np.random.default_rng(4)
        queries = random_workload(rng, 24, 2, 5)
        whole = WorkloadCostEstimator(queries, 2, 5)
        merged = WorkloadCostEstimator.merge(
            [
                WorkloadCostEstimator(queries[:8], 2, 5),
                WorkloadCostEstimator(queries[8:], 2, 5),
            ]
        )
        for s in ["XYXYXYXYXY", "XXYYXYXYXY", "YXYXYXYXYX"]:
            sigma = BMC.from_string(s)
            assert merged.cost(sigma) == whole.cost(sigma)


class TestCostDiscriminates:
    def test_query_aligned_curve_wins(self):
        # workload of wide flat queries: a curve keeping x in the low
        # bits must be cheaper than one keeping y in the low bits
        queries = [RangeQuery((i, j), (i + 14, j)) for i, j in [(0, 3), (8, 9), (16, 40)]]
        est = WorkloadCostEstimator(queries, 2, 6)
        x_low = BMC.from_string("YYYYYYXXXXXX")
        y_low = BMC.from_string("XXXXXXYYYYYY")
        assert est.cost(x_low) < est.cost(y_low)

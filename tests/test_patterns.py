"""Tests for rise/drop pattern closed-form counting (§4.2.1)."""
import numpy as np
import pytest

from repro.core.patterns import (
    count_drop,
    count_rise,
    drop_matrix,
    drop_vector,
    rise_matrix,
    rise_vector,
)


def brute_rise(xs: int, xe: int, k: int) -> int:
    """Count a >= 0 with both rise endpoints inside [xs, xe]."""
    n, p, half = 0, 1 << k, 1 << (k - 1)
    a = 0
    while a * p + half - 1 <= xe:
        if a * p + half - 1 >= xs and a * p + half <= xe:
            n += 1
        a += 1
    return n


def brute_drop(xs: int, xe: int, k: int) -> int:
    if k == 0:
        return xe - xs + 1
    n, p = 0, 1 << k
    a = 0
    while a * p <= xe:
        if a * p >= xs and a * p + p - 1 <= xe:
            n += 1
        a += 1
    return n


class TestClosedForms:
    @pytest.mark.parametrize("k", [1, 2, 3, 4])
    def test_rise_matches_brute_force(self, k):
        for xs in range(0, 20):
            for xe in range(xs, 40):
                assert count_rise(xs, xe, k) == brute_rise(xs, xe, k), (xs, xe, k)

    @pytest.mark.parametrize("k", [0, 1, 2, 3, 4])
    def test_drop_matches_brute_force(self, k):
        for xs in range(0, 20):
            for xe in range(xs, 40):
                assert count_drop(xs, xe, k) == brute_drop(xs, xe, k), (xs, xe, k)

    def test_paper_worked_example(self):
        # §4.2.1 example: q = [0,4] x [2,3], ell = 3
        # x-range [0,4]: two R^1, one R^2, one R^3; D^0 = 5
        assert count_rise(0, 4, 1) == 2
        assert count_rise(0, 4, 2) == 1
        assert count_rise(0, 4, 3) == 1
        assert count_drop(0, 4, 0) == 5
        # y-range [2,3]: one R^1, one D^1, zero D^2, zero D^3
        assert count_rise(2, 3, 1) == 1
        assert count_drop(2, 3, 1) == 1
        assert count_drop(2, 3, 2) == 0
        assert count_drop(2, 3, 3) == 0

    def test_single_cell_range(self):
        # a single cell has no rises and no >=1-level drops
        for k in range(1, 5):
            assert count_rise(7, 7, k) == 0
            assert count_drop(7, 7, k) == 0
        assert count_drop(7, 7, 0) == 1

    def test_full_domain_rises_sum(self):
        # over the full domain [0, 2^ell - 1] there are 2^ell - 1
        # consecutive-integer steps; each is exactly one rise pattern
        ell = 6
        total = sum(count_rise(0, (1 << ell) - 1, k) for k in range(1, ell + 1))
        assert total == (1 << ell) - 1

    def test_invalid_k(self):
        with pytest.raises(ValueError):
            count_rise(0, 5, 0)
        with pytest.raises(ValueError):
            count_drop(0, 5, -1)


class TestVectorized:
    def test_rise_matrix_matches_scalar(self):
        rng = np.random.default_rng(0)
        ell = 8
        lo = rng.integers(0, 200, 50)
        hi = lo + rng.integers(0, 55, 50)
        m = rise_matrix(lo, hi, ell)
        for i in range(50):
            assert np.array_equal(m[i], rise_vector(int(lo[i]), int(hi[i]), ell))

    def test_drop_matrix_matches_scalar(self):
        rng = np.random.default_rng(1)
        ell = 8
        lo = rng.integers(0, 200, 50)
        hi = lo + rng.integers(0, 55, 50)
        m = drop_matrix(lo, hi, ell)
        for i in range(50):
            assert np.array_equal(m[i], drop_vector(int(lo[i]), int(hi[i]), ell))

    def test_shapes(self):
        assert rise_matrix([0], [3], 5).shape == (1, 5)
        assert drop_matrix([0], [3], 5).shape == (1, 6)

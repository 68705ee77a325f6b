"""Every worked example and stated identity from the paper, asserted.

Each test cites the paper location it reproduces.
"""
import numpy as np
import pytest

from repro.core.bmc import BMC
from repro.core.global_cost import global_cost_single
from repro.core.local_cost import (
    count_edges_single,
    exact_edges,
    exact_sections,
    sections_via_patterns,
)
from repro.core.query import RangeQuery
from repro.storage.blockstore import BlockStore


class TestSection1Counting:
    def test_bmc_space_size_formula(self):
        # §1: the number of BMCs is (d*ell)! / (ell!)^d — enumerate for
        # a tiny case and compare
        import itertools
        import math

        d, ell = 2, 2
        formula = math.factorial(d * ell) // math.factorial(ell) ** d
        valid = {
            perm
            for perm in itertools.permutations([0, 0, 1, 1])
        }
        assert len(valid) == formula == 6

    def test_figure1_query_section_counts(self):
        # Figure 1's message: the same query has different section
        # counts under different curves. q1 = one ZC quadrant:
        q1 = RangeQuery((0, 0), (1, 1))
        zc = BMC.zc(2, 2)  # XYXY: quadrant is contiguous
        lex = BMC.lex(2, 2)
        assert exact_sections(zc, q1) == 1
        assert exact_sections(lex, q1) == 2


class TestSection3Examples:
    def test_figure3_value(self):
        # Figure 3: F_sigma((2,1,7)) for sigma=XYZXYZXYZ merges to
        # X3Y3Z3 X2Y2Z2 X1Y1Z1 = 001 101 011 = 107
        sigma = BMC.from_string("XYZXYZXYZ")
        assert sigma.value((2, 1, 7)) == 107

    def test_equation2_bit_decomposition(self):
        # Eq. 2: sum_j alpha_j * 2^(j-1) = x for every coordinate
        for x in range(32):
            assert sum(((x >> j) & 1) << j for j in range(5)) == x

    def test_corollary1_query_bounded_by_corner_values(self):
        # Corollary 1: every cell of q maps inside [F(p_s), F(p_e)]
        rng = np.random.default_rng(0)
        for _ in range(20):
            slots = rng.permutation([0, 0, 0, 1, 1, 1])
            sigma = BMC(tuple(int(s) for s in slots))
            q = RangeQuery((1, 2), (5, 6))
            lo, hi = sigma.value(q.lo), sigma.value(q.hi)
            vals = sigma.values(q.cells_array())
            assert lo == vals.min() and hi == vals.max()


class TestSection3DirectedEdges:
    def test_example2_bit_patterns(self):
        # Example 2: 15 -> 16 flips K=4 trailing ones; 16 -> 17 flips K=0
        def trailing_ones(x):
            k = 0
            while x & 1:
                k += 1
                x >>= 1
            return k

        assert trailing_ones(15) == 4 and 15 + 1 == 16
        assert trailing_ones(16) == 0 and 16 + 1 == 17

    def test_equation3_on_figure4_curves(self):
        # Figure 4: XYXYXY vs YXYXYX give different (S, E) splits of the
        # same 8-cell query; E + S = V = 8 in both cases
        for s in ["XYXYXY", "YXYXYX"]:
            sigma = BMC.from_string(s)
            q = RangeQuery((2, 2), (3, 5))  # a 2 x 4 = 8-cell query
            assert exact_edges(sigma, q) + exact_sections(sigma, q) == 8


class TestSection4Examples:
    def test_running_example_all_numbers(self):
        # §4.2.1: q=[0,4]x[2,3] under XYXYXY: E = 2*1 + 1*5 = 7,
        # V = 10, S = 3
        sigma = BMC.from_string("XYXYXY")
        q = RangeQuery((0, 2), (4, 3))
        assert q.n_cells == 10
        assert count_edges_single(sigma, q) == 7
        assert sections_via_patterns(sigma, q) == 3

    def test_example4_edge_decomposition(self):
        # Example 4: the edge 000001 -> 000010 under XYXYXY is
        # R_x^1 (x: 000 -> 001) + D_y^1 (y: 001 -> 000)
        sigma = BMC.from_string("XYXYXY")
        p_i, p_j = sigma.decode(1), sigma.decode(2)
        assert p_i == (0, 1) and p_j == (1, 0)  # x rises, y drops

    def test_worst_case_block_accesses_formula(self):
        # §4.2 Intuition: with one query section and block size B, at
        # most floor((V-2)/B) + 2 blocks are accessed
        B = 4
        pts = np.array([(x, 0) for x in range(32)], dtype=np.uint64)
        sigma = BMC.from_string("YYYYYXXXXX")  # x in low bits, ell=5
        store = BlockStore(pts, sigma.values(pts), B)
        q = RangeQuery((3, 0), (18, 0))  # 16 cells, one section
        v = 16
        _, blocks = store.query(q)
        assert blocks <= (v - 2) // B + 2

    def test_example3_precision(self):
        # Example 3's arithmetic: 14 true positives, B=4; one section in
        # 5 blocks -> precision 70%; three sections in 7 blocks -> 50%
        assert 14 / (5 * 4) == 0.7
        assert 14 / (7 * 4) == 0.5

    def test_global_cost_closed_form_equivalence(self):
        # Eq. 5 must equal the literal span F(pe) - F(ps) + 1
        rng = np.random.default_rng(1)
        for _ in range(20):
            slots = rng.permutation([0] * 4 + [1] * 4)
            sigma = BMC(tuple(int(s) for s in slots))
            q = RangeQuery((3, 1), (9, 13))
            assert global_cost_single(sigma, q) == sigma.value(q.hi) - sigma.value(q.lo) + 1


class TestSection5Formulation:
    def test_state_vector_ordering(self):
        # §5: sigma_t = <sigma[d*ell], ..., sigma[1]> with sigma[1] the
        # rightmost bit; our slots tuple is exactly that, LSB first
        sigma = BMC.from_string("XYZ" + "XYZ"[::-1])  # any d=3 curve
        assert sigma.slots[0] == sigma.from_string(sigma.to_string()).slots[0]

    def test_action_bounds(self):
        # A = {1 <= a <= d*ell - 1}
        sigma = BMC.zc(2, 3)
        assert not sigma.can_swap(0)
        assert not sigma.can_swap(sigma.nbits)
        assert any(sigma.can_swap(a) for a in range(1, sigma.nbits))

    def test_max_swaps_bound(self):
        # §5: any bit reaches its target within (d-1)*ell adjacent swaps
        # of other-dimension bits; check the bound is attainable: move
        # the LSB X bit of ZC to the top via repeated valid swaps
        sigma = BMC.zc(2, 4)
        moved = 0
        pos = 1
        cur = sigma
        while pos < cur.nbits and cur.can_swap(pos):
            cur = cur.swap(pos)
            pos += 1
            moved += 1
        assert moved <= (2 - 1) * 4

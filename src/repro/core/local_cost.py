"""Local cost of a BMC over a query workload — Section 4.2.

The local cost of a query is its number of *query sections* (maximal
runs of consecutive curve values inside the query, Definition 3).  Via
the identity ``S(q) = V(q) - E(q)`` (Eq. 3/7) counting sections reduces
to counting *directed edges*, and each directed edge decomposes into a
rise pattern in one dimension plus drop patterns in the others
(Section 4.2.1), all countable with O(1) closed forms.

Three computation paths are provided, mirroring the experiments:

* ``exact_sections`` / ``naive_local_cost`` — the "NLC" baseline that
  materializes the V(q) cells of each query and counts runs of
  consecutive curve values (O(V log V) per query per BMC).
* ``count_edges_single`` — closed-form per-query edge count,
  O(d * ell) per query per BMC.
* ``PatternTables`` — Algorithms 1 & 2: an O(n)-time, BMC-independent
  initialization ("ILC") after which any BMC's workload local cost is
  computed in O(d * ell) = O(1) ("LC").
"""
from __future__ import annotations

from functools import lru_cache

import numpy as np

from .bmc import BMC
from .patterns import count_drop, count_rise, drop_matrix, rise_matrix
from .query import RangeQuery, queries_to_arrays

# ---------------------------------------------------------------------------
# Brute-force baseline (NLC)
# ---------------------------------------------------------------------------


def exact_sections(sigma: BMC, q: RangeQuery) -> int:
    """Count query sections by materializing every cell of ``q``.

    This is the paper's naive baseline: O(V(q)) work per query."""
    vals = np.sort(sigma.values(q.cells_array()))
    if len(vals) == 0:
        return 0
    return 1 + int(np.count_nonzero(np.diff(vals) > 1))


def exact_edges(sigma: BMC, q: RangeQuery) -> int:
    """Directed edges in ``q`` by brute force (for cross-validation)."""
    vals = np.sort(sigma.values(q.cells_array()))
    return int(np.count_nonzero(np.diff(vals) == 1))


def naive_local_cost(sigma: BMC, queries: list[RangeQuery]) -> int:
    """NLC: total number of query sections, brute force per query."""
    return sum(exact_sections(sigma, q) for q in queries)


# ---------------------------------------------------------------------------
# Closed-form per-query edge counting
# ---------------------------------------------------------------------------


@lru_cache(maxsize=4096)
def _drop_profile(slots: tuple[int, ...]) -> tuple[tuple[tuple[int, ...], ...], ...]:
    """For each (rise dim b, rise level k): how many low bits of every
    *other* dimension sit below the rise bit in the BMC.

    ``profile[b][k-1]`` is the tuple ``(c_i for i != b, ascending i)``
    used to look up the matching drop patterns — the paper's ``get_col``.
    BMC dependent, O(d^2 * ell) once per curve (cached on the slot
    tuple)."""
    sigma = BMC(slots)
    d, ell = sigma.d, sigma.ell
    # below[r][i] = number of dim-i slots with rank < r
    below = np.zeros((d * ell + 1, d), dtype=np.int64)
    for r, dim in enumerate(slots):
        below[r + 1] = below[r]
        below[r + 1][dim] += 1
    profile = []
    for b in range(d):
        per_k = []
        for k in range(1, ell + 1):
            r = sigma.gamma[b][k - 1]
            per_k.append(tuple(int(below[r][i]) for i in range(d) if i != b))
        profile.append(tuple(per_k))
    return tuple(profile)


def drop_profile(sigma: BMC):
    """Public accessor for the cached get_col profile of ``sigma``."""
    return _drop_profile(sigma.slots)


def count_edges_single(sigma: BMC, q: RangeQuery) -> int:
    """Closed-form ``E_sigma(q)`` (Eq. 8/9) in O(d * ell) time."""
    if q.d != sigma.d:
        raise ValueError("query/curve dimensionality mismatch")
    d, ell = sigma.d, sigma.ell
    profile = drop_profile(sigma)
    other_dims = [[i for i in range(d) if i != b] for b in range(d)]
    edges = 0
    for b in range(d):
        for k in range(1, ell + 1):
            n_rise = count_rise(q.lo[b], q.hi[b], k)
            if n_rise == 0:
                continue
            prod = n_rise
            for i, c in zip(other_dims[b], profile[b][k - 1]):
                prod *= count_drop(q.lo[i], q.hi[i], c)
                if prod == 0:
                    break
            edges += prod
    return edges


def sections_via_patterns(sigma: BMC, q: RangeQuery) -> int:
    """``S_sigma(q) = V(q) - E_sigma(q)`` (Eq. 7) in O(1) time."""
    return q.n_cells - count_edges_single(sigma, q)


# ---------------------------------------------------------------------------
# Pattern tables (Algorithms 1 and 2)
# ---------------------------------------------------------------------------


class PatternTables:
    """BMC-independent pattern tables for a workload (Definition 7).

    One dense table per dimension ``b`` with shape
    ``(ell, ell+1, ..., ell+1)`` — axis 0 is the rise level ``k`` and the
    ``d-1`` trailing axes are the per-other-dimension drop levels
    ``c_i`` (ascending dimension index, ``b`` skipped).  Entry
    ``[k-1, c_1, ..., c_{d-1}]`` holds
    ``sum_q N(R_b^k) * prod_i N(D_i^{c_i})`` (Algorithm 1, vectorized
    as one einsum over the workload).

    After this O(n) initialization ("ILC"), :meth:`local_cost` scores
    any BMC in O(d * ell) table lookups (Algorithm 2, "LC").
    """

    def __init__(self, queries: list[RangeQuery], d: int, ell: int):
        lo, hi = queries_to_arrays(queries)
        if lo.shape[1] != d:
            raise ValueError(f"workload is {lo.shape[1]}-dimensional, expected {d}")
        if np.any(hi >= (1 << ell)):
            raise ValueError(f"query coordinates exceed 2^{ell} - 1")
        self.d, self.ell, self.n = d, ell, len(queries)
        # V = sum of cell counts, BMC independent (Eq. 10 first term).
        self.total_cells = int(np.prod(hi - lo + 1, axis=1, dtype=object).sum())
        rises = [rise_matrix(lo[:, i], hi[:, i], ell) for i in range(d)]
        drops = [drop_matrix(lo[:, i], hi[:, i], ell) for i in range(d)]
        letters = "abcdefgh"
        self.tables: list[np.ndarray] = []
        for b in range(d):
            others = [i for i in range(d) if i != b]
            sub_in = ["nk"] + [f"n{letters[t]}" for t in range(len(others))]
            sub_out = "k" + "".join(letters[t] for t in range(len(others)))
            operands = [rises[b]] + [drops[i] for i in others]
            self.tables.append(
                np.einsum(",".join(sub_in) + "->" + sub_out, *operands)
            )

    def edges(self, sigma: BMC) -> int:
        """Algorithm 2's accumulation: total directed edges over Q."""
        if sigma.d != self.d or sigma.ell != self.ell:
            raise ValueError("BMC shape does not match the fitted workload")
        profile = drop_profile(sigma)
        total = 0
        for b in range(self.d):
            table = self.tables[b]
            for k in range(1, self.ell + 1):
                total += int(table[(k - 1, *profile[b][k - 1])])
        return total

    def local_cost(self, sigma: BMC) -> int:
        """Total workload local cost ``V - E_sigma`` (Algorithm 2)."""
        return self.total_cells - self.edges(sigma)

    @staticmethod
    def merge(parts: list["PatternTables"]) -> "PatternTables":
        """Combine tables fitted on disjoint query partitions.

        Tables and cell totals are additive over queries — the basis for
        the Spark per-partition initialization."""
        if not parts:
            raise ValueError("nothing to merge")
        first = parts[0]
        out = object.__new__(PatternTables)
        out.d, out.ell = first.d, first.ell
        out.n = sum(p.n for p in parts)
        out.total_cells = sum(p.total_cells for p in parts)
        out.tables = [np.zeros_like(t) for t in first.tables]
        for p in parts:
            if (p.d, p.ell) != (first.d, first.ell):
                raise ValueError("mismatched table shapes")
            for acc, t in zip(out.tables, p.tables):
                acc += t
        return out

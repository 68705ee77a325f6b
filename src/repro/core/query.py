"""Range queries over the discretized grid — Definition 1.

A query is an axis-aligned box of grid cells, inclusive on both ends in
every dimension: ``[lo[i], hi[i]]`` are cell coordinates (column
indices), not raw data values.  ``n_cells`` is the paper's ``V(q)``.
"""
from __future__ import annotations

import itertools
from dataclasses import dataclass

import numpy as np


@dataclass(frozen=True)
class RangeQuery:
    """Inclusive cell-coordinate box ``[lo[i], hi[i]]`` per dimension."""

    lo: tuple[int, ...]
    hi: tuple[int, ...]

    def __post_init__(self) -> None:
        if len(self.lo) != len(self.hi):
            raise ValueError("lo/hi dimensionality mismatch")
        for a, b in zip(self.lo, self.hi):
            if a < 0 or b < a:
                raise ValueError(f"invalid range [{a}, {b}]")

    @property
    def d(self) -> int:
        return len(self.lo)

    @property
    def n_cells(self) -> int:
        """The paper's ``V(q)`` — number of grid cells inside the query.

        O(d) as stated in Section 4.2."""
        v = 1
        for a, b in zip(self.lo, self.hi):
            v *= b - a + 1
        return v

    def extent(self, dim: int) -> int:
        """Inclusive side length along ``dim``."""
        return self.hi[dim] - self.lo[dim] + 1

    def contains(self, point) -> bool:
        return all(a <= x <= b for a, x, b in zip(self.lo, point, self.hi))

    def cells(self):
        """Iterate every cell coordinate tuple inside the query.

        Exponential in d — only for brute-force baselines and tests."""
        return itertools.product(*(range(a, b + 1) for a, b in zip(self.lo, self.hi)))

    def cells_array(self) -> np.ndarray:
        """All cells as an (V, d) uint64 array (brute-force helper)."""
        grids = np.meshgrid(
            *(np.arange(a, b + 1, dtype=np.uint64) for a, b in zip(self.lo, self.hi)),
            indexing="ij",
        )
        return np.stack([g.ravel() for g in grids], axis=1)

    def clip(self, lo: tuple[int, ...], hi: tuple[int, ...]) -> "RangeQuery | None":
        """Intersect with the box ``[lo, hi]``; ``None`` if disjoint."""
        nlo = tuple(max(a, c) for a, c in zip(self.lo, lo))
        nhi = tuple(min(b, c) for b, c in zip(self.hi, hi))
        if any(a > b for a, b in zip(nlo, nhi)):
            return None
        return RangeQuery(nlo, nhi)

    def corners(self) -> tuple[tuple[int, ...], tuple[int, ...]]:
        """The paper's ``p_s`` and ``p_e`` (Corollary 1)."""
        return self.lo, self.hi


def queries_to_arrays(queries: list[RangeQuery]) -> tuple[np.ndarray, np.ndarray]:
    """Stack a workload into (n, d) ``lo`` and ``hi`` arrays."""
    if not queries:
        raise ValueError("empty workload")
    d = queries[0].d
    if any(q.d != d for q in queries):
        raise ValueError("mixed dimensionality workload")
    lo = np.array([q.lo for q in queries], dtype=np.int64)
    hi = np.array([q.hi for q in queries], dtype=np.int64)
    return lo, hi

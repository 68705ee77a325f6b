"""Curve-ordered block storage and block-access accounting.

The paper's query-efficiency metric is "the average number of block
accesses as reported by PostgreSQL" after ordering the data points by an
SFC and indexing the 1-D curve values with a B+-tree (Section 6.1).  We
reproduce that substrate directly: points are sorted by curve value and
packed ``B`` per block (the paper's block size ``B``, §4.2 Intuition);
a range query must fetch every block that holds at least one matching
point.  This is exactly the quantity the paper's §4.2 intuition
analyses — each query section can add up to two boundary blocks that
mostly contain non-matching points — so the *relative* ordering of SFCs
under this metric matches the PostgreSQL measurements.

Default block size: 204 points/block ≈ an 8 KB PostgreSQL heap page
holding 2-D points with a rowid (3 * 8 bytes + tuple overhead ~40 B).
"""
from __future__ import annotations

import numpy as np

from repro.core.query import RangeQuery

DEFAULT_BLOCK_SIZE = 204


class BlockStore:
    """Points sorted by a 1-D curve value, packed ``block_size`` per block."""

    def __init__(
        self,
        points: np.ndarray,
        curve_values: np.ndarray,
        block_size: int = DEFAULT_BLOCK_SIZE,
    ):
        pts = np.asarray(points)
        vals = np.asarray(curve_values)
        if pts.ndim != 2 or len(pts) != len(vals):
            raise ValueError("points must be (n, d) aligned with curve_values")
        if block_size < 1:
            raise ValueError("block size must be >= 1")
        order = np.argsort(vals, kind="stable")
        self.points = pts[order]
        self.values = vals[order]
        self.block_size = block_size
        self.n_blocks = -(-len(pts) // block_size) if len(pts) else 0
        # block id of each (sorted) point
        self._block_of = np.arange(len(pts)) // block_size

    def query(self, q: RangeQuery) -> tuple[int, int]:
        """Execute a range query; returns (result count, blocks accessed).

        Blocks accessed = distinct blocks holding >= 1 matching point —
        the B+-tree fetches each such block exactly once regardless of
        how many query sections land in it."""
        if q.d != self.points.shape[1]:
            raise ValueError("query dimensionality mismatch")
        mask = np.ones(len(self.points), dtype=bool)
        for i in range(q.d):
            col = self.points[:, i]
            mask &= (col >= q.lo[i]) & (col <= q.hi[i])
        n = int(mask.sum())
        if n == 0:
            return 0, 0
        blocks = int(np.unique(self._block_of[mask]).size)
        return n, blocks

    def avg_block_accesses(self, queries: list[RangeQuery]) -> float:
        """Average blocks accessed per query — the paper's core metric."""
        if not queries:
            raise ValueError("empty workload")
        return float(np.mean([self.query(q)[1] for q in queries]))

    def precision(self, q: RangeQuery) -> float:
        """Fraction of fetched tuples that match (§4.2 Intuition).

        ``V(q) / (blocks * B)`` in the paper's notation, with the actual
        last-block occupancy accounted for."""
        n, blocks = self.query(q)
        if blocks == 0:
            return 1.0
        fetched = 0
        for b in np.unique(self._block_of[self._match_mask(q)]):
            start = b * self.block_size
            fetched += min(self.block_size, len(self.points) - start)
        return n / fetched

    def _match_mask(self, q: RangeQuery) -> np.ndarray:
        mask = np.ones(len(self.points), dtype=bool)
        for i in range(q.d):
            col = self.points[:, i]
            mask &= (col >= q.lo[i]) & (col <= q.hi[i])
        return mask


def order_by_curve(points: np.ndarray, value_fn) -> BlockStore:
    """Convenience: build a store using ``value_fn(points) -> values``."""
    return BlockStore(points, value_fn(np.asarray(points)))

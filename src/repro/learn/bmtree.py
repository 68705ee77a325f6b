"""BMTree-lite — piecewise BMC learner (competitor + host, [Li et al. 2023]).

The original BMTree learns a *piecewise* BMC: a binary tree where every
internal node picks which dimension contributes the next most
significant bit for the points in its subspace, splitting the subspace
in half on that bit; below depth ``h`` a fixed interleaved curve fills
the remaining bits.  The released implementation drives the choice with
sampled-data empirical query costs ("SP"); the paper's contribution is
to swap that reward for the constant-time GC/LC estimators
("BMTree-GC" / "BMTree-LC", §6.3).

This is a greedy reproduction of that scheme (DESIGN.md documents the
substitution for the original MCTS driver): every node evaluates the
``d`` candidate dimensions with the configured reward and keeps the
best.  What the experiments measure — the *reward calculation time* and
its scaling (SP grows with the sampled dataset size, GC/LC do not) and
the query efficiency of the learned curve — is preserved, and all three
variants perform the identical number of reward evaluations.

Reward variants:

* ``"sp"`` — order the node's sampled points by the candidate curve,
  pack into blocks, execute the node's queries, count block accesses
  (the original BMTree's empirical estimate; cost ∝ sample size).
* ``"gc"`` — workload global cost (Eq. 6) of the node's queries.
* ``"lc"`` — workload local cost (Algorithms 1-2) of the node's queries.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np

from repro.core.bmc import BMC
from repro.core.global_cost import GlobalCostEstimator
from repro.core.local_cost import PatternTables
from repro.core.query import RangeQuery
from repro.storage.blockstore import BlockStore

REWARDS = ("sp", "gc", "lc")


def _fill_curve(prefix_msb: list[int], d: int, ell: int) -> BMC:
    """Complete a partial MSB-first dimension choice into a full BMC by
    interleaving the remaining bits round-robin."""
    used = [prefix_msb.count(i) for i in range(d)]
    if any(u > ell for u in used):
        raise ValueError("prefix uses more bits than available")
    rest: list[int] = []
    left = [ell - u for u in used]
    while any(left):
        for i in range(d):
            if left[i] > 0:
                rest.append(i)
                left[i] -= 1
    # slots are LSB-first: the filled remainder first (reversed so its
    # round-robin order reads MSB-first), then the prefix reversed on top
    msb_first = prefix_msb + rest
    return BMC(tuple(reversed(msb_first)))


@dataclass
class _Leaf:
    lo: tuple[int, ...]
    hi: tuple[int, ...]
    sigma: BMC


@dataclass
class BMTreeStats:
    """Bookkeeping the experiments report on."""

    reward_seconds: float = 0.0
    n_reward_evals: int = 0
    fit_seconds: float = 0.0
    n_nodes: int = 0
    n_leaves: int = 0
    sample_size: int = 0
    choices: list[int] = field(default_factory=list)


class BMTreeLite:
    """Greedy piecewise-BMC learner with pluggable reward."""

    def __init__(
        self,
        d: int,
        ell: int,
        h: int = 6,
        reward: str = "sp",
        sample_rate: float = 1e-3,
        reward_block_size: int = 8,
        seed: int = 0,
    ):
        if reward not in REWARDS:
            raise ValueError(f"reward must be one of {REWARDS}")
        if not 0 < sample_rate <= 1:
            raise ValueError("sample_rate in (0, 1]")
        if h < 1 or h > d * ell:
            raise ValueError("depth h out of range")
        self.d, self.ell, self.h = d, ell, h
        self.reward = reward
        self.sample_rate = sample_rate
        self.reward_block_size = reward_block_size
        self.seed = seed
        self.leaves: list[_Leaf] = []
        self.stats = BMTreeStats()

    # -- reward functions --------------------------------------------------
    def _score(
        self, sigma: BMC, queries: list[RangeQuery], sample: np.ndarray
    ) -> float:
        t0 = time.perf_counter()
        try:
            if self.reward == "sp":
                if len(sample) == 0 or not queries:
                    return 0.0
                store = BlockStore(sample, sigma.values(sample), self.reward_block_size)
                return store.avg_block_accesses(queries)
            if not queries:
                return 0.0
            if self.reward == "gc":
                return float(GlobalCostEstimator(queries, self.d, self.ell).cost(sigma))
            return float(PatternTables(queries, self.d, self.ell).local_cost(sigma))
        finally:
            self.stats.reward_seconds += time.perf_counter() - t0
            self.stats.n_reward_evals += 1

    # -- construction ------------------------------------------------------
    def fit(self, points: np.ndarray, queries: list[RangeQuery]) -> "BMTreeLite":
        """Learn the piecewise curve from data + workload.

        ``points`` is the full dataset; the SP reward samples
        ``sample_rate`` of it (the paper's ρ), GC/LC ignore the data."""
        t0 = time.perf_counter()
        pts = np.asarray(points, dtype=np.uint64)
        rng = np.random.default_rng(self.seed)
        if self.reward == "sp" and len(pts):
            k = max(1, int(len(pts) * self.sample_rate))
            sample = pts[rng.choice(len(pts), size=k, replace=False)]
        else:
            sample = pts[:0]
        self.stats.sample_size = len(sample)
        self.leaves = []
        top = (1 << self.ell) - 1
        self._build(
            lo=(0,) * self.d,
            hi=(top,) * self.d,
            prefix=[],
            queries=queries,
            sample=sample,
        )
        self.leaves.sort(key=lambda leaf: leaf.lo)
        self.stats.fit_seconds = time.perf_counter() - t0
        self.stats.n_leaves = len(self.leaves)
        return self

    def _build(self, lo, hi, prefix, queries, sample) -> None:
        depth = len(prefix)
        used = [prefix.count(i) for i in range(self.d)]
        candidates = [i for i in range(self.d) if used[i] < self.ell]
        if depth >= self.h or not candidates:
            self.leaves.append(_Leaf(lo, hi, _fill_curve(prefix, self.d, self.ell)))
            return
        self.stats.n_nodes += 1
        # clip the workload to this subspace
        local_q = [c for q in queries if (c := q.clip(lo, hi)) is not None]
        if len(candidates) == 1 or not local_q:
            best = candidates[depth % len(candidates)]
        else:
            scores = [
                self._score(_fill_curve(prefix + [i], self.d, self.ell), local_q, sample)
                for i in candidates
            ]
            best = candidates[int(np.argmin(scores))]
        self.stats.choices.append(best)
        # split on the most significant unused bit of `best`
        bit = self.ell - 1 - used[best]
        mid = lo[best] + (1 << bit)  # first cell of the upper half
        lo_hi = list(hi)
        lo_hi[best] = mid - 1
        hi_lo = list(lo)
        hi_lo[best] = mid
        in_upper = sample[:, best] >= mid if len(sample) else sample
        self._build(lo, tuple(lo_hi), prefix + [best], local_q, sample[~in_upper] if len(sample) else sample)
        self._build(tuple(hi_lo), hi, prefix + [best], local_q, sample[in_upper] if len(sample) else sample)

    # -- application -------------------------------------------------------
    def values(self, points: np.ndarray) -> np.ndarray:
        """Piecewise curve values for an (n, d) coordinate array.

        Each leaf's full BMC already places its path bits as the most
        significant output bits, so per-leaf evaluation yields a single
        globally consistent order."""
        if not self.leaves:
            raise RuntimeError("fit() first")
        pts = np.asarray(points, dtype=np.uint64)
        out = np.zeros(len(pts), dtype=np.uint64)
        assigned = np.zeros(len(pts), dtype=bool)
        for leaf in self.leaves:
            mask = ~assigned
            for i in range(self.d):
                mask &= (pts[:, i] >= leaf.lo[i]) & (pts[:, i] <= leaf.hi[i])
            if mask.any():
                out[mask] = leaf.sigma.values(pts[mask])
                assigned |= mask
        if not assigned.all():
            raise ValueError("points outside the grid domain")
        return out
